"""User constraints (UCs, paper §2).

A UC is any binary function over a cell value. The paper's primary
forms — min/max length (or min/max numeric value), not-null, and
regular expressions — are first-class and evaluate vectorized over
pandas Series; an arbitrary ``predicate`` hook covers the general case
("any function that returns a binary output").

Missing values (None / NaN / empty string) violate every UC except the
trivial one with ``not_null=False`` and no other clauses — matching the
paper's use of non-null constraints to force inference of M errors.
"""
from __future__ import annotations

import re
from dataclasses import dataclass, field, replace
from typing import Callable, Optional

import numpy as np
import pandas as pd

__all__ = ["UC", "TRUE_UC", "uc_mask", "strip_uc_kinds"]


def _missing_mask(s: pd.Series) -> np.ndarray:
    vals = s.astype("object")
    return (vals.isna() | (vals == "")).to_numpy(dtype=bool)


@dataclass(frozen=True)
class UC:
    """Conjunction of simple user constraints on one attribute."""

    min_len: Optional[int] = None
    max_len: Optional[int] = None
    not_null: bool = True
    pattern: Optional[str] = None  # full-match regular expression
    min_value: Optional[float] = None
    max_value: Optional[float] = None
    predicate: Optional[Callable[[str], bool]] = field(default=None, compare=False)

    def check(self, v) -> int:
        """1 if ``v`` satisfies the constraint conjunction, else 0."""
        return int(self.check_series(pd.Series([v], dtype="object"))[0])

    def check_series(self, s: pd.Series) -> np.ndarray:
        """Vectorized UC over a Series of raw (string) cell values."""
        s = s.astype("object")
        missing = _missing_mask(s)
        ok = np.ones(len(s), dtype=bool)
        text = s.where(~missing, "").astype(str)
        if self.min_len is not None:
            ok &= text.str.len().to_numpy() >= self.min_len
        if self.max_len is not None:
            ok &= text.str.len().to_numpy() <= self.max_len
        if self.pattern is not None:
            rx = re.compile(self.pattern)
            ok &= text.map(lambda x: rx.fullmatch(x) is not None).to_numpy(dtype=bool)
        if self.min_value is not None or self.max_value is not None:
            num = pd.to_numeric(text, errors="coerce")
            valid = ~num.isna().to_numpy()
            ok &= valid
            arr = num.to_numpy(dtype="float64")
            with np.errstate(invalid="ignore"):
                if self.min_value is not None:
                    ok &= np.where(valid, arr >= self.min_value, False)
                if self.max_value is not None:
                    ok &= np.where(valid, arr <= self.max_value, False)
        if self.predicate is not None:
            ok &= text.map(lambda x: bool(self.predicate(x))).to_numpy(dtype=bool)
        # Missing values: fail if not_null, or if any other clause exists
        # (a NULL cannot satisfy a length/pattern/value requirement).
        has_clause = any(
            x is not None
            for x in (self.min_len, self.max_len, self.pattern,
                      self.min_value, self.max_value, self.predicate)
        )
        if self.not_null or has_clause:
            ok &= ~missing
        return ok


TRUE_UC = UC(not_null=False)
"""The vacuous constraint: everything (including NULL) passes."""


def uc_mask(ucs: dict[str, UC], attr: str, values: pd.Series) -> np.ndarray:
    """Boolean mask of UC-satisfying values for ``attr`` (True_UC if
    the attribute has no declared constraint)."""
    return ucs.get(attr, TRUE_UC).check_series(values)


def strip_uc_kinds(ucs: dict[str, UC], kinds: set[str]) -> dict[str, UC]:
    """Remove constraint kinds for the Figure-5-style ablation.

    ``kinds`` ⊆ {"Max", "Min", "Nul", "Pat"}; "Max"/"Min" strip both the
    length and numeric-value bounds of that polarity.
    """
    out = {}
    for a, uc in ucs.items():
        kw = {}
        if "Max" in kinds:
            kw.update(max_len=None, max_value=None)
        if "Min" in kinds:
            kw.update(min_len=None, min_value=None)
        if "Nul" in kinds:
            kw.update(not_null=False)
        if "Pat" in kinds:
            kw.update(pattern=None)
        out[a] = replace(uc, **kw)
    return out
