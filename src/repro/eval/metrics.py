"""Cleaning-quality metrics (paper §7.1).

* precision — correctly repaired errors / cells modified by the system;
* recall    — correctly repaired errors / errors with ground truth;
* F1        — harmonic mean.

``per_type_recall`` splits recall by the injected error type using the
error log from ``repro.datasets.errors`` (paper Table 6 does exactly
this and skips precision, "as it is challenging to determine which type
of error a corrected value originally belongs to").
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd

__all__ = ["Scores", "score_repair", "per_type_recall"]


@dataclass(frozen=True)
class Scores:
    precision: float
    recall: float
    f1: float
    n_errors: int
    n_modified: int
    n_correct: int

    def row(self) -> tuple[float, float, float]:
        return (self.precision, self.recall, self.f1)


def _aligned(clean: pd.DataFrame, dirty: pd.DataFrame,
             repaired: pd.DataFrame) -> tuple[pd.DataFrame, ...]:
    attrs = [c for c in clean.columns if c != "tid"]
    frames = []
    for df in (clean, dirty, repaired):
        f = df.copy()
        f["tid"] = f["tid"].astype(str)
        frames.append(
            f.set_index("tid")[attrs].fillna("").astype(str))
    c, d, r = frames
    r = r.reindex(c.index)
    d = d.reindex(c.index)
    return c, d, r


def score_repair(clean: pd.DataFrame, dirty: pd.DataFrame,
                 repaired: pd.DataFrame) -> Scores:
    """Cell-level precision/recall/F1 of ``repaired`` w.r.t. ground truth."""
    c, d, r = _aligned(clean, dirty, repaired)
    errors = (d != c)
    modified = (r != d)
    correct = modified & (r == c)
    n_err = int(errors.to_numpy().sum())
    n_mod = int(modified.to_numpy().sum())
    n_cor = int(correct.to_numpy().sum())
    p = n_cor / n_mod if n_mod else 0.0
    rec = n_cor / n_err if n_err else 0.0
    f1 = 2 * p * rec / (p + rec) if (p + rec) else 0.0
    return Scores(p, rec, f1, n_err, n_mod, n_cor)


def per_type_recall(clean: pd.DataFrame, dirty: pd.DataFrame,
                    repaired: pd.DataFrame,
                    errors: pd.DataFrame) -> dict[str, float]:
    """Recall split by injected error type (paper Table 6)."""
    c, _, r = _aligned(clean, dirty, repaired)
    out: dict[str, float] = {}
    for etype, grp in errors.groupby("type"):
        total, fixed = 0, 0
        for tid, attr in zip(grp["tid"].astype(str), grp["attr"]):
            if tid not in c.index:
                continue
            total += 1
            if r.at[tid, attr] == c.at[tid, attr]:
                fixed += 1
        out[str(etype)] = fixed / total if total else 0.0
    return out
