"""Seeded error injection (paper §7.1, "Error Injection").

Four error types, following the Raha+Baran / HoloClean benchmarks:

* ``T`` (typo)          — randomly add, delete, or replace one character;
* ``M`` (missing)       — replace the value with NULL (we use ``""``);
* ``I`` (inconsistency) — interchange with a value from another column's
                          domain, or with a different value from the
                          same column's domain;
* ``S`` (swap)          — swap the values of two rows within the same
                          attribute (both cells become errors).

``inject_errors`` returns ``(dirty, errors)`` where ``errors`` is a log
DataFrame of (tid, attr, type, clean_value, dirty_value) — the ground
truth used by the metrics in ``repro.eval.metrics``. The injector never
produces a "dirty" value equal to the clean one, so the error log is
exact. Type frequencies are balanced across the requested types, as in
the paper ("their frequencies do not exhibit a significant
difference").
"""
from __future__ import annotations

import numpy as np
import pandas as pd

__all__ = ["inject_errors"]

_CHARS = "abcdefghijklmnopqrstuvwxyz0123456789"


def _typo(g: np.random.Generator, v: str) -> str:
    for _ in range(8):  # retry until the typo actually changes the value
        op = g.choice(["add", "del", "rep"]) if len(v) > 1 else "add"
        pos = int(g.integers(0, max(1, len(v))))
        if op == "add":
            out = v[:pos] + str(g.choice(list(_CHARS))) + v[pos:]
        elif op == "del":
            out = v[:pos] + v[pos + 1:]
        else:
            out = v[:pos] + str(g.choice(list(_CHARS))) + v[pos + 1:]
        if out != v:
            return out
    return v + "x"


def _inconsistent(g: np.random.Generator, v: str, own_domain: np.ndarray,
                  other_domain: np.ndarray) -> str:
    # 50/50: foreign-column value (format-violating) vs same-column
    # different value (FD-violating), per the paper's two I sub-kinds.
    pool = other_domain if g.random() < 0.5 and len(other_domain) else own_domain
    cand = pool[pool != v]
    if len(cand) == 0:
        return _typo(g, v)
    return str(cand[int(g.integers(0, len(cand)))])


def inject_errors(
    clean: pd.DataFrame,
    *,
    rate: float,
    types: tuple[str, ...] = ("T", "M", "I"),
    seed: int = 0,
    attrs: list[str] | None = None,
) -> tuple[pd.DataFrame, pd.DataFrame]:
    """Inject errors into ``rate`` fraction of the targeted cells.

    ``attrs`` restricts injection (default: every column except
    ``tid``). The dirty frame keeps the clean dtypes (all strings).
    """
    if not 0 <= rate < 1:
        raise ValueError("rate must be in [0, 1)")
    for t in types:
        if t not in ("T", "M", "I", "S"):
            raise ValueError(f"unknown error type {t!r}")
    g = np.random.default_rng(seed)
    dirty = clean.copy()
    target_attrs = [a for a in (attrs or clean.columns) if a != "tid"]
    n = len(clean)
    n_cells = n * len(target_attrs)
    n_err = int(round(rate * n_cells))
    domains = {a: clean[a].unique() for a in target_attrs}

    # Sample distinct target cells, then deal error types round-robin so
    # frequencies are balanced.
    flat = g.choice(n_cells, size=n_err, replace=False)
    cells = [(int(f % n), target_attrs[int(f // n)]) for f in flat]
    g.shuffle(cells)
    log: list[dict] = []
    used = set(cells)
    for k, (row, attr) in enumerate(cells):
        etype = types[k % len(types)]
        col = dirty.columns.get_loc(attr)
        v = str(dirty.iat[row, col])
        if etype == "T":
            new = _typo(g, v)
        elif etype == "M":
            new = ""
        elif etype == "I":
            other = target_attrs[int(g.integers(0, len(target_attrs)))]
            new = _inconsistent(g, v, domains[attr], domains[other])
        else:  # S — swap with a random other row whose value differs
            partner = None
            for _ in range(16):
                p = int(g.integers(0, n))
                pv = str(dirty.iat[p, col])
                if p != row and pv != v and (p, attr) not in used:
                    partner = p
                    break
            if partner is None:
                new = _typo(g, v)  # degenerate column: fall back to typo
            else:
                pv = str(dirty.iat[partner, col])
                dirty.iat[partner, col] = v
                used.add((partner, attr))
                log.append({"tid": str(clean.iloc[partner]["tid"]),
                            "attr": attr, "type": "S",
                            "clean_value": pv, "dirty_value": v})
                new = pv
        if new == v:
            continue
        dirty.iat[row, col] = new
        log.append({"tid": str(clean.iloc[row]["tid"]), "attr": attr,
                    "type": etype, "clean_value": v, "dirty_value": new})
    errors = pd.DataFrame(
        log, columns=["tid", "attr", "type", "clean_value", "dirty_value"])
    return dirty, errors
