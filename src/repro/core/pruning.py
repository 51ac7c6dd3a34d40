"""Pruning strategies (paper §6.2) as pure numpy kernels.

Both operate on the dense per-cell gather vectors the inference kernel
already computes, so they are unit-testable in isolation:

* ``tuple_filter`` — Filter(T, A_i): the mean, over evidence
  attributes, of count(T[A_i], T[A_k]) / count(T[A_k]). Cells with
  Filter ≥ τ_clean are "relatively reliable" and skip inference.
* ``domain_prune_mask`` — TF-IDF candidate pruning over the
  sub-network: score(v) = context(v) · log(|D| / (1 + count(v, D))),
  where context(v) counts the blanket evidence values v co-occurs
  with; only the top-K positive-score candidates stay.
"""
from __future__ import annotations

import numpy as np

__all__ = ["tuple_filter", "domain_prune_mask"]


def tuple_filter(orig_code: int, cnt_vecs: list[np.ndarray],
                 evidence_counts: list[float]) -> float:
    """Filter(T, A_i) over the available (non-missing) evidence columns.

    ``cnt_vecs[k][c]`` is count(c, T[A_k]) over dom(A_i);
    ``evidence_counts[k]`` is count(T[A_k]). Returns 0 when there is no
    usable evidence (the cell then always qualifies for inference).
    """
    if orig_code < 0 or not cnt_vecs:
        return 0.0
    acc, used = 0.0, 0
    for vec, denom in zip(cnt_vecs, evidence_counts):
        if denom <= 0:
            continue
        acc += vec[orig_code] / denom
        used += 1
    return acc / used if used else 0.0


def domain_prune_mask(cnt_vecs_blanket: list[np.ndarray],
                      value_counts: np.ndarray, n_rows: int,
                      top_k: int = 32) -> np.ndarray:
    """Boolean keep-mask over the candidate domain (§6.2 domain pruning).

    With no blanket evidence every candidate survives (nothing to prune
    against). Otherwise candidates must co-occur with at least one
    blanket evidence value and rank in the top-K by TF-IDF.
    """
    dom = len(value_counts)
    if not cnt_vecs_blanket:
        return np.ones(dom, dtype=bool)
    context = np.zeros(dom, dtype="float64")
    for vec in cnt_vecs_blanket:
        context += (vec > 0).astype("float64")
    with np.errstate(divide="ignore"):
        idf = np.log(n_rows / (1.0 + value_counts))
    score = context * np.maximum(idf, 1e-9)  # keep IDF positive so
    # context alone decides candidacy even for very frequent values
    keep = score > 0
    if keep.sum() > top_k:
        kth = np.partition(score, dom - top_k)[dom - top_k]
        keep &= score >= kth
    return keep
