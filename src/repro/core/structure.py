"""Automatic BN skeleton construction (paper §4).

Pipeline (the FDX [65] recipe extended with similarity softening):

1. For each attribute, sort tuples by that attribute and pair each tuple
   with its sort-neighbor ("we first sort tuples according to each
   attribute, and only compute similarities and check equality within
   two adjacent tuples"). Each pair yields an m-dimensional observation:
   the per-attribute similarity between the two tuples.
2. Treat the observations as draws from a multivariate Gaussian and run
   the graphical lasso to obtain the precision matrix Θ.
3. Decompose Θ = (I − B) Ω (I − B)ᵀ by iteratively peeling sink nodes
   (Schur complements), recovering the autoregression matrix B — the
   weighted adjacency matrix of the BN skeleton.
4. Keep edges with |B[i, j]| above a weight threshold, capped to the
   ``max_parents`` strongest parents per node.

Step 1 is the data-parallel part and runs in Spark: the dataset is
range-partitioned and sorted by the pivot attribute, and a
``mapInPandas`` kernel emits one similarity row per adjacent pair
within each partition (pairs straddling partition boundaries are
dropped — at most ``numPartitions − 1`` of the n−1 pairs per pivot).
Steps 2–4 operate on an m×m matrix (m ≤ 15) on the driver.
"""
from __future__ import annotations

from typing import Iterable, Iterator, Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, functions as F
from pyspark.sql.types import DoubleType, StructField, StructType

from .glasso import empirical_covariance, graphical_lasso
from .similarity import similarity_series

__all__ = ["similarity_observations", "decompose_precision",
           "learn_skeleton", "edge_determinism"]


def edge_determinism(corr_pdf: pd.DataFrame, x: str, y: str) -> tuple[float, float]:
    """FD-ness of a candidate edge X → Y from pairwise co-occurrence
    counts (the Algorithm-2 output): ``det`` is the fraction of rows on
    which the majority Y-value per X-value would be correct (the
    confidence of the approximate FD X → Y), ``support`` the mean
    majority count. The cleaner drops auto-learned edges that are not
    FD-like — the paper's structure learning explicitly targets
    (softened) FDs, so a high-entropy conditional is a lasso artifact,
    not a dependency worth a CPT."""
    sub = corr_pdf[(corr_pdf["attr_i"] == y) & (corr_pdf["attr_j"] == x)]
    if not len(sub):
        return 0.0, 0.0
    per_x = sub.groupby("e")["cnt"]
    maxes = per_x.max()
    total = float(sub["cnt"].sum())
    det = float(maxes.sum()) / total if total else 0.0
    return det, float(maxes.mean())


def _pair_kernel(attrs: Sequence[str], numeric: set[str]):
    def kernel(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            if len(pdf) < 2:
                continue
            cur = pdf.iloc[1:].reset_index(drop=True)
            prev = pdf.iloc[:-1].reset_index(drop=True)
            out = {
                a: similarity_series(cur[a], prev[a], numeric=a in numeric)
                for a in attrs
            }
            yield pd.DataFrame(out)

    return kernel


def similarity_observations(
    df: DataFrame,
    attrs: Sequence[str],
    numeric_attrs: Iterable[str] = (),
    *,
    num_partitions: int = 8,
) -> DataFrame:
    """Adjacent-pair similarity observations, one DataFrame row per pair.

    Returns a DataFrame with one double column per attribute and
    ~m·(n−1) rows (the union over all m pivot sorts).
    """
    numeric = set(numeric_attrs)
    schema = StructType([StructField(a, DoubleType()) for a in attrs])
    kernel = _pair_kernel(attrs, numeric)
    parts = []
    for pivot in attrs:
        sorted_df = (
            df.select(*attrs)
            .repartitionByRange(num_partitions, F.col(pivot))
            .sortWithinPartitions(pivot)
        )
        parts.append(sorted_df.mapInPandas(kernel, schema=schema))
    out = parts[0]
    for p in parts[1:]:
        out = out.unionByName(p)
    return out


def decompose_precision(theta: np.ndarray) -> tuple[np.ndarray, list[int]]:
    """Recover the autoregression matrix B from Θ = (I−B)Ω(I−B)ᵀ.

    Peels sink nodes greedily: for a sink s, Θ[s,s] = ω_s and
    B[i, s] = −Θ[i, s] / Θ[s, s]; eliminating s is the Schur complement
    of Θ on the remaining block. The sink heuristic picks the active
    node with the smallest diagonal (smallest conditional precision
    contribution, exact under homogeneous noise — observations are
    standardized upstream). Returns (B, topological order, sources
    first).
    """
    theta = np.asarray(theta, dtype="float64")
    m = theta.shape[0]
    B = np.zeros((m, m))
    active = list(range(m))
    T = theta.copy()
    reverse_order: list[int] = []
    while active:
        diag = np.array([T[v, v] for v in active])
        s_pos = int(np.argmin(diag))
        s = active[s_pos]
        rest = [v for v in active if v != s]
        tss = T[s, s]
        if tss <= 1e-12:
            tss = 1e-12
        for i in rest:
            B[i, s] = -T[i, s] / tss
        # Schur complement: eliminate s from the active block.
        for i in rest:
            for j in rest:
                T[i, j] = T[i, j] - T[i, s] * T[s, j] / tss
        reverse_order.append(s)
        active = rest
    return B, list(reversed(reverse_order))


def learn_skeleton(
    obs: np.ndarray,
    attrs: Sequence[str],
    *,
    rho: float = 0.05,
    weight_threshold: float = 0.12,
    max_parents: int = 3,
) -> tuple[dict[str, list[str]], np.ndarray, list[str]]:
    """Full driver-side skeleton learning from an observation matrix.

    Returns ``(parents, B, topo_order)`` where ``parents[a]`` lists the
    parent attributes of ``a`` (strongest-|weight| first, at most
    ``max_parents``), ``B`` is the thresholded weight matrix, and
    ``topo_order`` is a topological order of the attributes.
    """
    obs = np.asarray(obs, dtype="float64")
    if obs.shape[1] != len(attrs):
        raise ValueError("observation width must equal len(attrs)")
    # Standardize columns so the homogeneous-noise sink heuristic holds;
    # constant columns (no similarity signal) are left as-is and end up
    # isolated after thresholding.
    std = obs.std(axis=0)
    std = np.where(std < 1e-9, 1.0, std)
    obs = (obs - obs.mean(axis=0)) / std
    S = empirical_covariance(obs)
    _, theta = graphical_lasso(S, rho=rho)
    B, order = decompose_precision(theta)
    m = len(attrs)
    parents: dict[str, list[str]] = {a: [] for a in attrs}
    for j in range(m):
        weights = [(abs(B[i, j]), i) for i in range(m)
                   if i != j and abs(B[i, j]) >= weight_threshold]
        weights.sort(reverse=True)
        kept = [i for _, i in weights[:max_parents]]
        parents[attrs[j]] = [attrs[i] for i in kept]
        for i in range(m):
            if i != j and i not in kept:
                B[i, j] = 0.0
    return parents, B, [attrs[i] for i in order]
