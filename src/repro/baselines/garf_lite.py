"""Garf-lite: self-supervised rule mining + rule-based repair.

Garf [47] trains a SeqGAN over the dirty data to generate explainable
repair rules, then applies them. A sequence GAN is out of scope for
this substrate (and out of the paper's evaluation focus — Garf's
results are driven by *which rules* survive, not by how they were
generated), so the lite version mines the same family of rules
directly: high-confidence approximate FDs ``X → Y`` discovered from the
dirty data with no prior knowledge or labels, applied where a tuple
disagrees with the rule's majority consequent.

Characteristic shape (paper Table 4): very high precision — a repair
fires only under a ≥95%-confidence rule — but low recall, since errors
outside rule scope (and all rule-less columns) are untouched.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.compensatory import corr_counts
from repro.core.cpt import cpt_counts
from repro.core.structure import edge_determinism
from repro.datasets.registry import CleaningTask

__all__ = ["GarfLite"]

_MIN_CONF = 0.90   # rule confidence threshold
_MIN_SUPPORT = 5   # mean majority count per determinant value


class GarfLite:
    def run(self, spark: SparkSession, task: CleaningTask) -> pd.DataFrame:
        dirty = task.dirty
        attrs = task.attrs
        sdf = spark.createDataFrame(dirty).cache()
        corr_pdf = corr_counts(sdf, attrs, {}, lam=0.0, beta=0.0, tau=0.0)

        # Rule discovery: single-determinant approximate FDs.
        rules: list[tuple[str, str, dict[str, tuple[str, float, float]]]] = []
        for x in attrs:
            for y in attrs:
                if x == y:
                    continue
                det, support = edge_determinism(corr_pdf, x, y)
                if det < _MIN_CONF or support < _MIN_SUPPORT:
                    continue
                pdf = cpt_counts(sdf, y, [x])
                groups = {}
                for xv, grp in pdf.groupby(x):
                    total = float(grp["cnt"].sum())
                    top = grp.loc[grp["cnt"].idxmax()]
                    groups[str(xv)] = (str(top[y]), float(top["cnt"]), total)
                rules.append((x, y, groups))
        sdf.unpersist()

        cols = {a: dirty[a].astype(str).fillna("").to_numpy(object)
                for a in attrs}
        out_cols = {a: cols[a].copy() for a in attrs}
        for x, y, groups in rules:
            xs, ys = cols[x], cols[y]
            for i in range(len(dirty)):
                xv = xs[i]
                if xv == "":
                    continue
                hit = groups.get(xv)
                if hit is None:
                    continue
                maj, cnt, total = hit
                # the rule fires only where the determinant group is
                # near-unanimous (rule confidence, not global confidence)
                if total >= _MIN_SUPPORT and cnt / total >= _MIN_CONF * 0.95:
                    if ys[i] != maj:
                        out_cols[y][i] = maj
        out = pd.DataFrame(out_cols)
        out.insert(0, "tid", dirty["tid"].astype(str).to_numpy())
        return out
