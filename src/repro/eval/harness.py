"""Experiment harness: run a cleaning method on a task, time it, score it.

``run_method(spark, method, task)`` dispatches by method name (the
paper's Table 4 row labels) and returns a ``RunResult`` with the
repaired frame, wall-clock execution time, and quality scores. All
jobs and benchmarks funnel through this single entry point so Table 4,
5, 6 and 7 are different views over the same runs.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.garf_lite import GarfLite
from repro.baselines.holoclean_lite import HoloCleanLite
from repro.baselines.pclean_lite import PCleanLite
from repro.baselines.raha_baran_lite import RahaBaranLite
from repro.core.cleaner import BClean
from repro.datasets.registry import CleaningTask
from .metrics import Scores, per_type_recall, score_repair

__all__ = ["RunResult", "run_method", "METHODS", "BCLEAN_VARIANTS"]

BCLEAN_VARIANTS = {
    "BClean-UC": dict(variant="PI", use_ucs=False),
    "BClean": dict(variant="base", use_ucs=True),
    "BClean_PI": dict(variant="PI", use_ucs=True),
    "BClean_PIP": dict(variant="PIP", use_ucs=True),
}

METHODS = list(BCLEAN_VARIANTS) + [
    "PClean", "HoloClean", "Raha+Baran", "Garf",
]


@dataclass
class RunResult:
    method: str
    dataset: str
    repaired: pd.DataFrame
    exec_seconds: float
    scores: Scores

    def type_recall(self, task: CleaningTask) -> dict[str, float]:
        return per_type_recall(task.clean, task.dirty, self.repaired,
                               task.errors)


def _run_bclean(spark: SparkSession, task: CleaningTask,
                **overrides) -> pd.DataFrame:
    kw = dict(overrides)
    bc = BClean(kw.pop("variant", "PI"), **kw)
    bc.fit(spark, task.dirty, ucs=task.ucs,
           numeric_attrs=task.numeric_attrs, bn_edits=task.bn_edits)
    return bc.clean()


def run_method(spark: SparkSession, method: str, task: CleaningTask,
               **overrides) -> RunResult:
    t0 = time.perf_counter()
    if method in BCLEAN_VARIANTS:
        kw = dict(BCLEAN_VARIANTS[method])
        kw.update(overrides)
        repaired = _run_bclean(spark, task, **kw)
    elif method == "PClean":
        repaired = PCleanLite().run(spark, task)
    elif method == "HoloClean":
        repaired = HoloCleanLite().run(spark, task)
    elif method == "Raha+Baran":
        repaired = RahaBaranLite().run(spark, task)
    elif method == "Garf":
        repaired = GarfLite().run(spark, task)
    else:
        raise KeyError(f"unknown method {method!r}; choose from {METHODS}")
    dt = time.perf_counter() - t0
    scores = score_repair(task.clean, task.dirty, repaired)
    return RunResult(method, task.name, repaired, dt, scores)
