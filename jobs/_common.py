"""Shared plumbing for the per-table jobs.

Each job is a spark-submit entrypoint: ``spark-submit jobs/tableN_*.py``
(or plain ``python jobs/tableN_*.py``). Jobs expose ``run(spark)``
returning the table as a pandas DataFrame and print it in the paper's
row layout, so outputs can be diffed against EXPERIMENTS.md.

``REPRO_SCALE`` (env var, default 1.0) scales every dataset for quick
smoke runs: ``REPRO_SCALE=0.1 python jobs/table4_quality.py``.
"""
from __future__ import annotations

import os
import sys

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] --driver-memory 16g "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    spark = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "32")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    return spark


def scale() -> float:
    return float(os.environ.get("REPRO_SCALE", "1.0"))


def main(run, app: str):
    spark = get_spark(app)
    try:
        out = run(spark)
        if out is not None:
            print(out.to_string(index=False))
    finally:
        spark.stop()
    return 0


def log(msg: str):
    print(f"[job] {msg}", file=sys.stderr, flush=True)
