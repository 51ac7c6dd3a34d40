"""Benchmark behind Table 6: per-error-type evaluation pipeline."""
from repro.datasets.registry import load_task
from repro.eval.harness import run_method


def test_bench_type_recall_inpatient(benchmark, spark):
    task = load_task("inpatient", scale=0.15, error_types=("T", "M", "I"),
                     seed=2)

    def work():
        r = run_method(spark, "BClean_PI", task)
        return r.type_recall(task)

    out = benchmark.pedantic(work, rounds=1, iterations=1)
    assert set(out) == {"T", "M", "I"}
