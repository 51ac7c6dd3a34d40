"""Benchmark behind Table 5: BClean_PI on the sampled Soccer dataset."""
from repro.datasets.registry import load_task
from repro.eval.harness import run_method


def test_bench_sampled_soccer(benchmark, spark):
    task = load_task("soccer", scale=0.0125, seed=17)  # the 1/4 sample
    res = benchmark.pedantic(
        lambda: run_method(spark, "BClean_PI", task), rounds=1, iterations=1)
    assert res.scores.recall > 0.3
