"""Benchmark behind Table 4: BClean_PI end-to-end per dataset."""
import pytest

from repro.eval.harness import run_method


@pytest.mark.parametrize("name", ["hospital", "flights", "beers"])
def test_bench_bclean_pi_quality_run(benchmark, spark, bench_tasks, name):
    task = bench_tasks[name]
    res = benchmark.pedantic(
        lambda: run_method(spark, "BClean_PI", task), rounds=1, iterations=1)
    assert res.scores.f1 > 0.4


def test_bench_garf_baseline(benchmark, spark, bench_tasks):
    task = bench_tasks["hospital"]
    res = benchmark.pedantic(
        lambda: run_method(spark, "Garf", task), rounds=1, iterations=1)
    assert res.scores.n_modified >= 0
