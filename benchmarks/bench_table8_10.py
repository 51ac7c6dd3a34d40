"""Benchmark behind Tables 8–10: one full parameter-sweep point
(fit + clean on Hospital at a non-default parameter setting)."""
from repro.core.cleaner import BClean
from repro.eval.metrics import score_repair


def test_bench_param_point(benchmark, spark, bench_tasks):
    t = bench_tasks["hospital"]

    def work():
        bc = BClean("PI", lam=5.0, beta=10.0, tau=0.3).fit(
            spark, t.dirty, ucs=t.ucs, bn_edits=t.bn_edits)
        return score_repair(t.clean, t.dirty, bc.clean()).f1

    f1 = benchmark.pedantic(work, rounds=1, iterations=1)
    assert f1 > 0.5
