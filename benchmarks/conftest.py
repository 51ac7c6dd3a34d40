"""Benchmark fixtures: small-scale tasks (SF≈0.1 of the paper sizes)."""
import pytest

from repro.datasets.registry import load_task

BENCH_SCALE = {"hospital": 0.5, "flights": 0.25, "soccer": 0.05,
               "beers": 0.25, "inpatient": 0.15, "facilities": 0.08}


@pytest.fixture(scope="session")
def bench_tasks():
    return {n: load_task(n, scale=s, seed=2)
            for n, s in BENCH_SCALE.items()}
