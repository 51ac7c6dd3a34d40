"""Benchmark behind Table 2: dataset generation + error injection."""
import pytest

from repro.datasets.registry import DATASETS, load_task


@pytest.mark.parametrize("name", DATASETS)
def test_bench_generate_dataset(benchmark, name):
    out = benchmark.pedantic(
        lambda: load_task(name, scale=0.1, seed=0), rounds=2, iterations=1)
    assert len(out.dirty) > 0
