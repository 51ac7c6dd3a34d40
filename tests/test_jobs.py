"""Smoke tests for the per-table job entrypoints (tiny scale).

The heavyweight jobs (table4/5/6/7) are exercised end-to-end by the
results/ runs; here we check the cheap ones run and the heavy ones are
importable with correct paper-number tables embedded.
"""
import importlib.util
import sys
from pathlib import Path

import pytest

JOBS = Path(__file__).resolve().parent.parent / "jobs"
sys.path.insert(0, str(JOBS))


def _load(name):
    spec = importlib.util.spec_from_file_location(name, JOBS / f"{name}.py")
    mod = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(mod)
    return mod


def test_table2_runs(monkeypatch, capsys):
    monkeypatch.setenv("REPRO_SCALE", "0.05")
    mod = _load("table2_datasets")
    out = mod.run(None)
    assert len(out) == 6
    assert {"rows", "cols", "noise", "#UCs"} <= set(out.columns)
    printed = capsys.readouterr().out
    assert "Table 3" in printed


@pytest.mark.parametrize("job,attr", [
    ("table4_quality", "PAPER_F1"),
    ("table5_soccer_sample", "PAPER"),
    ("table6_error_types", "PAPER"),
    ("table7_runtime", "PAPER_EXEC"),
    ("table8_10_params", "PAPER"),
])
def test_jobs_importable_with_paper_numbers(job, attr):
    mod = _load(job)
    table = getattr(mod, attr)
    assert table and callable(mod.run)


def test_table4_paper_numbers_cover_grid():
    mod = _load("table4_quality")
    from repro.datasets.registry import DATASETS
    from repro.eval.harness import METHODS
    for m in METHODS:
        assert m in mod.PAPER_F1
        for d in DATASETS:
            assert d in mod.PAPER_F1[m]


def test_table8_sweeps_match_paper_grid():
    mod = _load("table8_10_params")
    assert mod.SWEEPS["lambda"] == [0, 1, 2, 5, 10, 15]
    assert mod.SWEEPS["beta"] == [0, 1, 2, 10, 50]
    assert mod.SWEEPS["tau"] == [0.1, 0.3, 0.5, 0.7, 0.9]
