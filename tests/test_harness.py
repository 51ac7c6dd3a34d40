"""Tests for the experiment harness (the engine behind Tables 4–7)."""
import pytest

from repro.eval.harness import BCLEAN_VARIANTS, METHODS, run_method


def test_method_registry_matches_table4():
    assert set(BCLEAN_VARIANTS) == {"BClean-UC", "BClean", "BClean_PI",
                                    "BClean_PIP"}
    for m in ["PClean", "HoloClean", "Raha+Baran", "Garf"]:
        assert m in METHODS


def test_run_method_bclean(spark, hospital_task):
    r = run_method(spark, "BClean_PIP", hospital_task)
    assert r.method == "BClean_PIP"
    assert r.dataset == "hospital"
    assert r.exec_seconds > 0
    assert 0 <= r.scores.f1 <= 1
    assert len(r.repaired) == len(hospital_task.dirty)


def test_run_method_baseline(spark, hospital_task):
    r = run_method(spark, "Garf", hospital_task)
    assert r.scores.n_modified >= 0


def test_run_method_type_recall(spark, hospital_task):
    r = run_method(spark, "Garf", hospital_task)
    tr = r.type_recall(hospital_task)
    assert set(tr) <= {"T", "M", "I", "S"}
    assert all(0 <= v <= 1 for v in tr.values())


def test_run_method_unknown(spark, hospital_task):
    with pytest.raises(KeyError):
        run_method(spark, "MagicCleaner", hospital_task)


def test_run_method_overrides(spark, hospital_task):
    r = run_method(spark, "BClean_PI", hospital_task, margin=1e9)
    # an absurd margin blocks every optional repair
    assert r.scores.n_modified <= hospital_task.errors.shape[0]
