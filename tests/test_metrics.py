"""Tests for precision/recall/F1 scoring (paper §7.1 metrics)."""
import pandas as pd
import pytest

from repro.eval.metrics import per_type_recall, score_repair


def _frames():
    clean = pd.DataFrame({"tid": ["0", "1", "2"],
                          "a": ["x", "y", "z"], "b": ["p", "q", "r"]})
    dirty = clean.copy()
    dirty.loc[0, "a"] = "BAD"   # error 1
    dirty.loc[1, "b"] = ""      # error 2
    return clean, dirty


def test_perfect_repair():
    clean, dirty = _frames()
    s = score_repair(clean, dirty, clean.copy())
    assert (s.precision, s.recall, s.f1) == (1.0, 1.0, 1.0)
    assert s.n_errors == 2 and s.n_modified == 2 and s.n_correct == 2


def test_no_repair():
    clean, dirty = _frames()
    s = score_repair(clean, dirty, dirty.copy())
    assert s.n_modified == 0 and s.recall == 0.0 and s.precision == 0.0


def test_partial_repair():
    clean, dirty = _frames()
    rep = dirty.copy()
    rep.loc[0, "a"] = "x"       # correct repair
    rep.loc[2, "b"] = "WRONG"   # spurious modification
    s = score_repair(clean, dirty, rep)
    assert s.precision == pytest.approx(1 / 2)
    assert s.recall == pytest.approx(1 / 2)
    assert s.f1 == pytest.approx(0.5)


def test_wrong_repair_counts_as_modified_not_correct():
    clean, dirty = _frames()
    rep = dirty.copy()
    rep.loc[0, "a"] = "ALSO_BAD"
    s = score_repair(clean, dirty, rep)
    assert s.n_modified == 1 and s.n_correct == 0


def test_row_order_independent():
    clean, dirty = _frames()
    rep = clean.copy().iloc[::-1].reset_index(drop=True)
    s = score_repair(clean, dirty, rep)
    assert s.f1 == 1.0


def test_nan_and_empty_equivalent():
    clean, dirty = _frames()
    rep = dirty.copy()
    rep.loc[1, "b"] = float("nan")  # still missing -> not a modification
    s = score_repair(clean, dirty, rep)
    assert s.n_modified == 0


def test_clean_dataset_scores_zero_errors():
    clean, _ = _frames()
    s = score_repair(clean, clean.copy(), clean.copy())
    assert s.n_errors == 0 and s.recall == 0.0


def test_per_type_recall():
    clean, dirty = _frames()
    rep = dirty.copy()
    rep.loc[0, "a"] = "x"  # fixes the T error, misses the M error
    errors = pd.DataFrame({
        "tid": ["0", "1"], "attr": ["a", "b"], "type": ["T", "M"],
        "clean_value": ["x", "q"], "dirty_value": ["BAD", ""],
    })
    out = per_type_recall(clean, dirty, rep, errors)
    assert out == {"T": 1.0, "M": 0.0}


def test_per_type_recall_empty_log():
    clean, dirty = _frames()
    out = per_type_recall(clean, dirty, dirty.copy(),
                          pd.DataFrame(columns=["tid", "attr", "type"]))
    assert out == {}


def test_scores_row_helper():
    clean, dirty = _frames()
    s = score_repair(clean, dirty, clean.copy())
    assert s.row() == (1.0, 1.0, 1.0)
