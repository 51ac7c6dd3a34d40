"""Tests for the error injector (paper §7.1 error model)."""
import numpy as np
import pandas as pd
import pytest

from repro.datasets.errors import inject_errors


def _clean(n=200, seed=0):
    g = np.random.default_rng(seed)
    return pd.DataFrame({
        "tid": np.arange(n).astype(str),
        "a": [f"alpha{v}" for v in g.integers(0, 10, n)],
        "b": [f"beta{v}" for v in g.integers(0, 5, n)],
        "c": [f"{v}" for v in g.integers(100, 999, n)],
    })


def test_rate_respected():
    clean = _clean()
    dirty, errors = inject_errors(clean, rate=0.1, seed=1)
    n_cells = len(clean) * 3
    assert abs(len(errors) - 0.1 * n_cells) <= 0.03 * n_cells


def test_zero_rate_noop():
    clean = _clean()
    dirty, errors = inject_errors(clean, rate=0.0, seed=1)
    pd.testing.assert_frame_equal(dirty, clean)
    assert len(errors) == 0


def test_log_matches_diff():
    clean = _clean()
    dirty, errors = inject_errors(clean, rate=0.15, seed=2)
    diff = (dirty.set_index("tid") != clean.set_index("tid")).stack()
    diff_cells = {(t, a) for (t, a), bad in diff.items() if bad}
    log_cells = set(zip(errors["tid"], errors["attr"]))
    assert diff_cells == log_cells


def test_log_values_correct():
    clean = _clean()
    dirty, errors = inject_errors(clean, rate=0.1, seed=3)
    ci = clean.set_index("tid")
    di = dirty.set_index("tid")
    for _, r in errors.iterrows():
        assert ci.at[r["tid"], r["attr"]] == r["clean_value"]
        assert di.at[r["tid"], r["attr"]] == r["dirty_value"]
        assert r["clean_value"] != r["dirty_value"]


def test_types_balanced():
    clean = _clean(400)
    _, errors = inject_errors(clean, rate=0.2, types=("T", "M", "I"), seed=4)
    counts = errors["type"].value_counts()
    assert set(counts.index) == {"T", "M", "I"}
    assert counts.max() - counts.min() <= 0.2 * counts.max()


def test_missing_is_empty_string():
    clean = _clean()
    dirty, errors = inject_errors(clean, rate=0.2, types=("M",), seed=5)
    assert (errors["dirty_value"] == "").all()
    assert (dirty.loc[:, ["a", "b", "c"]] == "").sum().sum() == len(errors)


def test_typo_single_edit():
    from repro.core.similarity import edit_distance
    clean = _clean()
    _, errors = inject_errors(clean, rate=0.2, types=("T",), seed=6)
    for _, r in errors.iterrows():
        assert edit_distance(r["clean_value"], r["dirty_value"]) == 1


def test_inconsistency_draws_from_domains():
    clean = _clean()
    dirty, errors = inject_errors(clean, rate=0.2, types=("I",), seed=7)
    domains = {a: set(clean[a]) for a in ["a", "b", "c"]}
    all_vals = set().union(*domains.values())
    for _, r in errors.iterrows():
        assert r["dirty_value"] in all_vals
        assert r["dirty_value"] != r["clean_value"]


def test_swap_marks_both_cells():
    clean = _clean()
    dirty, errors = inject_errors(clean, rate=0.05, types=("S",), seed=8)
    swaps = errors[errors["type"] == "S"]
    assert len(swaps) > 0
    # swaps come in pairs per attribute with exchanged values
    for attr, grp in swaps.groupby("attr"):
        vals = list(zip(grp["clean_value"], grp["dirty_value"]))
        for cv, dv in vals:
            assert (dv, cv) in vals  # the partner swap exists


def test_attrs_restriction():
    clean = _clean()
    _, errors = inject_errors(clean, rate=0.2, seed=9, attrs=["a"])
    assert set(errors["attr"]) == {"a"}


def test_tid_never_touched():
    clean = _clean()
    dirty, _ = inject_errors(clean, rate=0.3, seed=10)
    assert (dirty["tid"] == clean["tid"]).all()


def test_deterministic_in_seed():
    clean = _clean()
    d1, e1 = inject_errors(clean, rate=0.1, seed=11)
    d2, e2 = inject_errors(clean, rate=0.1, seed=11)
    pd.testing.assert_frame_equal(d1, d2)
    pd.testing.assert_frame_equal(e1, e2)


def test_invalid_args():
    clean = _clean()
    with pytest.raises(ValueError):
        inject_errors(clean, rate=1.5)
    with pytest.raises(ValueError):
        inject_errors(clean, rate=0.1, types=("X",))
