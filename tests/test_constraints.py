"""Unit tests for the user-constraint (UC) framework (paper §2)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.constraints import TRUE_UC, UC, strip_uc_kinds, uc_mask


@pytest.mark.parametrize("v,ok", [
    ("12345", 1), ("1234", 0), ("123456", 0), ("abcde", 0),
    ("02345", 0), ("", 0), (None, 0),
])
def test_zip_pattern(v, ok):
    uc = UC(pattern=r"[1-9][0-9]{4}")
    assert uc.check(v) == ok


@pytest.mark.parametrize("v,ok", [
    ("ab", 1), ("abcd", 1), ("a", 0), ("abcde", 0),
])
def test_length_bounds(v, ok):
    assert UC(min_len=2, max_len=4).check(v) == ok


@pytest.mark.parametrize("v,ok", [
    ("0.05", 1), ("0.2", 1), ("0.21", 0), ("0.001", 0), ("x", 0),
])
def test_value_bounds(v, ok):
    assert UC(min_value=0.01, max_value=0.2, not_null=True).check(v) == ok


def test_not_null_default():
    assert UC().check(None) == 0
    assert UC().check("") == 0
    assert UC().check("x") == 1


def test_nullable_uc_without_clauses_accepts_null():
    assert UC(not_null=False).check(None) == 1
    assert TRUE_UC.check("") == 1


def test_null_fails_any_clause_even_if_nullable():
    # A NULL cannot satisfy a pattern, regardless of not_null.
    assert UC(not_null=False, pattern=r".+").check(None) == 0
    assert UC(not_null=False, min_len=1).check("") == 0


def test_predicate_hook():
    uc = UC(predicate=lambda v: v.startswith("mc-"))
    assert uc.check("mc-01") == 1
    assert uc.check("xx-01") == 0


def test_conjunction_semantics():
    uc = UC(min_len=3, max_len=5, pattern=r"[a-z]+")
    assert uc.check("abc") == 1
    assert uc.check("ab") == 0       # too short
    assert uc.check("abc1") == 0     # pattern fails


def test_check_series_matches_scalar():
    uc = UC(min_len=2, max_len=4, pattern=r"[a-z0-9]+")
    vals = pd.Series(["ab", "a", "abcd", "abcde", "AB", "", None, "x9"])
    vec = uc.check_series(vals)
    for i, v in enumerate(vals):
        assert vec[i] == bool(uc.check(v)), f"mismatch at {v!r}"


def test_check_series_dtype_and_length():
    out = UC().check_series(pd.Series(["a", "b", None]))
    assert out.dtype == bool and len(out) == 3


def test_uc_mask_defaults_to_true():
    vals = pd.Series(["anything", None])
    out = uc_mask({}, "nope", vals)
    np.testing.assert_array_equal(out, [True, True])


def test_uc_mask_uses_declared():
    vals = pd.Series(["ab", "abcdef"])
    out = uc_mask({"a": UC(max_len=3)}, "a", vals)
    np.testing.assert_array_equal(out, [True, False])


@pytest.mark.parametrize("kind,probe,before,after", [
    ("Max", "abcdefghij", 0, 1),
    ("Min", "a", 0, 1),
    ("Pat", "XYZ", 0, 1),
])
def test_strip_uc_kinds(kind, probe, before, after):
    ucs = {"a": UC(min_len=2, max_len=5, pattern=r"[a-z]+")}
    assert ucs["a"].check(probe) == before
    stripped = strip_uc_kinds(ucs, {kind})
    # Other clauses may still reject; strip all three to be sure
    full = strip_uc_kinds(ucs, {"Max", "Min", "Pat"})
    assert full["a"].check(probe) == after


def test_strip_nul_allows_null():
    ucs = {"a": UC()}  # not_null only
    assert strip_uc_kinds(ucs, {"Nul"})["a"].check(None) == 1


def test_strip_does_not_mutate_original():
    ucs = {"a": UC(max_len=3)}
    strip_uc_kinds(ucs, {"Max"})
    assert ucs["a"].max_len == 3


def test_numeric_bounds_reject_non_numeric():
    uc = UC(min_value=0, not_null=True)
    assert uc.check("abc") == 0
    assert uc.check("1e3") == 1  # scientific notation parses
