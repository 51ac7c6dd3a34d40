"""Tests for vocabulary / CPT-table / child-view assembly."""
import numpy as np
import pandas as pd
import pytest

from repro.core.model import (build_child_views, build_cpt_table,
                              build_vocab)


@pytest.fixture()
def frame():
    return pd.DataFrame({
        "tid": ["0", "1", "2", "3", "4"],
        "x": ["a", "a", "b", "b", "a"],
        "y": ["p", "p", "q", "q", "r"],
        "z": ["1", "2", "1", "", "1"],
    })


def test_build_vocab_sorted_and_excludes_missing(frame):
    vocab, code = build_vocab(frame, ["x", "y", "z"])
    assert list(vocab["x"]) == ["a", "b"]
    assert list(vocab["z"]) == ["1", "2"]       # "" excluded
    assert code["y"] == {"p": 0, "q": 1, "r": 2}


def _counts(rows, cols):
    return pd.DataFrame(rows, columns=cols)


def test_build_cpt_table_no_parents(frame):
    vocab, code = build_vocab(frame, ["x", "y", "z"])
    pdf = _counts([("a", 3), ("b", 2)], ["x", "cnt"])
    table = build_cpt_table(pdf, "x", [], code)
    codes, counts, total = table[()]
    assert total == 5.0
    got = dict(zip(codes.tolist(), counts.tolist()))
    assert got == {0: 3.0, 1: 2.0}


def test_build_cpt_table_one_parent(frame):
    vocab, code = build_vocab(frame, ["x", "y", "z"])
    pdf = _counts([("a", "p", 2), ("a", "r", 1), ("b", "q", 2)],
                  ["x", "y", "cnt"])
    table = build_cpt_table(pdf, "y", ["x"], code)
    codes, counts, total = table[("a",)]
    assert total == 3.0
    got = dict(zip(codes.tolist(), counts.tolist()))
    assert got == {code["y"]["p"]: 2.0, code["y"]["r"]: 1.0}
    assert ("b",) in table and ("zzz",) not in table


def test_build_cpt_table_two_parents(frame):
    vocab, code = build_vocab(frame, ["x", "y", "z"])
    pdf = _counts([("a", "p", "1", 1), ("a", "p", "2", 1), ("b", "q", "1", 1)],
                  ["x", "y", "z", "cnt"])
    table = build_cpt_table(pdf, "z", ["x", "y"], code)
    codes, counts, total = table[("a", "p")]
    assert total == 2.0
    assert set(codes.tolist()) == {code["z"]["1"], code["z"]["2"]}


def test_build_cpt_table_skips_unknown_node_values(frame):
    vocab, code = build_vocab(frame, ["x", "y", "z"])
    pdf = _counts([("a", 3), ("GHOST", 2)], ["x", "cnt"])
    table = build_cpt_table(pdf, "x", [], code)
    codes, counts, total = table[()]
    assert total == 3.0  # ghost value dropped entirely


def test_build_cpt_table_empty():
    assert build_cpt_table(pd.DataFrame(), "x", [], {"x": {}}) == {}


def test_build_child_views_single_parent(frame):
    vocab, code = build_vocab(frame, ["x", "y", "z"])
    pdf = _counts([("a", "p", 2), ("a", "r", 1), ("b", "q", 2)],
                  ["x", "y", "cnt"])
    views, tots = build_child_views(pdf, "y", ["x"], code)
    # view[((), e)] -> counts over dom(x)
    codes, counts = views["x"][((), "p")]
    assert dict(zip(codes.tolist(), counts.tolist())) == {code["x"]["a"]: 2.0}
    codes, totals = tots["x"][()]
    got = dict(zip(codes.tolist(), totals.tolist()))
    assert got == {code["x"]["a"]: 3.0, code["x"]["b"]: 2.0}


def test_build_child_views_coparents(frame):
    vocab, code = build_vocab(frame, ["x", "y", "z"])
    pdf = _counts([("a", "p", "1", 2), ("a", "r", "1", 1), ("b", "q", "2", 2)],
                  ["x", "y", "z", "cnt"])
    views, tots = build_child_views(pdf, "z", ["x", "y"], code)
    # view keyed by (coparent cfg, child value); for parent x, copa = (y,)
    codes, counts = views["x"][(("p",), "1")]
    assert dict(zip(codes.tolist(), counts.tolist())) == {code["x"]["a"]: 2.0}
    codes, totals = tots["x"][("p",)]
    assert dict(zip(codes.tolist(), totals.tolist())) == {code["x"]["a"]: 2.0}
    # and for parent y, copa = (x,)
    codes, counts = views["y"][(("b",), "2")]
    assert dict(zip(codes.tolist(), counts.tolist())) == {code["y"]["q"]: 2.0}


def test_build_child_views_empty():
    views, tots = build_child_views(pd.DataFrame(), "y", ["x"], {})
    assert views == {"x": {}} and tots == {"x": {}}
