"""Tests for the §6.2 pruning kernels."""
import numpy as np
import pytest

from repro.core.pruning import domain_prune_mask, tuple_filter


def test_tuple_filter_formula():
    # two evidence columns, dom size 3, original value code 1
    cnt_vecs = [np.array([0.0, 8.0, 2.0]), np.array([1.0, 4.0, 0.0])]
    out = tuple_filter(1, cnt_vecs, [10.0, 8.0])
    assert out == pytest.approx((8 / 10 + 4 / 8) / 2)


def test_tuple_filter_missing_original():
    assert tuple_filter(-1, [np.ones(3)], [1.0]) == 0.0


def test_tuple_filter_no_evidence():
    assert tuple_filter(0, [], []) == 0.0


def test_tuple_filter_skips_zero_denominators():
    cnt_vecs = [np.array([5.0, 0.0]), np.array([3.0, 0.0])]
    out = tuple_filter(0, cnt_vecs, [0.0, 6.0])
    assert out == pytest.approx(3 / 6)  # first column ignored


def test_tuple_filter_clean_cell_scores_high():
    # a value co-occurring with every evidence value maximally
    cnt_vecs = [np.array([10.0, 0.0])] * 4
    assert tuple_filter(0, cnt_vecs, [10.0] * 4) == pytest.approx(1.0)


def test_domain_prune_no_blanket_keeps_all():
    keep = domain_prune_mask([], np.array([5.0, 1.0]), n_rows=10)
    assert keep.all()


def test_domain_prune_requires_context():
    # candidate 1 never co-occurs with any blanket evidence -> pruned
    vecs = [np.array([3.0, 0.0, 1.0])]
    keep = domain_prune_mask(vecs, np.array([5.0, 5.0, 5.0]), n_rows=100)
    assert keep[0] and keep[2] and not keep[1]


def test_domain_prune_top_k():
    n = 50
    vecs = [np.ones(n)]
    counts = np.arange(1, n + 1, dtype="float64")
    keep = domain_prune_mask(vecs, counts, n_rows=1000, top_k=5)
    assert keep.sum() <= 6  # ties at the kth score may keep a few extra
    # IDF: rarer values score higher -> the kept ones are the rarest
    assert keep[:5].all()


def test_domain_prune_idf_floor_keeps_frequent_context():
    # a value more frequent than n_rows would get negative IDF; the
    # floor keeps it eligible when it has context
    vecs = [np.array([2.0, 0.0])]
    keep = domain_prune_mask(vecs, np.array([500.0, 1.0]), n_rows=100)
    assert keep[0] and not keep[1]


def test_domain_prune_multiple_blanket_columns_sum_context():
    vecs = [np.array([1.0, 0.0]), np.array([1.0, 1.0])]
    counts = np.array([10.0, 10.0])
    keep = domain_prune_mask(vecs, counts, n_rows=100, top_k=1)
    assert keep[0] and not keep[1]  # context 2 beats context 1
