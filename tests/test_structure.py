"""Tests for FDX-style structure learning (Spark observations + driver)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.structure import (decompose_precision, edge_determinism,
                                  learn_skeleton, similarity_observations)


def _sem_obs(n=3000, seed=0):
    """Linear SEM x -> y, z independent — ground-truth edge (0, 1)."""
    g = np.random.default_rng(seed)
    x = g.normal(size=n)
    y = 0.9 * x + 0.3 * g.normal(size=n)
    z = g.normal(size=n)
    return np.column_stack([x, y, z])


def test_decompose_precision_shapes():
    theta = np.eye(4)
    B, order = decompose_precision(theta)
    assert B.shape == (4, 4)
    assert sorted(order) == [0, 1, 2, 3]
    assert np.abs(B).max() < 1e-9  # independent variables -> no edges


def test_decompose_recovers_sem_edge():
    obs = _sem_obs()
    from repro.core.glasso import empirical_covariance, graphical_lasso
    obs = (obs - obs.mean(0)) / obs.std(0)
    _, theta = graphical_lasso(empirical_covariance(obs), rho=0.02)
    B, order = decompose_precision(theta)
    # the x–y dependency must dominate everything touching z
    xy = max(abs(B[0, 1]), abs(B[1, 0]))
    assert xy > 5 * abs(B[0, 2]) and xy > 5 * abs(B[2, 1])


def test_learn_skeleton_finds_dependency():
    obs = _sem_obs(seed=3)
    parents, B, order = learn_skeleton(obs, ["x", "y", "z"],
                                       weight_threshold=0.2)
    linked = parents["y"] + parents["x"]
    assert ("x" in parents["y"]) or ("y" in parents["x"])
    assert "z" not in linked
    assert sorted(order) == ["x", "y", "z"]


def test_learn_skeleton_max_parents():
    g = np.random.default_rng(5)
    base = g.normal(size=(4000, 1))
    obs = np.hstack([base + 0.2 * g.normal(size=(4000, 1))
                     for _ in range(5)])
    parents, _, _ = learn_skeleton(obs, list("abcde"), max_parents=2)
    assert all(len(p) <= 2 for p in parents.values())


def test_learn_skeleton_is_dag():
    obs = _sem_obs(seed=7)
    from repro.core.network import BayesianNetwork
    parents, _, _ = learn_skeleton(obs, ["x", "y", "z"])
    BayesianNetwork.from_parents(parents).topo_order()  # raises on cycle


def test_learn_skeleton_width_mismatch():
    with pytest.raises(ValueError):
        learn_skeleton(np.zeros((10, 3)), ["a", "b"])


def test_learn_skeleton_constant_column_isolated():
    obs = _sem_obs(seed=9)
    obs[:, 2] = 1.0  # constant similarity — no signal
    parents, _, _ = learn_skeleton(obs, ["x", "y", "z"])
    assert parents["z"] == []
    assert all("z" not in p for p in parents.values())


# ---------------------------------------------------------------------------
# Spark observation builder
# ---------------------------------------------------------------------------

def _fd_frame(n=400, seed=1):
    g = np.random.default_rng(seed)
    k = g.integers(0, 20, n)
    return pd.DataFrame({
        "tid": np.arange(n).astype(str),
        "a": [f"key{v:02d}" for v in k],
        "b": [f"val{v:02d}" for v in k],          # FD a -> b
        "c": [f"r{v}" for v in g.integers(0, 50, n)],  # independent
    })


def test_similarity_observations_shape(spark):
    pdf = _fd_frame()
    sdf = spark.createDataFrame(pdf)
    obs = similarity_observations(sdf, ["a", "b", "c"], num_partitions=4)
    out = obs.toPandas()
    assert list(out.columns) == ["a", "b", "c"]
    # m sorts × (n−1 pairs, minus ≤(numPartitions−1) boundary pairs each)
    n = len(pdf)
    assert 3 * (n - 4) <= len(out) <= 3 * (n - 1)
    assert ((out >= 0) & (out <= 1)).all().all()


def test_similarity_observations_capture_fd(spark):
    pdf = _fd_frame()
    sdf = spark.createDataFrame(pdf)
    obs = similarity_observations(sdf, ["a", "b", "c"],
                                  num_partitions=2).toPandas().to_numpy()
    corr = np.corrcoef(obs.T)
    # The FD pair must be strongly positively correlated. (Raw Pearson
    # correlation with the independent column is NOT guaranteed small —
    # the pair-source mixture induces spurious marginal correlation; the
    # glasso partial-correlation step downstream removes it, which
    # test_learned_skeleton_on_spark_data verifies end-to-end.)
    assert corr[0, 1] > 0.6


def test_learned_skeleton_on_spark_data(spark):
    pdf = _fd_frame(800, seed=2)
    sdf = spark.createDataFrame(pdf)
    obs = similarity_observations(sdf, ["a", "b", "c"]).toPandas().to_numpy()
    parents, _, _ = learn_skeleton(obs, ["a", "b", "c"])
    assert ("a" in parents["b"]) or ("b" in parents["a"])


# ---------------------------------------------------------------------------
# edge determinism
# ---------------------------------------------------------------------------

def _pair_counts(rows):
    return pd.DataFrame(rows, columns=["attr_i", "attr_j", "c", "e", "w",
                                       "cnt"])


def test_edge_determinism_perfect_fd():
    pdf = _pair_counts([
        ("y", "x", "v1", "k1", 10.0, 10),
        ("y", "x", "v2", "k2", 20.0, 20),
    ])
    det, support = edge_determinism(pdf, "x", "y")
    assert det == pytest.approx(1.0)
    assert support == pytest.approx(15.0)


def test_edge_determinism_noisy_fd():
    pdf = _pair_counts([
        ("y", "x", "v1", "k1", 9.0, 9),
        ("y", "x", "bad", "k1", 1.0, 1),
    ])
    det, _ = edge_determinism(pdf, "x", "y")
    assert det == pytest.approx(0.9)


def test_edge_determinism_non_fd():
    rows = [("y", "x", f"v{i}", "k1", 1.0, 1) for i in range(10)]
    det, support = edge_determinism(_pair_counts(rows), "x", "y")
    assert det == pytest.approx(0.1)
    assert support == pytest.approx(1.0)


def test_edge_determinism_missing_pair():
    det, support = edge_determinism(_pair_counts([]), "x", "y")
    assert det == 0.0 and support == 0.0
