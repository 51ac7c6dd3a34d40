"""Unit tests for the graphical lasso implementation."""
import numpy as np
import pytest

from repro.core.glasso import empirical_covariance, graphical_lasso


def _random_cov(m, seed=0):
    g = np.random.default_rng(seed)
    A = g.normal(size=(m, m))
    return A @ A.T / m + np.eye(m)


def test_empirical_covariance_matches_numpy():
    g = np.random.default_rng(1)
    obs = g.normal(size=(500, 4))
    S = empirical_covariance(obs)
    np.testing.assert_allclose(S, np.cov(obs.T, bias=True), atol=1e-10)


def test_empirical_covariance_rejects_bad_shapes():
    with pytest.raises(ValueError):
        empirical_covariance(np.zeros((1, 3)))
    with pytest.raises(ValueError):
        empirical_covariance(np.zeros(5))


def test_glasso_identity_covariance():
    S = np.eye(3)
    W, T = graphical_lasso(S, rho=0.01)
    # Near-diagonal precision; off-diagonals shrunk to ~0.
    off = T - np.diag(np.diag(T))
    assert np.abs(off).max() < 1e-6


def test_glasso_precision_is_symmetric_pd():
    S = _random_cov(5, seed=2)
    _, T = graphical_lasso(S, rho=0.05)
    np.testing.assert_allclose(T, T.T, atol=1e-10)
    assert np.all(np.linalg.eigvalsh(T) > 0)


def test_glasso_inverse_relationship_small_rho():
    S = _random_cov(4, seed=3)
    W, T = graphical_lasso(S, rho=1e-4)
    np.testing.assert_allclose(W @ T, np.eye(4), atol=0.05)


def test_glasso_sparsity_increases_with_rho():
    g = np.random.default_rng(4)
    obs = g.normal(size=(400, 6))
    obs[:, 1] += 0.9 * obs[:, 0]
    obs[:, 3] += 0.5 * obs[:, 2]
    S = empirical_covariance(obs)

    def nnz(rho):
        _, T = graphical_lasso(S, rho=rho)
        off = T - np.diag(np.diag(T))
        return int((np.abs(off) > 1e-4).sum())

    assert nnz(0.01) >= nnz(0.2) >= nnz(2.0)


def test_glasso_recovers_strong_partial_correlation():
    g = np.random.default_rng(5)
    x = g.normal(size=2000)
    y = x + 0.1 * g.normal(size=2000)
    z = g.normal(size=2000)
    S = empirical_covariance(np.column_stack([x, y, z]))
    _, T = graphical_lasso(S, rho=0.02)
    assert abs(T[0, 1]) > 5 * abs(T[0, 2])
    assert abs(T[0, 1]) > 5 * abs(T[1, 2])


def test_glasso_m1():
    W, T = graphical_lasso(np.array([[2.0]]), rho=0.1)
    assert W[0, 0] == pytest.approx(2.1)
    assert T[0, 0] == pytest.approx(1 / 2.1)


def test_glasso_rejects_nonsquare():
    with pytest.raises(ValueError):
        graphical_lasso(np.zeros((2, 3)))


def test_glasso_handles_degenerate_constant_column():
    g = np.random.default_rng(6)
    obs = g.normal(size=(300, 3))
    obs[:, 2] = 0.0  # zero-variance column
    S = empirical_covariance(obs)
    _, T = graphical_lasso(S, rho=0.05)
    assert np.isfinite(T).all()
