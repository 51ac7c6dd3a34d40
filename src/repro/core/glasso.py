"""Graphical lasso (sparse inverse covariance estimation).

BClean (§4) follows FDX [65]: similarity observations are treated as
draws from a multivariate Gaussian, the graphical lasso [60] estimates a
sparse precision matrix Θ = Σ⁻¹, and Θ is then decomposed into the BN
skeleton's autoregression matrix (see ``structure.py``).

This is the standard block-coordinate-descent glasso of Friedman,
Hastie & Tibshirani (2008): each column of the covariance estimate W is
updated by solving a lasso regression via cyclic coordinate descent.
The attribute count m ≤ 15 in every BClean workload, so this runs on
the driver in numpy; the data-parallel cost (building the observation
matrix) lives in Spark.
"""
from __future__ import annotations

import numpy as np

__all__ = ["empirical_covariance", "graphical_lasso"]


def empirical_covariance(obs: np.ndarray) -> np.ndarray:
    """Biased (1/n) empirical covariance of an (n, m) observation matrix."""
    obs = np.asarray(obs, dtype="float64")
    if obs.ndim != 2 or obs.shape[0] < 2:
        raise ValueError("need an (n>=2, m) observation matrix")
    centered = obs - obs.mean(axis=0, keepdims=True)
    return centered.T @ centered / obs.shape[0]


def _lasso_cd(V: np.ndarray, u: np.ndarray, rho: float, beta0: np.ndarray,
              max_iter: int = 200, tol: float = 1e-6) -> np.ndarray:
    """Cyclic coordinate descent for ``min 0.5 βᵀVβ - uᵀβ + ρ|β|₁``."""
    beta = beta0.copy()
    p = len(u)
    for _ in range(max_iter):
        delta = 0.0
        for j in range(p):
            old = beta[j]
            r = u[j] - V[j] @ beta + V[j, j] * old
            new = np.sign(r) * max(abs(r) - rho, 0.0) / V[j, j]
            beta[j] = new
            delta = max(delta, abs(new - old))
        if delta < tol:
            break
    return beta


def graphical_lasso(S: np.ndarray, rho: float = 0.05, *,
                    max_iter: int = 100, tol: float = 1e-5) -> tuple[np.ndarray, np.ndarray]:
    """Estimate (covariance W, precision Θ) from empirical covariance S.

    ``rho`` is the L1 penalty; larger values yield sparser Θ. Returns
    matrices symmetrized and with Θ guaranteed symmetric positive
    definite (up to numerical jitter for degenerate inputs).
    """
    S = np.asarray(S, dtype="float64")
    m = S.shape[0]
    if S.shape != (m, m):
        raise ValueError("S must be square")
    if m == 1:
        w = S[0, 0] + rho
        return np.array([[w]]), np.array([[1.0 / w]])
    # Regularize near-singular inputs (constant similarity columns give
    # zero variance rows) so the sub-problems stay well-posed.
    jitter = 1e-8 * max(1.0, np.trace(S) / m)
    W = S + (rho + jitter) * np.eye(m)
    betas = np.zeros((m, m))  # beta for each column's lasso problem
    idx = np.arange(m)
    for _ in range(max_iter):
        W_old = W.copy()
        for col in range(m):
            rest = idx != col
            V = W[np.ix_(rest, rest)]
            u = S[rest, col]
            beta = _lasso_cd(V, u, rho, betas[col, : m - 1])
            betas[col, : m - 1] = beta
            w12 = V @ beta
            W[rest, col] = w12
            W[col, rest] = w12
        if np.abs(W - W_old).max() < tol:
            break
    # Recover Θ column-wise from the final W and betas.
    Theta = np.zeros((m, m))
    for col in range(m):
        rest = idx != col
        beta = betas[col, : m - 1]
        denom = W[col, col] - W[rest, col] @ beta
        denom = max(denom, 1e-12)
        Theta[col, col] = 1.0 / denom
        Theta[rest, col] = -beta / denom
    Theta = (Theta + Theta.T) / 2.0
    return (W + W.T) / 2.0, Theta
