"""Tests for the block-diagonal Gaussian machinery (repro.core.gmm)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core import gmm


def rnd(seed=0):
    return np.random.default_rng(seed)


def test_group_slices():
    groups = np.array([0, 0, 1, 2, 2, 2])
    sl = gmm.group_slices(groups)
    assert [list(s) for s in sl] == [[0, 1], [2], [3, 4, 5]]


def test_weighted_moments_match_numpy():
    g = rnd(1)
    X = g.random((50, 4))
    w = g.random(50)
    n, s1, s2 = gmm.weighted_moments(X, w)
    assert n == pytest.approx(w.sum())
    np.testing.assert_allclose(s1, (X * w[:, None]).sum(0))
    np.testing.assert_allclose(s2, (X**2 * w[:, None]).sum(0))


def test_weighted_cov_uniform_weights_equals_np_cov():
    g = rnd(2)
    X = g.random((200, 3))
    S, R = gmm.weighted_cov(X, np.ones(200))
    np.testing.assert_allclose(S, np.cov(X.T, bias=True), atol=1e-10)
    np.testing.assert_allclose(R, np.corrcoef(X.T), atol=1e-8)


def test_weighted_cov_indicator_weights_is_subset_cov():
    g = rnd(3)
    X = g.random((100, 3))
    w = (g.random(100) > 0.5).astype(float)
    S, _ = gmm.weighted_cov(X, w)
    sub = X[w == 1]
    np.testing.assert_allclose(S, np.cov(sub.T, bias=True), atol=1e-10)


def test_block_correlation_from_moments():
    g = rnd(4)
    X = g.random((500, 5))
    groups = np.array([0, 0, 0, 1, 1])
    s1 = X.sum(0)
    s2 = [X[:, idx].T @ X[:, idx] for idx in gmm.group_slices(groups)]
    R = gmm.block_correlation(s1, s2, 500.0, groups)
    # Within-group entries equal np.corrcoef; cross-group entries are 0.
    ref = np.corrcoef(X.T)
    np.testing.assert_allclose(R[:3, :3], ref[:3, :3], atol=1e-8)
    np.testing.assert_allclose(R[3:, 3:], ref[3:, 3:], atol=1e-8)
    assert np.all(R[:3, 3:] == 0)
    np.testing.assert_allclose(np.diag(R), 1.0)


def test_block_correlation_degenerate_feature():
    X = np.ones((50, 2))
    X[:, 1] = np.arange(50)
    groups = np.array([0, 0])
    s2 = [X.T @ X]
    R = gmm.block_correlation(X.sum(0), s2, 50.0, groups)
    assert R[0, 1] == 0.0  # constant feature: correlation undefined → 0
    assert R[0, 0] == 1.0


def test_compose_covariance_roundtrip():
    g = rnd(5)
    A = g.random((4, 4))
    S_full = A @ A.T
    sd = np.sqrt(np.diag(S_full))
    R = S_full / np.outer(sd, sd)
    np.testing.assert_allclose(gmm.compose_covariance(sd, R), S_full, atol=1e-10)


def test_block_of():
    M = np.arange(16, dtype=float).reshape(4, 4)
    groups = np.array([0, 0, 1, 1])
    B = gmm.block_of(M, groups)
    assert np.all(B[:2, 2:] == 0) and np.all(B[2:, :2] == 0)
    np.testing.assert_allclose(B[:2, :2], M[:2, :2])


def test_block_gaussian_matches_dense_logpdf():
    """Block-diagonal logpdf == dense multivariate normal logpdf when the
    covariance really is block diagonal."""
    g = rnd(6)
    groups = np.array([0, 0, 1, 1, 1])
    d = 5
    Sigma = np.zeros((d, d))
    for idx in gmm.group_slices(groups):
        A = g.random((len(idx), len(idx)))
        Sigma[np.ix_(idx, idx)] = A @ A.T + 0.5 * np.eye(len(idx))
    mu = g.random(d)
    X = g.random((20, d))
    bg = gmm.BlockGaussian(mu, Sigma, groups)
    got = bg.logpdf(X)
    # dense reference
    inv = np.linalg.inv(Sigma)
    _, logdet = np.linalg.slogdet(Sigma)
    Z = X - mu
    ref = -0.5 * (d * np.log(2 * np.pi) + logdet + np.einsum("ij,jk,ik->i", Z, inv, Z))
    np.testing.assert_allclose(got, ref, atol=1e-8)


def test_block_gaussian_singular_block_fallback():
    """A numerically singular block falls back to its diagonal, not NaN."""
    groups = np.array([0, 0])
    Sigma = np.array([[1.0, 1.0], [1.0, 1.0]])  # rank 1
    bg = gmm.BlockGaussian(np.zeros(2), Sigma, groups)
    val = bg.logpdf(np.array([[0.5, 0.5]]))
    assert np.isfinite(val).all()


def test_block_gaussian_univariate_matches_formula():
    bg = gmm.BlockGaussian(np.array([0.0]), np.array([[2.0]]), np.array([0]))
    x = np.array([[1.0]])
    ref = -0.5 * (np.log(2 * np.pi) + np.log(2.0) + 1.0 / 2.0)
    assert bg.logpdf(x)[0] == pytest.approx(ref)
