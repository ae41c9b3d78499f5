"""Tests for the EM engine: parameter estimation, both backends, recovery."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.core import em as em_mod
from repro.core.em import (
    EMConfig,
    NumpyBackend,
    SparkBackend,
    apply_overrides,
    build_params,
    class_logliks,
    fit_em,
    gammas,
    shared_correlation,
    stats_from_gamma,
)
from repro.oracle import assert_equivalent


def synthetic_mixture(n=2000, d=4, pi=0.05, seed=0):
    """A cleanly separated 2-component Gaussian mixture in [0,1]^d."""
    g = np.random.default_rng(seed)
    n_m = int(n * pi)
    Xm = np.clip(g.normal(0.85, 0.05, (n_m, d)), 0, 1)
    Xu = np.clip(g.normal(0.15, 0.05, (n - n_m, d)), 0, 1)
    X = np.vstack([Xm, Xu])
    y = np.concatenate([np.ones(n_m), np.zeros(n - n_m)])
    ids = np.column_stack([np.arange(n), np.arange(n)])
    return ids, X, y


GROUPS2 = np.array([0, 0, 1, 1])


def test_stats_from_gamma_moments():
    g = np.random.default_rng(1)
    X = g.random((30, 3))
    gamma = g.random(30)
    s = stats_from_gamma(X, gamma)
    assert s.n == 30
    assert s.n_m == pytest.approx(gamma.sum())
    np.testing.assert_allclose(s.s1_m, gamma @ X)
    np.testing.assert_allclose(s.s1_u, (1 - gamma) @ X)
    assert s.ell == 0.0


def test_build_params_from_known_assignment():
    ids, X, y = synthetic_mixture()
    stats = stats_from_gamma(X, y)
    p = build_params(stats, np.eye(4), GROUPS2, EMConfig(regularization="none"))
    assert p.pi_m == pytest.approx(y.mean(), rel=1e-6)
    np.testing.assert_allclose(p.mu_m, X[y == 1].mean(0), atol=1e-9)
    np.testing.assert_allclose(p.mu_u, X[y == 0].mean(0), atol=1e-9)
    np.testing.assert_allclose(p.var_m, X[y == 1].var(0), atol=1e-9)


def test_build_params_diag_shared_cov():
    ids, X, y = synthetic_mixture()
    stats = stats_from_gamma(X, y)
    p = build_params(stats, np.eye(4), GROUPS2, EMConfig(covariance="diag_shared_cov", regularization="none"))
    np.testing.assert_allclose(p.Sigma_m, p.Sigma_u)
    assert np.all(p.Sigma_m == np.diag(np.diag(p.Sigma_m)))


def test_build_params_uniform_reg_adds_constant():
    ids, X, y = synthetic_mixture()
    stats = stats_from_gamma(X, y)
    none = build_params(stats, np.eye(4), GROUPS2, EMConfig(regularization="none"))
    unif = build_params(stats, np.eye(4), GROUPS2, EMConfig(regularization="uniform", uniform_kappa=0.01))
    np.testing.assert_allclose(np.diag(unif.Sigma_m) - np.diag(none.Sigma_m), 0.01, atol=1e-12)


def test_build_params_adaptive_reg_positive_on_degenerate():
    X = np.zeros((100, 2))
    X[:5] = 1.0  # degenerate features: variance 0 within each class
    gamma = np.zeros(100)
    gamma[:5] = 1.0
    stats = stats_from_gamma(X, gamma)
    p = build_params(stats, np.eye(2), np.array([0, 1]), EMConfig())
    assert np.all(np.diag(p.Sigma_m) > 0)


def test_build_params_unknown_modes_raise():
    ids, X, y = synthetic_mixture(n=100)
    stats = stats_from_gamma(X, y)
    with pytest.raises(ValueError):
        build_params(stats, np.eye(4), GROUPS2, EMConfig(covariance="nope"))
    with pytest.raises(ValueError):
        build_params(stats, np.eye(4), GROUPS2, EMConfig(regularization="nope"))


def test_gammas_sigmoid_of_logodds():
    logm = np.array([0.0, 5.0, -5.0])
    logu = np.array([0.0, -5.0, 5.0])
    g = gammas(logm, logu)
    assert g[0] == pytest.approx(0.5)
    assert g[1] > 0.99 and g[2] < 0.01


def test_apply_overrides_vectorized_matches_naive():
    g = np.random.default_rng(3)
    ids = g.integers(0, 50, (200, 2)).astype(np.int64)
    gamma = g.random(200)
    overrides = {(int(ids[i, 0]), int(ids[i, 1])): 0.42 for i in [3, 77, 150]}
    out = apply_overrides(ids, gamma, overrides)
    for i in range(200):
        k = (int(ids[i, 0]), int(ids[i, 1]))
        if k in overrides:
            assert out[i] == pytest.approx(0.42)
    assert apply_overrides(ids, gamma, {}) is gamma


def test_numpy_backend_em_recovers_mixture():
    ids, X, y = synthetic_mixture()
    be = NumpyBackend(ids, X)
    params, hist = fit_em(be, GROUPS2, EMConfig())
    gamma = be.posterior_vector(params)
    pred = gamma > 0.5
    assert (pred == (y == 1)).mean() > 0.995
    assert params.pi_m == pytest.approx(0.05, abs=0.01)
    assert len(hist) < 200  # converged


def test_numpy_backend_init_stats_eps():
    ids, X, y = synthetic_mixture()
    be = NumpyBackend(ids, X)
    s = be.init_stats(0.5)
    # matches have mean ≈ 0.85 > 0.5, unmatches ≈ 0.15 < 0.5
    assert s.n_m == pytest.approx(y.sum())


def test_numpy_backend_match_candidates_and_lookup():
    ids, X, y = synthetic_mixture(n=500)
    be = NumpyBackend(ids, X)
    params, _ = fit_em(be, GROUPS2, EMConfig())
    mc = be.match_candidates(params)
    assert set(mc.columns) == {"l_id", "r_id", "gamma", "logm", "logu"}
    assert (mc.gamma >= 0.5).all()
    keys = {(int(r.l_id), int(r.r_id)) for r in mc.head(3).itertuples()}
    looked = be.lookup(params, keys)
    assert set(looked) == keys
    for k, (g, lm, lu) in looked.items():
        assert g >= 0.5
    assert be.lookup(params, {(999999, 999999)}) == {}


def test_shared_correlation_identity_for_independent_groups():
    g = np.random.default_rng(5)
    X = g.random((3000, 4))
    be = NumpyBackend(np.column_stack([np.arange(3000)] * 2), X)
    R = shared_correlation(be, GROUPS2)
    # independent uniform features: correlations ≈ 0 off-diagonal
    off = R - np.eye(4)
    assert np.abs(off).max() < 0.1


# --------------------------------------------------------- Spark backend

@pytest.fixture(scope="module")
def spark_feat(spark):
    ids, X, y = synthetic_mixture(n=800, seed=7)
    pdf = pd.DataFrame(X, columns=[f"f{i}" for i in range(4)])
    pdf.insert(0, "r_id", ids[:, 1])
    pdf.insert(0, "l_id", ids[:, 0])
    return spark.createDataFrame(pdf), [f"f{i}" for i in range(4)], ids, X


def test_spark_backend_equals_numpy_backend(spark, spark_feat):
    """The distributed backend must reproduce the numpy backend exactly
    (same init stats, same correlation, same per-iteration parameters)."""
    df, cols, ids, X = spark_feat
    nb = NumpyBackend(ids, X)
    sb = SparkBackend(df, cols)
    config = EMConfig(max_iter=3)
    assert sb.n == nb.n and sb.d == nb.d

    s_np = nb.init_stats(0.5)
    s_sp = sb.init_stats(0.5)
    assert s_sp.n_m == pytest.approx(s_np.n_m)
    np.testing.assert_allclose(s_sp.s1_m, s_np.s1_m, rtol=1e-9)
    np.testing.assert_allclose(s_sp.s2_u, s_np.s2_u, rtol=1e-9)

    R_np = shared_correlation(nb, GROUPS2)
    R_sp = shared_correlation(sb, GROUPS2)
    np.testing.assert_allclose(R_sp, R_np, atol=1e-9)

    p_np, _ = fit_em(nb, GROUPS2, config)
    p_sp, _ = fit_em(sb, GROUPS2, config)
    np.testing.assert_allclose(p_sp.mu_m, p_np.mu_m, atol=1e-8)
    np.testing.assert_allclose(p_sp.Sigma_u, p_np.Sigma_u, atol=1e-8)
    assert p_sp.pi_m == pytest.approx(p_np.pi_m, rel=1e-6)

    post_np = nb.posterior_vector(p_np)
    post_sp = sb.posteriors_df(p_sp).toPandas().sort_values("l_id")["gamma"].to_numpy()
    np.testing.assert_allclose(post_sp, post_np, atol=1e-8)
    sb.unpersist()


def test_spark_backend_match_candidates_and_lookup(spark, spark_feat):
    df, cols, ids, X = spark_feat
    nb = NumpyBackend(ids, X)
    sb = SparkBackend(df, cols)
    params, _ = fit_em(nb, GROUPS2, EMConfig(max_iter=3))
    mc_np = nb.match_candidates(params).sort_values(["l_id", "r_id"]).reset_index(drop=True)
    mc_sp = sb.match_candidates(params).sort_values(["l_id", "r_id"]).reset_index(drop=True)
    pd.testing.assert_frame_equal(mc_np, mc_sp, check_exact=False, atol=1e-8)
    keys = {(int(r.l_id), int(r.r_id)) for r in mc_np.head(4).itertuples()}
    lk_np = nb.lookup(params, keys)
    lk_sp = sb.lookup(params, keys)
    assert set(lk_np) == set(lk_sp)
    for k in keys:
        np.testing.assert_allclose(lk_sp[k], lk_np[k], atol=1e-8)
    sb.unpersist()


def test_suffstats_oracle_weighted_sums(spark, spark_feat):
    """The M-step's weighted moments equal the SQL aggregation DuckDB runs."""
    df, cols, ids, X = spark_feat
    nb = NumpyBackend(ids, X)
    params, _ = fit_em(nb, GROUPS2, EMConfig(max_iter=2))
    logm, logu = class_logliks(X, params)
    g = gammas(logm, logu)
    gdf = pd.DataFrame(
        {"l_id": ids[:, 0], "r_id": ids[:, 1], "gamma": g, "f0": X[:, 0], "f1": X[:, 1]}
    )
    stats = nb.suffstats(params)
    got = spark.createDataFrame(
        pd.DataFrame(
            {
                "n_m": [stats.n_m],
                "s1_f0": [stats.s1_m[0]],
                "s2_f1": [stats.s2_m[1]],
            }
        )
    )
    sql = """
    SELECT SUM(gamma) AS n_m,
           SUM(gamma * f0) AS s1_f0,
           SUM(gamma * f1 * f1) AS s2_f1
    FROM g
    """
    assert_equivalent(got, sql, g=gdf)
