"""Tests for the unsupervised baselines: K-Means, ECM, naive GMM."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.baselines import ecm as ecm_mod
from repro.baselines import gmm_naive, kmeans


@pytest.fixture(scope="module")
def separable(spark):
    """A trivially separable candidate set: 30 matches at ~0.9, 970 at ~0.1."""
    g = np.random.default_rng(0)
    n_m, n_u = 30, 970
    X = np.vstack(
        [
            np.clip(g.normal(0.9, 0.03, (n_m, 3)), 0, 1),
            np.clip(g.normal(0.1, 0.03, (n_u, 3)), 0, 1),
        ]
    )
    pdf = pd.DataFrame(X, columns=["f0", "f1", "f2"])
    pdf.insert(0, "r_id", np.arange(1000, dtype="int64"))
    pdf.insert(0, "l_id", np.arange(1000, dtype="int64"))
    truth = set(range(n_m))
    return spark.createDataFrame(pdf), ["f0", "f1", "f2"], truth


def _prf(pred_df, truth):
    got = set(pred_df.toPandas()["l_id"])
    tp = len(got & truth)
    return tp, len(got - truth), len(truth - got)


def test_km_sk_separable(spark, separable):
    df, cols, truth = separable
    tp, fp, fn = _prf(kmeans.km_sk(df, cols), truth)
    assert fn == 0 and fp == 0


def test_km_rl_separable(spark, separable):
    df, cols, truth = separable
    tp, fp, fn = _prf(kmeans.km_rl(spark, df, cols), truth)
    assert fn == 0 and fp == 0


def test_km_rl_beta_zero_is_plain_lloyds(spark, separable):
    df, cols, truth = separable
    pred = kmeans.km_rl(spark, df, cols, beta=0.0)
    tp, fp, fn = _prf(pred, truth)
    assert fn == 0 and fp == 0  # still separable without weighting


def test_km_rl_output_schema(spark, separable):
    df, cols, _ = separable
    pred = kmeans.km_rl(spark, df, cols)
    assert pred.columns == ["l_id", "r_id"]


def test_gmm_naive_separable(spark, separable):
    df, cols, truth = separable
    tp, fp, fn = _prf(gmm_naive.gmm_naive(df, cols), truth)
    assert fn <= 2 and fp <= 2  # MLlib GMM has its own initialization noise


def test_ecm_separable(spark, separable):
    df, cols, truth = separable
    tp, fp, fn = _prf(ecm_mod.ecm(spark, df, cols), truth)
    assert fn == 0 and fp == 0


def test_ecm_binarization_threshold(spark, separable):
    """With an impossible threshold everything binarizes to 0 and the model
    must not crash (degenerate single-cluster input)."""
    df, cols, _ = separable
    pred = ecm_mod.ecm(spark, df, cols, bin_threshold=2.0)
    assert pred.columns == ["l_id", "r_id"]


def test_ecm_deterministic(spark, separable):
    df, cols, _ = separable
    a = set(ecm_mod.ecm(spark, df, cols).toPandas()["l_id"])
    b = set(ecm_mod.ecm(spark, df, cols).toPandas()["l_id"])
    assert a == b


def test_km_rl_single_cluster_input_survives(spark):
    pdf = pd.DataFrame(
        {
            "l_id": np.arange(10, dtype="int64"),
            "r_id": np.arange(10, dtype="int64"),
            "f0": np.full(10, 0.5),
        }
    )
    pred = kmeans.km_rl(spark, spark.createDataFrame(pdf), ["f0"])
    assert pred.count() in (0, 10)
