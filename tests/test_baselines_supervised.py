"""Tests for supervised baselines, DeepMatcher-lite and active learning."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.baselines import active_learning, deepmatcher_lite, supervised


@pytest.fixture(scope="module")
def separable(spark):
    """Separable labeled candidate set (40 matches / 960 unmatches)."""
    g = np.random.default_rng(1)
    n_m, n_u = 40, 960
    X = np.vstack(
        [
            np.clip(g.normal(0.85, 0.05, (n_m, 4)), 0, 1),
            np.clip(g.normal(0.15, 0.05, (n_u, 4)), 0, 1),
        ]
    )
    cols = [f"f{i}" for i in range(4)]
    pdf = pd.DataFrame(X, columns=cols)
    pdf.insert(0, "r_id", np.arange(1000, dtype="int64"))
    pdf.insert(0, "l_id", np.arange(1000, dtype="int64"))
    truth = spark.createDataFrame(
        pd.DataFrame({"l_id": np.arange(n_m, dtype="int64"),
                      "r_id": np.arange(n_m, dtype="int64")})
    )
    return spark.createDataFrame(pdf).cache(), cols, truth


def test_labeled_pairs(spark, separable):
    df, cols, truth = separable
    lab = supervised.labeled_pairs(df, truth)
    agg = {r["label"]: r["count"] for r in lab.groupBy("label").count().collect()}
    assert agg[1.0] == 40 and agg[0.0] == 960


def test_split_pairs_disjoint_and_complete(spark, separable):
    df, cols, truth = separable
    lab = supervised.labeled_pairs(df, truth)
    train, test = supervised.split_pairs(lab, test_frac=0.5, seed=3)
    nt, ns = train.count(), test.count()
    assert nt + ns == 1000
    assert train.join(test, ["l_id", "r_id"]).count() == 0
    assert 300 < nt < 700  # random split near half


def test_oversample_matches_balances(spark, separable):
    df, cols, truth = separable
    lab = supervised.labeled_pairs(df, truth)
    over = supervised.oversample_matches(lab)
    agg = {r["label"]: r["count"] for r in over.groupBy("label").count().collect()}
    assert agg[1.0] >= 10 * 40  # duplicated toward balance
    assert agg[0.0] == 960


def test_oversample_noop_when_balanced(spark, separable):
    df, cols, truth = separable
    lab = supervised.labeled_pairs(df, truth).where(F.col("l_id") < 80)
    # 40 matches vs 40 unmatches: factor 1 → unchanged
    assert supervised.oversample_matches(lab).count() == lab.count()


@pytest.mark.parametrize("model", ["LR", "RF", "MLP"])
def test_supervised_f1_separable(spark, separable, model):
    df, cols, truth = separable
    run = supervised.supervised_f1(model, df, cols, truth, seed=0, tune=False)
    assert run.prf.f1 > 0.9
    assert run.n_train + run.n_test == 1000


def test_supervised_tuning_path(spark, separable):
    df, cols, truth = separable
    run = supervised.supervised_f1("LR", df, cols, truth, seed=1, tune=True)
    assert run.prf.f1 > 0.9


def test_budget_f1_no_matches_returns_zero(spark, separable):
    df, cols, truth = separable
    # a 5-pair budget almost surely has no matches at 4% match rate w/ seed 2
    prf = supervised.budget_f1("RF", df, cols, truth, n_labels=5, seed=2)
    assert prf.f1 == 0.0 or prf.tp >= 0  # never crashes; zero when no match drawn


def test_budget_f1_grows_with_labels(spark, separable):
    df, cols, truth = separable
    lo = supervised.budget_f1("LR", df, cols, truth, n_labels=20, seed=0)
    hi = supervised.budget_f1("LR", df, cols, truth, n_labels=500, seed=0)
    assert hi.f1 >= lo.f1 - 0.05  # more labels never much worse (separable)
    assert hi.f1 > 0.9


def test_unknown_model_raises(spark, separable):
    df, cols, truth = separable
    with pytest.raises(ValueError):
        supervised.supervised_f1("SVM", df, cols, truth)


# ------------------------------------------------------------- DM-lite

def test_dm_feature_columns_counts():
    cols = deepmatcher_lite.dm_feature_columns(
        ["name", "price"], {"name": "short_str", "price": "numeric"}
    )
    assert len(cols) == 12  # 10 string + 2 numeric
    assert all(c.startswith("dm_") for c in cols)


def test_dm_features_bounded(spark, fz):
    from repro.blocking import cross_block

    pairs = cross_block(fz.left, fz.right, fz.blocking_attr).limit(200)
    feat, cols = deepmatcher_lite.dm_features(pairs, fz)
    pdf = feat.toPandas()
    vals = pdf[cols].to_numpy()
    assert np.nanmin(vals) >= 0.0 and np.nanmax(vals) <= 1.0 + 1e-9


def test_dm_lite_f1_on_clean_dataset(spark, fz):
    from repro.blocking import cross_block

    pairs = cross_block(fz.left, fz.right, fz.blocking_attr)
    run = deepmatcher_lite.dm_lite_f1(spark, pairs, fz, seed=0)
    assert run.prf.f1 > 0.8


# ------------------------------------------------------------- AL-RF

def test_al_rf_separable(spark, separable):
    df, cols, truth = separable
    res = active_learning.al_rf(spark, df, cols, truth, batch=20, seed=0)
    assert res.prf.f1 > 0.8
    assert res.trajectory  # at least one evaluation round
    ns = [n for n, _ in res.trajectory]
    assert ns == sorted(ns)  # labeled count grows monotonically


def test_al_rf_budget_respected(spark, separable):
    df, cols, truth = separable
    res = active_learning.al_rf(spark, df, cols, truth, batch=20, seed=0)
    # stops at 50% of matches labeled or 50% of pairs (plus one final batch)
    assert res.n_labeled <= 500 + 20
