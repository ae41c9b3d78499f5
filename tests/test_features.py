"""Tests for Magellan-style feature generation (repro.textsim.features)."""
from __future__ import annotations

import math

import numpy as np
import pandas as pd
import pytest

from repro.textsim import (
    compute_features,
    feature_columns,
    feature_plan,
    group_ids,
    pairs_with_attrs,
    sim,
    tokenize,
)

ATTRS = ["name", "phone", "price"]
TYPES = {"name": "short_str", "phone": "phone", "price": "numeric"}


def test_feature_plan_counts():
    plan = feature_plan(ATTRS, TYPES)
    # short_str: 9, phone: 3, numeric: 2
    assert len(plan) == 14
    assert len({f.name for f in plan}) == 14


def test_feature_plan_long_str():
    plan = feature_plan(["d"], {"d": "long_str"})
    assert len(plan) == 6
    assert all("lev" not in f.kind and f.kind != "exm" for f in plan)


def test_group_ids_align_with_attributes():
    plan = feature_plan(ATTRS, TYPES)
    gids = group_ids(plan)
    assert len(gids) == len(plan)
    assert set(gids) == {0, 1, 2}
    for f, g in zip(plan, gids):
        assert ATTRS[g] == f.attr


@pytest.fixture(scope="module")
def small_pair_feats(spark):
    left = spark.createDataFrame(
        pd.DataFrame(
            {
                "_id": pd.array([0, 1, 2], dtype="int64"),
                "name": ["ritz carlton cafe", "patina", None],
                "phone": ["404/237-2700", "213/467-1108", "555/000-1111"],
                "price": [10.0, 20.0, math.nan],
            }
        )
    )
    right = spark.createDataFrame(
        pd.DataFrame(
            {
                "_id": pd.array([0, 1, 2], dtype="int64"),
                "name": ["ritz-carlton cafe", "patina", "anything"],
                "phone": ["404-237-2700", "213-467-1108", None],
                "price": [10.0, 30.0, 5.0],
            }
        )
    )
    pairs = spark.createDataFrame(
        pd.DataFrame({"l_id": pd.array([0, 1, 2], dtype="int64"),
                      "r_id": pd.array([0, 1, 2], dtype="int64")})
    )
    plan = feature_plan(ATTRS, TYPES)
    pa = pairs_with_attrs(pairs, left, right, ATTRS)
    out = compute_features(pa, plan, TYPES).toPandas().sort_values("l_id").reset_index(drop=True)
    return out, plan


def test_pairs_with_attrs_columns(spark, small_pair_feats):
    out, plan = small_pair_feats
    assert list(out.columns) == ["l_id", "r_id"] + feature_columns(plan)


def test_exact_phone_digits_match(small_pair_feats):
    out, _ = small_pair_feats
    # Same digits, different separators → exm_dig = 1 for both real pairs.
    assert out.loc[0, "phone_exm_dig"] == 1.0
    assert out.loc[1, "phone_exm_dig"] == 1.0


def test_identical_name_scores_one(small_pair_feats):
    out, _ = small_pair_feats
    row = out.loc[1]
    for col in ["name_exm", "name_lev_sim", "name_jwn", "name_jac_qgm3", "name_jac_ws"]:
        assert row[col] == 1.0


def test_feature_values_match_direct_kernels(small_pair_feats):
    out, _ = small_pair_feats
    a, b = "ritz carlton cafe", "ritz-carlton cafe"
    assert out.loc[0, "name_lev_sim"] == pytest.approx(sim.lev_sim(a, b))
    assert out.loc[0, "name_jac_qgm3"] == pytest.approx(
        sim.jaccard(tokenize.qgrams(a), tokenize.qgrams(b))
    )
    assert out.loc[0, "name_cos_ws"] == pytest.approx(
        sim.cosine(tokenize.word_tokens(a), tokenize.word_tokens(b))
    )
    assert out.loc[0, "name_exm"] == 0.0


def test_missing_value_yields_nan(small_pair_feats):
    out, _ = small_pair_feats
    row = out.loc[2]  # left name None, right phone None, left price NaN
    assert math.isnan(row["name_jac_qgm3"])
    assert math.isnan(row["phone_exm_dig"])
    assert math.isnan(row["price_rel_sim"])


def test_numeric_features(small_pair_feats):
    out, _ = small_pair_feats
    assert out.loc[0, "price_exm_num"] == 1.0
    assert out.loc[0, "price_rel_sim"] == 1.0
    assert out.loc[1, "price_exm_num"] == 0.0
    assert out.loc[1, "price_rel_sim"] == pytest.approx(1 - 10 / 30)


def test_all_feature_values_in_unit_interval_or_nan(small_pair_feats):
    out, plan = small_pair_feats
    vals = out[feature_columns(plan)].to_numpy(dtype=float)
    ok = np.isnan(vals) | ((vals >= 0.0) & (vals <= 1.0 + 1e-9))
    assert ok.all()


def test_features_on_real_dataset_separate_matches(spark, fz):
    """On the clean FZ dataset, matches must average visibly higher than
    unmatches on the blocking attribute's Jaccard feature."""
    from pyspark.sql import functions as F

    from repro.blocking import cross_block

    plan = feature_plan(fz.attributes, fz.attr_types)
    pairs = cross_block(fz.left, fz.right, fz.blocking_attr)
    pa = pairs_with_attrs(pairs, fz.left, fz.right, fz.attributes)
    feats = compute_features(pa, plan, fz.attr_types)
    truth = fz.matches.withColumn("y", F.lit(1.0))
    col = f"{fz.blocking_attr}_jac_ws"
    stats = (
        feats.join(truth, ["l_id", "r_id"], "left")
        .fillna({"y": 0.0})
        .groupBy("y")
        .agg(F.avg(col).alias("avg_sim"))
        .toPandas()
        .set_index("y")["avg_sim"]
    )
    assert stats[1.0] > stats[0.0] + 0.3
