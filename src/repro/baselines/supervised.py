"""Supervised baselines LR / RF / MLP over the shared feature matrix (§5.1 #1–3).

Protocol per the paper: label every candidate pair from ground truth, split
50/50 into train/test, oversample matches in the training half, tune a small
hyper-parameter grid on a held-out quarter of the training half (substitute
for sklearn's 5-fold CV — see DESIGN.md), refit, and evaluate F1 on the test
half only. ``budget_f1`` supports Table 4's label-budget sweep: train on a
random sample of n labeled pairs, evaluate on all remaining pairs, fixed
default hyper-parameters (tuning a grid per budget point is intractable and
does not change the regime).
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.ml.classification import (
    LogisticRegression,
    MultilayerPerceptronClassifier,
    RandomForestClassifier,
)
from pyspark.ml.feature import VectorAssembler
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.eval import PRF, evaluate


def labeled_pairs(feat_df: DataFrame, truth: DataFrame) -> DataFrame:
    """Attach the ground-truth label column to a candidate feature DataFrame."""
    t = truth.select("l_id", "r_id").withColumn("label", F.lit(1.0))
    return feat_df.join(t, ["l_id", "r_id"], "left").fillna({"label": 0.0})


def split_pairs(labeled: DataFrame, *, test_frac: float = 0.5, seed: int = 0) -> tuple[DataFrame, DataFrame]:
    """Random train/test split of the candidate set."""
    with_r = labeled.withColumn("_r", F.rand(seed))
    train = with_r.where(F.col("_r") >= test_frac).drop("_r")
    test = with_r.where(F.col("_r") < test_frac).drop("_r")
    return train, test


def oversample_matches(train: DataFrame, *, cap: int = 50) -> DataFrame:
    """Duplicate match rows to roughly balance classes (capped factor)."""
    agg = {r["label"]: r["count"] for r in train.groupBy("label").count().collect()}
    n_m, n_u = agg.get(1.0, 0), agg.get(0.0, 0)
    if n_m == 0 or n_u == 0:
        return train
    factor = min(cap, max(1, int(n_u // n_m)))
    if factor <= 1:
        return train
    dup = train.where(F.col("label") == 1.0).withColumn(
        "_k", F.explode(F.array_repeat(F.lit(1), factor - 1))
    ).drop("_k")
    return train.unionAll(dup)


_GRIDS = {
    "LR": [{"regParam": 0.0}, {"regParam": 0.01}, {"regParam": 0.1}],
    "RF": [{"minInstancesPerNode": 1}, {"minInstancesPerNode": 5}],
    "MLP": [{"maxIter": 60}, {"maxIter": 200}],
}
_DEFAULTS = {"LR": {"regParam": 0.01}, "RF": {"minInstancesPerNode": 1}, "MLP": {"maxIter": 100}}


def _estimator(name: str, d: int, hp: dict, seed: int):
    if name == "LR":
        return LogisticRegression(featuresCol="features", labelCol="label", maxIter=100, **hp)
    if name == "RF":
        return RandomForestClassifier(
            featuresCol="features", labelCol="label", numTrees=100, seed=seed, **hp
        )
    if name == "MLP":
        return MultilayerPerceptronClassifier(
            featuresCol="features", labelCol="label", layers=[d, 50, 10, 2], seed=seed, **hp
        )
    raise ValueError(f"unknown supervised model {name!r}")


def _assemble(df: DataFrame, cols: list[str]) -> DataFrame:
    return VectorAssembler(inputCols=cols, outputCol="features").transform(df)


def _f1_of(pred: DataFrame) -> float:
    agg = pred.agg(
        F.sum(((F.col("prediction") == 1.0) & (F.col("label") == 1.0)).cast("int")).alias("tp"),
        F.sum(((F.col("prediction") == 1.0) & (F.col("label") == 0.0)).cast("int")).alias("fp"),
        F.sum(((F.col("prediction") == 0.0) & (F.col("label") == 1.0)).cast("int")).alias("fn"),
    ).first()
    return PRF(tp=agg["tp"] or 0, fp=agg["fp"] or 0, fn=agg["fn"] or 0).f1


@dataclass
class SupervisedRun:
    """Result of one supervised train/eval: PRF on the test half + sizes."""

    prf: PRF
    n_train: int
    n_test: int


def fit_predict(
    name: str, train: DataFrame, test: DataFrame, cols: list[str], *, seed: int = 0, tune: bool = True
) -> DataFrame:
    """Train (with optional grid tuning on a validation split) and return the
    test rows predicted as matches."""
    if name not in _DEFAULTS:
        raise ValueError(f"unknown supervised model {name!r}")
    d = len(cols)
    train_a = _assemble(train, cols).cache()
    test_a = _assemble(test, cols)
    hp = _DEFAULTS[name]
    if tune:
        fit_part, val_part = split_pairs(train_a, test_frac=0.25, seed=seed + 1)
        fit_part = oversample_matches(fit_part).cache()
        best_f1 = -1.0
        for cand in _GRIDS[name]:
            model = _estimator(name, d, cand, seed).fit(fit_part)
            f1 = _f1_of(model.transform(val_part))
            if f1 > best_f1:
                best_f1, hp = f1, cand
        fit_part.unpersist()
    final = _estimator(name, d, hp, seed).fit(oversample_matches(train_a))
    pred = final.transform(test_a)
    train_a.unpersist()
    return pred.where(F.col("prediction") == 1.0).select("l_id", "r_id")


def supervised_f1(
    name: str,
    feat_df: DataFrame,
    cols: list[str],
    truth: DataFrame,
    *,
    seed: int = 0,
    tune: bool = True,
) -> SupervisedRun:
    """The Table 3 protocol: 50/50 split, oversample, tune, F1 on test half."""
    labeled = labeled_pairs(feat_df, truth)
    train, test = split_pairs(labeled, test_frac=0.5, seed=seed)
    pred = fit_predict(name, train, test, cols, seed=seed, tune=tune)
    prf = evaluate(pred, truth, restrict_to=test.select("l_id", "r_id"))
    return SupervisedRun(prf=prf, n_train=train.count(), n_test=test.count())


def budget_f1(
    name: str,
    feat_df: DataFrame,
    cols: list[str],
    truth: DataFrame,
    n_labels: int,
    *,
    seed: int = 0,
) -> PRF:
    """Table 4 protocol: train on a random sample of ~``n_labels`` labeled
    pairs (a Bernoulli sample at rate n/N — deterministic and cheap, exact
    counts are irrelevant on a doubling grid), evaluate on the rest."""
    labeled = labeled_pairs(feat_df, truth)
    total = labeled.count()
    frac = min(1.0, n_labels / max(total, 1))
    with_r = labeled.withColumn("_r", F.rand(seed)).cache()
    train = with_r.where(F.col("_r") < frac).drop("_r")
    rest = with_r.where(F.col("_r") >= frac).drop("_r")
    if train.where(F.col("label") == 1.0).count() == 0:
        # No match examples in the budget: a classifier degenerates to
        # "predict unmatch" — F1 = 0 without fitting anything.
        n_true = rest.where(F.col("label") == 1.0).count()
        with_r.unpersist()
        return PRF(tp=0, fp=0, fn=n_true)
    pred = fit_predict(name, train, rest, cols, seed=seed, tune=False)
    prf = evaluate(pred, truth, restrict_to=rest.select("l_id", "r_id"))
    with_r.unpersist()
    return prf
