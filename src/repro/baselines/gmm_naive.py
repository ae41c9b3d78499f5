"""Naive Gaussian Mixture baseline — MLlib ``GaussianMixture`` with k=2 (§5.1 #7).

This is the "blindly apply GMM" strawman of the paper: full covariance, no
grouping, no correlation sharing, no adaptive regularization, no transitivity.
The match component is the one with the larger mean similarity.
"""
from __future__ import annotations

from pyspark.ml.clustering import GaussianMixture
from pyspark.ml.feature import VectorAssembler
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def gmm_naive(feat_df: DataFrame, cols: list[str], *, seed: int = 0) -> DataFrame:
    """Predicted (l_id, r_id) matches from a 2-component MLlib GMM."""
    assembled = VectorAssembler(inputCols=cols, outputCol="features").transform(feat_df)
    model = GaussianMixture(k=2, featuresCol="features", seed=seed, maxIter=100).fit(assembled)
    means = [row["mean"].toArray().mean() for row in model.gaussiansDF.select("mean").collect()]
    match_cluster = int(means.index(max(means)))
    pred = model.transform(assembled)
    return pred.where(F.col("prediction") == match_cluster).select("l_id", "r_id")
