"""Fellegi-Sunter ECM baseline (§5.1 #8).

The FS model with the recordlinkage-toolkit ECM estimator: every feature is
binarized, the two classes are Bernoulli product distributions (feature
independence), and parameters are fit by EM with no labels. The paper notes
this "binarizes all features … which loses information" — the reason it
underperforms everywhere.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame, SparkSession

_CLIP = 1e-6


def ecm(
    spark: SparkSession,
    feat_df: DataFrame,
    cols: list[str],
    *,
    bin_threshold: float = 0.5,
    max_iter: int = 200,
    tol: float = 1e-6,
) -> DataFrame:
    """Predicted matches from a two-class Bernoulli mixture over binarized
    (scaled-similarity ≥ threshold) features."""
    pdf = feat_df.select("l_id", "r_id", *cols).toPandas()
    B = (pdf[cols].to_numpy(dtype=np.float64) >= bin_threshold).astype(np.float64)
    n, d = B.shape
    gamma = (B.mean(axis=1) > 0.5).astype(np.float64)
    gamma = np.clip(gamma, _CLIP, 1 - _CLIP)
    prev_ll = -np.inf
    for _ in range(max_iter):
        # M-step
        n_m = max(gamma.sum(), 1e-9)
        n_u = max(n - n_m, 1e-9)
        pi = np.clip(n_m / n, _CLIP, 1 - _CLIP)
        p_m = np.clip((gamma @ B) / n_m, _CLIP, 1 - _CLIP)
        p_u = np.clip(((1 - gamma) @ B) / n_u, _CLIP, 1 - _CLIP)
        # E-step
        logm = np.log(pi) + B @ np.log(p_m) + (1 - B) @ np.log(1 - p_m)
        logu = np.log(1 - pi) + B @ np.log(p_u) + (1 - B) @ np.log(1 - p_u)
        gamma = 1.0 / (1.0 + np.exp(np.clip(logu - logm, -700, 700)))
        ll = float(np.logaddexp(logm, logu).sum())
        if abs(ll - prev_ll) < tol * (1 + abs(prev_ll)):
            break
        prev_ll = ll
    # Orient components: the match class is the one with higher mean p_j.
    if p_m.mean() < p_u.mean():
        gamma = 1.0 - gamma
    out = pdf.loc[gamma > 0.5, ["l_id", "r_id"]]
    return spark.createDataFrame(out.astype("int64"), schema="l_id long, r_id long")
