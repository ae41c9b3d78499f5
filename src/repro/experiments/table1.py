"""Table 1 — cosine(S_M, S_U) vs cosine(R_M, R_U) after feature grouping.

The empirical justification for correlation sharing (§3.1): using ground
truth, the M/U *covariance* matrices differ substantially while the M/U
*correlation* matrices are nearly identical. We compute both from the
candidate set's feature matrix, block-restricted to the feature groups.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.core import gmm
from repro.core.zeroer import FeaturizedTask, featurize
from repro.erdata.generators import all_datasets

PAPER_TABLE1 = {
    "cosine(S_M,S_U)": {"FZ": 0.76, "DA": 0.69, "DS": 0.74, "AB": 0.92, "AG": 0.73},
    "cosine(R_M,R_U)": {"FZ": 0.97, "DA": 0.94, "DS": 0.98, "AB": 0.99, "AG": 0.99},
}


def _flat_cosine(a: np.ndarray, b: np.ndarray) -> float:
    fa, fb = a.ravel(), b.ravel()
    na, nb = np.linalg.norm(fa), np.linalg.norm(fb)
    return float(fa @ fb / (na * nb)) if na > 0 and nb > 0 else 0.0


def grouped_cosines(task: FeaturizedTask) -> tuple[float, float]:
    """(cosine(S_M, S_U), cosine(R_M, R_U)) from ground-truth labels."""
    truth = task.ds.matches.withColumn("y", F.lit(1.0))
    pdf = (
        task.cross.join(truth, ["l_id", "r_id"], "left")
        .fillna({"y": 0.0})
        .select("y", *task.cols)
        .toPandas()
    )
    X = pdf[task.cols].to_numpy(dtype=np.float64)
    y = pdf["y"].to_numpy(dtype=np.float64)
    S_m, R_m = gmm.weighted_cov(X, y)
    S_u, R_u = gmm.weighted_cov(X, 1.0 - y)
    g = task.groups
    return (
        _flat_cosine(gmm.block_of(S_m, g), gmm.block_of(S_u, g)),
        _flat_cosine(gmm.block_of(R_m, g), gmm.block_of(R_u, g)),
    )


def run(spark: SparkSession, *, scale: float = 1.0) -> pd.DataFrame:
    """Compute Table 1 over all five datasets; paper values alongside."""
    rows = []
    for ds in all_datasets(spark, scale=scale):
        task = featurize(spark, ds)
        cos_s, cos_r = grouped_cosines(task)
        task.cross.unpersist()
        rows.append(
            {
                "dataset": ds.code,
                "cosine(S_M,S_U)": round(cos_s, 2),
                "paper cosine(S_M,S_U)": PAPER_TABLE1["cosine(S_M,S_U)"][ds.code],
                "cosine(R_M,R_U)": round(cos_r, 2),
                "paper cosine(R_M,R_U)": PAPER_TABLE1["cosine(R_M,R_U)"][ds.code],
            }
        )
    return pd.DataFrame(rows)
