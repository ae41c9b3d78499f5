"""Table 3 — F-score of all eleven methods on the five datasets.

One featurization per dataset (shared blocking + features, the paper's
protocol), then every method from the registry. Paper F1 values ride along
for the EXPERIMENTS.md diff.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.zeroer import featurize
from repro.erdata.generators import all_datasets
from repro.experiments.runner import ALL_METHODS, run_method

PAPER_TABLE3 = {
    "ZeroER": {"FZ": 1.00, "DA": 0.96, "DS": 0.86, "AB": 0.52, "AG": 0.48},
    "ECM":    {"FZ": 0.07, "DA": 0.09, "DS": 0.07, "AB": 0.01, "AG": 0.01},
    "KM-RL":  {"FZ": 0.30, "DA": 0.95, "DS": 0.85, "AB": 0.01, "AG": 0.02},
    "KM-SK":  {"FZ": 0.30, "DA": 0.27, "DS": 0.43, "AB": 0.02, "AG": 0.02},
    "GMM":    {"FZ": 0.30, "DA": 0.26, "DS": 0.07, "AB": 0.02, "AG": 0.02},
    "PP*":    {"FZ": 0.97, "DA": 0.87, "DS": 0.83, "AB": 0.29, "AG": 0.30},
    "RF":     {"FZ": 0.97, "DA": 0.98, "DS": 0.93, "AB": 0.46, "AG": 0.51},
    "LR":     {"FZ": 0.98, "DA": 0.96, "DS": 0.88, "AB": 0.18, "AG": 0.18},
    "MLP":    {"FZ": 0.99, "DA": 0.97, "DS": 0.92, "AB": 0.32, "AG": 0.35},
    "DM":     {"FZ": 0.93, "DA": 0.97, "DS": 0.95, "AB": 0.63, "AG": 0.67},
    "AL-RF":  {"FZ": 1.00, "DA": 0.99, "DS": 0.99, "AB": 0.44, "AG": 0.46},
}


def run(
    spark: SparkSession,
    *,
    scale: float = 1.0,
    methods: list[str] | None = None,
    datasets: list[str] | None = None,
    seed: int = 0,
) -> pd.DataFrame:
    """One row per (dataset, method) with measured and paper F1."""
    methods = methods or ALL_METHODS
    rows = []
    for ds in all_datasets(spark, scale=scale):
        if datasets and ds.code not in datasets:
            continue
        task = featurize(spark, ds, include_intra=True)
        for m in methods:
            res = run_method(spark, task, m, seed=seed)
            rows.append(
                {
                    "dataset": ds.code,
                    "method": m,
                    "f1": round(res.f1, 3),
                    "paper f1": PAPER_TABLE3[m][ds.code],
                    "precision": round(res.precision, 3),
                    "recall": round(res.recall, 3),
                }
            )
        task.unpersist()
    return pd.DataFrame(rows)


def pivot(df: pd.DataFrame) -> pd.DataFrame:
    """Datasets × methods F1 matrix in the paper's layout (plus average row)."""
    wide = df.pivot(index="dataset", columns="method", values="f1")
    wide = wide.reindex([c for c in ["FZ", "DA", "DS", "AB", "AG"] if c in wide.index])
    order = [m for m in PAPER_TABLE3 if m in wide.columns]
    wide = wide[order]
    wide.loc["average"] = wide.mean()
    return wide.round(3)
