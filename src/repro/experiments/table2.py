"""Table 2 — dataset characteristics (#tuples, #matches, #attributes).

Ours are the synthetic generators' actual counts; the paper's counts ride
along so EXPERIMENTS.md can show the size mapping (DESIGN.md documents the
deliberate down-scaling of DA and DS).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.erdata.generators import all_datasets


def run(spark: SparkSession, *, scale: float = 1.0) -> pd.DataFrame:
    rows = []
    for ds in all_datasets(spark, scale=scale):
        nl, nr, nm = ds.counts()
        rows.append(
            {
                "dataset": ds.code,
                "tuples": f"{nl} - {nr}",
                "paper tuples": ds.paper_stats["tuples"],
                "matches": nm,
                "paper matches": ds.paper_stats["matches"],
                "attributes": len(ds.attributes),
                "paper attributes": ds.paper_stats["attributes"],
            }
        )
    return pd.DataFrame(rows)
