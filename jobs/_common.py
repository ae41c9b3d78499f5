"""Shared plumbing for the spark-submit table jobs."""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession


def session(app: str) -> SparkSession:
    """A local SparkSession configured like the test fixture."""
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.showConsoleProgress", "false")
        .getOrCreate()
    )


def parse_args(desc: str) -> argparse.Namespace:
    p = argparse.ArgumentParser(description=desc)
    p.add_argument("--scale", type=float, default=1.0, help="dataset scale factor")
    p.add_argument("--datasets", nargs="*", default=None, help="subset of FZ DA DS AB AG")
    p.add_argument("--seed", type=int, default=0)
    return p.parse_args()
