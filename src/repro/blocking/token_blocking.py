"""Shared-rare-token blocking as a pure Spark dataflow.

Two records become a candidate pair iff their blocking attribute shares at
least ``min_overlap`` word tokens that are not stop-tokens (document
frequency above ``max_df_frac`` of all records). ``min_overlap`` is the
aggressiveness knob that stands in for the paper's LSH "overlapping size"
sweep: higher values prune more pairs at the risk of losing matches.

Everything here is explode + join + groupBy — no driver-side loops — so the
quadratic-shaped work stays inside Catalyst.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def token_table(df: DataFrame, attr: str, id_alias: str) -> DataFrame:
    """(_id, attr) → distinct (id_alias, token) rows of lowercase word tokens."""
    return (
        df.select(
            F.col("_id").alias(id_alias),
            F.explode(F.split(F.lower(F.col(attr).cast("string")), "[^a-z0-9]+")).alias("token"),
        )
        .where(F.col("token") != "")
        .distinct()
    )


def _rare_tokens(lt: DataFrame, rt: DataFrame, n_records: int, max_df_frac: float) -> DataFrame:
    """Tokens whose document frequency is below the stop-token cap."""
    cap = max(20.0, max_df_frac * n_records)
    df_counts = (
        lt.select("token").unionAll(rt.select("token")).groupBy("token").count()
    )
    return df_counts.where(F.col("count") <= F.lit(cap)).select("token")


def cross_block(
    left: DataFrame,
    right: DataFrame,
    attr: str,
    *,
    max_df_frac: float = 0.05,
    min_overlap: int = 1,
) -> DataFrame:
    """Candidate (l_id, r_id) pairs across two tables sharing rare tokens."""
    lt = token_table(left, attr, "l_id")
    rt = token_table(right, attr, "r_id")
    rare = _rare_tokens(lt, rt, left.count() + right.count(), max_df_frac)
    lt = lt.join(rare, "token")
    rt = rt.join(rare, "token")
    pairs = (
        lt.join(rt, "token")
        .groupBy("l_id", "r_id")
        .agg(F.count("*").alias("n_shared"))
        .where(F.col("n_shared") >= F.lit(min_overlap))
        .select("l_id", "r_id")
    )
    return pairs


def self_block(
    table: DataFrame,
    attr: str,
    *,
    max_df_frac: float = 0.05,
    min_overlap: int = 1,
) -> DataFrame:
    """Candidate intra-table pairs (l_id < r_id), for the T×T / T'×T' models."""
    lt = token_table(table, attr, "l_id")
    rt = lt.select(F.col("l_id").alias("r_id"), "token")
    rare = _rare_tokens(lt, rt, 2 * table.count(), max_df_frac)
    lt = lt.join(rare, "token")
    rt = rt.join(rare, "token")
    return (
        lt.join(rt, "token")
        .where(F.col("l_id") < F.col("r_id"))
        .groupBy("l_id", "r_id")
        .agg(F.count("*").alias("n_shared"))
        .where(F.col("n_shared") >= F.lit(min_overlap))
        .select("l_id", "r_id")
    )
