"""Oracle tests for token blocking: the Spark dataflow must equal the
equivalent relational query run by DuckDB."""
from __future__ import annotations

import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.blocking import cross_block, self_block, token_table
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def tables(spark):
    left = spark.createDataFrame(
        pd.DataFrame(
            {
                "_id": pd.array([0, 1, 2, 3], dtype="int64"),
                "name": ["alpha beta", "beta gamma", "delta", "omega alpha beta"],
            }
        )
    )
    right = spark.createDataFrame(
        pd.DataFrame(
            {
                "_id": pd.array([0, 1, 2], dtype="int64"),
                "name": ["beta delta", "ALPHA!", None],
            }
        )
    )
    return left, right


def test_token_table_normalizes(spark, tables):
    left, _ = tables
    toks = token_table(left, "name", "l_id").toPandas()
    assert set(toks.token) == {"alpha", "beta", "gamma", "delta", "omega"}
    assert len(toks) == len(toks.drop_duplicates())


def test_token_table_handles_null(spark, tables):
    _, right = tables
    toks = token_table(right, "name", "r_id").toPandas()
    assert set(toks[toks.r_id == 1].token) == {"alpha"}
    assert (toks.r_id == 2).sum() == 0  # NULL attribute yields no tokens


def test_cross_block_oracle(spark, tables):
    """cross_block == DuckDB distinct token join (no stop tokens at this df)."""
    left, right = tables
    pairs = cross_block(left, right, "name", max_df_frac=1.0)
    lt = token_table(left, "name", "l_id")
    rt = token_table(right, "name", "r_id")
    sql = """
    SELECT DISTINCT lt.l_id AS l_id, rt.r_id AS r_id
    FROM lt JOIN rt USING (token)
    """
    assert_equivalent(pairs, sql, lt=lt, rt=rt)


def test_cross_block_min_overlap(spark, tables):
    left, right = tables
    p1 = cross_block(left, right, "name", max_df_frac=1.0, min_overlap=1).toPandas()
    p2 = cross_block(left, right, "name", max_df_frac=1.0, min_overlap=2).toPandas()
    # "beta delta" shares 0 tokens twice with anything except nothing here;
    # higher overlap requirement prunes pairs monotonically.
    assert len(p2) <= len(p1)
    assert set(map(tuple, p2.to_numpy())) <= set(map(tuple, p1.to_numpy()))


def test_cross_block_pairs_share_a_token(spark, tables):
    left, right = tables
    pairs = cross_block(left, right, "name", max_df_frac=1.0).toPandas()
    lp = tables[0].toPandas().set_index("_id")
    rp = tables[1].toPandas().set_index("_id")
    for l, r in pairs.to_numpy():
        ltoks = set(str(lp.loc[l, "name"]).lower().replace("!", "").split())
        rtoks = set(str(rp.loc[r, "name"] or "").lower().replace("!", "").split())
        assert ltoks & rtoks


def test_self_block_ordered_pairs(spark, tables):
    left, _ = tables
    pairs = self_block(left, "name", max_df_frac=1.0).toPandas()
    assert (pairs.l_id < pairs.r_id).all()
    got = set(map(tuple, pairs.to_numpy()))
    # alpha: {0,3}; beta: {0,1,3}
    assert got == {(0, 1), (0, 3), (1, 3)}


def test_self_block_oracle(spark, tables):
    left, _ = tables
    pairs = self_block(left, "name", max_df_frac=1.0)
    lt = token_table(left, "name", "l_id")
    sql = """
    SELECT DISTINCT a.l_id AS l_id, b.l_id AS r_id
    FROM lt a JOIN lt b USING (token)
    WHERE a.l_id < b.l_id
    """
    assert_equivalent(pairs, sql, lt=lt)


def test_blocking_recall_on_dataset(spark, fz):
    """On the clean FZ dataset, token blocking must keep ≥95% of matches."""
    pairs = cross_block(fz.left, fz.right, fz.blocking_attr)
    kept = pairs.join(fz.matches, ["l_id", "r_id"]).count()
    total = fz.matches.count()
    assert kept >= 0.95 * total


def test_stop_token_cap_prunes(spark):
    """A token in (almost) every record is a stop token and creates no pairs
    once the corpus is big enough to exceed the absolute floor of the cap."""
    n = 60
    left = spark.createDataFrame(
        pd.DataFrame({"_id": pd.array(range(n), dtype="int64"),
                      "name": [f"common word{i}" for i in range(n)]})
    )
    right = spark.createDataFrame(
        pd.DataFrame({"_id": pd.array(range(n), dtype="int64"),
                      "name": [f"common other{i}" for i in range(n)]})
    )
    pairs = cross_block(left, right, "name", max_df_frac=0.05)
    assert pairs.count() == 0  # "common" alone would give n² pairs
