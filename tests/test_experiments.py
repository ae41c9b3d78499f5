"""Tests for the table harnesses and the method registry."""
from __future__ import annotations

import pytest

from repro.experiments import table1, table2, table3, table4, table5
from repro.experiments.runner import ALL_METHODS, run_method


def test_registry_matches_paper_methods():
    assert set(ALL_METHODS) == set(table3.PAPER_TABLE3)
    assert len(ALL_METHODS) == 11


def test_paper_constants_complete():
    for tbl in (table3.PAPER_TABLE3, table5.PAPER_TABLE5, table4.PAPER_TABLE4):
        for method, per_ds in tbl.items():
            assert set(per_ds) == {"FZ", "DA", "DS", "AB", "AG"}, method
    for row in table1.PAPER_TABLE1.values():
        assert set(row) == {"FZ", "DA", "DS", "AB", "AG"}


def test_run_method_unknown_raises(spark, task_fz):
    with pytest.raises(ValueError):
        run_method(spark, task_fz, "NOPE")


def test_run_method_zeroer(spark, task_fz):
    res = run_method(spark, task_fz, "ZeroER")
    assert res.dataset == "FZ" and res.method == "ZeroER"
    assert res.f1 > 0.85
    assert res.extra and res.extra["iters"] > 0


def test_run_method_fast_baselines(spark, task_fz):
    for m in ("ECM", "KM-RL", "KM-SK"):
        res = run_method(spark, task_fz, m)
        assert 0.0 <= res.f1 <= 1.0


def test_table2_counts(spark):
    df = table2.run(spark, scale=0.06)
    assert list(df["dataset"]) == ["FZ", "DA", "DS", "AB", "AG"]
    assert (df["attributes"] == df["paper attributes"]).all()
    assert {"tuples", "paper tuples", "matches", "paper matches"} <= set(df.columns)


def test_table1_cosines_in_range_and_corr_higher(spark, fz, task_fz):
    cos_s, cos_r = table1.grouped_cosines(task_fz)
    assert -1.0 <= cos_s <= 1.0 and -1.0 <= cos_r <= 1.0
    # The paper's claim: correlation matrices agree much more than covariances.
    assert cos_r > cos_s


def test_table4_budget_grid():
    grid = table4._budget_grid(1000, start=50)
    assert grid[0] == 50 and grid[-1] == 1000
    assert all(b < 1000 for b in grid[:-1])
    assert grid == sorted(grid)


def test_table3_pivot_layout():
    import pandas as pd

    df = pd.DataFrame(
        [
            {"dataset": d, "method": m, "f1": 0.5}
            for d in ("FZ", "DA")
            for m in ("ZeroER", "GMM")
        ]
    )
    wide = table3.pivot(df)
    assert list(wide.index) == ["FZ", "DA", "average"]
    assert list(wide.columns) == ["ZeroER", "GMM"]


def test_table5_pivot_layout():
    import pandas as pd

    df = pd.DataFrame(
        [
            {"dataset": d, "variant": v, "f1": 0.5}
            for d in ("FZ",)
            for v in ("ZeroER", "uniform reg")
        ]
    )
    wide = table5.pivot(df)
    assert "average" in wide.index
    assert list(wide.columns) == ["ZeroER", "uniform reg"]
