"""Tests for the PPJoin prefix-filtered similarity join baseline.

The key correctness property: for any threshold and similarity function, the
prefix-filtered Spark dataflow returns exactly the pairs a brute-force
all-pairs computation returns (the filter must be lossless).
"""
from __future__ import annotations

import math

import pytest

from repro.baselines import ppjoin
from repro.textsim import tokenize


@pytest.fixture(scope="module")
def fz_small(spark):
    from repro.erdata import fodors_zagats

    return fodors_zagats(spark, scale=0.12)


def brute_force(ds, threshold, func):
    lp = ds.left.toPandas()
    rp = ds.right.toPandas()

    def toks(row):
        return frozenset().union(
            *[tokenize.word_tokens(str(row[a])) for a in ds.attributes if row[a] is not None]
        )

    lt = {r["_id"]: toks(r) for _, r in lp.iterrows()}
    rt = {r["_id"]: toks(r) for _, r in rp.iterrows()}
    out = set()
    for li, ls in lt.items():
        if not ls:
            continue
        for ri, rs in rt.items():
            if not rs:
                continue
            inter = len(ls & rs)
            if func == "jaccard":
                s = inter / (len(ls) + len(rs) - inter)
            else:
                s = inter / math.sqrt(len(ls) * len(rs))
            if s >= threshold:
                out.add((li, ri))
    return out


@pytest.mark.parametrize("func", ["jaccard", "cosine"])
@pytest.mark.parametrize("threshold", [0.4, 0.6, 0.8])
def test_ppjoin_equals_brute_force(spark, fz_small, func, threshold):
    got = set(map(tuple, ppjoin.ppjoin(fz_small, threshold, func).toPandas().to_numpy()))
    assert got == brute_force(fz_small, threshold, func)


def test_ppjoin_threshold_monotone(spark, fz_small):
    sizes = [ppjoin.ppjoin(fz_small, t, "jaccard").count() for t in (0.3, 0.6, 0.9)]
    assert sizes[0] >= sizes[1] >= sizes[2]


def test_ppjoin_threshold_one_identical_sets_only(spark, fz_small):
    pairs = ppjoin.ppjoin(fz_small, 1.0, "jaccard").toPandas()
    bf = brute_force(fz_small, 1.0, "jaccard")
    assert set(map(tuple, pairs.to_numpy())) == bf


def test_ppjoin_unknown_func_raises(fz_small):
    with pytest.raises(ValueError):
        ppjoin.ppjoin(fz_small, 0.5, "hamming").count()


def test_pp_star_picks_best(spark, fz_small):
    best, sweep = ppjoin.pp_star(
        fz_small, thresholds=(0.4, 0.6, 0.8), funcs=("jaccard", "cosine")
    )
    assert len(sweep) == 6
    assert best.f1 == pytest.approx(sweep["f1"].max())
    assert {"func", "threshold", "f1", "precision", "recall"} <= set(sweep.columns)


def test_pp_star_reasonable_on_clean_data(spark, fz_small):
    """On clean FZ, the best PPJoin configuration is a strong baseline."""
    best, _ = ppjoin.pp_star(fz_small, thresholds=(0.2, 0.4, 0.6, 0.8), funcs=("jaccard",))
    assert best.f1 > 0.7
