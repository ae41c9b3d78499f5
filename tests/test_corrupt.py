"""Tests for the corruption operators (repro.erdata.corrupt)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.erdata import corrupt


def rng(seed=0):
    return np.random.default_rng(seed)


def test_typo_changes_string():
    out = corrupt.typo("restaurant", rng(), n=1)
    assert out != "restaurant"
    assert abs(len(out) - len("restaurant")) <= 1


def test_typo_short_string_noop():
    assert corrupt.typo("a", rng()) == "a"


def test_typo_deterministic():
    assert corrupt.typo("abcdef", rng(7)) == corrupt.typo("abcdef", rng(7))


def test_drop_token():
    out = corrupt.drop_token("a b c", rng())
    assert len(out.split()) == 2
    assert corrupt.drop_token("single", rng()) == "single"


def test_swap_tokens_preserves_multiset():
    s = "one two three four"
    out = corrupt.swap_tokens(s, rng())
    assert sorted(out.split()) == sorted(s.split())
    assert corrupt.swap_tokens("single", rng()) == "single"


def test_abbreviate():
    out = corrupt.abbreviate("los angeles", rng(1))
    toks = out.split()
    assert len(toks) == 2
    assert any(t.endswith(".") and len(t) == 2 for t in toks) or out == "los angeles"


def test_truncate_tokens():
    s = "a b c d e f"
    out = corrupt.truncate_tokens(s, rng(), keep_min=2)
    assert 2 <= len(out.split()) < 6
    assert s.startswith(out)


def test_truncate_tokens_short_noop():
    assert corrupt.truncate_tokens("a", rng(), keep_min=1) == "a"


def test_add_noise_tokens():
    out = corrupt.add_noise_tokens("base name", ["new", "oem"], rng(), n=2)
    assert len(out.split()) == 4
    assert out.startswith("base name")


def test_corrupt_string_zero_intensity_identity():
    assert corrupt.corrupt_string("anything at all", rng(), 0.0) == "anything at all"


def test_corrupt_string_high_intensity_changes():
    s = "alpha beta gamma delta epsilon"
    outs = {corrupt.corrupt_string(s, rng(i), 0.8) for i in range(10)}
    assert any(o != s for o in outs)


def test_corrupt_string_deterministic():
    s = "alpha beta gamma"
    assert corrupt.corrupt_string(s, rng(3), 0.5) == corrupt.corrupt_string(s, rng(3), 0.5)


def test_maybe_missing_probabilities():
    g = rng(0)
    outs = [corrupt.maybe_missing("x", g, 0.5) for _ in range(400)]
    frac_none = sum(o is None for o in outs) / len(outs)
    assert 0.35 < frac_none < 0.65
    assert all(corrupt.maybe_missing("x", rng(), 0.0) == "x" for _ in range(5))


def test_jitter_price_positive_and_near():
    p = corrupt.jitter_price(100.0, rng(0), rel=0.05)
    assert 70 < p < 130
