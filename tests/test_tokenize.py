"""Tests for repro.textsim.tokenize."""
from __future__ import annotations

import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.textsim import tokenize


def test_normalize_none_and_case():
    assert tokenize.normalize(None) == ""
    assert tokenize.normalize("  AbC ") == "abc"
    assert tokenize.normalize(123) == "123"


def test_word_tokens_basic():
    assert tokenize.word_tokens("Hello, World! 42") == frozenset({"hello", "world", "42"})


def test_word_tokens_dedup_and_punct():
    assert tokenize.word_tokens("a-a a.a") == frozenset({"a"})


def test_word_tokens_empty():
    assert tokenize.word_tokens("") == frozenset()
    assert tokenize.word_tokens(None) == frozenset()
    assert tokenize.word_tokens("--- !!") == frozenset()


def test_word_list_preserves_order_and_dups():
    assert tokenize.word_list("b a b") == ["b", "a", "b"]


def test_qgrams_padding():
    qs = tokenize.qgrams("ab", 3)
    assert qs == frozenset({"##a", "#ab", "ab#", "b##"})


def test_qgrams_empty():
    assert tokenize.qgrams("", 3) == frozenset()
    assert tokenize.qgrams(None, 3) == frozenset()


def test_qgrams_q2():
    assert tokenize.qgrams("ab", 2) == frozenset({"#a", "ab", "b#"})


@given(st.text(alphabet="abc", min_size=1, max_size=20))
def test_qgrams_count(s):
    # Padded q-gram multiset has len + q - 1 positions; set is a subset.
    assert 1 <= len(tokenize.qgrams(s, 3)) <= len(s) + 2


def test_digits():
    assert tokenize.digits("404/237-2700 ext. 5") == "40423727005"
    assert tokenize.digits(None) == ""
    assert tokenize.digits("abc") == ""


@given(st.text(max_size=30))
def test_digits_only_digits(s):
    assert all(c.isdigit() for c in tokenize.digits(s))


@pytest.mark.parametrize("q", [2, 3, 4, 5])
def test_qgrams_identical_strings_equal(q):
    assert tokenize.qgrams("restaurant", q) == tokenize.qgrams("Restaurant ", q)
