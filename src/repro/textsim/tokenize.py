"""Tokenizers shared by feature generation, blocking and PPJoin.

All tokenizers lowercase their input and return ``frozenset`` so results can
be cached per distinct string and reused across the similarity functions of a
feature group.
"""
from __future__ import annotations

import re

_WORD_RE = re.compile(r"[a-z0-9]+")


def normalize(s: str | None) -> str:
    """Lowercased, stripped string; ``None`` becomes the empty string."""
    return "" if s is None else str(s).strip().lower()


def word_tokens(s: str | None) -> frozenset[str]:
    """Whitespace/punctuation-delimited alphanumeric tokens."""
    return frozenset(_WORD_RE.findall(normalize(s)))


def word_list(s: str | None) -> list[str]:
    """Like :func:`word_tokens` but order-preserving with duplicates (PPJoin)."""
    return _WORD_RE.findall(normalize(s))


def qgrams(s: str | None, q: int = 3) -> frozenset[str]:
    """Padded character q-grams (``##a``, ``#ab`` … for q=3)."""
    t = normalize(s)
    if not t:
        return frozenset()
    padded = "#" * (q - 1) + t + "#" * (q - 1)
    return frozenset(padded[i : i + q] for i in range(len(padded) - q + 1))


def digits(s: str | None) -> str:
    """Digit characters only — phone-number canonical form."""
    return "".join(c for c in normalize(s) if c.isdigit())
