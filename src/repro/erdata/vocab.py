"""Deterministic fake-vocabulary factory for the synthetic ER datasets.

Everything is derived from a :class:`numpy.random.Generator` passed by the
caller, so a dataset generator seeded once is fully reproducible. Words are
pronounceable consonant-vowel syllable strings, which gives realistic q-gram
and token statistics (shared prefixes, variable lengths) without shipping any
real-world corpus.
"""
from __future__ import annotations

import numpy as np

_CONSONANTS = list("bcdfghjklmnprstvwz")
_VOWELS = list("aeiou")


def word(rng: np.random.Generator, min_syl: int = 2, max_syl: int = 4) -> str:
    """One pronounceable lowercase word with ``min_syl``..``max_syl`` syllables."""
    n = int(rng.integers(min_syl, max_syl + 1))
    parts = []
    for _ in range(n):
        parts.append(str(rng.choice(_CONSONANTS)) + str(rng.choice(_VOWELS)))
        if rng.random() < 0.25:
            parts.append(str(rng.choice(_CONSONANTS)))
    return "".join(parts)


def vocab(rng: np.random.Generator, n: int, min_syl: int = 2, max_syl: int = 4) -> list[str]:
    """``n`` distinct words. Draws until unique, so it is deterministic in ``rng``."""
    seen: dict[str, None] = {}
    while len(seen) < n:
        seen.setdefault(word(rng, min_syl, max_syl), None)
    return list(seen)


def person_name(rng: np.random.Generator, firsts: list[str], lasts: list[str]) -> str:
    """A ``first last`` person name from pre-drawn name pools."""
    return f"{rng.choice(firsts)} {rng.choice(lasts)}"


def model_code(rng: np.random.Generator) -> str:
    """Product model code like ``kx-450b`` — letters + digits, ER's classic
    hard-negative carrier (siblings differ by one digit)."""
    letters = "".join(rng.choice(list("abcdefghkmnpqrstvwxz"), size=2))
    digits = "".join(str(d) for d in rng.integers(0, 10, size=3))
    suffix = str(rng.choice(list("abcdes")))
    return f"{letters}-{digits}{suffix}"


def phone_number(rng: np.random.Generator) -> tuple[str, str, str]:
    """A phone as (area, prefix, line) digit strings; callers pick a format."""
    return (
        f"{rng.integers(200, 999)}",
        f"{rng.integers(200, 999)}",
        f"{rng.integers(1000, 9999)}",
    )


def street_address(rng: np.random.Generator, streets: list[str]) -> str:
    """``<number> <street-word> <suffix>`` street address."""
    suffix = str(rng.choice(["st.", "ave.", "rd.", "blvd.", "ln.", "dr."]))
    return f"{rng.integers(1, 9999)} {rng.choice(streets)} {suffix}"
