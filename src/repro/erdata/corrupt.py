"""String-corruption operators used to derive the "other side" of a match.

Each operator takes the clean string plus a :class:`numpy.random.Generator`
and returns a corrupted variant. Dataset generators compose these with a
per-dataset intensity to control how separable matches are from unmatches
(clean datasets: light corruption, well-separated similarity clusters; dirty
product datasets: heavy corruption, overlapping clusters).
"""
from __future__ import annotations

import numpy as np

_ALPHABET = list("abcdefghijklmnopqrstuvwxyz")


def typo(s: str, rng: np.random.Generator, n: int = 1) -> str:
    """Apply ``n`` random single-character edits (swap/delete/insert/replace)."""
    chars = list(s)
    for _ in range(n):
        if len(chars) < 2:
            break
        op = rng.integers(0, 4)
        i = int(rng.integers(0, len(chars) - 1))
        if op == 0:  # swap adjacent
            chars[i], chars[i + 1] = chars[i + 1], chars[i]
        elif op == 1:  # delete
            del chars[i]
        elif op == 2:  # insert
            chars.insert(i, str(rng.choice(_ALPHABET)))
        else:  # replace
            chars[i] = str(rng.choice(_ALPHABET))
    return "".join(chars)


def drop_token(s: str, rng: np.random.Generator) -> str:
    """Remove one whitespace token (no-op on single-token strings)."""
    toks = s.split()
    if len(toks) <= 1:
        return s
    i = int(rng.integers(0, len(toks)))
    return " ".join(toks[:i] + toks[i + 1 :])


def swap_tokens(s: str, rng: np.random.Generator) -> str:
    """Swap two adjacent whitespace tokens (word-order divergence)."""
    toks = s.split()
    if len(toks) <= 1:
        return s
    i = int(rng.integers(0, len(toks) - 1))
    toks[i], toks[i + 1] = toks[i + 1], toks[i]
    return " ".join(toks)


def abbreviate(s: str, rng: np.random.Generator) -> str:
    """Abbreviate one token to its initial + '.' (``los angeles`` → ``l. angeles``)."""
    toks = s.split()
    if not toks:
        return s
    i = int(rng.integers(0, len(toks)))
    if len(toks[i]) > 2:
        toks[i] = toks[i][0] + "."
    return " ".join(toks)


def truncate_tokens(s: str, rng: np.random.Generator, keep_min: int = 1) -> str:
    """Keep only a prefix of the token sequence (title truncation à la Scholar)."""
    toks = s.split()
    if len(toks) <= keep_min:
        return s
    k = int(rng.integers(keep_min, len(toks)))
    return " ".join(toks[:k])


def add_noise_tokens(s: str, noise_pool: list[str], rng: np.random.Generator, n: int = 1) -> str:
    """Append ``n`` extra marketing/noise tokens (product-listing divergence)."""
    extra = [str(rng.choice(noise_pool)) for _ in range(n)]
    return " ".join(s.split() + extra)


def corrupt_string(
    s: str,
    rng: np.random.Generator,
    intensity: float,
    noise_pool: list[str] | None = None,
) -> str:
    """Compose the operators with probability proportional to ``intensity``.

    ``intensity`` in [0, 1]: 0 returns ``s`` unchanged; ~0.1 yields near-clean
    variants (one typo/abbreviation sometimes); ~0.6 yields heavily diverged
    variants (dropped/reordered/extra tokens plus typos).
    """
    out = s
    if rng.random() < intensity:
        out = typo(out, rng, n=1 + int(intensity > 0.4))
    if rng.random() < intensity * 0.8:
        out = abbreviate(out, rng)
    if rng.random() < intensity * 0.7:
        out = swap_tokens(out, rng)
    if rng.random() < intensity * 0.6:
        out = drop_token(out, rng)
    if noise_pool is not None and rng.random() < intensity * 0.8:
        out = add_noise_tokens(out, noise_pool, rng, n=1 + int(rng.integers(0, 2)))
    return out


def maybe_missing(s: str, rng: np.random.Generator, p: float) -> str | None:
    """Return ``None`` (missing value) with probability ``p``, else ``s``."""
    return None if rng.random() < p else s


def jitter_price(x: float, rng: np.random.Generator, rel: float = 0.05) -> float:
    """Price with multiplicative noise — sides of a match rarely list the
    exact same price."""
    return round(float(x) * float(1.0 + rng.normal(0.0, rel)), 2)
