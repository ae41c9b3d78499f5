"""Transitivity as posterior constraints (§4): trio discovery + greedy projection.

Constraints have the form ``γ_a · γ_b ≤ γ_c`` (Eq. 12) where a, b are two
match-predicted pairs sharing a tuple and c is the closing pair. Under the
reduced set Q' (Eq. 19) only pairs with γ ≥ 0.5 generate constraints, so the
constraint graph is built from the (small) match sets of the three models —
cross (T×T'), left (T×T), right (T'×T') — and resolved greedily on the driver
with the axis projections of Eq. 18, picking per violated constraint the
projection that maximizes the free energy F(Θ, γ) (Eq. 14) and never undoing
a previous constraint's adjustment (the paper's conflict rule).

Closing pairs excluded by blocking have no feature vector: their γ is pinned
to 0 (the paper's convention), which forbids the "raise γ_c" projection and
forces one of the two cross pairs down — exactly the fd1/fd3 false-positive
repair of Example 1.3.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

import pandas as pd

GammaKey = tuple[int, int]
ModelKey = tuple[str, int, int]  # ("c"|"l"|"r", id1, id2)

_CLIP = 1e-7
_MAX_FANOUT = 64  # cap per-tuple match fan-out when enumerating trios


@dataclass(frozen=True)
class Constraint:
    """γ[a] · γ[b] ≤ γ[c] over model-qualified pair keys."""

    a: ModelKey
    b: ModelKey
    c: ModelKey


def _intra_key(model: str, i: int, j: int) -> ModelKey:
    return (model, min(i, j), max(i, j))


def enumerate_constraints(matches: dict[str, pd.DataFrame]) -> list[Constraint]:
    """Build Q' from the three match sets (γ ≥ 0.5 pairs per model).

    ``matches[m]`` has columns l_id, r_id, gamma. Two cross matches sharing a
    left tuple close through a *right*-model pair and vice versa; two intra
    matches sharing a tuple close through the same intra model.
    """
    out: list[Constraint] = []
    cross = matches.get("c")
    if cross is not None and len(cross):
        for side, closing in (("l_id", "r"), ("r_id", "l")):
            other = "r_id" if side == "l_id" else "l_id"
            for _, grp in cross.groupby(side, sort=True):
                if len(grp) < 2:
                    continue
                grp = grp.nlargest(_MAX_FANOUT, "gamma").sort_values(other)
                rows = list(grp.itertuples())
                for i in range(len(rows)):
                    for j in range(i + 1, len(rows)):
                        a = ("c", int(rows[i].l_id), int(rows[i].r_id))
                        b = ("c", int(rows[j].l_id), int(rows[j].r_id))
                        c = _intra_key(
                            closing, int(getattr(rows[i], other)), int(getattr(rows[j], other))
                        )
                        out.append(Constraint(a, b, c))
    for m in ("l", "r"):
        intra = matches.get(m)
        if intra is None or not len(intra):
            continue
        # (i,j) and (i,k) matched within one table ⇒ (j,k) must match too.
        edges = [(int(r.l_id), int(r.r_id), float(r.gamma)) for r in intra.itertuples()]
        by_tuple: dict[int, list[tuple[int, float, int, int]]] = {}
        for i, j, g in edges:
            by_tuple.setdefault(i, []).append((j, g, i, j))
            by_tuple.setdefault(j, []).append((i, g, i, j))
        for _, nbrs in sorted(by_tuple.items()):
            if len(nbrs) < 2:
                continue
            nbrs = sorted(nbrs, key=lambda t: -t[1])[:_MAX_FANOUT]
            nbrs = sorted(nbrs)
            for x in range(len(nbrs)):
                for y in range(x + 1, len(nbrs)):
                    ja, _, ia1, ja1 = nbrs[x]
                    jb, _, ia2, ja2 = nbrs[y]
                    if ja == jb:
                        continue
                    out.append(
                        Constraint(
                            _intra_key(m, ia1, ja1),
                            _intra_key(m, ia2, ja2),
                            _intra_key(m, ja, jb),
                        )
                    )
    return out


def _free_energy_term(v: float, logm: float, logu: float) -> float:
    """One pair's contribution to F(Θ, γ) (Eq. 14)."""
    v = min(max(v, _CLIP), 1.0 - _CLIP)
    return v * (logm - math.log(v)) + (1.0 - v) * (logu - math.log(1.0 - v))


def resolve(
    constraints: list[Constraint],
    values: dict[ModelKey, float],
    logliks: dict[ModelKey, tuple[float, float]],
) -> dict[ModelKey, float]:
    """Greedy projection of γ* onto (approximately) the boundary of Q.

    ``values``: current γ* for every key appearing in some constraint; keys
    missing from ``values`` are treated as pinned 0 (blocked-out pairs).
    ``logliks``: (log π_M p(x|θ_M), log π_U p(x|θ_U)) for keys that *have* a
    feature vector — only those keys may be adjusted.

    Returns the adjusted γ' per key (only keys that were actually moved).
    """
    adjusted: dict[ModelKey, float] = {}
    direction: dict[ModelKey, int] = {}  # +1 raised, -1 lowered

    def cur(k: ModelKey) -> float:
        if k in adjusted:
            return adjusted[k]
        return values.get(k, 0.0)

    for con in constraints:
        ga, gb, gc = cur(con.a), cur(con.b), cur(con.c)
        if ga * gb <= gc + 1e-12:
            continue
        # Candidate projections (Eq. 18): raise c, or lower a or b.
        options: list[tuple[float, ModelKey, float, int]] = []
        for key, new, dirn in (
            (con.c, ga * gb, +1),
            (con.a, gc / gb if gb > _CLIP else 0.0, -1),
            (con.b, gc / ga if ga > _CLIP else 0.0, -1),
        ):
            ll = logliks.get(key)
            if ll is None:
                continue  # pinned γ=0 pair: not adjustable
            prev_dir = direction.get(key)
            if prev_dir is not None and prev_dir != dirn:
                continue  # would undo an earlier constraint's adjustment
            gain = _free_energy_term(new, *ll) - _free_energy_term(cur(key), *ll)
            options.append((gain, key, new, dirn))
        if not options:
            continue  # all axes conflict: perform no projection (paper's rule)
        gain, key, new, dirn = max(options, key=lambda t: t[0])
        adjusted[key] = min(max(new, _CLIP), 1.0 - _CLIP)
        direction[key] = dirn
    return adjusted


def split_by_model(adjusted: dict[ModelKey, float]) -> dict[str, dict[GammaKey, float]]:
    """Regroup adjusted values into per-model override dicts for the backends."""
    out: dict[str, dict[GammaKey, float]] = {"c": {}, "l": {}, "r": {}}
    for (m, i, j), v in adjusted.items():
        out[m][(i, j)] = v
    return out
