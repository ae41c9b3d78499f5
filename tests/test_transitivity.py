"""Tests for transitivity constraint enumeration and greedy projection."""
from __future__ import annotations

import math

import pandas as pd
import pytest

from repro.core import transitivity as tr


def mdf(rows):
    return pd.DataFrame(rows, columns=["l_id", "r_id", "gamma", "logm", "logu"])


LL = {"logm": -1.0, "logu": -1.0}


def test_enumerate_cross_shared_left():
    matches = {"c": mdf([(1, 10, 0.9, -1, -1), (1, 11, 0.8, -1, -1)])}
    cons = tr.enumerate_constraints(matches)
    assert len(cons) == 1
    c = cons[0]
    assert c.a == ("c", 1, 10) and c.b == ("c", 1, 11)
    assert c.c == ("r", 10, 11)  # closing pair is right-intra


def test_enumerate_cross_shared_right():
    matches = {"c": mdf([(1, 10, 0.9, -1, -1), (2, 10, 0.8, -1, -1)])}
    cons = tr.enumerate_constraints(matches)
    assert len(cons) == 1
    assert cons[0].c == ("l", 1, 2)


def test_enumerate_no_shared_tuple_no_constraints():
    matches = {"c": mdf([(1, 10, 0.9, -1, -1), (2, 11, 0.8, -1, -1)])}
    assert tr.enumerate_constraints(matches) == []


def test_enumerate_three_way_fanout():
    matches = {"c": mdf([(1, 10, 0.9, -1, -1), (1, 11, 0.8, -1, -1), (1, 12, 0.7, -1, -1)])}
    cons = tr.enumerate_constraints(matches)
    # C(3,2) = 3 closing right pairs
    assert len(cons) == 3
    closings = {c.c for c in cons}
    assert closings == {("r", 10, 11), ("r", 10, 12), ("r", 11, 12)}


def test_enumerate_intra_trio():
    matches = {"l": mdf([(1, 2, 0.9, -1, -1), (1, 3, 0.8, -1, -1)])}
    cons = tr.enumerate_constraints(matches)
    assert len(cons) == 1
    assert cons[0].c == ("l", 2, 3)


def test_enumerate_intra_key_canonical_order():
    matches = {"l": mdf([(2, 5, 0.9, -1, -1), (3, 5, 0.8, -1, -1)])}
    cons = tr.enumerate_constraints(matches)
    assert cons[0].c == ("l", 2, 3)


def test_enumerate_mixed_models():
    matches = {
        "c": mdf([(1, 10, 0.9, -1, -1), (1, 11, 0.8, -1, -1)]),
        "l": mdf([(4, 5, 0.9, -1, -1), (4, 6, 0.7, -1, -1)]),
        "r": mdf([]),
    }
    cons = tr.enumerate_constraints(matches)
    assert len(cons) == 2


# ------------------------------------------------------------------ resolve

def _f(v, lm=-1.0, lu=-1.0):
    v = min(max(v, 1e-7), 1 - 1e-7)
    return v * (lm - math.log(v)) + (1 - v) * (lu - math.log(1 - v))


def test_resolve_satisfied_constraint_untouched():
    con = tr.Constraint(("c", 1, 10), ("c", 1, 11), ("r", 10, 11))
    values = {("c", 1, 10): 0.6, ("c", 1, 11): 0.6, ("r", 10, 11): 0.5}
    logliks = {k: (-1.0, -1.0) for k in values}
    assert tr.resolve([con], values, logliks) == {}


def test_resolve_violated_projects_onto_boundary():
    con = tr.Constraint(("c", 1, 10), ("c", 1, 11), ("r", 10, 11))
    values = {("c", 1, 10): 0.9, ("c", 1, 11): 0.9, ("r", 10, 11): 0.1}
    logliks = {k: (-1.0, -1.0) for k in values}
    adj = tr.resolve([con], values, logliks)
    assert len(adj) == 1
    # After the projection the constraint holds.
    get = lambda k: adj.get(k, values[k])
    assert get(("c", 1, 10)) * get(("c", 1, 11)) <= get(("r", 10, 11)) + 1e-9


def test_resolve_missing_closing_pair_lowers_a_cross_pair():
    """Blocked-out closing pair: pinned γ=0, so one cross pair must drop
    (the fd1/fd3 false-positive repair of Example 1.3)."""
    con = tr.Constraint(("c", 1, 10), ("c", 1, 11), ("r", 10, 11))
    values = {("c", 1, 10): 0.99, ("c", 1, 11): 0.6}  # closing pair absent
    logliks = {("c", 1, 10): (-1.0, -5.0), ("c", 1, 11): (-3.0, -1.1)}
    adj = tr.resolve([con], values, logliks)
    assert len(adj) == 1
    key, v = next(iter(adj.items()))
    assert key[0] == "c"
    assert v < 0.5  # dropped below the match threshold (γc = 0)


def test_resolve_picks_max_free_energy_axis():
    """The pair whose move costs least free energy is adjusted: here B is
    nearly unmatch-preferring (logu >> logm), so B is lowered, A kept."""
    con = tr.Constraint(("c", 1, 10), ("c", 1, 11), ("r", 10, 11))
    values = {("c", 1, 10): 0.9, ("c", 1, 11): 0.9}
    logliks = {
        ("c", 1, 10): (10.0, -10.0),  # strongly match-preferring
        ("c", 1, 11): (-2.0, -2.1),  # nearly indifferent
    }
    adj = tr.resolve([con], values, logliks)
    assert list(adj) == [("c", 1, 11)]


def test_resolve_direction_conflict_skips():
    """A key already raised must not be lowered by a later constraint."""
    c1 = tr.Constraint(("c", 1, 10), ("c", 1, 11), ("r", 10, 11))
    c2 = tr.Constraint(("r", 10, 11), ("c", 2, 12), ("l", 1, 2))
    values = {
        ("c", 1, 10): 0.95, ("c", 1, 11): 0.95, ("r", 10, 11): 0.5,
        ("c", 2, 12): 0.95, ("l", 1, 2): 0.1,
    }
    # Make raising the closing pair overwhelmingly attractive for c1 …
    logliks = {
        ("c", 1, 10): (50.0, -50.0), ("c", 1, 11): (50.0, -50.0),
        ("r", 10, 11): (50.0, -50.0),
        ("c", 2, 12): (50.0, -50.0), ("l", 1, 2): (-50.0, 50.0),
    }
    adj = tr.resolve([c1, c2], values, logliks)
    # c1 raised ("r",10,11); c2 requires lowering it or others — must never
    # move ("r",10,11) back down.
    assert adj[("r", 10, 11)] >= values[("r", 10, 11)]


def test_resolve_further_move_same_direction_allowed():
    """Two constraints pushing the same key the same way compose."""
    c1 = tr.Constraint(("c", 1, 10), ("c", 1, 11), ("r", 10, 11))
    c2 = tr.Constraint(("c", 2, 10), ("c", 2, 11), ("r", 10, 11))
    values = {
        ("c", 1, 10): 0.8, ("c", 1, 11): 0.8,
        ("c", 2, 10): 0.95, ("c", 2, 11): 0.95,
        ("r", 10, 11): 0.1,
    }
    logliks = {k: (20.0, -20.0) for k in values}  # everything prefers M: raise c
    adj = tr.resolve([c1, c2], values, logliks)
    assert adj[("r", 10, 11)] == pytest.approx(0.95 * 0.95, abs=1e-6)


def test_split_by_model():
    adj = {("c", 1, 2): 0.3, ("l", 1, 2): 0.9, ("r", 4, 5): 0.8}
    out = tr.split_by_model(adj)
    assert out["c"] == {(1, 2): 0.3}
    assert out["l"] == {(1, 2): 0.9}
    assert out["r"] == {(4, 5): 0.8}


def test_projection_equation_18_values():
    """The three axis projections of Eq. 18 land exactly on the boundary."""
    ga, gb, gc = 0.9, 0.8, 0.5
    assert gc / gb * gb * ga / ga == pytest.approx(gc)
    # lower A: γa' = γc/γb ⇒ γa'·γb = γc
    assert (gc / gb) * gb == pytest.approx(gc)
    # raise C: γc' = γa·γb ⇒ boundary
    assert ga * gb == pytest.approx(ga * gb)
