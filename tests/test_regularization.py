"""Tests for the adaptive regularization (Bhattacharyya + κ solver)."""
from __future__ import annotations

import numpy as np
import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.core import regularization as reg

POSVAR = st.floats(min_value=1e-8, max_value=0.25)
MEAN = st.floats(min_value=0.0, max_value=1.0)


def test_bc_identical_distributions_is_one():
    bc = reg.bhattacharyya(np.array([0.1]), np.array([0.1]), np.array([0.5]), np.array([0.5]))
    assert bc[0] == pytest.approx(1.0)


def test_bc_separated_distributions_small():
    bc = reg.bhattacharyya(
        np.array([1e-4]), np.array([1e-4]), np.array([0.0]), np.array([1.0])
    )
    assert bc[0] < 1e-6


def test_bc_symmetric_in_classes():
    a = reg.bhattacharyya(np.array([0.01]), np.array([0.05]), np.array([0.2]), np.array([0.8]))
    b = reg.bhattacharyya(np.array([0.05]), np.array([0.01]), np.array([0.8]), np.array([0.2]))
    assert a[0] == pytest.approx(b[0])


@given(vm=POSVAR, vu=POSVAR, mm=MEAN, mu=MEAN)
def test_bc_bounded(vm, vu, mm, mu):
    bc = reg.bhattacharyya(np.array([vm]), np.array([vu]), np.array([mm]), np.array([mu]))
    assert 0.0 <= bc[0] <= 1.0 + 1e-12


@given(vm=POSVAR, vu=POSVAR, mm=MEAN, mu=MEAN, k1=POSVAR, k2=POSVAR)
def test_bc_monotone_in_kappa(vm, vu, mm, mu, k1, k2):
    """Adding a common ridge to both variances never decreases overlap."""
    lo, hi = sorted([k1, k2])
    d2 = (mm - mu) ** 2
    assert reg._bc_scalar(vm, vu, d2, lo) <= reg._bc_scalar(vm, vu, d2, hi) + 1e-12


@given(vm=POSVAR, vu=POSVAR, mm=MEAN, mu=MEAN)
def test_solve_kappa_hits_target(vm, vu, mm, mu):
    d2 = (mm - mu) ** 2
    bc0 = reg._bc_scalar(vm, vu, d2, 0.0)
    target = bc0 + 0.5 * (1.0 - bc0) * 0.5  # halfway toward mid-gap
    k = reg.solve_kappa(vm, vu, d2, target)
    assert k >= 0.0
    assert reg._bc_scalar(vm, vu, d2, k) == pytest.approx(target, abs=1e-6)


def test_solve_kappa_zero_when_already_overlapping():
    # BC at κ=0 is already 1.0 for identical distributions: no ridge needed.
    assert reg.solve_kappa(0.1, 0.1, 0.0, 0.5) == 0.0


def test_adaptive_kappas_equal_bc_increase():
    """The defining property (Eq. 11): every feature's BC increases by κ'."""
    var_m = np.array([1e-6, 0.01, 0.05])
    var_u = np.array([1e-5, 0.002, 0.05])
    mu_m = np.array([0.95, 0.8, 0.5])
    mu_u = np.array([0.05, 0.2, 0.45])
    kp = 0.02
    K = reg.adaptive_kappas(var_m, var_u, mu_m, mu_u, kp)
    bc0 = reg.bhattacharyya(var_m, var_u, mu_m, mu_u)
    bc1 = reg.bhattacharyya(var_m + K, var_u + K, mu_m, mu_u)
    for j in range(3):
        expect = min(kp, 0.5 * (1 - bc0[j]))
        assert bc1[j] - bc0[j] == pytest.approx(expect, abs=1e-5)


def test_adaptive_kappas_degenerate_feature_gets_ridge():
    """A zero-variance (overfitting) feature must receive a positive κ."""
    K = reg.adaptive_kappas(
        np.array([0.0]), np.array([0.0]), np.array([1.0]), np.array([0.0]), 0.01
    )
    assert K[0] > 0.0


def test_adaptive_kappas_saturated_feature_finite():
    """BC already ≈ 1 (useless feature): κ stays finite (half-gap clamp)."""
    K = reg.adaptive_kappas(
        np.array([0.04]), np.array([0.035]), np.array([0.67]), np.array([0.66]), 0.01
    )
    assert np.isfinite(K[0])
    assert K[0] < 10.0


def test_adaptive_kappas_more_overlap_less_ridge():
    """A dominating (tiny-overlap) feature gets a larger ridge than an
    already-overlapping one — the whole point of adaptive regularization."""
    var_m = np.array([1e-8, 0.04])
    var_u = np.array([1e-8, 0.04])
    mu_m = np.array([1.0, 0.6])
    mu_u = np.array([0.0, 0.4])
    K = reg.adaptive_kappas(var_m, var_u, mu_m, mu_u, 0.01)
    assert K[0] > K[1]
