"""Concentration-bound helpers (paper Lemma A.2)."""
import numpy as np
import pytest

from repro.sampling.bounds import coverage_lower_bound, coverage_upper_bound


@pytest.mark.parametrize("cov", [0, 1, 10, 100, 5000])
@pytest.mark.parametrize("a", [0.5, 2.0, 10.0])
def test_bounds_bracket_observation(cov, a):
    assert coverage_lower_bound(cov, a) <= cov <= coverage_upper_bound(cov, a)


@pytest.mark.parametrize("a", [1.0, 5.0])
def test_lower_monotone_in_cov(a):
    vals = [coverage_lower_bound(c, a) for c in range(0, 200, 10)]
    assert all(x <= y for x, y in zip(vals, vals[1:]))


@pytest.mark.parametrize("a", [1.0, 5.0])
def test_upper_monotone_in_cov(a):
    vals = [coverage_upper_bound(c, a) for c in range(0, 200, 10)]
    assert all(x <= y for x, y in zip(vals, vals[1:]))


def test_lower_decreasing_in_a():
    vals = [coverage_lower_bound(100, a) for a in (0.5, 1, 2, 5, 10)]
    assert all(x >= y for x, y in zip(vals, vals[1:]))


def test_upper_increasing_in_a():
    vals = [coverage_upper_bound(100, a) for a in (0.5, 1, 2, 5, 10)]
    assert all(x <= y for x, y in zip(vals, vals[1:]))


def test_lower_clipped_at_zero():
    assert coverage_lower_bound(0, 10.0) == 0.0
    assert coverage_lower_bound(1, 50.0) == 0.0


def test_bounds_tighten_relatively_with_scale():
    """Relative width shrinks as coverage grows (√Λ concentration)."""
    def rel_width(cov, a=3.0):
        return (coverage_upper_bound(cov, a) - coverage_lower_bound(cov, a)) / cov

    assert rel_width(10000) < rel_width(1000) < rel_width(100)


@pytest.mark.parametrize("p", [0.1, 0.5])
def test_statistical_coverage(p):
    """P[true mean·T outside [Λ^l, Λ^u]] ≤ 2e^{-a} for Bernoulli sums."""
    rng = np.random.default_rng(0)
    a = 4.0  # e^-4 ≈ 1.8% per side
    T = 500
    fails = 0
    trials = 400
    for _ in range(trials):
        cov = rng.binomial(T, p)
        lo = coverage_lower_bound(cov, a)
        hi = coverage_upper_bound(cov, a)
        if not (lo <= p * T <= hi):
            fails += 1
    assert fails / trials <= 0.05
