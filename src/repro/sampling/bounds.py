"""Martingale concentration bounds (paper Lemma A.2, from OPIM-C [37]).

Given an observed coverage count ``Λ`` over a set of (m)RR sets, these
give a high-probability lower bound on the *expected* coverage of the
observed node, and an upper bound on the expected coverage of the
(unknown) optimal node — the two quantities TRIM's stopping rule
compares (Alg. 2 lines 9–11).
"""
import math


def coverage_lower_bound(cov: float, a1: float) -> float:
    """Λ^l = (√(Λ + 2a₁/9) − √(a₁/2))² − a₁/18 (Eq. 18), clipped at 0."""
    val = (math.sqrt(cov + 2.0 * a1 / 9.0) - math.sqrt(a1 / 2.0)) ** 2 - a1 / 18.0
    # Mathematically 0 ≤ Λ^l ≤ Λ for a₁ > 0; the clamps also absorb
    # float dust at Λ = 0.
    return min(float(cov), max(0.0, val))


def coverage_upper_bound(cov: float, a2: float) -> float:
    """Λ^u = (√(Λ + a₂/2) + √(a₂/2))² (Eq. 19)."""
    return (math.sqrt(cov + a2 / 2.0) + math.sqrt(a2 / 2.0)) ** 2
