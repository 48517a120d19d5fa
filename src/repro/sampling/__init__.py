"""Sampling substrate: RR sets, mRR sets, and concentration bounds.

The paper's sampling contribution is the multi-root reverse reachable
(mRR) set (§3.3): a reverse stochastic BFS from ``k`` uniformly chosen
roots where ``k`` is randomized-rounded so ``E[k] = n/η``, giving the
binary estimator ``Γ̃(S) = η·1[S ∩ R ≠ ∅]`` the Theorem 3.3 sandwich
``(1−1/e)·E[Γ(S)] ≤ E[Γ̃(S)] ≤ E[Γ(S)]``. Single-root RR sets (Borgs et
al.) are kept for the ATEUC/ADAPTIM baselines.
"""
from repro.sampling.bounds import coverage_lower_bound, coverage_upper_bound
from repro.sampling.mrr import (
    sample_root_size,
    sample_sets_local,
    sample_sets_pairs,
)

__all__ = [
    "coverage_lower_bound",
    "coverage_upper_bound",
    "sample_root_size",
    "sample_sets_local",
    "sample_sets_pairs",
]
