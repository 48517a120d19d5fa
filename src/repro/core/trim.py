"""TRIM — Truncated Influence Maximization (paper Algorithm 2).

Selects the single node with (approximately) maximum expected marginal
*truncated* spread on the residual graph, via mRR sets with an
OPIM-C-style doubling schedule and the Lemma A.2 stopping rule. Returns
a (1−1/e)(1−ε)-approximate node.

The same machinery, switched to single-root RR sets and the ``n_i``
estimator scale, implements ADAPTIM's per-round selection (baselines/).
"""
import math
from dataclasses import dataclass

import numpy as np
import pyspark.sql.functions as F
from pyspark.sql import SparkSession

from repro.graphs.csr import GraphCSR
from repro.sampling.bounds import coverage_lower_bound, coverage_upper_bound
from repro.sampling.mrr import sample_sets_local, sample_sets_pairs

# Below this many sets, executor fan-out costs more than it saves
# (measured ~0.4 s/job overhead vs milliseconds of local sampling at
# lite scale); the schedule still matches the paper, only the execution
# venue changes.
SPARK_MIN_SETS = 4096


def ln_choose(n: int, b: int) -> float:
    """ln C(n, b) via lgamma (b=1 reduces to ln n)."""
    return (
        math.lgamma(n + 1) - math.lgamma(b + 1) - math.lgamma(n - b + 1)
    )


def rho(b: int) -> float:
    """Greedy max-coverage ratio ρ_b = 1 − (1 − 1/b)^b (ρ₁ = 1)."""
    return 1.0 - (1.0 - 1.0 / b) ** b


@dataclass(frozen=True)
class TrimSchedule:
    """The sample-size schedule of Algorithms 2/3 (lines 1–5)."""

    delta: float
    eps_hat: float
    theta_max: float
    theta_o: int
    T: int
    a1: float
    a2: float

    @staticmethod
    def build(n_i: int, eta_i: int, eps: float, *, b: int = 1, delta: float | None = None) -> "TrimSchedule":
        if delta is None:
            delta = eps / (100.0 * (1.0 - 1.0 / math.e) * (1.0 - eps) * eta_i)
        eps_hat = 99.0 * eps / (100.0 - eps)
        rb = rho(b)
        lnc = ln_choose(n_i, b)
        theta_max = (
            2.0
            * n_i
            * (
                math.sqrt(math.log(6.0 / delta))
                + math.sqrt((lnc + math.log(6.0 / delta)) / rb)
            )
            ** 2
            / (b * eps_hat**2)
        )
        theta_o = max(1, int(math.ceil(theta_max * b * eps_hat**2 / n_i)))
        T = int(math.ceil(math.log2(theta_max / theta_o))) + 1
        a1 = math.log(3.0 * T / delta) + lnc
        a2 = math.log(3.0 * T / delta)
        return TrimSchedule(
            delta=delta,
            eps_hat=eps_hat,
            theta_max=theta_max,
            theta_o=theta_o,
            T=T,
            a1=a1,
            a2=a2,
        )


@dataclass
class TrimResult:
    """Outcome of one TRIM round."""

    node: int
    coverage: int
    n_sets: int
    iterations: int
    est_truncated_spread: float  # η_i · Λ_R(v*)/|R|


def _coverage_increment(
    spark: SparkSession | None,
    g: GraphCSR,
    active: np.ndarray,
    eta_i: int,
    model: str,
    need: int,
    seed: int,
    roots: str,
    use_spark: bool,
) -> np.ndarray:
    """Coverage-count vector over nodes for ``need`` freshly sampled sets."""
    if use_spark and spark is not None and need >= SPARK_MIN_SETS:
        pairs = sample_sets_pairs(
            spark, g, active, eta_i, model, need, seed, roots=roots
        )
        rows = pairs.groupBy("node").agg(F.count("*").alias("cov")).collect()
        inc = np.zeros(g.n, dtype=np.int64)
        for r in rows:
            inc[r["node"]] = r["cov"]
        return inc
    sets = sample_sets_local(g, active, eta_i, model, need, seed, roots=roots)
    inc = np.zeros(g.n, dtype=np.int64)
    for _, members in sets:
        inc[members] += 1
    return inc


def trim(
    spark: SparkSession | None,
    g: GraphCSR,
    active: np.ndarray,
    eta_i: int,
    model: str,
    eps: float,
    seed: int,
    *,
    roots: str = "mrr",
    delta: float | None = None,
    use_spark: bool = True,
) -> TrimResult:
    """One round of Algorithm 2 on the residual graph given by ``active``.

    ``roots="rr"`` with an explicit ``delta`` turns this into ADAPTIM's
    per-round untruncated selection (coverage logic is identical; only
    the sampler and the estimator scale differ — handled by callers).
    """
    n_i = int(active.sum())
    if n_i == 0:
        raise ValueError("empty residual graph")
    eta_i = min(eta_i, n_i)
    sched = TrimSchedule.build(n_i, eta_i, eps, b=1, delta=delta)
    cov = np.zeros(g.n, dtype=np.int64)
    n_sets = 0
    for t in range(1, sched.T + 1):
        target = sched.theta_o * (2 ** (t - 1))
        need = target - n_sets
        if need > 0:
            cov += _coverage_increment(
                spark, g, active, eta_i, model, need, seed + 104729 * t, roots, use_spark
            )
            n_sets = target
        v_star = int(np.argmax(cov))
        lam = int(cov[v_star])
        lam_l = coverage_lower_bound(lam, sched.a1)
        lam_u = coverage_upper_bound(lam, sched.a2)
        if lam_u > 0 and lam_l / lam_u >= 1.0 - sched.eps_hat or t == sched.T:
            return TrimResult(
                node=v_star,
                coverage=lam,
                n_sets=n_sets,
                iterations=t,
                est_truncated_spread=eta_i * lam / n_sets,
            )
    raise AssertionError("unreachable: loop returns at t == T")
