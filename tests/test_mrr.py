"""mRR-set sampling (paper §3.3): root-size law, Theorem 3.3 sandwich,
RR-set truncation bias, and the distributed pairs path vs its oracle."""
import numpy as np
import pyspark.sql.functions as F
import pytest

from repro.diffusion.propagate import (
    exact_expected_truncated,
    spread_local,
    truncated,
)
from repro.diffusion.realization import IC, LT, sample_realization
from repro.oracle import assert_equivalent
from repro.sampling.mrr import (
    sample_root_size,
    sample_sets_local,
    sample_sets_pairs,
)
from repro.sampling.rr import sample_rr_local


@pytest.mark.parametrize("n_i,eta_i", [(10, 3), (100, 7), (4, 2), (1000, 999)])
def test_root_size_support(n_i, eta_i):
    rng = np.random.default_rng(0)
    k_low = int(n_i / eta_i)
    for _ in range(200):
        k = sample_root_size(n_i, eta_i, rng)
        assert k in (max(1, k_low), min(n_i, k_low + 1))


@pytest.mark.parametrize("n_i,eta_i", [(10, 3), (100, 7), (7, 2)])
def test_root_size_mean(n_i, eta_i):
    """Randomized rounding gives E[k] = n_i/η_i (Thm 3.3)."""
    rng = np.random.default_rng(1)
    ks = [sample_root_size(n_i, eta_i, rng) for _ in range(20000)]
    assert np.mean(ks) == pytest.approx(n_i / eta_i, rel=0.02)


def test_root_size_integer_ratio_is_deterministic():
    rng = np.random.default_rng(2)
    assert all(sample_root_size(8, 4, rng) == 2 for _ in range(100))


def test_members_are_active_and_contain_roots(small_cl_graph):
    g = small_cl_graph
    active = np.ones(g.n, bool)
    active[:40] = False
    sets = sample_sets_local(g, active, 20, IC, 50, seed=3)
    for sid, members in sets:
        assert len(members) > 0
        assert active[members].all(), "inactive nodes never enter a set"


def test_local_deterministic(small_cl_graph):
    g = small_cl_graph
    active = np.ones(g.n, bool)
    a = sample_sets_local(g, active, 20, IC, 10, seed=9)
    b = sample_sets_local(g, active, 20, IC, 10, seed=9)
    for (ia, ma), (ib, mb) in zip(a, b):
        assert ia == ib
        np.testing.assert_array_equal(np.sort(ma), np.sort(mb))


def test_set_ids_respect_offset(small_cl_graph):
    g = small_cl_graph
    active = np.ones(g.n, bool)
    sets = sample_sets_local(g, active, 20, IC, 5, seed=1, id_offset=100)
    assert [sid for sid, _ in sets] == [100, 101, 102, 103, 104]


@pytest.mark.parametrize("model", [IC, LT])
def test_rr_sets_single_root(small_cl_graph, model):
    g = small_cl_graph
    active = np.ones(g.n, bool)
    sets = sample_rr_local(g, active, model, 30, seed=4)
    assert len(sets) == 30
    for _, members in sets:
        assert len(members) >= 1


def test_theorem_3_3_sandwich_ex23(ex23_graph):
    """(1−1/e)·E[Γ(S)] ≤ E[Γ̃(S)] ≤ E[Γ(S)] on the Example 2.3 graph."""
    g = ex23_graph
    eta = 2
    active = np.ones(g.n, bool)
    n_sets = 20000
    sets = sample_sets_local(g, active, eta, IC, n_sets, seed=5)
    for v in range(4):
        hit = sum(1 for _, m in sets if v in m)
        est = eta * hit / n_sets  # E[Γ̃({v})]
        exact = exact_expected_truncated(g, [v], eta)
        assert est <= exact * 1.05
        assert est >= (1 - 1 / np.e) * exact * 0.95


def test_mrr_estimator_exact_values_ex23(ex23_graph):
    """Closed-form check: with η=2, k=2 roots without replacement,
    E[Γ̃(v)] = η·Pr[v ∈ R] works out to (1.75, 5/3, 5/3, 1) for v1..v4
    (e.g. v2 always reaches {v2, v4}, so Pr[hit] = 1 − C(2,2)/C(4,2) = 5/6).
    Note the estimator keeps every node inside the Theorem 3.3 band but
    does not preserve the exact Γ-ordering — that is precisely why TRIM's
    guarantee is (1−1/e)(1−ε) rather than exact greedy."""
    g = ex23_graph
    active = np.ones(g.n, bool)
    n_sets = 20000
    sets = sample_sets_local(g, active, 2, IC, n_sets, seed=6)
    cov = np.zeros(4)
    for _, m in sets:
        cov[m] += 1
    est = 2 * cov / n_sets
    np.testing.assert_allclose(est, [1.75, 5 / 3, 5 / 3, 1.0], rtol=0.05)


def _mc_expected(g, seeds, model, eta, n_trials=3000, seed0=0):
    tot_i, tot_g = 0.0, 0.0
    for s in range(n_trials):
        real = sample_realization(g, model, seed0 + s)
        x = len(spread_local(real, seeds))
        tot_i += x
        tot_g += truncated(x, eta)
    return tot_i / n_trials, tot_g / n_trials


def test_rr_truncation_bias(small_cl_graph):
    """Paper §3.2: single-root RR sets estimate truncated spread as
    (η/n)·E[I(S)], badly biased when η ≪ n, while mRR stays in the
    Theorem 3.3 band."""
    g = small_cl_graph
    eta = 5
    v = int(np.argmax(g.outdeg))
    active = np.ones(g.n, bool)
    e_i, e_g = _mc_expected(g, [v], IC, eta)
    n_sets = 8000
    rr = sample_rr_local(g, active, IC, n_sets, seed=7)
    rr_est = eta * sum(1 for _, m in rr if v in m) / n_sets
    mrr = sample_sets_local(g, active, eta, IC, n_sets, seed=8)
    mrr_est = eta * sum(1 for _, m in mrr if v in m) / n_sets
    # RR underestimates by roughly η/n (here η/n = 1/30).
    assert rr_est == pytest.approx(eta / g.n * e_i, rel=0.3)
    assert rr_est < 0.5 * e_g
    # mRR lands inside the (1-1/e) sandwich of the truth.
    assert (1 - 1 / np.e) * e_g * 0.9 <= mrr_est <= e_g * 1.1


def test_rr_untruncated_unbiased(small_cl_graph):
    """E[I(S)] = n·Pr[R ∩ S ≠ ∅] for single-root RR sets (Borgs et al.)."""
    g = small_cl_graph
    v = int(np.argmax(g.outdeg))
    active = np.ones(g.n, bool)
    e_i, _ = _mc_expected(g, [v], IC, eta=g.n)
    n_sets = 8000
    rr = sample_rr_local(g, active, IC, n_sets, seed=9)
    est = g.n * sum(1 for _, m in rr if v in m) / n_sets
    assert est == pytest.approx(e_i, rel=0.15)


@pytest.mark.parametrize("model", [IC, LT])
def test_spark_pairs_shape(spark, small_cl_graph, model):
    g = small_cl_graph
    active = np.ones(g.n, bool)
    pairs = sample_sets_pairs(spark, g, active, 20, model, 40, seed=10)
    pdf = pairs.toPandas()
    assert set(pdf.columns) == {"set_id", "node"}
    assert pdf["set_id"].nunique() == 40
    assert sorted(pdf["set_id"].unique()) == list(range(40))
    assert pdf["node"].isin(range(g.n)).all()
    # No duplicate membership rows within a set.
    assert not pdf.duplicated(["set_id", "node"]).any()


def test_spark_coverage_vs_duckdb_oracle(spark, small_cl_graph):
    """Λ_R(v) via Spark groupBy equals the SQL GROUP BY oracle."""
    g = small_cl_graph
    active = np.ones(g.n, bool)
    pairs = sample_sets_pairs(spark, g, active, 20, IC, 100, seed=11)
    pdf = pairs.toPandas()
    got = pairs.groupBy("node").agg(F.count("*").alias("cov"))
    assert_equivalent(
        got, "SELECT node, count(*) AS cov FROM pairs GROUP BY node", pairs=pdf
    )


def test_spark_pairs_id_offset(spark, small_cl_graph):
    g = small_cl_graph
    active = np.ones(g.n, bool)
    pairs = sample_sets_pairs(
        spark, g, active, 20, IC, 10, seed=12, id_offset=500
    ).toPandas()
    assert pairs["set_id"].min() >= 500 and pairs["set_id"].max() <= 509


def test_spark_rejects_empty_active(spark, small_cl_graph):
    g = small_cl_graph
    with pytest.raises(ValueError):
        sample_sets_pairs(spark, g, np.zeros(g.n, bool), 5, IC, 10, seed=0)


def test_unknown_roots_mode(small_cl_graph):
    g = small_cl_graph
    with pytest.raises(ValueError):
        sample_sets_local(g, np.ones(g.n, bool), 5, IC, 1, seed=0, roots="xyz")
