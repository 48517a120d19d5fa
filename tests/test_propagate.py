"""Influence propagation: local BFS, Spark BFS, DuckDB recursive oracle."""
import numpy as np
import pandas as pd
import pytest

from repro.diffusion.propagate import (
    exact_expected_spread,
    exact_expected_truncated,
    spread_local,
    spread_spark,
    truncated,
)
from repro.diffusion.realization import IC, LT, Realization, sample_realization
from repro.oracle import assert_equivalent


def _all_live(g):
    return Realization(graph=g, model=IC, live_fwd=np.ones(g.m, bool), chosen_src=None)


def test_line_reachability(line_graph):
    real = _all_live(line_graph)
    assert spread_local(real, [0]).tolist() == [0, 1, 2, 3, 4]
    assert spread_local(real, [2]).tolist() == [2, 3, 4]
    assert spread_local(real, [4]).tolist() == [4]


def test_multi_seed_union(line_graph):
    real = _all_live(line_graph)
    assert spread_local(real, [0, 3]).tolist() == [0, 1, 2, 3, 4]


def test_blocked_edges_stop_spread(line_graph):
    live = np.array([True, False, True, True])  # 1→2 blocked
    real = Realization(graph=line_graph, model=IC, live_fwd=live, chosen_src=None)
    assert spread_local(real, [0]).tolist() == [0, 1]
    assert spread_local(real, [2]).tolist() == [2, 3, 4]


def test_active_mask_restricts(line_graph):
    real = _all_live(line_graph)
    active = np.array([True, True, False, True, True])
    # Node 2 inactive: the walk cannot pass through it.
    assert spread_local(real, [0], active).tolist() == [0, 1]
    # Inactive seeds are ignored entirely.
    assert spread_local(real, [2], active).tolist() == []


@pytest.mark.parametrize("seed", [0, 1, 2, 3, 4])
def test_adaptive_observation_equivalence(small_cl_graph, seed):
    """Observing batch 2 among nodes not reached by batch 1 equals
    full-graph reachability of batch1 ∪ batch2 — the correctness basis
    of ASTI's residual-graph observation step (DESIGN.md §3)."""
    g = small_cl_graph
    real = sample_realization(g, IC, seed)
    s1, s2 = [3], [7]
    r1 = spread_local(real, s1)
    active = np.ones(g.n, bool)
    active[r1] = False
    r2 = spread_local(real, s2, active)
    joint = spread_local(real, s1 + s2)
    assert set(r1) | set(r2) == set(joint.tolist())
    assert len(set(r1) & set(r2)) == 0


@pytest.mark.parametrize("seed", [10, 11])
def test_adaptive_observation_equivalence_lt(small_cl_graph, seed):
    g = small_cl_graph
    real = sample_realization(g, LT, seed)
    r1 = spread_local(real, [1])
    active = np.ones(g.n, bool)
    active[r1] = False
    r2 = spread_local(real, [2], active)
    joint = spread_local(real, [1, 2])
    assert set(r1) | set(r2) == set(joint.tolist())


def test_truncated_identity():
    # Γ = min{I, η} (Def. 2.2 / Eq. 5).
    assert truncated(7, 5) == 5
    assert truncated(3, 5) == 3
    assert truncated(5, 5) == 5


@pytest.mark.parametrize("seed", [0, 1, 2])
@pytest.mark.parametrize("model", [IC, LT])
def test_spark_bfs_matches_local(spark, small_cl_graph, seed, model):
    g = small_cl_graph
    real = sample_realization(g, model, seed)
    seeds = [0, 9]
    local = set(spread_local(real, seeds).tolist())
    got = spread_spark(spark, real.live_edges_pdf(), seeds)
    assert {r["node"] for r in got.collect()} == local


def test_spark_bfs_duckdb_recursive_oracle(spark, small_cl_graph):
    """Distributed BFS vs a DuckDB WITH RECURSIVE transitive closure."""
    g = small_cl_graph
    real = sample_realization(g, IC, 42)
    live = real.live_edges_pdf()
    seeds = pd.DataFrame({"node": [0, 5]})
    got = spread_spark(spark, live, [0, 5])
    sql = """
        WITH RECURSIVE reach(node) AS (
            SELECT node FROM seeds
            UNION
            SELECT e.dst FROM live e JOIN reach r ON e.src = r.node
        )
        SELECT node FROM reach
    """
    assert_equivalent(got, sql, live=live, seeds=seeds)


def test_spark_bfs_no_live_edges(spark, line_graph):
    got = spread_spark(spark, pd.DataFrame({"src": [], "dst": []}), [1, 3])
    assert {r["node"] for r in got.collect()} == {1, 3}


def test_exact_expected_spread_example23(ex23_graph):
    """Paper Example 2.3: E[I(v1)] = 2.75 beats all others."""
    vals = [exact_expected_spread(ex23_graph, [v]) for v in range(4)]
    assert vals[0] == pytest.approx(2.75)
    assert vals[1] == pytest.approx(2.0)
    assert vals[2] == pytest.approx(2.0)
    assert vals[3] == pytest.approx(1.0)
    assert np.argmax(vals) == 0


def test_exact_expected_truncated_example23(ex23_graph):
    """Paper Example 2.3: E[Γ] = (1.75, 2, 2, 1) with η = 2, so the
    truncated-greedy choice is v2 or v3, not v1."""
    vals = [exact_expected_truncated(ex23_graph, [v], eta=2) for v in range(4)]
    assert vals == pytest.approx([1.75, 2.0, 2.0, 1.0])
    assert np.argmax(vals) in (1, 2)


def test_exact_enumeration_guards(ex23_graph):
    with pytest.raises(ValueError):
        exact_expected_spread(ex23_graph, [0], model=LT)
