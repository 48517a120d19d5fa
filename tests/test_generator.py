"""Tests for the synthetic social-network generator (DESIGN.md S1)."""
import numpy as np
import pytest

from repro.graphs.generator import DATASETS, dataset_csr, dataset_graph, social_graph

ALL = list(DATASETS)


@pytest.fixture(scope="module")
def graphs():
    return {name: dataset_graph(name) for name in ALL}


@pytest.mark.parametrize("name", ALL)
def test_node_count_exact(graphs, name):
    spec = DATASETS[name]
    edges = graphs[name]
    nodes = set(edges["src"]) | set(edges["dst"])
    assert nodes == set(range(spec.n)), "every node present, none extra"


@pytest.mark.parametrize("name", ALL)
def test_no_self_loops(graphs, name):
    edges = graphs[name]
    assert (edges["src"] != edges["dst"]).all()


@pytest.mark.parametrize("name", ALL)
def test_no_duplicate_edges(graphs, name):
    edges = graphs[name]
    assert not edges.duplicated(["src", "dst"]).any()


@pytest.mark.parametrize("name", ALL)
def test_avg_degree_near_spec(graphs, name):
    spec = DATASETS[name]
    edges = graphs[name]
    m_table = len(edges) / (1 if spec.directed else 2)
    avg = 2.0 * m_table / spec.n
    assert avg == pytest.approx(spec.avg_deg, rel=0.15)


@pytest.mark.parametrize("name", ALL)
def test_deterministic(graphs, name):
    again = dataset_graph(name)
    assert graphs[name].equals(again)


@pytest.mark.parametrize("name", [n for n in ALL if not DATASETS[n].directed])
def test_undirected_symmetric(graphs, name):
    edges = graphs[name]
    fwd = set(zip(edges["src"], edges["dst"]))
    assert all((b, a) in fwd for a, b in fwd)


@pytest.mark.parametrize("name", [n for n in ALL if DATASETS[n].directed])
def test_directed_not_fully_symmetric(graphs, name):
    edges = graphs[name]
    fwd = set(zip(edges["src"], edges["dst"]))
    assert any((b, a) not in fwd for a, b in fwd)


@pytest.mark.parametrize("name", ALL)
def test_power_law_tail(graphs, name):
    """Fig. 3 shape: hubs far above the mean degree."""
    edges = graphs[name]
    deg = np.bincount(
        np.concatenate([edges["src"].to_numpy(), edges["dst"].to_numpy()])
    )
    assert deg.max() >= 5 * deg.mean()


@pytest.mark.parametrize("name", ALL)
def test_csr_probabilities_weighted_cascade(name):
    g = dataset_csr(name)
    spec = DATASETS[name]
    # Every in-edge of v carries wc_scale/indeg(v).
    dst_deg = np.repeat(g.indeg, np.diff(g.rev_indptr))
    np.testing.assert_allclose(g.rev_probs, spec.wc_scale / dst_deg)
    assert (g.rev_probs > 0).all() and (g.rev_probs <= 1).all()


@pytest.mark.parametrize("n,avg_deg,directed", [(50, 3.0, True), (80, 4.0, False), (200, 6.0, True)])
def test_social_graph_custom_params(n, avg_deg, directed):
    edges = social_graph(n=n, avg_deg=avg_deg, directed=directed, seed=5)
    nodes = set(edges["src"]) | set(edges["dst"])
    assert nodes == set(range(n))
    m_table = len(edges) / (1 if directed else 2)
    assert 2.0 * m_table / n == pytest.approx(avg_deg, rel=0.25)


def test_different_seeds_differ():
    a = social_graph(n=100, avg_deg=4.0, directed=True, seed=1)
    b = social_graph(n=100, avg_deg=4.0, directed=True, seed=2)
    assert not a.equals(b)


def test_dataset_registry_matches_paper_shape():
    """The four datasets mirror paper Table 2's type/degree columns."""
    assert DATASETS["nethept_lite"].directed is False
    assert DATASETS["epinions_lite"].directed is True
    assert DATASETS["youtube_lite"].directed is False
    assert DATASETS["livejournal_lite"].directed is True
    assert DATASETS["nethept_lite"].avg_deg == 4.18
    assert DATASETS["livejournal_lite"].avg_deg == 28.5
