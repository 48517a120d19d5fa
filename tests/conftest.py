"""Shared test fixtures: reference graphs of known structure.

The ``spark`` session fixture comes from the repo-root conftest.py.
"""
import numpy as np
import pandas as pd
import pytest

from repro.graphs.csr import GraphCSR
from repro.graphs.generator import social_graph


@pytest.fixture(scope="session")
def ex23_graph() -> GraphCSR:
    """The paper's Example 2.3 / Figure 2 graph.

    v1→v2 (p=.5), v1→v3 (p=.5), v2→v4 (p=1), v3→v4 (p=1); node ids are
    v1..v4 → 0..3. Its four realizations are equiprobable and give
    E[I(v1)] = 2.75 and expected truncated spreads (η=2) of
    1.75, 2, 2, 1 — the worked numbers we assert against.
    """
    edges = pd.DataFrame({"src": [0, 0, 1, 2], "dst": [1, 2, 3, 3]})
    probs = np.array([0.5, 0.5, 1.0, 1.0])
    return GraphCSR.from_edges(edges, n=4, probs=probs)


@pytest.fixture(scope="session")
def line_graph() -> GraphCSR:
    """Deterministic 5-node line 0→1→2→3→4 with p=1 everywhere."""
    edges = pd.DataFrame({"src": [0, 1, 2, 3], "dst": [1, 2, 3, 4]})
    return GraphCSR.from_edges(edges, n=5, probs=np.ones(4))


@pytest.fixture(scope="session")
def two_comp_graph() -> GraphCSR:
    """Two weak components: {0,1,2} (triangle-ish) and {3,4}."""
    edges = pd.DataFrame({"src": [0, 1, 2, 3], "dst": [1, 2, 0, 4]})
    return GraphCSR.from_edges(edges, n=5, probs=np.ones(4))


@pytest.fixture(scope="session")
def small_cl_graph() -> GraphCSR:
    """A 150-node Chung-Lu graph with damped WC probabilities."""
    edges = social_graph(n=150, avg_deg=5.0, directed=True, seed=11)
    return GraphCSR.from_edges(edges, n=150, wc_scale=0.6)


@pytest.fixture(scope="session")
def nethept_graph() -> GraphCSR:
    from repro.graphs.generator import dataset_csr

    return dataset_csr("nethept_lite")
