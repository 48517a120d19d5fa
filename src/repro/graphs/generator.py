"""Seeded synthetic social networks (substitutes for the SNAP datasets).

The paper's datasets (NetHEPT, Epinions, Youtube, LiveJournal) are not
available offline, so we generate Chung–Lu power-law graphs whose shape
matches what the algorithms actually depend on: power-law degree
distribution (paper Fig. 3), directedness, and average degree (paper
Table 2). Weighted-cascade probabilities ``p(u, v) = 1/indeg(v)`` are
attached afterwards, exactly as in the paper's parameter setting.

``social_graph`` returns a pandas edge list; ``dataset_graph`` wraps the
four named lite datasets from the registry. Everything is deterministic
in ``seed``.
"""
from dataclasses import dataclass

import numpy as np
import pandas as pd


@dataclass(frozen=True)
class DatasetSpec:
    """Recipe for one lite dataset (paper Table 2 analogue)."""

    name: str
    n: int
    avg_deg: float  # 2m/n with m counted as in paper Table 2
    directed: bool
    gamma: float = 2.5  # power-law exponent for Chung-Lu weights
    seed: int = 0
    # Weighted-cascade damping: p(u, v) = wc_scale / indeg(v). The paper
    # uses wc_scale = 1, but at lite scale critical WC percolation makes a
    # single seed reach an O(n^{2/3}) live component that is a far larger
    # *fraction* of n than at paper scale, collapsing every threshold to
    # 1-2 seeds. Damping restores the paper's operating regime
    # (single-seed spread ≪ η for the tested thresholds) — see DESIGN.md §4.
    wc_scale: float = 1.0


# Lite-scale substitutes for the paper's Table 2 datasets. Average degree
# (2m/n) matches the paper; n is scaled down ~10-1000x (DESIGN.md §4).
DATASETS: dict[str, DatasetSpec] = {
    "nethept_lite": DatasetSpec(
        "nethept_lite", 1200, 4.18, directed=False, seed=101, wc_scale=0.6
    ),
    "epinions_lite": DatasetSpec(
        "epinions_lite", 2000, 13.4, directed=True, seed=102, wc_scale=0.6
    ),
    "youtube_lite": DatasetSpec(
        "youtube_lite", 3000, 5.29, directed=False, seed=103, wc_scale=0.6
    ),
    "livejournal_lite": DatasetSpec(
        "livejournal_lite", 4000, 28.5, directed=True, seed=104, wc_scale=0.6
    ),
}


def _chung_lu_weights(n: int, avg_deg: float, gamma: float, g: np.random.Generator) -> np.ndarray:
    """Power-law expected-degree weights with mean ``avg_deg / 2`` per side.

    Pareto-tail weights ``w_i ∝ (1 - u)^(-1/(gamma-1))`` give a degree
    distribution with tail exponent ``gamma``; we rescale to the target
    mean and cap at ``sqrt(n * mean)`` so that Chung-Lu edge probabilities
    stay below 1.
    """
    u = g.random(n)
    w = (1.0 - u) ** (-1.0 / (gamma - 1.0))
    w = w / w.mean()
    cap = np.sqrt(n)
    return np.minimum(w, cap)


def social_graph(
    *,
    n: int,
    avg_deg: float,
    directed: bool,
    gamma: float = 2.5,
    seed: int = 0,
) -> pd.DataFrame:
    """Generate a power-law social graph as a directed edge list.

    Undirected graphs are emitted as both directions of each undirected
    edge (the paper transforms undirected edges the same way), so the
    returned frame always has columns ``src``, ``dst`` with distinct
    directed edges and no self loops. ``avg_deg`` is ``2m/n`` with ``m``
    counted as in paper Table 2 (undirected-edge count for undirected
    graphs, directed-edge count for directed ones).
    """
    g = np.random.default_rng(seed)
    # Number of *sampled* undirected/directed edges before dedup; oversample
    # a little because dedup and self-loop removal lose a few.
    m_target = int(round(n * avg_deg / 2))
    w = _chung_lu_weights(n, avg_deg, gamma, g)
    p = w / w.sum()
    edges: set[tuple[int, int]] = set()
    # Rejection-style batched sampling until we hit the target edge count.
    while len(edges) < m_target:
        need = int((m_target - len(edges)) * 1.3) + 16
        src = g.choice(n, size=need, p=p)
        dst = g.choice(n, size=need, p=p)
        for a, b in zip(src.tolist(), dst.tolist()):
            if a == b:
                continue
            e = (a, b) if directed else (min(a, b), max(a, b))
            edges.add(e)
            if len(edges) >= m_target:
                break
    # The paper's datasets have no isolated node; attach any node the
    # Chung-Lu sampling missed to a weight-proportional random partner.
    arr0 = np.array(sorted(edges), dtype=np.int64)
    present = np.zeros(n, dtype=bool)
    present[arr0.ravel()] = True
    extra = []
    for v in np.nonzero(~present)[0].tolist():
        u = int(g.choice(n, p=p))
        while u == v:
            u = int(g.choice(n, p=p))
        e = (u, v) if directed else (min(u, v), max(u, v))
        if e not in edges:
            edges.add(e)
            extra.append(e)
    if extra:
        arr0 = np.array(sorted(edges), dtype=np.int64)
    arr = arr0
    if not directed:
        arr = np.vstack([arr, arr[:, ::-1]])
    pdf = pd.DataFrame({"src": arr[:, 0], "dst": arr[:, 1]})
    return pdf.sort_values(["src", "dst"]).reset_index(drop=True)


def dataset_graph(name: str) -> pd.DataFrame:
    """Edge list for one of the named lite datasets in ``DATASETS``."""
    spec = DATASETS[name]
    return social_graph(
        n=spec.n,
        avg_deg=spec.avg_deg,
        directed=spec.directed,
        gamma=spec.gamma,
        seed=spec.seed,
    )


def dataset_csr(name: str):
    """CSR graph for a named lite dataset, with its WC probabilities."""
    from repro.graphs.csr import GraphCSR

    spec = DATASETS[name]
    return GraphCSR.from_edges(
        dataset_graph(name), n=spec.n, wc_scale=spec.wc_scale
    )
