"""Run one experiment cell: (dataset, model, algorithm, threshold).

Protocol mirrors the paper §6: for each dataset we pre-sample R
ground-truth realizations (shared across algorithms — the realization
seed depends only on (dataset, model, index)), run the algorithm on
each, and report per-realization seed counts, achieved spread, and wall
time. Non-adaptive ATEUC selects once per cell and is evaluated on
every realization, which is exactly how the paper's N/A entries arise.
"""
import time
import zlib
from dataclasses import dataclass, asdict

import numpy as np
from pyspark.sql import SparkSession

from repro.baselines.adaptim import adaptim
from repro.baselines.ateuc import ateuc
from repro.core.asti import asti
from repro.diffusion.propagate import spread_local
from repro.diffusion.realization import sample_realization
from repro.graphs.csr import GraphCSR
from repro.graphs.generator import DATASETS, dataset_csr

ADAPTIVE_ALGOS = ("asti", "asti-2", "asti-4", "asti-8", "adaptim")
ALGOS = ADAPTIVE_ALGOS + ("ateuc",)


def realization_seed(dataset: str, model: str, index: int) -> int:
    """Stable per-(dataset, model, index) seed shared by all algorithms."""
    return zlib.crc32(f"{dataset}|{model}|{index}".encode()) & 0x7FFFFFFF


@dataclass
class RunRecord:
    """One algorithm run on one realization."""

    dataset: str
    model: str
    algo: str
    eta_frac: float
    eta: int
    realization: int
    n_seeds: int
    spread: int
    time_s: float
    meets_threshold: bool

    def to_dict(self) -> dict:
        return asdict(self)


def run_cell(
    spark: SparkSession | None,
    dataset: str,
    model: str,
    algo: str,
    eta_frac: float,
    *,
    n_realizations: int = 3,
    eps: float = 0.5,
    seed: int = 0,
    g: GraphCSR | None = None,
) -> list[RunRecord]:
    """All per-realization records for one experiment cell."""
    if algo not in ALGOS:
        raise ValueError(f"unknown algo {algo!r}; expected one of {ALGOS}")
    if g is None:
        g = dataset_csr(dataset)
    eta = max(1, int(round(eta_frac * g.n)))
    reals = [
        sample_realization(g, model, realization_seed(dataset, model, r))
        for r in range(n_realizations)
    ]
    records: list[RunRecord] = []
    if algo == "ateuc":
        t0 = time.perf_counter()
        sel = ateuc(spark, g, eta, model, seed=seed)
        select_time = time.perf_counter() - t0
        for r, real in enumerate(reals):
            spread = len(spread_local(real, sel.seeds))
            records.append(
                RunRecord(
                    dataset=dataset,
                    model=model,
                    algo=algo,
                    eta_frac=eta_frac,
                    eta=eta,
                    realization=r,
                    n_seeds=sel.n_seeds,
                    spread=spread,
                    time_s=select_time,
                    meets_threshold=spread >= eta,
                )
            )
        return records
    b = 1
    if algo.startswith("asti-"):
        b = int(algo.split("-")[1])
    for r, real in enumerate(reals):
        t0 = time.perf_counter()
        if algo == "adaptim":
            res = adaptim(
                spark, g, eta, model, 0, eps=eps, seed=seed + r, realization=real
            )
        else:
            res = asti(
                spark,
                g,
                eta,
                model,
                0,
                eps=eps,
                b=b,
                seed=seed + r,
                realization=real,
            )
        records.append(
            RunRecord(
                dataset=dataset,
                model=model,
                algo=algo,
                eta_frac=eta_frac,
                eta=eta,
                realization=r,
                n_seeds=res.n_seeds,
                spread=res.spread,
                time_s=time.perf_counter() - t0,
                meets_threshold=res.spread >= eta,
            )
        )
    return records


def eta_fracs(dataset: str) -> list[float]:
    """The paper's threshold grid: large-η, except small-η for LiveJournal."""
    if dataset.startswith("livejournal"):
        return [0.01, 0.02, 0.03, 0.04, 0.05]
    return [0.01, 0.05, 0.1, 0.15, 0.2]


def all_datasets() -> list[str]:
    return list(DATASETS)


def records_to_pandas(records: list[RunRecord]):
    import pandas as pd

    return pd.DataFrame([r.to_dict() for r in records])
