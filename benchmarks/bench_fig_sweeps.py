"""Benchmark + regeneration of the Figure 4–7 data as tables.

Seeds & runtime vs threshold for ASTI, its batched variants and ATEUC
(IC on two datasets, LT on one), plus ADAPTIM on the smallest dataset
over the lower thresholds (documented cost cap — it is the 10–20×
slower baseline).
"""
import pandas as pd

from benchmarks._util import save
from repro.experiments.tables import sweep

N_REALIZATIONS = 2
MAIN_ALGOS = ["asti", "asti-2", "asti-4", "asti-8", "ateuc"]


def test_fig45_sweep_ic(benchmark, spark):
    result = {}

    def run():
        main = sweep(
            spark,
            datasets=["nethept_lite", "epinions_lite"],
            algos=MAIN_ALGOS,
            model="IC",
            n_realizations=N_REALIZATIONS,
        )
        adapt = sweep(
            spark,
            datasets=["nethept_lite"],
            algos=["adaptim"],
            model="IC",
            n_realizations=N_REALIZATIONS,
            fracs=[0.01, 0.05, 0.1],
        )
        result["pdf"] = pd.concat([main, adapt], ignore_index=True)
        return result["pdf"]

    benchmark.pedantic(run, rounds=1, iterations=1)
    pdf = result["pdf"]
    save("fig_sweeps_ic", pdf)
    adaptive = pdf[pdf.algo.str.startswith(("asti", "adaptim"))]
    assert adaptive["meets_all"].all(), "adaptive algorithms always reach η"


def test_fig67_sweep_lt(benchmark, spark):
    result = {}

    def run():
        result["pdf"] = sweep(
            spark,
            datasets=["nethept_lite"],
            algos=MAIN_ALGOS,
            model="LT",
            n_realizations=N_REALIZATIONS,
        )
        return result["pdf"]

    benchmark.pedantic(run, rounds=1, iterations=1)
    pdf = result["pdf"]
    save("fig_sweeps_lt", pdf)
    assert pdf[pdf.algo.str.startswith("asti")]["meets_all"].all()
