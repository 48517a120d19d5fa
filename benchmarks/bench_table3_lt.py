"""Benchmark + regeneration of paper Table 3, LT model (all datasets)."""
from benchmarks._util import save
from repro.experiments.harness import records_to_pandas
from repro.experiments.tables import table3

N_REALIZATIONS = 3


def test_table3_lt(benchmark, spark):
    result = {}

    def run():
        records = []
        pdf = table3(
            spark,
            models=("LT",),
            n_realizations=N_REALIZATIONS,
            records_out=records,
        )
        result["pdf"], result["records"] = pdf, records
        return pdf

    benchmark.pedantic(run, rounds=1, iterations=1)
    pdf = result["pdf"]
    save("table3_lt", pdf)
    save("table3_lt_runs", records_to_pandas(result["records"]))
    assert len(pdf) == 4
    runs = records_to_pandas(result["records"])
    assert runs[runs.algo == "asti"]["meets_threshold"].all()
