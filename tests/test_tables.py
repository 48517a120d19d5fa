"""Table builders (Table 2, Table 3, figure sweeps) — integration tests."""
import pytest

from repro.experiments.tables import fig8_spread, sweep, table2, table3
from repro.graphs.generator import DATASETS


@pytest.fixture(scope="module")
def t2(spark):
    return table2(spark, datasets=["nethept_lite", "epinions_lite"])


def test_table2_schema(t2):
    assert list(t2.columns) == ["dataset", "n", "m", "type", "avg_deg", "lwcc_size"]


def test_table2_values(t2):
    row = t2[t2.dataset == "nethept_lite"].iloc[0]
    assert row["n"] == 1200
    assert row["type"] == "undirected"
    assert row["avg_deg"] == pytest.approx(4.18, rel=0.15)
    assert 0 < row["lwcc_size"] <= row["n"]
    row = t2[t2.dataset == "epinions_lite"].iloc[0]
    assert row["type"] == "directed"
    assert row["avg_deg"] == pytest.approx(13.4, rel=0.15)


def test_table3_mini(spark):
    pdf = table3(
        None,
        datasets=["nethept_lite"],
        models=("IC",),
        n_realizations=2,
        fracs=[0.05],
    )
    assert list(pdf.columns) == ["model", "dataset", "eta/n=0.05"]
    cell = pdf.iloc[0]["eta/n=0.05"]
    assert cell == "N/A" or cell.endswith("%")


def test_table3_records_out(spark):
    records = []
    table3(
        None,
        datasets=["nethept_lite"],
        models=("IC",),
        n_realizations=1,
        fracs=[0.01],
        records_out=records,
    )
    algos = {r.algo for r in records}
    assert algos == {"asti", "ateuc"}
    assert all(r.meets_threshold for r in records if r.algo == "asti")


def test_sweep_mini(spark):
    pdf = sweep(
        None,
        datasets=["nethept_lite"],
        algos=["asti", "asti-4"],
        model="IC",
        n_realizations=1,
        fracs=[0.05],
    )
    assert set(pdf.columns) == {
        "dataset",
        "algo",
        "eta_frac",
        "eta",
        "mean_seeds",
        "mean_spread",
        "mean_time_s",
        "meets_all",
    }
    assert set(pdf["algo"]) == {"asti", "asti-4"}
    assert (pdf["mean_spread"] >= pdf["eta"]).all()
    assert pdf["meets_all"].all()


def test_fig8_mini(spark):
    pdf = fig8_spread(
        None,
        dataset="nethept_lite",
        models=("IC",),
        eta_frac=0.05,
        n_realizations=2,
    )
    assert set(pdf["algo"]) == {"asti", "ateuc"}
    asti_rows = pdf[pdf.algo == "asti"]
    assert (asti_rows["spread"] >= asti_rows["eta"]).all()


def test_dataset_registry_covers_paper():
    assert set(DATASETS) == {
        "nethept_lite",
        "epinions_lite",
        "youtube_lite",
        "livejournal_lite",
    }
