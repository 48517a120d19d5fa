"""Graph statistics vs the DuckDB oracle (Table 2 inputs)."""
import pyspark.sql.functions as F
import pytest

from repro.graphs.generator import DATASETS, dataset_graph
from repro.graphs.stats import degree_histogram, degree_stats, edges_df
from repro.oracle import assert_equivalent

# Smaller datasets only — oracle tests collect to the driver anyway.
NAMES = ["nethept_lite", "epinions_lite"]


@pytest.mark.parametrize("name", NAMES)
def test_degree_stats_oracle(spark, name):
    spec = DATASETS[name]
    edges = dataset_graph(name)
    div = 1 if spec.directed else 2
    got = degree_stats(edges_df(spark, edges), directed=spec.directed)
    sql = f"""
        WITH nodes AS (
            SELECT src AS node FROM edges UNION SELECT dst FROM edges
        )
        SELECT (SELECT count(*) FROM nodes) AS n,
               CAST((SELECT count(*) FROM edges) / {div} AS BIGINT) AS m,
               2.0 * ((SELECT count(*) FROM edges) / {div})
                   / (SELECT count(*) FROM nodes) AS avg_deg
    """
    assert_equivalent(got, sql, edges=edges)


@pytest.mark.parametrize("name", NAMES)
def test_degree_histogram_oracle(spark, name):
    edges = dataset_graph(name)
    got = degree_histogram(edges_df(spark, edges))
    sql = """
        WITH all_deg AS (
            SELECT node, count(*) AS degree FROM (
                SELECT src AS node FROM edges
                UNION ALL SELECT dst FROM edges
            ) GROUP BY node
        )
        SELECT degree, count(*) AS node_count FROM all_deg GROUP BY degree
    """
    assert_equivalent(got, sql, edges=edges)


@pytest.mark.parametrize("name", NAMES)
def test_degree_stats_values(spark, name):
    spec = DATASETS[name]
    row = degree_stats(
        edges_df(spark, dataset_graph(name)), directed=spec.directed
    ).collect()[0]
    assert row["n"] == spec.n
    assert float(row["avg_deg"]) == pytest.approx(spec.avg_deg, rel=0.15)


def test_histogram_total_equals_n(spark):
    edges = dataset_graph("nethept_lite")
    hist = degree_histogram(edges_df(spark, edges))
    total = hist.agg(F.sum("node_count").alias("t")).collect()[0]["t"]
    assert total == DATASETS["nethept_lite"].n
