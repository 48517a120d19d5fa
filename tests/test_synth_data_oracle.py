"""The provided TPC-H-lite generators + DuckDB oracle, exercised as the
repo intends (query-result equality between Spark and DuckDB)."""
import pyspark.sql.functions as F
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.002, seed=0)


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.002, seed=1)


def test_lineitem_aggregate_oracle(spark, li):
    got = (
        li.groupBy("l_returnflag")
        .agg(
            F.count("*").alias("cnt"),
            F.round(F.sum("l_quantity"), 2).alias("sum_qty"),
        )
    )
    sql = """
        SELECT l_returnflag, count(*) AS cnt,
               round(sum(l_quantity), 2) AS sum_qty
        FROM li GROUP BY l_returnflag
    """
    assert_equivalent(got, sql, li=li)


def test_join_oracle(spark, li, orders):
    got = (
        li.join(orders, li.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("cnt"))
    )
    sql = """
        SELECT o_orderpriority, count(*) AS cnt
        FROM li JOIN orders ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
    """
    assert_equivalent(got, sql, li=li, orders=orders)


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, seed=3)
    top = (
        df.groupBy("k").agg(F.count("*").alias("c")).orderBy(F.desc("c")).first()
    )
    assert top["k"] == 1  # rank-1 key dominates under zipf
    assert top["c"] > 5000 / 100  # far above uniform share
