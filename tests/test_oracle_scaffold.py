"""The provided DuckDB oracle + TPC-H-lite scaffold stays exercised:
relational results computed in Spark are replayed in DuckDB."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001, seed=3).cache()


def test_lineitem_aggregate_oracle(spark, li):
    got = (
        li.groupBy("l_returnflag")
        .agg(
            F.count(F.lit(1)).alias("cnt"),
            F.sum("l_quantity").alias("sum_qty"),
        )
    )
    assert_equivalent(
        got,
        """
        SELECT l_returnflag, COUNT(*) AS cnt, SUM(l_quantity) AS sum_qty
        FROM lineitem GROUP BY l_returnflag
        """,
        lineitem=li,
    )


def test_join_oracle(spark, li):
    orders = synth_data.orders(spark, sf=0.001, seed=4)
    got = (
        li.join(orders, li.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count(F.lit(1)).alias("cnt"))
    )
    assert_equivalent(
        got,
        """
        SELECT o_orderpriority, COUNT(*) AS cnt
        FROM lineitem JOIN orders ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        lineitem=li,
        orders=orders,
    )


def test_road_edges_df(spark):
    df = synth_data.road_edges(spark, width=10, height=4, seed=1)
    assert df.columns == ["u", "v", "w"]
    assert df.count() > 0
    assert df.where(F.col("w") <= 0).count() == 0
