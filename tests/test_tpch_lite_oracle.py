"""TPC-H-lite (provided generators) through the DuckDB oracle.

Exercises the provided ``synth_data`` generators and the oracle on
classic OLAP shapes — the generic correctness harness the streaming
work builds on.
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data as sd
from repro.oracle import assert_equivalent

SF = 0.002


@pytest.fixture(scope="module")
def li(spark):
    return sd.lineitem(spark, sf=SF).cache()


@pytest.fixture(scope="module")
def orders_df(spark):
    return sd.orders(spark, sf=SF).cache()


def test_tpch_q1_lite_pricing_summary(li):
    out = (
        li.filter(F.col("l_shipdate") <= "1998-09-01")
        .groupBy("l_returnflag", "l_linestatus")
        .agg(
            F.round(F.sum("l_quantity"), 2).alias("sum_qty"),
            F.round(F.sum("l_extendedprice"), 2).alias("sum_base_price"),
            F.count(F.lit(1)).alias("count_order"),
        )
    )
    assert_equivalent(
        out,
        """
        SELECT l_returnflag, l_linestatus,
               ROUND(SUM(l_quantity), 2) AS sum_qty,
               ROUND(SUM(l_extendedprice), 2) AS sum_base_price,
               COUNT(*) AS count_order
        FROM lineitem
        WHERE l_shipdate <= '1998-09-01'
        GROUP BY l_returnflag, l_linestatus
        """,
        lineitem=li,
    )


def test_tpch_join_order_lineitem(li, orders_df):
    out = (
        li.join(orders_df, li["l_orderkey"] == orders_df["o_orderkey"])
        .groupBy("o_orderpriority")
        .agg(F.count(F.lit(1)).alias("n"))
    )
    assert_equivalent(
        out,
        """
        SELECT o_orderpriority, COUNT(*) AS n
        FROM lineitem l JOIN orders o ON l.l_orderkey = o.o_orderkey
        GROUP BY o_orderpriority
        """,
        lineitem=li,
        orders=orders_df,
    )


def test_uniform_and_zipf_generators(spark):
    z = sd.zipf_keys(spark, n=5_000, n_keys=100, alpha=1.2)
    u = sd.uniform_keys(spark, n=5_000, n_keys=100)
    zc = z.groupBy("k").count().orderBy(F.desc("count")).limit(1).collect()[0]["count"]
    uc = u.groupBy("k").count().orderBy(F.desc("count")).limit(1).collect()[0]["count"]
    assert zc > 3 * uc  # zipf head is much heavier than uniform's max


def test_customer_part_shapes(spark):
    assert sd.customer(spark, sf=SF).columns[0] == "c_custkey"
    assert sd.part(spark, sf=SF).filter(F.col("p_size") > 50).count() == 0
