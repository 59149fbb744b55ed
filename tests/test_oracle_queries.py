"""Spark SQL vs DuckDB oracle checks on the provided TPC-H-lite
generators — exercising the shuffle path (broadcast joins disabled in
conftest) with the kind of metadata queries a compressed scientific
database runs alongside its array blocks."""
import pyspark.sql.functions as F
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.005).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.005).cache()


def test_aggregate_pricing_summary(spark, li):
    q = (
        li.groupBy("l_returnflag", "l_linestatus")
        .agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.sum("l_extendedprice").alias("sum_price"),
            F.count("*").alias("cnt"),
        )
        .orderBy("l_returnflag", "l_linestatus")
    )
    assert_equivalent(
        q,
        "SELECT l_returnflag, l_linestatus, sum(l_quantity) AS sum_qty, "
        "sum(l_extendedprice) AS sum_price, count(*) AS cnt "
        "FROM li GROUP BY l_returnflag, l_linestatus "
        "ORDER BY l_returnflag, l_linestatus",
        li=li,
    )


def test_join_revenue_by_priority(spark, li, orders):
    q = (
        li.join(orders, li.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(
            F.sum(
                F.col("l_extendedprice") * (1 - F.col("l_discount"))
            ).alias("revenue")
        )
        .orderBy("o_orderpriority")
    )
    assert_equivalent(
        q,
        "SELECT o_orderpriority, "
        "sum(l_extendedprice * (1 - l_discount)) AS revenue "
        "FROM li JOIN orders ON l_orderkey = o_orderkey "
        "GROUP BY o_orderpriority ORDER BY o_orderpriority",
        li=li,
        orders=orders,
    )


def test_filter_and_count(spark, li):
    q = li.filter(F.col("l_discount") > 0.05).agg(
        F.count("*").alias("n"), F.avg("l_quantity").alias("avg_qty")
    )
    assert_equivalent(
        q,
        "SELECT count(*) AS n, avg(l_quantity) AS avg_qty FROM li "
        "WHERE l_discount > 0.05",
        li=li,
    )
