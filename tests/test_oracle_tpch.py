"""Smoke tests wiring the provided TPC-H-lite generators to the DuckDB
oracle — validates the session fixture + oracle harness itself."""
import pyspark.sql.functions as F
import pytest

from repro.oracle import assert_equivalent
from repro.synth_data import customer, lineitem, orders


@pytest.fixture(scope="module")
def li(spark):
    return lineitem(spark, sf=0.001).cache()


@pytest.fixture(scope="module")
def od(spark):
    return orders(spark, sf=0.001).cache()


def test_lineitem_aggregate(spark, li):
    got = li.groupBy("l_returnflag").agg(
        F.count(F.lit(1)).alias("cnt"),
        F.round(F.sum("l_quantity"), 2).alias("sum_qty"),
    )
    assert_equivalent(
        got,
        """
        SELECT l_returnflag, count(*) AS cnt, round(sum(l_quantity), 2) AS sum_qty
        FROM li GROUP BY l_returnflag
        """,
        li=li,
    )


def test_join_shuffle_path(spark, li, od):
    got = (
        li.join(od, li.l_orderkey == od.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count(F.lit(1)).alias("cnt"))
    )
    assert_equivalent(
        got,
        """
        SELECT o_orderpriority, count(*) AS cnt
        FROM li JOIN od ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        li=li,
        od=od,
    )


def test_customer_filter(spark):
    c = customer(spark, sf=0.001)
    got = c.filter(F.col("c_acctbal") > 0).groupBy("c_mktsegment").agg(
        F.count(F.lit(1)).alias("cnt")
    )
    assert_equivalent(
        got,
        "SELECT c_mktsegment, count(*) AS cnt FROM c WHERE c_acctbal > 0 GROUP BY c_mktsegment",
        c=c,
    )
