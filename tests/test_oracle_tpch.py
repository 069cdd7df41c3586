"""Smoke tests wiring the provided TPC-H-lite generators through the
DuckDB oracle — guards the shared correctness harness itself."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    df = synth_data.lineitem(spark, sf=0.001, seed=0)
    df.cache().count()
    return df


def test_lineitem_aggregate(spark, li):
    got = (
        li.groupBy("l_returnflag")
        .agg(F.sum("l_quantity").alias("sum_qty"), F.count("*").alias("cnt"))
    )
    sql = (
        "SELECT l_returnflag, SUM(l_quantity) AS sum_qty, COUNT(*) AS cnt "
        "FROM li GROUP BY l_returnflag"
    )
    assert_equivalent(got, sql, li=li)


def test_join_lineitem_orders(spark, li):
    o = synth_data.orders(spark, sf=0.001, seed=1)
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("cnt"))
    )
    sql = (
        "SELECT o_orderpriority, COUNT(*) AS cnt FROM li "
        "JOIN o ON l_orderkey = o_orderkey GROUP BY o_orderpriority"
    )
    assert_equivalent(got, sql, li=li, o=o)


def test_oracle_catches_wrong_result(spark, li):
    got = li.groupBy("l_returnflag").agg((F.count("*") + 1).alias("cnt"))
    with pytest.raises(AssertionError):
        assert_equivalent(
            got,
            "SELECT l_returnflag, COUNT(*) AS cnt FROM li GROUP BY l_returnflag",
            li=li,
        )
