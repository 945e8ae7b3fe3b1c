"""Tests for the provided TPC-H-lite generators and the DuckDB oracle."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001)


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.001)


def test_lineitem_deterministic(spark, li):
    again = synth_data.lineitem(spark, sf=0.001)
    assert li.count() == again.count()
    a = li.agg(F.sum("l_quantity")).collect()[0][0]
    b = again.agg(F.sum("l_quantity")).collect()[0][0]
    assert a == b


def test_oracle_accepts_matching_aggregate(spark, li):
    q = li.groupBy("l_returnflag").agg(
        F.count(F.lit(1)).alias("n"), F.round(F.sum("l_quantity"), 2).alias("qty")
    )
    assert_equivalent(
        q,
        "SELECT l_returnflag, COUNT(*) AS n, ROUND(SUM(l_quantity), 2) AS qty "
        "FROM li GROUP BY l_returnflag",
        li=li,
    )


def test_oracle_rejects_wrong_result(spark, li):
    q = li.groupBy("l_returnflag").agg((F.count(F.lit(1)) + 1).alias("n"))
    with pytest.raises(AssertionError):
        assert_equivalent(
            q,
            "SELECT l_returnflag, COUNT(*) AS n FROM li GROUP BY l_returnflag",
            li=li,
        )


def test_oracle_join_path(spark, li, orders):
    q = (
        li.join(orders, li.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count(F.lit(1)).alias("n"))
    )
    assert_equivalent(
        q,
        "SELECT o_orderpriority, COUNT(*) AS n FROM li "
        "JOIN orders ON l_orderkey = o_orderkey GROUP BY o_orderpriority",
        li=li,
        orders=orders,
    )


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, seed=1)
    top = df.groupBy("k").count().orderBy(F.desc("count")).limit(1).collect()[0]["count"]
    assert top > 5000 / 100 * 5  # head key far above uniform share
