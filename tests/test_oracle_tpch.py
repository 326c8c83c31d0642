"""Exercise the provided TPC-H-lite generators and the DuckDB oracle on
Spark aggregations (sanity that the oracle itself catches wrong results)."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001, seed=0).cache()


def test_lineitem_aggregate_oracle(spark, li):
    got = li.groupBy("l_returnflag").agg(
        F.count(F.lit(1)).alias("cnt"), F.sum("l_quantity").alias("qty")
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, count(*) AS cnt, sum(l_quantity) AS qty "
        "FROM li GROUP BY l_returnflag",
        li=li,
    )


def test_oracle_catches_wrong_result(spark, li):
    wrong = li.groupBy("l_returnflag").agg((F.count(F.lit(1)) + 1).alias("cnt"))
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, count(*) AS cnt FROM li GROUP BY l_returnflag",
            li=li,
        )


def test_orders_join_oracle(spark, li):
    orders = synth_data.orders(spark, sf=0.001, seed=1)
    got = (
        li.join(orders, li.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderstatus")
        .agg(F.count(F.lit(1)).alias("cnt"))
    )
    assert_equivalent(
        got,
        "SELECT o_orderstatus, count(*) AS cnt FROM li "
        "JOIN o ON li.l_orderkey = o.o_orderkey GROUP BY o_orderstatus",
        li=li,
        o=orders,
    )
