"""Provided TPC-H-lite generators still work and agree with the oracle
(they are part of the workspace contract even though the paper's
evaluation is graph-based)."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.002, seed=0)


def test_lineitem_deterministic(spark):
    a = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
    b = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
    assert a.equals(b)


def test_lineitem_aggregate_oracle(spark, li):
    got = li.groupBy("l_returnflag").agg(
        F.sum("l_quantity").alias("sum_qty"), F.count("*").alias("cnt")
    )
    assert_equivalent(
        got,
        "select l_returnflag, sum(l_quantity) as sum_qty, count(*) as cnt "
        "from lineitem group by l_returnflag",
        lineitem=li,
    )


def test_orders_join_oracle(spark, li):
    orders = synth_data.orders(spark, sf=0.002, seed=1)
    got = (
        li.join(orders, li.l_orderkey == orders.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("cnt"))
    )
    assert_equivalent(
        got,
        "select o_orderpriority, count(*) as cnt from lineitem l "
        "join orders o on l.l_orderkey = o.o_orderkey group by o_orderpriority",
        lineitem=li,
        orders=orders,
    )


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=20000, n_keys=1000, alpha=1.2, seed=0)
    top = df.groupBy("k").count().orderBy(F.desc("count")).first()["count"]
    assert top > 20000 / 1000 * 5  # head key way above uniform share
