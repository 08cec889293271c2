"""Provided TPC-H-lite generators stay healthy (regression guard).

The paper's evaluation runs on graphs, not TPC-H; these tests keep the
provided relational generators + DuckDB oracle wiring exercised, so the
oracle path is proven on a plain relational query too.
"""
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


def test_lineitem_row_count(spark):
    li = synth_data.lineitem(spark, sf=0.001, seed=0)
    assert li.count() == 6000


def test_orders_deterministic(spark):
    a = synth_data.orders(spark, sf=0.001, seed=1).toPandas()
    b = synth_data.orders(spark, sf=0.001, seed=1).toPandas()
    assert a.equals(b)


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=20000, n_keys=100, alpha=1.2, seed=3)
    top = (
        df.groupBy("k").count().orderBy(F.desc("count")).limit(1).collect()[0]
    )
    assert top["count"] > 20000 / 100 * 3  # far above uniform share


def test_uniform_keys_range(spark):
    df = synth_data.uniform_keys(spark, n=5000, n_keys=50, seed=4)
    mn, mx = df.agg(F.min("k"), F.max("k")).collect()[0]
    assert mn >= 1 and mx <= 50


def test_join_aggregate_oracle(spark):
    li = synth_data.lineitem(spark, sf=0.001, seed=0)
    o = synth_data.orders(spark, sf=0.001, seed=1)
    out = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(
            F.count("*").alias("cnt"),
            F.round(F.sum("l_quantity"), 2).alias("qty"),
        )
    )
    assert_equivalent(
        out,
        """
        SELECT o_orderpriority, count(*) AS cnt,
               round(sum(l_quantity), 2) AS qty
        FROM lineitem JOIN orders ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        lineitem=li,
        orders=o,
    )
