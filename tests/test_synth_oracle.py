"""Provided substrate sanity: TPC-H-lite generators + the DuckDB oracle
itself, exercised through Spark SQL aggregates."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


def test_lineitem_pricing_summary_oracle(spark):
    """TPC-H Q1-lite over the synthetic lineitem — Spark vs DuckDB."""
    li = synth_data.lineitem(spark, sf=0.002, seed=1)
    got = (
        li.groupBy("l_returnflag", "l_linestatus")
        .agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.count("*").alias("count_order"),
        )
    )
    assert_equivalent(
        got,
        """
        SELECT l_returnflag, l_linestatus,
               sum(l_quantity) AS sum_qty,
               count(*) AS count_order
        FROM lineitem GROUP BY 1, 2
        """,
        lineitem=li,
    )


def test_orders_join_oracle(spark):
    li = synth_data.lineitem(spark, sf=0.002, seed=1)
    o = synth_data.orders(spark, sf=0.002, seed=2)
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("n"))
    )
    assert_equivalent(
        got,
        """
        SELECT o_orderpriority, count(*) AS n
        FROM lineitem JOIN orders ON l_orderkey = o_orderkey
        GROUP BY 1
        """,
        lineitem=li,
        orders=o,
    )


def test_generators_deterministic(spark):
    a = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
    b = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
    assert a.equals(b)


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, seed=0).toPandas()
    counts = df["k"].value_counts()
    assert counts.iloc[0] > 3 * counts.iloc[-1]  # head much heavier than tail
