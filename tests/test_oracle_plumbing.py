"""TPC-H-lite relational plumbing through the DuckDB oracle.

Keeps the provided synth_data/oracle substrate exercised end-to-end with
join/aggregate shapes similar to those the reproduction relies on.
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent

SF = 0.002


def test_lineitem_groupby(spark):
    li = synth_data.lineitem(spark, sf=SF, seed=0)
    got = li.groupBy("l_returnflag").agg(
        F.sum("l_quantity").alias("qty"), F.count("*").alias("n")
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, sum(l_quantity) AS qty, count(*) AS n "
        "FROM lineitem GROUP BY l_returnflag",
        lineitem=li,
    )


def test_orders_lineitem_join(spark):
    li = synth_data.lineitem(spark, sf=SF, seed=0)
    o = synth_data.orders(spark, sf=SF, seed=1)
    got = (
        li.join(o, li["l_orderkey"] == o["o_orderkey"])
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("n"))
    )
    assert_equivalent(
        got,
        "SELECT o_orderpriority, count(*) AS n FROM lineitem l "
        "JOIN orders o ON l.l_orderkey = o.o_orderkey "
        "GROUP BY o_orderpriority",
        lineitem=li,
        orders=o,
    )


def test_generators_deterministic(spark):
    a = synth_data.lineitem(spark, sf=SF, seed=0).toPandas()
    b = synth_data.lineitem(spark, sf=SF, seed=0).toPandas()
    assert a.equals(b)


def test_customer_part_shapes(spark):
    c = synth_data.customer(spark, sf=SF, seed=2)
    p = synth_data.part(spark, sf=SF, seed=5)
    assert c.count() == max(1, int(150_000 * SF))
    assert p.count() == max(1, int(200_000 * SF))


def test_zipf_keys_skew(spark):
    z = synth_data.zipf_keys(spark, n=20_000, n_keys=1000, alpha=1.2).toPandas()
    u = synth_data.uniform_keys(spark, n=20_000, n_keys=1000).toPandas()
    assert z["k"].value_counts().iloc[0] > 5 * u["k"].value_counts().iloc[0]
