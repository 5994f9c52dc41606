"""Smoke tests for the provided TPC-H-lite generators + oracle wiring."""
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.synth_data import customer, lineitem, orders, uniform_keys, zipf_keys


def test_lineitem_shape(spark):
    li = lineitem(spark, sf=0.001, seed=0)
    assert li.count() == 6000
    assert "l_orderkey" in li.columns


def test_orders_join_oracle(spark):
    li = lineitem(spark, sf=0.001, seed=0)
    o = orders(spark, sf=0.001, seed=1)
    q = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count(F.lit(1)).alias("n"))
    )
    assert_equivalent(
        q,
        """
        SELECT o_orderpriority, count(*) AS n
        FROM li JOIN o ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        li=li,
        o=o,
    )


def test_customer_deterministic(spark):
    c1 = customer(spark, sf=0.001, seed=2).toPandas()
    c2 = customer(spark, sf=0.001, seed=2).toPandas()
    assert c1.equals(c2)


def test_zipf_keys_skewed(spark):
    z = zipf_keys(spark, n=5000, n_keys=100, alpha=1.2, seed=3).toPandas()
    counts = z["k"].value_counts()
    assert counts.iloc[0] > counts.iloc[-1] * 3


def test_uniform_keys_range(spark):
    u = uniform_keys(spark, n=1000, n_keys=50, seed=4).toPandas()
    assert u["k"].between(1, 50).all()
