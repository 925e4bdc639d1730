"""Tests for the provided TPC-H-lite generators and the DuckDB oracle."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.synth_data import customer, lineitem, orders, uniform_keys, zipf_keys


def test_lineitem_shape(spark):
    df = lineitem(spark, sf=0.001)
    assert df.count() == 6000
    assert "l_orderkey" in df.columns


def test_orders_keys_dense(spark):
    df = orders(spark, sf=0.001)
    assert df.count() == 1500
    mm = df.agg(F.min("o_orderkey").alias("lo"), F.max("o_orderkey").alias("hi")).first()
    assert (mm["lo"], mm["hi"]) == (1, 1500)


def test_generators_deterministic(spark):
    a = customer(spark, sf=0.001, seed=2).toPandas()
    b = customer(spark, sf=0.001, seed=2).toPandas()
    pd.testing.assert_frame_equal(a, b)


def test_zipf_skewed(spark):
    df = zipf_keys(spark, n=5000, n_keys=100, alpha=1.2).toPandas()
    top = df["k"].value_counts().iloc[0]
    assert top > 5000 / 100 * 3  # far above uniform share


def test_oracle_agg_query(spark):
    """assert_equivalent catches nothing on a correct aggregation."""
    li = lineitem(spark, sf=0.001)
    got = (
        li.groupBy("l_returnflag")
        .agg(
            F.count(F.lit(1)).alias("n"),
            F.round(F.sum("l_quantity"), 2).alias("qty"),
        )
    )
    sql = """
        SELECT l_returnflag, count(*) AS n, round(sum(l_quantity), 2) AS qty
        FROM li GROUP BY l_returnflag
    """
    assert_equivalent(got, sql, li=li)


def test_oracle_join_query(spark):
    li = lineitem(spark, sf=0.001)
    o = orders(spark, sf=0.001)
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count(F.lit(1)).alias("n"))
    )
    sql = """
        SELECT o_orderpriority, count(*) AS n
        FROM li JOIN o ON li.l_orderkey = o.o_orderkey
        GROUP BY o_orderpriority
    """
    assert_equivalent(got, sql, li=li, o=o)


def test_oracle_detects_wrong_result(spark):
    df = uniform_keys(spark, n=100, n_keys=10)
    wrong = df.groupBy("k").agg((F.count(F.lit(1)) + 1).alias("n"))
    with pytest.raises(AssertionError):
        assert_equivalent(wrong, "SELECT k, count(*) AS n FROM t GROUP BY k", t=df)


def test_oracle_detects_column_mismatch(spark):
    df = uniform_keys(spark, n=10, n_keys=5)
    got = df.groupBy("k").agg(F.count(F.lit(1)).alias("wrong_name"))
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(got, "SELECT k, count(*) AS n FROM t GROUP BY k", t=df)
