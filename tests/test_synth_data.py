"""Tests for the provided TPC-H-lite generators + the DuckDB oracle.

The OKB reproduction does not consume these tables, but they ship with
the repo scaffold and the oracle pattern is exercised here end-to-end:
a Spark aggregation is checked for result-equality against DuckDB.
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


def test_lineitem_scales():
    # row counts derive from the SF constants
    import pandas as pd

    assert synth_data._N_LINEITEM_PER_SF == 6_000_000


def test_generators_deterministic(spark):
    a = synth_data.orders(spark, sf=0.001, seed=1).toPandas()
    b = synth_data.orders(spark, sf=0.001, seed=1).toPandas()
    assert a.equals(b)


def test_lineitem_pricing_query_matches_duckdb(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    got = (
        li.groupBy("l_returnflag")
        .agg(
            F.count("*").alias("n"),
            F.round(F.sum(F.col("l_extendedprice") * (1 - F.col("l_discount"))), 2)
            .alias("revenue"),
        )
    )
    assert_equivalent(
        got,
        """
        SELECT l_returnflag,
               COUNT(*) AS n,
               ROUND(SUM(l_extendedprice * (1 - l_discount)), 2) AS revenue
        FROM li GROUP BY l_returnflag
        """,
        li=li,
    )


def test_join_cardinality_matches_duckdb(spark):
    o = synth_data.orders(spark, sf=0.001)
    c = synth_data.customer(spark, sf=0.001)
    got = (
        o.join(c, o.o_custkey == c.c_custkey)
        .groupBy("c_mktsegment")
        .agg(F.count("*").alias("n"))
    )
    assert_equivalent(
        got,
        """
        SELECT c_mktsegment, COUNT(*) AS n
        FROM o JOIN c ON o.o_custkey = c.c_custkey
        GROUP BY c_mktsegment
        """,
        o=o,
        c=c,
    )


def test_zipf_keys_are_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
    counts = df["k"].value_counts()
    assert counts.iloc[0] > 5 * counts.iloc[-1]


def test_uniform_keys_cover_range(spark):
    df = synth_data.uniform_keys(spark, n=2000, n_keys=10).toPandas()
    assert set(df["k"]) == set(range(1, 11))
