"""Provided TPC-H-lite generators + oracle infrastructure sanity.

The paper's data is the edge list (see DESIGN.md §4); these tests keep the
shipped OLAP generators and the DuckDB oracle demonstrably working, since the
oracle is the correctness backstop for every SQL-expressible dataflow above.
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001, seed=0).cache()


def test_lineitem_deterministic(spark):
    a = synth_data.lineitem(spark, sf=0.001, seed=0).toPandas()
    b = synth_data.lineitem(spark, sf=0.001, seed=0).toPandas()
    assert a.equals(b)


def test_lineitem_schema(li):
    assert {"l_orderkey", "l_quantity", "l_extendedprice"} <= set(li.columns)
    assert li.count() == 6000


def test_oracle_catches_aggregation(spark, li):
    q = li.groupBy("l_returnflag").agg(
        F.sum("l_quantity").alias("sum_qty"),
        F.count("*").alias("cnt"),
    )
    assert_equivalent(
        q,
        """
        SELECT l_returnflag, SUM(l_quantity) AS sum_qty, COUNT(*) AS cnt
        FROM li GROUP BY l_returnflag
        """,
        li=li,
    )


def test_oracle_join_path(spark, li):
    o = synth_data.orders(spark, sf=0.001, seed=1)
    q = (
        li.join(o, li["l_orderkey"] == o["o_orderkey"])
        .groupBy("o_orderpriority")
        .agg(F.sum("l_extendedprice").alias("rev"))
    )
    assert_equivalent(
        q,
        """
        SELECT o_orderpriority, SUM(l_extendedprice) AS rev
        FROM li JOIN o ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        li=li,
        o=o,
    )


def test_zipf_keys_are_skewed(spark):
    df = synth_data.zipf_keys(spark, n=20_000, n_keys=1000, alpha=1.2).toPandas()
    counts = df["k"].value_counts()
    assert counts.iloc[0] > 20 * counts.median()


def test_oracle_detects_mismatch(spark, li):
    wrong = li.groupBy("l_returnflag").agg(
        (F.sum("l_quantity") + 1).alias("sum_qty")
    )
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, SUM(l_quantity) AS sum_qty FROM li GROUP BY l_returnflag",
            li=li,
        )
