"""Sanity checks of the provided oracle + TPC-H-lite generators.

Keeps the provided ``synth_data`` / ``oracle`` modules exercised and
demonstrates the oracle catches wrong results (not just crashes).
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001)


def test_lineitem_aggregate_oracle(spark, li):
    got = li.groupBy("l_returnflag").agg(
        F.sum("l_quantity").alias("qty"),
        F.count(F.lit(1)).alias("n"),
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, sum(l_quantity) AS qty, count(*) AS n "
        "FROM li GROUP BY l_returnflag",
        li=li,
    )


def test_oracle_detects_wrong_result(spark, li):
    wrong = li.groupBy("l_returnflag").agg(
        (F.sum("l_quantity") + 1).alias("qty")
    )
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, sum(l_quantity) AS qty FROM li "
            "GROUP BY l_returnflag",
            li=li,
        )


def test_oracle_detects_column_mismatch(spark, li):
    got = li.groupBy("l_returnflag").agg(F.sum("l_quantity").alias("wrong_name"))
    with pytest.raises(AssertionError):
        assert_equivalent(
            got,
            "SELECT l_returnflag, sum(l_quantity) AS qty FROM li "
            "GROUP BY l_returnflag",
            li=li,
        )


def test_generators_deterministic(spark):
    a = synth_data.orders(spark, sf=0.001).toPandas()
    b = synth_data.orders(spark, sf=0.001).toPandas()
    assert a.equals(b)


def test_zipf_keys_skewed(spark):
    pdf = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
    counts = pdf["k"].value_counts()
    assert counts.iloc[0] > 3 * counts.iloc[-1]
