"""Smoke tests for the provided TPC-H-lite generators and DuckDB oracle.

These exercise the provided substrate the way the rest of the suite
relies on it (schema sanity + an aggregation round-trip through
``assert_equivalent``), and document a deliberate failure so a broken
oracle cannot silently pass everything.
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001, seed=0).cache()


def test_lineitem_schema(li):
    assert {"l_orderkey", "l_quantity", "l_extendedprice", "l_returnflag"} <= set(
        li.columns
    )
    assert li.count() == 6000


def test_generators_deterministic(spark):
    a = synth_data.orders(spark, sf=0.001, seed=1).toPandas()
    b = synth_data.orders(spark, sf=0.001, seed=1).toPandas()
    assert a.equals(b)


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.5, seed=0)
    top = df.groupBy("k").count().orderBy(F.desc("count")).first()
    assert top["count"] > 5000 / 100 * 5  # head key way above uniform share


def test_oracle_agreement_on_aggregation(li):
    got = li.groupBy("l_returnflag").agg(
        F.count("*").alias("n"),
        F.sum("l_quantity").alias("sum_qty"),
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, count(*) AS n, sum(l_quantity) AS sum_qty "
        "FROM lineitem GROUP BY l_returnflag",
        lineitem=li,
    )


def test_oracle_catches_wrong_result(li):
    wrong = li.groupBy("l_returnflag").agg(
        (F.count("*") + 1).alias("n")  # deliberately off by one
    )
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, count(*) AS n FROM lineitem GROUP BY l_returnflag",
            lineitem=li,
        )


def test_oracle_catches_column_mismatch(li):
    got = li.agg(F.count("*").alias("cnt"))
    with pytest.raises(AssertionError):
        assert_equivalent(got, "SELECT count(*) AS n FROM lineitem", lineitem=li)
