"""Sanity tests for the provided TPC-H-lite generators + DuckDB oracle
wiring (the graph generators are the paper's actual evaluation data; this
validates the shared correctness harness itself)."""
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001, seed=0).cache()


def test_lineitem_rowcount(spark, li):
    assert li.count() == 6000


def test_oracle_agreement_on_aggregate(spark, li):
    from pyspark.sql import functions as F

    q = """
        SELECT l_returnflag AS flag, COUNT(*) AS n,
               ROUND(SUM(l_quantity), 2) AS qty
        FROM li GROUP BY l_returnflag
    """
    li.createOrReplaceTempView("li")
    got = spark.sql(q)
    assert_equivalent(got, q, li=li)


def test_oracle_catches_wrong_result(spark, li):
    li.createOrReplaceTempView("li")
    good = "SELECT COUNT(*) AS n FROM li"
    bad_df = spark.sql("SELECT COUNT(*) + 1 AS n FROM li")
    with pytest.raises(AssertionError):
        assert_equivalent(bad_df, good, li=li)


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.2, seed=1)
    top = df.groupBy("k").count().orderBy("count", ascending=False).first()
    assert top["count"] > 5000 / 100 * 3  # far above uniform share
