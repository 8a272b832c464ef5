"""Exercise the provided TPC-H-lite generators and the DuckDB oracle plumbing
(kept healthy even though the CORE reproduction evaluates on event streams:
the oracle path they validate is the same one the CER tests rely on)."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001, seed=0)


def test_lineitem_schema_and_rows(li):
    assert li.count() == 6000
    assert {"l_orderkey", "l_quantity", "l_shipdate"} <= set(li.columns)


def test_oracle_agreement_on_aggregate(spark, li):
    got = li.groupBy("l_returnflag").agg(
        F.sum("l_quantity").alias("sum_qty"), F.count("*").alias("n")
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, SUM(l_quantity) AS sum_qty, COUNT(*) AS n "
        "FROM lineitem GROUP BY l_returnflag",
        lineitem=li,
    )


def test_oracle_detects_wrong_result(spark, li):
    got = li.groupBy("l_returnflag").agg(
        (F.sum("l_quantity") + 1).alias("sum_qty")
    )
    with pytest.raises(AssertionError):
        assert_equivalent(
            got,
            "SELECT l_returnflag, SUM(l_quantity) AS sum_qty "
            "FROM lineitem GROUP BY l_returnflag",
            lineitem=li,
        )


def test_generators_deterministic(spark):
    a = synth_data.orders(spark, sf=0.001, seed=1).toPandas()
    b = synth_data.orders(spark, sf=0.001, seed=1).toPandas()
    assert a.equals(b)


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, seed=0).toPandas()
    top = df["k"].value_counts().iloc[0]
    assert top > 5000 / 100 * 3  # head key far above uniform share
