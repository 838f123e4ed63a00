"""Sanity tests for the provided TPC-H-lite generators and the oracle."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001).cache()


def test_lineitem_shape(li):
    assert li.count() == 6000
    assert "l_orderkey" in li.columns


def test_oracle_catches_agreement(spark, li):
    agg = li.groupBy("l_returnflag").agg(F.sum("l_quantity").alias("qty"))
    assert_equivalent(
        agg,
        "SELECT l_returnflag, sum(l_quantity) AS qty FROM li GROUP BY l_returnflag",
        li=li,
    )


def test_oracle_catches_disagreement(spark, li):
    agg = li.groupBy("l_returnflag").agg((F.sum("l_quantity") + 1).alias("qty"))
    with pytest.raises(AssertionError):
        assert_equivalent(
            agg,
            "SELECT l_returnflag, sum(l_quantity) AS qty FROM li GROUP BY l_returnflag",
            li=li,
        )


def test_generators_deterministic(spark):
    a = synth_data.orders(spark, sf=0.001).toPandas()
    b = synth_data.orders(spark, sf=0.001).toPandas()
    assert a.equals(b)
