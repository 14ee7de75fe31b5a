"""Provided TPC-H-lite generators + DuckDB oracle wiring."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001).cache()


class TestGenerators:
    def test_lineitem_rowcount(self, li):
        assert li.count() == 6000

    def test_deterministic(self, spark):
        a = synth_data.orders(spark, sf=0.001).toPandas()
        b = synth_data.orders(spark, sf=0.001).toPandas()
        assert a.equals(b)

    def test_zipf_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
        top = df["k"].value_counts().iloc[0]
        assert top > 5000 / 100 * 3  # heavy head


class TestOracle:
    def test_aggregation_equivalence(self, spark, li):
        got = (
            li.groupBy("l_returnflag")
            .agg(F.sum("l_quantity").alias("qty"))
        )
        assert_equivalent(
            got,
            "SELECT l_returnflag, sum(l_quantity) AS qty FROM li GROUP BY l_returnflag",
            li=li,
        )

    def test_detects_wrong_result(self, spark, li):
        wrong = (
            li.groupBy("l_returnflag")
            .agg((F.sum("l_quantity") + 1).alias("qty"))
        )
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT l_returnflag, sum(l_quantity) AS qty FROM li GROUP BY l_returnflag",
                li=li,
            )
