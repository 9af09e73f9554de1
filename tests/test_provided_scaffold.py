"""Smoke tests for the provided scaffolding (synth_data + oracle).

The reproduction's own datasets live in repro.kg; these tests keep the
shipped TPC-H-lite generators and the DuckDB oracle exercised end-to-end
so the harness contract (Spark result == DuckDB result) stays proven.
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


class TestSynthData:
    def test_lineitem_deterministic(self, spark):
        a = synth_data.lineitem(spark, sf=0.001, seed=1).toPandas()
        b = synth_data.lineitem(spark, sf=0.001, seed=1).toPandas()
        assert a.equals(b)

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
        counts = df["k"].value_counts()
        assert counts.iloc[0] > 5 * counts.iloc[-1]


class TestOracle:
    def test_aggregation_equivalence(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        got = li.groupBy("l_returnflag").agg(
            F.count(F.lit(1)).alias("n"), F.round(F.sum("l_quantity"), 2).alias("qty")
        )
        assert_equivalent(
            got,
            "SELECT l_returnflag, COUNT(*) AS n, ROUND(SUM(l_quantity), 2) AS qty "
            "FROM lineitem GROUP BY l_returnflag",
            lineitem=li,
        )

    def test_detects_wrong_result(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        wrong = li.groupBy("l_returnflag").agg((F.count(F.lit(1)) + 1).alias("n"))
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT l_returnflag, COUNT(*) AS n FROM lineitem GROUP BY l_returnflag",
                lineitem=li,
            )
