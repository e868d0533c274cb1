"""Oracle and synthetic-data wiring tests.

The paper's workload is string tables (benchgen), but the provided
TPC-H-lite generators and the DuckDB oracle are part of the harness
contract — exercise them so any oracle regression is caught where it is
easiest to debug.
"""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


class TestOracle:
    def test_accepts_identical_aggregation(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        got = li.groupBy("l_returnflag").agg(
            F.sum("l_quantity").alias("qty"), F.count("*").alias("n")
        )
        assert_equivalent(
            got,
            "SELECT l_returnflag, SUM(l_quantity) AS qty, COUNT(*) AS n "
            "FROM li GROUP BY l_returnflag",
            li=li,
        )

    def test_rejects_wrong_result(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        wrong = li.groupBy("l_returnflag").agg((F.sum("l_quantity") + 1).alias("qty"))
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT l_returnflag, SUM(l_quantity) AS qty FROM li GROUP BY l_returnflag",
                li=li,
            )

    def test_rejects_column_mismatch(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        got = li.groupBy("l_returnflag").agg(F.count("*").alias("cnt"))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(
                got,
                "SELECT l_returnflag, COUNT(*) AS n FROM li GROUP BY l_returnflag",
                li=li,
            )

    def test_accepts_pandas_inputs(self, spark):
        pdf = pd.DataFrame({"k": [1, 1, 2], "v": [1.0, 2.0, 3.0]})
        got = spark.createDataFrame(pdf).groupBy("k").agg(F.sum("v").alias("s"))
        assert_equivalent(got, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)


class TestSynthData:
    def test_lineitem_deterministic(self, spark):
        a = synth_data.lineitem(spark, sf=0.001, seed=42).toPandas()
        b = synth_data.lineitem(spark, sf=0.001, seed=42).toPandas()
        pd.testing.assert_frame_equal(a, b)

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.5).toPandas()
        counts = df["k"].value_counts()
        assert counts.iloc[0] > 5 * counts.iloc[-1]

    def test_uniform_keys_cover_range(self, spark):
        df = synth_data.uniform_keys(spark, n=2000, n_keys=10).toPandas()
        assert set(df["k"]) == set(range(1, 11))
