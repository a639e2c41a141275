"""Tests for the provided oracle + TPC-H-lite generators (kept healthy:
CIAO's evaluation uses the JSON datasets, but the oracle is the
correctness backbone of every Spark query test in this repo)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


class TestOracle:
    def test_passes_on_equal_results(self, spark):
        pdf = pd.DataFrame({"a": [1, 2, 3], "b": ["x", "y", "z"]})
        df = spark.createDataFrame(pdf)
        assert_equivalent(df, "SELECT a, b FROM t", t=pdf)

    def test_detects_wrong_rows(self, spark):
        pdf = pd.DataFrame({"a": [1, 2, 3]})
        df = spark.createDataFrame(pdf).where("a < 3")
        with pytest.raises(AssertionError):
            assert_equivalent(df, "SELECT a FROM t", t=pdf)

    def test_detects_column_mismatch(self, spark):
        pdf = pd.DataFrame({"a": [1]})
        df = spark.createDataFrame(pdf)
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(df, "SELECT a AS b FROM t", t=pdf)

    def test_projection_order_insensitive(self, spark):
        pdf = pd.DataFrame({"a": [1, 2], "b": ["x", "y"]})
        df = spark.createDataFrame(pdf).select("b", "a")
        assert_equivalent(df, "SELECT a, b FROM t", t=pdf)

    def test_accepts_spark_frames_as_tables(self, spark):
        pdf = pd.DataFrame({"a": [1, 2]})
        df = spark.createDataFrame(pdf)
        assert_equivalent(df, "SELECT a FROM t", t=df)


class TestSynthData:
    def test_lineitem_shape(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        assert li.count() == 6000
        assert "l_orderkey" in li.columns

    def test_deterministic(self, spark):
        a = synth_data.orders(spark, sf=0.001).toPandas()
        b = synth_data.orders(spark, sf=0.001).toPandas()
        pd.testing.assert_frame_equal(a, b)

    def test_join_agg_matches_duckdb(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        o = synth_data.orders(spark, sf=0.001)
        got = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .groupBy("o_orderstatus")
            .agg(F.count(F.lit(1)).alias("cnt"))
        )
        assert_equivalent(
            got,
            """
            SELECT o_orderstatus, COUNT(*) AS cnt
            FROM lineitem JOIN orders ON l_orderkey = o_orderkey
            GROUP BY o_orderstatus
            """,
            lineitem=li,
            orders=o,
        )

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
        counts = df["k"].value_counts()
        assert counts.iloc[0] > counts.iloc[-1]
