"""Provided substrate: synthetic data generators and the DuckDB oracle."""
import pandas as pd
import pytest

from repro import oracle, synth_data


class TestSynthData:
    def test_lineitem_deterministic(self, spark):
        a = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
        b = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
        pd.testing.assert_frame_equal(a, b)

    def test_lineitem_schema_has_q1_q6_columns(self, spark):
        cols = set(synth_data.lineitem(spark, sf=0.001).columns)
        assert {
            "l_quantity", "l_extendedprice", "l_discount", "l_tax",
            "l_returnflag", "l_linestatus", "l_shipdate",
        } <= cols

    def test_row_count_scales_with_sf(self, spark):
        n = synth_data.lineitem(spark, sf=0.002).count()
        assert n == 12000

    def test_zipf_keys_are_skewed(self, spark):
        pdf = synth_data.zipf_keys(spark, n=20000, n_keys=100).toPandas()
        top = pdf["k"].value_counts().iloc[0]
        assert top > 3 * len(pdf) / 100

    def test_uniform_keys_cover_range(self, spark):
        pdf = synth_data.uniform_keys(spark, n=5000, n_keys=10).toPandas()
        assert set(pdf["k"].unique()) == set(range(1, 11))


class TestOracle:
    def test_passes_on_equivalent_results(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"k": [1, 2], "v": [3.0, 4.0]}))
        oracle.assert_equivalent(
            df.groupBy("k").sum("v").withColumnRenamed("sum(v)", "s"),
            "SELECT k, sum(v) AS s FROM t GROUP BY k",
            t=pd.DataFrame({"k": [1, 2], "v": [3.0, 4.0]}),
        )

    def test_fails_on_wrong_result(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"s": [999.0]}))
        with pytest.raises(AssertionError):
            oracle.assert_equivalent(
                df, "SELECT sum(v) AS s FROM t", t=pd.DataFrame({"v": [1.0, 2.0]})
            )

    def test_fails_on_column_mismatch(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"wrong_name": [3.0]}))
        with pytest.raises(AssertionError, match="column mismatch"):
            oracle.assert_equivalent(
                df, "SELECT sum(v) AS s FROM t", t=pd.DataFrame({"v": [3.0]})
            )
