"""Tests for the provided DuckDB oracle and TPC-H-lite generators."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


class TestOracle:
    def test_passes_on_equal_results(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"a": [1, 2, 3]}))
        got = df.agg(F.sum("a").alias("s"))
        assert_equivalent(got, "SELECT SUM(a) AS s FROM t", t=df)

    def test_fails_on_wrong_result(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"a": [1, 2, 3]}))
        got = df.agg((F.sum("a") + 1).alias("s"))
        with pytest.raises(AssertionError):
            assert_equivalent(got, "SELECT SUM(a) AS s FROM t", t=df)

    def test_fails_on_column_mismatch(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"a": [1]}))
        got = df.agg(F.sum("a").alias("wrong_name"))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(got, "SELECT SUM(a) AS s FROM t", t=df)

    def test_accepts_pandas_tables(self, spark):
        pdf = pd.DataFrame({"a": [5, 6]})
        got = spark.createDataFrame(pdf).agg(F.max("a").alias("m"))
        assert_equivalent(got, "SELECT MAX(a) AS m FROM t", t=pdf)


class TestSynthData:
    def test_lineitem_deterministic(self, spark):
        a = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
        b = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
        pd.testing.assert_frame_equal(a, b)

    def test_orders_keys_dense(self, spark):
        o = synth_data.orders(spark, sf=0.001).toPandas()
        assert o.o_orderkey.min() == 1
        assert o.o_orderkey.is_unique

    def test_lineitem_orders_joinable(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        o = synth_data.orders(spark, sf=0.001)
        joined = li.join(o, li.l_orderkey == o.o_orderkey, "inner")
        assert joined.count() == li.count()

    def test_zipf_keys_skewed(self, spark):
        z = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
        counts = z.k.value_counts()
        assert counts.iloc[0] > 5 * counts.iloc[-1]

    def test_uniform_keys_cover(self, spark):
        u = synth_data.uniform_keys(spark, n=2000, n_keys=10).toPandas()
        assert set(u.k) == set(range(1, 11))
