"""Tests for the provided scaffold modules (synth_data, oracle) that the
reproduction builds on — they must stay healthy."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


class TestSynthData:
    def test_lineitem_rowcount_scales(self, spark):
        df = synth_data.lineitem(spark, sf=0.001)
        assert df.count() == 6000

    def test_orders_keys_dense(self, spark):
        pdf = synth_data.orders(spark, sf=0.001).toPandas()
        assert pdf["o_orderkey"].min() == 1
        assert pdf["o_orderkey"].is_unique

    def test_deterministic_in_seed(self, spark):
        a = synth_data.zipf_keys(spark, n=1000, n_keys=50, seed=3).toPandas()
        b = synth_data.zipf_keys(spark, n=1000, n_keys=50, seed=3).toPandas()
        pd.testing.assert_frame_equal(a, b)

    def test_zipf_is_skewed(self, spark):
        pdf = synth_data.zipf_keys(spark, n=20_000, n_keys=100, alpha=1.5).toPandas()
        counts = pdf["k"].value_counts()
        assert counts.iloc[0] > 5 * counts.mean()

    def test_uniform_is_flat(self, spark):
        pdf = synth_data.uniform_keys(spark, n=20_000, n_keys=100).toPandas()
        counts = pdf["k"].value_counts()
        assert counts.max() < 2.0 * counts.mean()


class TestOracle:
    def test_accepts_equivalent_aggregation(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        got = li.groupBy("l_returnflag").agg(
            F.count("*").alias("n"), F.sum("l_quantity").alias("qty")
        )
        assert_equivalent(
            got,
            "SELECT l_returnflag, count(*) AS n, sum(l_quantity) AS qty "
            "FROM li GROUP BY 1",
            li=li,
        )

    def test_rejects_wrong_result(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        wrong = li.groupBy("l_returnflag").agg((F.count("*") + 1).alias("n"))
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT l_returnflag, count(*) AS n FROM li GROUP BY 1",
                li=li,
            )

    def test_rejects_column_mismatch(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        got = li.groupBy("l_returnflag").agg(F.count("*").alias("cnt"))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(
                got,
                "SELECT l_returnflag, count(*) AS n FROM li GROUP BY 1",
                li=li,
            )

    def test_pandas_input_tables(self, spark):
        """Oracle tables may be pandas frames, not just Spark ones."""
        pdf = pd.DataFrame({"a": [3, 1, 2]})
        got = spark.createDataFrame(pdf).agg(F.sum("a").alias("s"))
        assert_equivalent(got, "SELECT sum(a) AS s FROM t", t=pdf)

    def test_canon_is_order_invariant(self):
        from repro.oracle import _canon

        a = pd.DataFrame({"x": [1, 2], "y": [10.0, 20.0]})
        b = pd.DataFrame({"y": [20.0, 10.0], "x": [2, 1]})
        pd.testing.assert_frame_equal(_canon(a), _canon(b), check_dtype=False)
