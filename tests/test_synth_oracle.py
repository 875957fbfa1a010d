"""Tests for the provided scaffolding: synth_data generators and the DuckDB
oracle itself (used by count/NEXMark correctness tests)."""
import numpy as np
import pandas as pd
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


class TestSynthData:
    def test_lineitem_schema_and_determinism(self, spark):
        a = synth_data.lineitem(spark, sf=0.001, seed=1).toPandas()
        b = synth_data.lineitem(spark, sf=0.001, seed=1).toPandas()
        pd.testing.assert_frame_equal(a, b)
        assert {"l_orderkey", "l_quantity", "l_extendedprice"} <= set(a.columns)

    def test_orders_keys_sequential(self, spark):
        o = synth_data.orders(spark, sf=0.001).toPandas()
        assert o.o_orderkey.tolist() == list(range(1, len(o) + 1))

    def test_uniform_keys_range(self, spark):
        df = synth_data.uniform_keys(spark, n=1000, n_keys=50).toPandas()
        assert df.k.between(1, 50).all()

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=1000, alpha=1.3).toPandas()
        counts = df.k.value_counts()
        assert counts.iloc[0] > 10 * counts.median()


class TestOracle:
    def test_accepts_equivalent(self, spark):
        pdf = pd.DataFrame({"k": [1, 1, 2], "v": [1.0, 2.0, 3.0]})
        got = spark.createDataFrame(
            pd.DataFrame({"k": [1, 2], "s": [3.0, 3.0]})
        )
        assert_equivalent(got, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)

    def test_rejects_wrong_result(self, spark):
        pdf = pd.DataFrame({"k": [1, 2], "v": [1.0, 2.0]})
        got = spark.createDataFrame(pd.DataFrame({"k": [1, 2], "s": [9.0, 9.0]}))
        with pytest.raises(AssertionError):
            assert_equivalent(got, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)

    def test_rejects_column_mismatch(self, spark):
        pdf = pd.DataFrame({"k": [1]})
        got = spark.createDataFrame(pd.DataFrame({"wrong": [1]}))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(got, "SELECT k FROM t", t=pdf)

    def test_tpch_q1_lite(self, spark):
        """A TPC-H Q1-style aggregate over synthetic lineitem, oracle-checked
        (exercises the shuffle path with broadcast joins disabled)."""
        li = synth_data.lineitem(spark, sf=0.002)
        import pyspark.sql.functions as F

        got = (
            li.filter(F.col("l_shipdate") <= "1998-09-01")
            .groupBy("l_returnflag", "l_linestatus")
            .agg(
                F.sum("l_quantity").alias("sum_qty"),
                F.count("*").alias("cnt"),
            )
        )
        assert_equivalent(
            got,
            """
            SELECT l_returnflag, l_linestatus, SUM(l_quantity) AS sum_qty,
                   COUNT(*) AS cnt
            FROM li WHERE l_shipdate <= TIMESTAMP '1998-09-01'
            GROUP BY 1, 2
            """,
            li=li,
        )
