"""Tests for the provided synth_data generators and the DuckDB oracle
(exercised over Spark, per the repo's correctness contract)."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


class TestGenerators:
    def test_lineitem_deterministic(self, spark):
        a = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
        b = synth_data.lineitem(spark, sf=0.001, seed=3).toPandas()
        pd.testing.assert_frame_equal(a, b)

    def test_zipf_skew(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.3).toPandas()
        counts = df.k.value_counts()
        assert counts.iloc[0] > 5 * counts.iloc[-1]

    def test_uniform_keys_range(self, spark):
        df = synth_data.uniform_keys(spark, n=1000, n_keys=50).toPandas()
        assert df.k.between(1, 50).all()


class TestOracle:
    def test_simple_aggregate(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        got = li.groupBy("l_returnflag").agg(
            F.count("*").alias("n"),
            F.round(F.sum("l_quantity"), 2).alias("qty"),
        )
        assert_equivalent(
            got,
            "SELECT l_returnflag, count(*) AS n, round(sum(l_quantity), 2) AS qty "
            "FROM li GROUP BY l_returnflag",
            li=li,
        )

    def test_join_query(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        o = synth_data.orders(spark, sf=0.001)
        got = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("n"))
        )
        assert_equivalent(
            got,
            "SELECT o_orderpriority, count(*) AS n FROM li "
            "JOIN o ON l_orderkey = o_orderkey GROUP BY o_orderpriority",
            li=li,
            o=o,
        )

    def test_oracle_catches_wrong_result(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        wrong = li.groupBy("l_returnflag").agg((F.count("*") + 1).alias("n"))
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT l_returnflag, count(*) AS n FROM li GROUP BY l_returnflag",
                li=li,
            )

    def test_oracle_catches_column_mismatch(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        got = li.groupBy("l_returnflag").agg(F.count("*").alias("wrong_name"))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(
                got,
                "SELECT l_returnflag, count(*) AS n FROM li GROUP BY l_returnflag",
                li=li,
            )
