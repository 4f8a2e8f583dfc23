"""Tests for the provided TPC-H-lite generators and the DuckDB oracle."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


class TestGenerators:
    def test_lineitem_shape(self, spark):
        df = synth_data.lineitem(spark, sf=0.001, seed=0)
        assert df.count() == 6000
        assert "l_orderkey" in df.columns

    def test_orders_keys_dense(self, spark):
        df = synth_data.orders(spark, sf=0.001, seed=1)
        assert df.count() == 1500
        mx = df.agg(F.max("o_orderkey")).first()[0]
        assert mx == 1500

    def test_deterministic_in_seed(self, spark):
        a = synth_data.customer(spark, sf=0.001, seed=2).toPandas()
        b = synth_data.customer(spark, sf=0.001, seed=2).toPandas()
        pd.testing.assert_frame_equal(a, b)

    def test_zipf_skew(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.2, seed=3)
        top = (
            df.groupBy("k").count().orderBy(F.desc("count")).first()["count"]
        )
        assert top > 5000 / 100 * 3  # the head key is heavily skewed

    def test_uniform_keys_range(self, spark):
        df = synth_data.uniform_keys(spark, n=1000, n_keys=10, seed=4)
        ks = {r["k"] for r in df.select("k").distinct().collect()}
        assert ks <= set(range(1, 11))


class TestOracle:
    def test_join_aggregate_equivalence(self, spark):
        li = synth_data.lineitem(spark, sf=0.001, seed=0)
        o = synth_data.orders(spark, sf=0.001, seed=1)
        got = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("n"))
        )
        assert_equivalent(
            got,
            """
            SELECT o_orderpriority, COUNT(*) AS n
            FROM lineitem JOIN orders ON l_orderkey = o_orderkey
            GROUP BY o_orderpriority
            """,
            lineitem=li,
            orders=o,
        )

    def test_oracle_catches_wrong_result(self, spark):
        li = synth_data.lineitem(spark, sf=0.001, seed=0)
        got = li.groupBy("l_returnflag").agg((F.count("*") + 1).alias("n"))
        with pytest.raises(AssertionError):
            assert_equivalent(
                got,
                "SELECT l_returnflag, COUNT(*) AS n FROM lineitem GROUP BY l_returnflag",
                lineitem=li,
            )

    def test_oracle_catches_column_mismatch(self, spark):
        li = synth_data.lineitem(spark, sf=0.001, seed=0)
        got = li.groupBy("l_returnflag").agg(F.count("*").alias("wrong_name"))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(
                got,
                "SELECT l_returnflag, COUNT(*) AS n FROM lineitem GROUP BY l_returnflag",
                lineitem=li,
            )
