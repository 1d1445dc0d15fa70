"""Tests for the DuckDB oracle itself and the provided TPC-H-lite
generators (which back the market-basket bipartite view)."""
import pandas as pd
import pyspark.sql.functions as F
import pytest

from repro import synth_data as sd
from repro.oracle import assert_equivalent


class TestOracle:
    def test_accepts_matching_aggregate(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"k": [1, 1, 2], "v": [1.0, 2.0, 3.0]}))
        got = df.groupBy("k").agg(F.sum("v").alias("s"))
        assert_equivalent(got, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=df)

    def test_rejects_wrong_values(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"k": [1, 2], "v": [1.0, 2.0]}))
        got = df.select("k", (F.col("v") * 2).alias("v2"))
        with pytest.raises(AssertionError):
            assert_equivalent(got, "SELECT k, v * 3 AS v2 FROM t", t=df)

    def test_rejects_column_mismatch(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"k": [1]}))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(df, "SELECT k AS other FROM t", t=df)

    def test_row_order_irrelevant(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"k": [3, 1, 2]}))
        assert_equivalent(
            df.orderBy(F.desc("k")), "SELECT k FROM t ORDER BY k ASC", t=df
        )

    def test_accepts_pandas_inputs(self, spark):
        pdf = pd.DataFrame({"k": [1, 2, 2]})
        got = spark.createDataFrame(pdf).groupBy("k").agg(F.count("*").alias("c"))
        assert_equivalent(got, "SELECT k, count(*) AS c FROM t GROUP BY k", t=pdf)


class TestTpchLite:
    def test_lineitem_shape(self, spark):
        df = sd.lineitem(spark, sf=0.001, seed=0)
        assert df.count() == 6000
        assert "l_orderkey" in df.columns
        assert "l_shipdate" in df.columns

    def test_orders_keys_dense(self, spark):
        df = sd.orders(spark, sf=0.001, seed=1)
        row = df.agg(
            F.min("o_orderkey").alias("lo"), F.max("o_orderkey").alias("hi"),
            F.count("*").alias("n"),
        ).collect()[0]
        assert row["lo"] == 1 and row["hi"] == row["n"]

    def test_deterministic_in_seed(self, spark):
        a = sd.customer(spark, sf=0.001, seed=2).toPandas()
        b = sd.customer(spark, sf=0.001, seed=2).toPandas()
        pd.testing.assert_frame_equal(a, b)

    def test_lineitem_join_orders_oracle(self, spark):
        li = sd.lineitem(spark, sf=0.001, seed=0)
        o = sd.orders(spark, sf=0.001, seed=1)
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

    def test_zipf_keys_skewed(self, spark):
        df = sd.zipf_keys(spark, n=5000, n_keys=100, alpha=1.5, seed=3)
        top = (
            df.groupBy("k").agg(F.count("*").alias("c"))
            .orderBy(F.desc("c")).limit(5).agg(F.sum("c").alias("s"))
            .collect()[0]["s"]
        )
        assert top > 0.3 * 5000  # top-5 keys get >30% of rows

    def test_uniform_keys_flat(self, spark):
        df = sd.uniform_keys(spark, n=5000, n_keys=50, seed=4)
        counts = [r["c"] for r in df.groupBy("k").agg(F.count("*").alias("c")).collect()]
        assert max(counts) < 3 * min(counts)

    def test_market_basket_view_uses_lineitem(self, spark):
        g = sd.lineitem_bipartite(spark, sf=0.001, seed=0)
        li = sd.lineitem(spark, sf=0.001, seed=0)
        pairs = li.select("l_orderkey", "l_partkey").distinct().count()
        assert g.n_edges == pairs
