"""Tests for the synthetic data module (repro.synth_data), including the
graph schemas added for this paper and TPC-H-lite oracle smoke queries."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001, seed=0).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.001, seed=1).cache()


class TestTpchLite:
    def test_lineitem_rows(self, li):
        assert li.count() == 6000

    def test_agg_oracle(self, li):
        got = li.groupBy("l_returnflag").agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.count("*").alias("n"),
        )
        assert_equivalent(
            got,
            "SELECT l_returnflag, SUM(l_quantity) AS sum_qty, COUNT(*) AS n "
            "FROM li GROUP BY l_returnflag",
            li=li,
        )

    def test_join_oracle(self, li, orders):
        got = (
            li.join(orders, li["l_orderkey"] == orders["o_orderkey"])
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("n"))
        )
        assert_equivalent(
            got,
            "SELECT o_orderpriority, COUNT(*) AS n FROM li "
            "JOIN o ON l_orderkey = o_orderkey GROUP BY o_orderpriority",
            li=li,
            o=orders,
        )

    def test_deterministic(self, spark):
        a = synth_data.orders(spark, sf=0.001, seed=1).toPandas()
        b = synth_data.orders(spark, sf=0.001, seed=1).toPandas()
        assert a.equals(b)


class TestGraphSchemas:
    def test_lfr_edges_spark(self, spark):
        df = synth_data.lfr_edges(spark, n=200, k=8, maxk=20, on=20, seed=1)
        assert df.columns == ["src", "dst"]
        assert df.count() > 200

    def test_web_edges_spark(self, spark):
        df = synth_data.web_edges(spark, n=500, avg_degree=6, seed=1)
        assert df.columns == ["src", "dst"]
        assert df.count() == pytest.approx(1500, rel=0.05)

    def test_web_edges_canonical_oracle(self, spark):
        df = synth_data.web_edges(spark, n=300, avg_degree=6, seed=2)
        assert_equivalent(
            df.select("src", "dst"),
            "SELECT src, dst FROM e WHERE src < dst",
            e=df,
        )

    def test_zipf_keys_skew(self, spark):
        df = synth_data.zipf_keys(spark, n=20_000, n_keys=100, seed=3)
        top = (
            df.groupBy("k").count().orderBy(F.desc("count")).limit(1).collect()
        )
        assert top[0]["count"] > 20_000 / 100 * 3  # hottest key way above mean
