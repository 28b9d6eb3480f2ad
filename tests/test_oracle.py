"""Self-tests for the DuckDB oracle (repro.oracle): it must catch wrong
results, not just run."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def kv(spark):
    pdf = pd.DataFrame({"k": [1, 1, 2, 3], "v": [10.0, 20.0, 30.0, 40.0]})
    return spark.createDataFrame(pdf), pdf


class TestOracle:
    def test_accepts_correct_result(self, spark, kv):
        df, pdf = kv
        got = df.groupBy("k").sum("v").withColumnRenamed("sum(v)", "s")
        assert_equivalent(got, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)

    def test_rejects_wrong_rows(self, spark, kv):
        df, pdf = kv
        wrong = df.where("k <> 1").groupBy("k").sum("v").withColumnRenamed(
            "sum(v)", "s"
        )
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf
            )

    def test_rejects_wrong_values(self, spark, kv):
        df, pdf = kv
        wrong = df.groupBy("k").max("v").withColumnRenamed("max(v)", "s")
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf
            )

    def test_rejects_column_mismatch(self, spark, kv):
        df, pdf = kv
        got = df.groupBy("k").sum("v").withColumnRenamed("sum(v)", "other")
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(
                got, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf
            )

    def test_projection_order_irrelevant(self, spark, kv):
        df, pdf = kv
        got = df.groupBy("k").sum("v").withColumnRenamed("sum(v)", "s").select(
            "s", "k"
        )
        assert_equivalent(got, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)

    def test_spark_frames_as_oracle_input(self, spark, kv):
        df, _ = kv
        got = df.groupBy("k").count().withColumnRenamed("count", "n")
        assert_equivalent(got, "SELECT k, COUNT(*) AS n FROM t GROUP BY k", t=df)
