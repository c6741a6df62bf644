"""The DuckDB oracle itself, exercised through Spark queries."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def tiny(spark):
    li = pd.DataFrame({"k": [1, 1, 2, 3], "v": [1.0, 2.0, 3.0, 4.0]})
    o = pd.DataFrame({"k": [1, 2, 2], "w": [10.0, 20.0, 30.0]})
    return spark.createDataFrame(li), spark.createDataFrame(o), li, o


class TestOracle:
    def test_join_aggregate_passes(self, tiny):
        from pyspark.sql import functions as F

        sli, so, li, o = tiny
        got = (
            sli.join(so, on="k")
            .groupBy("k")
            .agg(F.sum("v").alias("sv"), F.count("*").alias("cnt"))
        )
        assert_equivalent(
            got,
            "SELECT k, SUM(v) AS sv, COUNT(*) AS cnt FROM li JOIN o USING (k) GROUP BY k",
            li=li,
            o=o,
        )

    def test_wrong_result_fails(self, tiny):
        from pyspark.sql import functions as F

        sli, so, li, o = tiny
        got = sli.join(so, on="k").groupBy("k").agg(F.sum("v").alias("sv"))
        with pytest.raises(AssertionError):
            assert_equivalent(
                got,
                "SELECT k, SUM(v) + 1 AS sv FROM li JOIN o USING (k) GROUP BY k",
                li=li,
                o=o,
            )

    def test_column_mismatch_fails(self, tiny):
        sli, so, li, o = tiny
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(
                sli.select("k"),
                "SELECT k AS key FROM li",
                li=li,
            )

    def test_accepts_spark_inputs(self, tiny):
        sli, so, li, o = tiny
        assert_equivalent(
            sli.select("k", "v"),
            "SELECT k, v FROM t",
            t=sli,
        )
