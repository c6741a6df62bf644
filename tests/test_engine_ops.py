"""Engine primitive operations: LocalEngine exhaustively, SparkEngine spot-checked."""
import numpy as np
import pandas as pd
import pytest

from repro.joins.engine import LocalEngine, SparkEngine


@pytest.fixture(scope="module")
def eng():
    return LocalEngine()


def sample_df():
    return pd.DataFrame(
        {"k": [1, 1, 2, 3], "v": [10.0, 20.0, 30.0, 40.0], "w": [1.0, 2.0, 3.0, 4.0]}
    )


class TestLocalOps:
    def test_columns(self, eng):
        assert eng.columns(sample_df()) == ["k", "v", "w"]

    def test_project(self, eng):
        out = eng.project(sample_df(), ["k"])
        assert list(out.columns) == ["k"]
        assert len(out) == 4

    def test_project_distinct(self, eng):
        out = eng.project(sample_df(), ["k"], distinct=True)
        assert sorted(out["k"].tolist()) == [1, 2, 3]

    def test_filter_range_closed(self, eng):
        out = eng.filter_range(sample_df(), "v", 20.0, 30.0)
        assert sorted(out["v"].tolist()) == [20.0, 30.0]

    def test_filter_range_half_open(self, eng):
        out = eng.filter_range(sample_df(), "v", 20.0, 30.0, right_closed=False)
        assert out["v"].tolist() == [20.0]

    def test_join(self, eng):
        b = pd.DataFrame({"k": [1, 2], "extra": ["a", "b"]})
        out = eng.join(sample_df(), b, ["k"])
        assert len(out) == 3
        assert "extra" in out.columns

    def test_semijoin(self, eng):
        b = pd.DataFrame({"k": [1, 1, 9]})
        out = eng.semijoin(sample_df(), b, ["k"])
        assert len(out) == 2  # duplicates in b must not duplicate a's rows

    def test_groupby_sum(self, eng):
        out = eng.groupby_sum(sample_df(), ["k"], "w", "total")
        got = dict(zip(out["k"], out["total"]))
        assert got == {1: 3.0, 2: 3.0, 3: 4.0}

    def test_groupby_sum_empty(self, eng):
        out = eng.groupby_sum(sample_df().iloc[:0], ["k"], "w", "total")
        assert len(out) == 0
        assert list(out.columns) == ["k", "total"]

    def test_with_lit_multiply_into(self, eng):
        df = eng.with_lit(sample_df(), "c", 2.0)
        out = eng.multiply_into(df, "w", "c")
        assert out["w"].tolist() == [2.0, 4.0, 6.0, 8.0]
        assert "c" not in out.columns

    def test_rename(self, eng):
        out = eng.rename(sample_df(), {"v": "value"})
        assert "value" in out.columns and "v" not in out.columns

    def test_add_row_id_unique_deterministic(self, eng):
        a = eng.add_row_id(sample_df(), "rid")
        b = eng.add_row_id(sample_df().sample(frac=1.0, random_state=3), "rid")
        assert a["rid"].is_unique
        merged = a.merge(b, on=["k", "v", "w"], suffixes=("_a", "_b"))
        assert (merged["rid_a"] == merged["rid_b"]).all()

    def test_sum_col(self, eng):
        assert eng.sum_col(sample_df(), "w") == 10.0
        assert eng.sum_col(sample_df().iloc[:0], "w") == 0.0

    def test_count(self, eng):
        assert eng.count(sample_df()) == 4

    def test_minmax(self, eng):
        got = eng.minmax(sample_df(), ["v", "w"])
        assert got["v"] == (10.0, 40.0)
        assert got["w"] == (1.0, 4.0)

    def test_assign_nearest(self, eng):
        centers = np.array([[10.0], [40.0]])
        out = eng.assign_nearest(sample_df(), ["v"], centers, "cid")
        assert out["cid"].tolist() == [0, 0, 1, 1]

    def test_assign_nearest_empty(self, eng):
        out = eng.assign_nearest(sample_df().iloc[:0], ["v"], np.array([[0.0]]), "cid")
        assert len(out) == 0


class TestSparkOps:
    @pytest.fixture(scope="class")
    def se(self, spark):
        return SparkEngine(spark)

    @pytest.fixture(scope="class")
    def sdf(self, se):
        return se.from_pandas(sample_df())

    def test_roundtrip(self, se, sdf):
        back = se.to_pandas(sdf).sort_values(["k", "v"]).reset_index(drop=True)
        pd.testing.assert_frame_equal(back, sample_df(), check_dtype=False)

    def test_filter_half_open(self, se, sdf):
        out = se.to_pandas(se.filter_range(sdf, "v", 20.0, 30.0, right_closed=False))
        assert out["v"].tolist() == [20.0]

    def test_groupby_sum(self, se, sdf):
        out = se.to_pandas(se.groupby_sum(sdf, ["k"], "w", "total"))
        got = dict(zip(out["k"], out["total"]))
        assert got == {1: 3.0, 2: 3.0, 3: 4.0}

    def test_semijoin_no_duplication(self, se, sdf):
        b = se.from_pandas(pd.DataFrame({"k": [1, 1, 9]}))
        assert se.count(se.semijoin(sdf, b, ["k"])) == 2

    def test_add_row_id_stable_across_actions(self, se, sdf):
        withid = se.add_row_id(sdf, "rid")
        a = se.to_pandas(withid).sort_values("rid").reset_index(drop=True)
        b = se.to_pandas(withid).sort_values("rid").reset_index(drop=True)
        pd.testing.assert_frame_equal(a, b)

    def test_assign_nearest(self, se, sdf):
        out = se.to_pandas(se.assign_nearest(sdf, ["v"], np.array([[10.0], [40.0]]), "cid"))
        got = dict(zip(out["v"], out["cid"]))
        assert got == {10.0: 0, 20.0: 0, 30.0: 1, 40.0: 1}

    def test_minmax(self, se, sdf):
        got = se.minmax(sdf, ["v"])
        assert got["v"] == (10.0, 40.0)
