"""Yannakakis DPs on the local engine vs. brute-force pandas joins."""
import numpy as np
import pandas as pd
import pytest

from repro.joins.engine import LocalEngine
from repro.joins.join_tree import JoinTree, Relation
from repro.joins.yannakakis import (
    CNT,
    RID,
    RelQuery,
    full_reduce,
    grouped_counts,
    subtree_counts,
    total_count,
)
from tests.conftest import brute_force_join


def random_instance(seed, n=60, n_keys=8):
    """A random 3-chain A(x,fa) ⋈ B(x,y,fb) ⋈ C(y,fc) with dangling tuples."""
    g = np.random.default_rng(seed)
    tree = JoinTree(
        [
            Relation("A", ("x", "fa"), ("fa",)),
            Relation("B", ("x", "y", "fb"), ("fb",)),
            Relation("C", ("y", "fc"), ("fc",)),
        ],
        [("A", "B", ["x"]), ("B", "C", ["y"])],
        root="B",
    )
    tables = {
        "A": pd.DataFrame({"x": g.integers(0, n_keys, n), "fa": g.random(n)}),
        "B": pd.DataFrame(
            {"x": g.integers(0, n_keys * 2, n), "y": g.integers(0, n_keys * 2, n), "fb": g.random(n)}
        ),
        "C": pd.DataFrame({"y": g.integers(0, n_keys, n), "fc": g.random(n)}),
    }
    return tree, tables


@pytest.fixture(scope="module")
def eng():
    return LocalEngine()


class TestFullReduce:
    @pytest.mark.parametrize("seed", range(6))
    def test_reduced_tuples_are_exactly_participating(self, eng, seed):
        tree, tables = random_instance(seed)
        joined = brute_force_join(tree, tables)
        reduced = full_reduce(eng, tree, tables)
        for name in tree.relations:
            attrs = list(tree.relations[name].attrs)
            surviving = reduced[name][attrs].drop_duplicates()
            participating = joined[attrs].drop_duplicates()
            merged = surviving.merge(participating, on=attrs, how="outer", indicator=True)
            assert (merged["_merge"] == "both").all(), name

    def test_multiplicity_preserved(self, eng):
        # Duplicate rows in a relation must survive as duplicates.
        tree, tables = random_instance(0)
        tables["A"] = pd.concat([tables["A"], tables["A"].iloc[:5]], ignore_index=True)
        reduced = full_reduce(eng, tree, tables)
        n_before = len(
            tables["A"].merge(tables["B"][["x"]].drop_duplicates(), on="x")
        )
        # After reduce on B side only (C may prune further) count is <=; but
        # duplicates of a surviving tuple must both survive.
        a = reduced["A"]
        dup_keys = tables["A"].iloc[:5]
        for _, row in dup_keys.iterrows():
            m = (a["x"] == row["x"]) & (a["fa"] == row["fa"])
            assert m.sum() in (0, 2)
        del n_before


class TestCounting:
    @pytest.mark.parametrize("seed", range(8))
    def test_total_count_matches_brute_force(self, eng, seed):
        tree, tables = random_instance(seed)
        reduced = full_reduce(eng, tree, tables)
        assert total_count(eng, tree, reduced) == len(brute_force_join(tree, tables))

    @pytest.mark.parametrize("root", ["A", "B", "C"])
    def test_count_independent_of_root(self, eng, root):
        tree, tables = random_instance(3)
        t2 = tree.rerooted(root)
        reduced = full_reduce(eng, t2, tables)
        assert total_count(eng, t2, reduced) == len(brute_force_join(tree, tables))

    @pytest.mark.parametrize("seed", range(4))
    def test_root_tuple_counts(self, eng, seed):
        """c(h) per root tuple equals the brute-force group size."""
        tree, tables = random_instance(seed)
        reduced = full_reduce(eng, tree, tables)
        counts = subtree_counts(eng, tree, reduced)["B"]
        joined = brute_force_join(tree, tables)
        expect = joined.groupby(["x", "y", "fb"]).size()
        for _, row in counts.iterrows():
            assert row[CNT] == expect.get((row["x"], row["y"], row["fb"]), 0)

    def test_empty_join(self, eng):
        tree, tables = random_instance(0)
        tables["C"] = tables["C"].assign(y=999_999)  # no matches
        reduced = full_reduce(eng, tree, tables)
        assert total_count(eng, tree, reduced) == 0


class TestRelQuery:
    @pytest.mark.parametrize("seed", range(4))
    def test_total_count(self, eng, seed):
        tree, tables = random_instance(seed)
        Q = RelQuery(eng, tree, tables)
        assert Q.total_count() == len(brute_force_join(tree, tables))

    def test_rid_added_and_unique(self, eng):
        tree, tables = random_instance(1)
        Q = RelQuery(eng, tree, tables)
        for name in tree.relations:
            rids = Q.dfs[name][RID]
            assert rids.is_unique

    @pytest.mark.parametrize("attr", ["fa", "fb", "fc"])
    def test_leaf_weights_match_brute_force(self, eng, attr):
        tree, tables = random_instance(2)
        Q = RelQuery(eng, tree, tables)
        H = eng.to_pandas(Q.leaf_weights(attr)).sort_values("value").reset_index(drop=True)
        joined = brute_force_join(tree, tables)
        expect = (
            joined.groupby(attr).size().rename("weight").reset_index()
            .rename(columns={attr: "value"}).sort_values("value").reset_index(drop=True)
        )
        pd.testing.assert_frame_equal(H, expect, check_dtype=False)

    def test_leaf_weights_total_is_join_size(self, eng):
        tree, tables = random_instance(4)
        Q = RelQuery(eng, tree, tables)
        H = eng.to_pandas(Q.leaf_weights("fa"))
        assert H["weight"].sum() == Q.total_count()

    def test_feature_bounds_exact(self, eng):
        tree, tables = random_instance(5)
        Q = RelQuery(eng, tree, tables)
        joined = brute_force_join(tree, tables)
        b = Q.feature_bounds()
        for f in ["fa", "fb", "fc"]:
            assert b[f][0] == pytest.approx(joined[f].min())
            assert b[f][1] == pytest.approx(joined[f].max())

    @pytest.mark.parametrize("seed", range(4))
    def test_materialize_matches_brute_force(self, eng, seed):
        tree, tables = random_instance(seed)
        Q = RelQuery(eng, tree, tables)
        got = (
            eng.to_pandas(Q.materialize())
            .sort_values(["fa", "fb", "fc"])
            .reset_index(drop=True)
        )
        expect = (
            brute_force_join(tree, tables)[["fa", "fb", "fc"]]
            .sort_values(["fa", "fb", "fc"])
            .reset_index(drop=True)
        )
        pd.testing.assert_frame_equal(got, expect, check_dtype=False)

    def test_missing_table_rejected(self, eng):
        tree, tables = random_instance(0)
        del tables["C"]
        with pytest.raises(ValueError):
            RelQuery(eng, tree, tables)


class TestGroupedCounts:
    def test_matches_brute_force_groupby(self, eng):
        tree, tables = random_instance(6)
        g = np.random.default_rng(0)
        tagged = dict(full_reduce(eng, tree, tables))
        tagged["A"] = tagged["A"].assign(__cid_A=g.integers(0, 3, len(tagged["A"])))
        tagged["C"] = tagged["C"].assign(__cid_C=g.integers(0, 2, len(tagged["C"])))
        got = grouped_counts(eng, tree, tagged, {"A": ["__cid_A"], "C": ["__cid_C"]})
        joined = brute_force_join(
            tree,
            {
                "A": tagged["A"].rename(columns={"__cid_A": "fa2"}).assign(fa2b=1),
                "B": tagged["B"],
                "C": tagged["C"],
            },
        )
        # Brute force: join tagged tables directly.
        jt = JoinTree(
            [
                Relation("A", ("x", "fa", "__cid_A")),
                Relation("B", ("x", "y", "fb")),
                Relation("C", ("y", "fc", "__cid_C")),
            ],
            [("A", "B", ["x"]), ("B", "C", ["y"])],
            root="B",
        )
        full = brute_force_join(jt, tagged)
        expect = full.groupby(["__cid_A", "__cid_C"]).size().rename(CNT).reset_index()
        merged = got.merge(expect, on=["__cid_A", "__cid_C"], suffixes=("_got", "_exp"))
        assert len(merged) == len(expect) == len(got)
        assert (merged[f"{CNT}_got"] == merged[f"{CNT}_exp"]).all()
        del joined

    def test_no_carry_gives_total(self, eng):
        tree, tables = random_instance(7)
        reduced = full_reduce(eng, tree, tables)
        got = grouped_counts(eng, tree, reduced, {})
        assert got[CNT].sum() == total_count(eng, tree, reduced)
