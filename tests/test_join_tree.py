"""JoinTree model and GYO acyclicity."""
import pytest

from repro.joins.join_tree import JoinTree, Relation, gyo_is_acyclic
from repro.workloads import chain_tree, star_tree


def three_chain():
    return JoinTree(
        [
            Relation("A", ("x", "fa"), ("fa",)),
            Relation("B", ("x", "y", "fb"), ("fb",)),
            Relation("C", ("y", "fc"), ("fc",)),
        ],
        [("A", "B", ["x"]), ("B", "C", ["y"])],
        root="B",
    )


class TestJoinTree:
    def test_parent_children(self):
        t = three_chain()
        assert t.parent["B"] is None
        assert t.parent["A"] == "B"
        assert t.parent["C"] == "B"
        assert sorted(t.children["B"]) == ["A", "C"]

    def test_postorder_children_first(self):
        t = three_chain()
        order = t.postorder()
        assert order[-1] == "B"
        assert set(order[:2]) == {"A", "C"}

    def test_join_attrs(self):
        t = three_chain()
        assert t.join_attrs("A", "B") == ("x",)
        assert t.join_attrs("B", "C") == ("y",)

    def test_rerooted(self):
        t = three_chain().rerooted("A")
        assert t.parent["A"] is None
        assert t.parent["B"] == "A"
        assert t.parent["C"] == "B"

    def test_all_features_order_dedup(self):
        t = three_chain()
        assert t.all_features == ("fa", "fb", "fc")

    def test_relation_with_attr(self):
        t = three_chain()
        assert t.relation_with_attr("fa") == "A"
        assert t.relation_with_attr("x") in {"A", "B"}
        with pytest.raises(KeyError):
            t.relation_with_attr("nope")

    def test_duplicate_relation_rejected(self):
        r = Relation("A", ("x",))
        with pytest.raises(ValueError):
            JoinTree([r, r], [])

    def test_unknown_root_rejected(self):
        with pytest.raises(ValueError):
            JoinTree([Relation("A", ("x",))], [], root="Z")

    def test_disconnected_rejected(self):
        with pytest.raises(ValueError):
            JoinTree(
                [Relation("A", ("x",)), Relation("B", ("y",))],
                [],
                root="A",
            )

    def test_cycle_rejected(self):
        rels = [
            Relation("A", ("x", "y")),
            Relation("B", ("y", "z")),
            Relation("C", ("z", "x")),
        ]
        with pytest.raises(ValueError):
            JoinTree(
                rels,
                [("A", "B", ["y"]), ("B", "C", ["z"]), ("C", "A", ["x"])],
                root="A",
            )

    def test_bad_join_attr_rejected(self):
        with pytest.raises(ValueError):
            JoinTree(
                [Relation("A", ("x",)), Relation("B", ("y",))],
                [("A", "B", ["x"])],
            )

    def test_feature_not_in_attrs_rejected(self):
        with pytest.raises(ValueError):
            Relation("A", ("x",), ("y",))

    def test_workload_trees_valid(self):
        assert star_tree().all_features == (
            "l_quantity_s",
            "l_price_s",
            "o_price_s",
            "c_acctbal_s",
        )
        assert chain_tree().all_features == ("x1", "x2", "x3")


ACYCLIC = [
    [("x",)],
    [("x", "y"), ("y", "z")],
    [("x", "y"), ("y", "z"), ("z", "w")],
    [("x", "y", "z"), ("z", "w"), ("w", "v")],
    [("a", "b"), ("b", "c"), ("b", "d")],  # star
    [("a", "b", "c"), ("a", "b"), ("b", "c")],  # contained edges
]
CYCLIC = [
    [("x", "y"), ("y", "z"), ("z", "x")],  # triangle
    [("a", "b"), ("b", "c"), ("c", "d"), ("d", "a")],  # 4-cycle
    [("a", "b"), ("b", "c"), ("c", "d"), ("d", "e"), ("e", "a")],  # 5-cycle
]


class TestGYO:
    @pytest.mark.parametrize("edges", ACYCLIC)
    def test_acyclic(self, edges):
        assert gyo_is_acyclic(edges)

    @pytest.mark.parametrize("edges", CYCLIC)
    def test_cyclic(self, edges):
        assert not gyo_is_acyclic(edges)

    def test_workload_queries_acyclic(self):
        star = [
            ("l_orderkey", "l_quantity_s", "l_price_s"),
            ("l_orderkey", "o_custkey", "o_price_s"),
            ("o_custkey", "c_acctbal_s"),
        ]
        chain = [("k1", "x1"), ("k1", "k2", "x2"), ("k2", "x3")]
        assert gyo_is_acyclic(star)
        assert gyo_is_acyclic(chain)

    def test_cycle4_bags_acyclic(self):
        # After GHD bag materialization the 4-cycle becomes acyclic.
        assert not gyo_is_acyclic([("a", "b"), ("b", "c"), ("c", "d"), ("d", "a")])
        assert gyo_is_acyclic([("a", "b", "c"), ("c", "d", "a")])
