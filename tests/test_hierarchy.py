"""Algorithm 3 (attribute tree) and the end-to-end pipeline, local engine."""
import numpy as np
import pytest

from repro.baselines.full_join import exact_cost, full_join_cluster
from repro.clustering.cost import weighted_cost
from repro.core.api import rel_kmeans, rel_kmedian
from repro.core.hierarchy import _alpha, cross_product, relational_cluster


class TestCrossProduct:
    def test_shape(self):
        Sv = np.array([[1.0], [2.0]])
        Sz = np.array([[10.0, 20.0], [30.0, 40.0], [50.0, 60.0]])
        X = cross_product(Sv, Sz)
        assert X.shape == (6, 3)

    def test_contains_all_pairs(self):
        Sv = np.array([[1.0], [2.0]])
        Sz = np.array([[3.0], [4.0]])
        X = {tuple(r) for r in cross_product(Sv, Sz)}
        assert X == {(1, 3), (1, 4), (2, 3), (2, 4)}

    def test_single_row_inputs(self):
        X = cross_product(np.array([[1.0, 2.0]]), np.array([[3.0]]))
        assert X.tolist() == [[1.0, 2.0, 3.0]]


class TestAlpha:
    def test_median_geometric(self):
        # Lemma 4.1: α = (1+ε)γ√2.
        assert _alpha(0.5, 2.0, "median", False) == pytest.approx(1.5 * 2 * np.sqrt(2))

    def test_median_discrete(self):
        assert _alpha(0.5, 2.0, "median", True) == pytest.approx(2 * 2.5 * 2 * np.sqrt(2))

    def test_means_geometric(self):
        # Lemma A.9: α = (1+ε)γ.
        assert _alpha(0.5, 2.0, "means", False) == pytest.approx(3.0)

    def test_ordering(self):
        assert _alpha(0.1, 2.0, "median", False) < _alpha(0.1, 2.0, "median", True)


@pytest.mark.parametrize("objective", ["median", "means"])
class TestEndToEnd:
    def test_within_approximation_of_full_join(
        self, chain_small, chain_small_join, objective
    ):
        """The headline guarantee: cost(S) ≤ (1+ε)·γ̂·OPT, with the full-join
        solution standing in for OPT (Theorem 4.2 / A.10 shape)."""
        P = chain_small_join
        res = relational_cluster(
            chain_small, k=3, eps=0.5, objective=objective, pool_size=4000, seed=0
        )
        _, cost_fj, _ = full_join_cluster(chain_small, 3, objective, P=P, seed=0)
        cost = exact_cost(P, res.centers, objective)
        assert cost <= (1 + 0.5) * 1.6 * cost_fj  # (1+ε)·slack on γ̂

    def test_k_centers_returned(self, chain_small, objective):
        res = relational_cluster(
            chain_small, k=4, eps=0.5, objective=objective, pool_size=3000, seed=1
        )
        assert res.centers.shape == (4, 3)
        assert res.features == ("x1", "x2", "x3")

    def test_r_certificate_bounds_cost(self, chain_small, chain_small_join, objective):
        """v_S(q(D)) ≤ r_u (Equation (5)/(8) left inequality, up to sampling)."""
        res = relational_cluster(
            chain_small, k=3, eps=0.5, objective=objective, pool_size=4000, seed=2
        )
        cost = exact_cost(chain_small_join, res.centers, objective)
        assert cost <= 1.35 * res.r

    def test_node_count(self, chain_small, objective):
        # 3 features → 3 leaves + 2 inner nodes.
        res = relational_cluster(
            chain_small, k=2, eps=0.5, objective=objective, pool_size=2000, seed=3
        )
        assert len(res.nodes) == 5
        assert sum(1 for nd in res.nodes if len(nd.attrs) == 1) == 3

    def test_discrete_centers_are_join_projections(
        self, chain_small, chain_small_join, objective
    ):
        res = relational_cluster(
            chain_small, k=2, eps=0.5, objective=objective, discrete=True,
            pool_size=3000, seed=4,
        )
        real = {tuple(p) for p in np.round(chain_small_join, 9)}
        for c in np.round(res.centers, 9):
            assert tuple(c) in real

    def test_deterministic_in_seed(self, chain_small, objective):
        a = relational_cluster(chain_small, 2, 0.5, objective, pool_size=1500, seed=7)
        b = relational_cluster(chain_small, 2, 0.5, objective, pool_size=1500, seed=7)
        assert np.allclose(a.centers, b.centers)
        assert a.r == pytest.approx(b.r)


class TestLeaves:
    def test_leaf_cost_is_exact_projection_cost(self, chain_small, chain_small_join):
        res = relational_cluster(chain_small, 2, 0.5, "median", pool_size=1500, seed=0)
        leaf = next(nd for nd in res.nodes if nd.attrs == ("x1",))
        P1 = chain_small_join[:, 0][:, None]
        assert leaf.r == pytest.approx(
            weighted_cost(P1, leaf.S, None, "median"), rel=1e-9
        )

    def test_single_feature_query(self, local):
        """d=1: the tree is a single leaf; result comes from the exact DP."""
        import pandas as pd

        from repro.joins.join_tree import JoinTree, Relation
        from repro.joins.yannakakis import RelQuery

        g = np.random.default_rng(0)
        tree = JoinTree(
            [Relation("A", ("x", "f"), ("f",)), Relation("B", ("x",))],
            [("A", "B", ["x"])],
            root="A",
        )
        tables = {
            "A": pd.DataFrame({"x": g.integers(0, 5, 40), "f": g.random(40)}),
            "B": pd.DataFrame({"x": g.integers(0, 5, 40)}),
        }
        Q = RelQuery(local, tree, tables)
        res = relational_cluster(Q, 2, 0.5, "median", pool_size=500, seed=0)
        assert res.centers.shape == (2, 1)


class TestApi:
    def test_rel_kmedian_objective(self, chain_small):
        res = rel_kmedian(chain_small, 2, pool_size=1500, seed=0)
        assert res.centers.shape[0] == 2

    def test_rel_kmeans_objective(self, chain_small):
        res = rel_kmeans(chain_small, 2, pool_size=1500, seed=0)
        assert res.centers.shape[0] == 2

    def test_invalid_method(self, chain_small):
        with pytest.raises(ValueError):
            relational_cluster(chain_small, 2, method="nope")

    def test_slow_method_end_to_end(self, local):
        """Algorithm 1 inside Algorithm 3 on a tiny 2-feature instance."""
        import pandas as pd

        from repro.joins.join_tree import JoinTree, Relation
        from repro.joins.yannakakis import RelQuery

        g = np.random.default_rng(1)
        tree = JoinTree(
            [Relation("A", ("x", "f1"), ("f1",)), Relation("B", ("x", "f2"), ("f2",))],
            [("A", "B", ["x"])],
            root="A",
        )
        tables = {
            "A": pd.DataFrame({"x": g.integers(0, 4, 30), "f1": g.random(30)}),
            "B": pd.DataFrame({"x": g.integers(0, 4, 30), "f2": g.random(30)}),
        }
        Q = RelQuery(local, tree, tables)
        res = relational_cluster(
            Q, 2, 0.5, "median", method="slow", seed=0,
            coreset_kwargs={"c_g": 0.5, "max_cells": 4000},
        )
        assert res.centers.shape == (2, 2)
        from tests.conftest import brute_force_join

        P = brute_force_join(tree, tables)[["f1", "f2"]].to_numpy(float)
        _, cost_fj, _ = full_join_cluster(Q, 2, "median", P=P)
        assert exact_cost(P, res.centers, "median") <= 1.6 * cost_fj
