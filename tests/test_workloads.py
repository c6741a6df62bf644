"""Workload builders: star, chain, cycle4 — structure and invariants."""
import numpy as np
import pytest

from repro.joins.engine import LocalEngine
from repro.workloads import chain_query, cycle4_query, star_query, star_tables


class TestStar:
    @pytest.fixture(scope="class")
    def Q(self):
        return star_query(LocalEngine(), sf=0.001, seed=0)

    def test_join_size_equals_lineitem(self, Q):
        # Complete FKs: the star join is 1:1 with the fact table.
        assert Q.total_count() == 6000

    def test_features(self, Q):
        assert Q.tree.all_features == (
            "l_quantity_s",
            "l_price_s",
            "o_price_s",
            "c_acctbal_s",
        )

    def test_features_normalized(self, Q):
        b = Q.feature_bounds()
        for f, (lo, hi) in b.items():
            assert -0.1 <= lo and hi <= 1.2, (f, lo, hi)

    def test_scaled_columns_in_tables(self):
        t = star_tables(sf=0.001)
        assert "l_quantity_s" in t["lineitem"].columns
        assert "o_price_s" in t["orders"].columns

    def test_clustering_runs(self, Q):
        from repro.core.api import rel_kmeans

        res = rel_kmeans(Q, 2, eps=0.5, pool_size=2000, seed=0)
        assert res.centers.shape == (2, 4)


class TestChain:
    def test_blowup(self):
        Q = chain_query(LocalEngine(), n=400, n_keys=40, seed=0)
        assert Q.total_count() > 10 * 400

    def test_root_is_middle_relation(self):
        Q = chain_query(LocalEngine(), n=50, n_keys=10, seed=0)
        assert Q.tree.root == "R2"

    def test_seed_determinism(self):
        a = chain_query(LocalEngine(), n=100, n_keys=10, seed=3)
        b = chain_query(LocalEngine(), n=100, n_keys=10, seed=3)
        assert a.total_count() == b.total_count()


class TestCycle4:
    def test_builds_and_counts(self):
        Q = cycle4_query(LocalEngine(), n=150, n_keys=8, seed=0)
        assert set(Q.tree.relations) == {"B1", "B2"}
        assert Q.total_count() >= 0

    def test_features_are_cycle_attrs(self):
        Q = cycle4_query(LocalEngine(), n=100, n_keys=6, seed=0)
        assert set(Q.tree.all_features) == {"a", "b", "c", "d"}
