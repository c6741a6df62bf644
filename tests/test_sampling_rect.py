"""Uniform join sampling and the Lemma 2.1 rectangle queries (local engine)."""
import numpy as np
import pandas as pd
import pytest

from repro.joins.engine import LocalEngine
from repro.joins.yannakakis import RelQuery
from tests.conftest import brute_force_join
from tests.test_yannakakis_local import random_instance


@pytest.fixture(scope="module")
def eng():
    return LocalEngine()


@pytest.fixture(scope="module")
def inst(eng):
    tree, tables = random_instance(11, n=50, n_keys=6)
    Q = RelQuery(eng, tree, tables)
    joined = brute_force_join(tree, tables)
    return Q, joined


class TestSampleJoin:
    def test_sample_columns_and_size(self, inst):
        Q, _ = inst
        s = Q.sample(25, np.random.default_rng(0))
        assert list(s.columns) == ["fa", "fb", "fc"]
        assert len(s) == 25

    def test_samples_are_real_join_results(self, inst):
        Q, joined = inst
        s = Q.sample(40, np.random.default_rng(1))
        real = joined[["fa", "fb", "fc"]].drop_duplicates()
        merged = s.drop_duplicates().merge(real, on=["fa", "fb", "fc"], how="left", indicator=True)
        assert (merged["_merge"] == "both").all()

    def test_zero_samples(self, inst):
        Q, _ = inst
        assert len(Q.sample(0, np.random.default_rng(0))) == 0

    def test_uniformity_chi_square(self, inst):
        """Each distinct join result appears proportionally to its multiplicity."""
        Q, joined = inst
        n = len(joined)
        z = 4000
        s = Q.sample(z, np.random.default_rng(2))
        got = s.groupby(["fa", "fb", "fc"]).size()
        expect = joined.groupby(["fa", "fb", "fc"]).size() * (z / n)
        # Pearson chi-square against the exact multiplicities.
        chi2 = 0.0
        for key, e in expect.items():
            o = got.get(key, 0)
            chi2 += (o - e) ** 2 / e
        dof = len(expect) - 1
        # Very loose bound: mean=dof, sd=sqrt(2 dof); 6 sigma.
        assert chi2 < dof + 6 * np.sqrt(2 * dof), (chi2, dof)

    def test_custom_attrs(self, inst):
        Q, _ = inst
        s = Q.sample(5, np.random.default_rng(3), attrs=["x", "fb"])
        assert list(s.columns) == ["x", "fb"]

    def test_empty_join_returns_empty(self, eng):
        tree, tables = random_instance(0)
        tables["C"] = tables["C"].assign(y=999_999)
        Q = RelQuery(eng, tree, tables)
        assert len(Q.sample(10, np.random.default_rng(0))) == 0


def random_box(joined, seed, dims=("fa", "fb")):
    g = np.random.default_rng(seed)
    box = {}
    for d in dims:
        lo, hi = np.sort(g.random(2))
        box[d] = (float(lo), float(hi))
    mask = np.ones(len(joined), dtype=bool)
    for d, (lo, hi) in box.items():
        mask &= (joined[d] >= lo) & (joined[d] <= hi)
    return box, int(mask.sum())


class TestCountRect:
    @pytest.mark.parametrize("seed", range(10))
    def test_matches_brute_force(self, inst, seed):
        Q, joined = inst
        box, expect = random_box(joined, seed)
        assert Q.count_rect(box) == expect

    def test_full_box_is_total(self, inst):
        Q, joined = inst
        box = {"fa": (0.0, 1.0), "fb": (0.0, 1.0), "fc": (0.0, 1.0)}
        assert Q.count_rect(box) == len(joined)

    def test_empty_box(self, inst):
        Q, _ = inst
        assert Q.count_rect({"fa": (2.0, 3.0)}) == 0

    def test_box_on_join_key(self, inst):
        """Boxes may constrain any attribute, including join keys."""
        Q, joined = inst
        box = {"x": (0.0, 3.0)}
        assert Q.count_rect(box) == int(((joined["x"] >= 0) & (joined["x"] <= 3)).sum())


class TestSampleRect:
    @pytest.mark.parametrize("seed", range(5))
    def test_samples_inside_box(self, inst, seed):
        Q, joined = inst
        box, cnt = random_box(joined, seed + 100, dims=("fa",))
        if cnt == 0:
            pytest.skip("empty box")
        s = Q.sample_rect(box, 20, np.random.default_rng(seed))
        lo, hi = box["fa"]
        assert ((s["fa"] >= lo) & (s["fa"] <= hi)).all()

    def test_samples_are_join_results_in_box(self, inst):
        Q, joined = inst
        box = {"fb": (0.0, 0.5)}
        s = Q.sample_rect(box, 30, np.random.default_rng(9))
        sub = joined[(joined["fb"] >= 0) & (joined["fb"] <= 0.5)]
        real = sub[["fa", "fb", "fc"]].drop_duplicates()
        merged = s.drop_duplicates().merge(real, on=["fa", "fb", "fc"], how="left", indicator=True)
        assert (merged["_merge"] == "both").all()

    def test_conditional_uniformity(self, inst):
        """Sampling within a box is uniform over the box's join results."""
        Q, joined = inst
        box = {"fa": (0.0, 0.6)}
        sub = joined[(joined["fa"] >= 0) & (joined["fa"] <= 0.6)]
        z = 3000
        s = Q.sample_rect(box, z, np.random.default_rng(4))
        got = s.groupby(["fa", "fb", "fc"]).size()
        expect = sub.groupby(["fa", "fb", "fc"]).size() * (z / len(sub))
        chi2 = sum((got.get(k, 0) - e) ** 2 / e for k, e in expect.items())
        dof = len(expect) - 1
        assert chi2 < dof + 6 * np.sqrt(2 * dof), (chi2, dof)


class TestWeightedPickEngineOp:
    def test_respects_weights(self, eng):
        tuples = pd.DataFrame(
            {"k": [1, 1, 1], "v": [10.0, 20.0, 30.0], "w": [8.0, 1.0, 1.0]}
        )
        g = np.random.default_rng(0)
        reqs = pd.DataFrame(
            {"k": [1] * 2000, "__sid": np.arange(2000), "__u": g.random(2000)}
        )
        out = eng.weighted_pick(tuples, ["k"], "w", reqs, ["v"])
        frac = (out["v"] == 10.0).mean()
        assert abs(frac - 0.8) < 0.04

    def test_unmatched_keys_dropped(self, eng):
        tuples = pd.DataFrame({"k": [1], "v": [1.0], "w": [1.0]})
        reqs = pd.DataFrame({"k": [2], "__sid": [0], "__u": [0.5]})
        out = eng.weighted_pick(tuples, ["k"], "w", reqs, ["v"])
        assert len(out) == 0

    def test_empty_inputs(self, eng):
        tuples = pd.DataFrame({"k": [], "v": [], "w": []})
        reqs = pd.DataFrame({"k": [], "__sid": [], "__u": []})
        assert len(eng.weighted_pick(tuples, ["k"], "w", reqs, ["v"])) == 0
