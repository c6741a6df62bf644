"""Table 1, k-means rows (measured): NEW vs. [23] vs. [43] vs. full-join.

The paper's claim: NEW (4+ε)γ dominates Rk-means [23] (γ²+4γ√γ+4γ) and the
k-means++ coreset [43] (320+644(1+ε)γ) on approximation while staying
Õ(k²N). Empirically: NEW's measured ratio ≤ both baselines' ratios.
"""
import pytest

from repro.baselines.full_join import exact_cost, full_join_cluster
from repro.baselines.kmeanspp_rel import rel_kmeanspp
from repro.baselines.rkmeans import rkmeans
from repro.core.api import rel_kmeans

K = 3
EPS = 0.5


@pytest.fixture(scope="module")
def best_cost(bench_q, bench_join):
    _, cost_fj, _ = full_join_cluster(bench_q, K, "means", P=bench_join, seed=0)
    return cost_fj


def test_kmeans_new_randomized(benchmark, bench_q, bench_join, best_cost):
    res = benchmark.pedantic(
        lambda: rel_kmeans(bench_q, K, eps=EPS, pool_size=20_000, seed=0),
        rounds=1,
        iterations=1,
    )
    ratio = exact_cost(bench_join, res.centers, "means") / best_cost
    benchmark.extra_info["cost_ratio_vs_fulljoin"] = round(ratio, 4)
    assert ratio <= 1.8


def test_kmeans_rkmeans_23(benchmark, bench_q, bench_join, best_cost):
    S, grid, _ = benchmark.pedantic(
        lambda: rkmeans(bench_q, K, seed=0), rounds=1, iterations=1
    )
    ratio = exact_cost(bench_join, S, "means") / best_cost
    benchmark.extra_info["cost_ratio_vs_fulljoin"] = round(ratio, 4)
    benchmark.extra_info["grid_points"] = len(grid)
    assert ratio <= 8.0  # [23] worst case is γ²+4γ√γ+4γ — much looser than NEW


def test_kmeans_kmeanspp_43(benchmark, bench_q, bench_join, best_cost):
    S, core, _ = benchmark.pedantic(
        lambda: rel_kmeanspp(bench_q, K, pool_size=20_000, seed=0),
        rounds=1,
        iterations=1,
    )
    ratio = exact_cost(bench_join, S, "means") / best_cost
    benchmark.extra_info["cost_ratio_vs_fulljoin"] = round(ratio, 4)
    benchmark.extra_info["coreset_size"] = len(core)
    assert ratio <= 4.0


def test_kmeans_fulljoin_two_step(benchmark, bench_q, bench_join, best_cost):
    S, cost, _ = benchmark.pedantic(
        lambda: full_join_cluster(bench_q, K, "means", seed=0), rounds=1, iterations=1
    )
    benchmark.extra_info["cost_ratio_vs_fulljoin"] = round(cost / best_cost, 4)


def test_kmeans_new_dominates_baselines(benchmark, bench_q, bench_join, best_cost):
    """The Table-1 ordering itself: NEW ≤ [23] and NEW ≤ [43] (with slack)."""

    def run():
        res = rel_kmeans(bench_q, K, eps=EPS, pool_size=20_000, seed=0)
        S23, _, _ = rkmeans(bench_q, K, seed=0)
        S43, _, _ = rel_kmeanspp(bench_q, K, pool_size=20_000, seed=0)
        return res.centers, S23, S43

    S_new, S23, S43 = benchmark.pedantic(run, rounds=1, iterations=1)
    c_new = exact_cost(bench_join, S_new, "means")
    c23 = exact_cost(bench_join, S23, "means")
    c43 = exact_cost(bench_join, S43, "means")
    benchmark.extra_info["ratios"] = {
        "NEW": round(c_new / best_cost, 4),
        "rkmeans_23": round(c23 / best_cost, 4),
        "kmeanspp_43": round(c43 / best_cost, 4),
    }
    assert c_new <= 1.1 * c23
    assert c_new <= 1.1 * c43
