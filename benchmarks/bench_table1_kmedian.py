"""Table 1, k-median rows (measured): NEW randomized vs. full-join two-step.

Each bench measures one method's wall time on the shared chain instance
(N=1000/relation, join ≫ N) and records the exact cost ratio against the
best-known solution in ``extra_info`` — the empirical counterpart of the
paper's (1+ε)γ / (2+ε)γ columns.
"""
import pytest

from repro.baselines.full_join import exact_cost, full_join_cluster
from repro.core.api import rel_kmedian

K = 3
EPS = 0.5


@pytest.fixture(scope="module")
def best_cost(bench_q, bench_join):
    _, cost_fj, _ = full_join_cluster(bench_q, K, "median", P=bench_join, seed=0)
    return cost_fj


def test_kmedian_new_randomized(benchmark, bench_q, bench_join, best_cost):
    res = benchmark.pedantic(
        lambda: rel_kmedian(bench_q, K, eps=EPS, pool_size=20_000, seed=0),
        rounds=1,
        iterations=1,
    )
    ratio = exact_cost(bench_join, res.centers, "median") / best_cost
    benchmark.extra_info["cost_ratio_vs_fulljoin"] = round(ratio, 4)
    benchmark.extra_info["join_size"] = len(bench_join)
    assert ratio <= 1.5  # (1+ε)γ̂ shape — far below any baseline bound


def test_kmedian_new_discrete(benchmark, bench_q, bench_join, best_cost):
    res = benchmark.pedantic(
        lambda: rel_kmedian(bench_q, K, eps=EPS, pool_size=20_000, seed=0, discrete=True),
        rounds=1,
        iterations=1,
    )
    ratio = exact_cost(bench_join, res.centers, "median") / best_cost
    benchmark.extra_info["cost_ratio_vs_fulljoin"] = round(ratio, 4)
    assert ratio <= 2.5  # (2+ε)γ̂ discrete shape


def test_kmedian_fulljoin_two_step(benchmark, bench_q, bench_join, best_cost):
    S, cost, _ = benchmark.pedantic(
        lambda: full_join_cluster(bench_q, K, "median", seed=0),
        rounds=1,
        iterations=1,
    )
    benchmark.extra_info["cost_ratio_vs_fulljoin"] = round(cost / best_cost, 4)
    benchmark.extra_info["join_size"] = len(bench_join)
