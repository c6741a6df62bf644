"""Table 1, running-time column (measured): NEW is Õ(k²N); two-step pays |q(D)|.

On the Zipf chain the join size grows super-linearly in N, so the full-join
baseline's time must grow faster than NEW's — the crossover/shape claim
behind "without the need for pre-computing the join query results".
"""
import pytest

from repro.baselines.full_join import full_join_cluster
from repro.core.api import rel_kmedian
from repro.experiments import build_chain
from repro.joins.engine import SparkEngine

K = 3
NS = [500, 1000, 2000]


@pytest.fixture(scope="module")
def queries(spark):
    eng = SparkEngine(spark)
    return {n: build_chain(eng, n, seed=0) for n in NS}


@pytest.mark.parametrize("n", NS)
def test_scaling_new(benchmark, queries, n):
    Q = queries[n]
    benchmark.extra_info["n_per_rel"] = n
    benchmark.extra_info["join_size"] = Q.total_count()
    benchmark.pedantic(
        lambda: rel_kmedian(Q, K, eps=0.5, pool_size=20_000, seed=0),
        rounds=1,
        iterations=1,
    )


@pytest.mark.parametrize("n", NS)
def test_scaling_fulljoin(benchmark, queries, n):
    Q = queries[n]
    benchmark.extra_info["n_per_rel"] = n
    benchmark.extra_info["join_size"] = Q.total_count()
    benchmark.pedantic(
        lambda: full_join_cluster(Q, K, "median", seed=0), rounds=1, iterations=1
    )
