"""Benchmark fixtures: one Spark chain instance shared by the Table-1 benches."""
from __future__ import annotations

import pytest

BENCH_N = 1000  # tuples per relation for the quality benches


@pytest.fixture(scope="session")
def bench_q(spark):
    """The Table-1 benchmark instance on the Spark engine."""
    from repro.experiments import build_chain
    from repro.joins.engine import SparkEngine

    return build_chain(SparkEngine(spark), BENCH_N, seed=0)


@pytest.fixture(scope="session")
def bench_join(bench_q):
    """Materialized join features — reference-cost evaluation only."""
    from repro.baselines.full_join import materialized_features

    return materialized_features(bench_q)
