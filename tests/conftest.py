"""Shared test fixtures: engines, small query instances, brute-force joins."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.joins.engine import LocalEngine
from repro.joins.join_tree import JoinTree


@pytest.fixture(scope="session")
def local():
    return LocalEngine()


def brute_force_join(tree: JoinTree, tables: dict[str, pd.DataFrame]) -> pd.DataFrame:
    """Ground-truth q(D) via pandas merges (tests only)."""
    cur = None
    for u in reversed(tree.postorder()):
        df = tables[u][list(tree.relations[u].attrs)]
        if cur is None:
            cur = df.copy()
        else:
            jk = list(tree.join_attrs(u, tree.parent[u]))
            new = [c for c in df.columns if c in jk or c not in cur.columns]
            cur = cur.merge(df[new], on=jk, how="inner")
    return cur


@pytest.fixture(scope="session")
def chain_small(local):
    """A small clustered chain query on the local engine (session-cached)."""
    from repro.workloads import chain_query

    return chain_query(local, n=300, n_keys=40, seed=5)


@pytest.fixture(scope="session")
def chain_small_join(chain_small):
    """Materialized features of chain_small (evaluation ground truth)."""
    from repro.baselines.full_join import materialized_features

    return materialized_features(chain_small)


@pytest.fixture(scope="session")
def star_small(local):
    from repro.workloads import star_query

    return star_query(local, sf=0.002, seed=0)


def rng(seed: int = 0) -> np.random.Generator:
    return np.random.default_rng(seed)
