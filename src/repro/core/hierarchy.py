"""Algorithm 3 — Rel-K-Median / Rel-K-Means over the attribute tree.

A balanced binary tree over the feature attributes. At a leaf (one attribute
A_u), the weighted 1-D projection H_u = π_{A_u}(q(D)) with multiplicity
weights is computed *exactly* by the counting Yannakakis DP re-rooted at a
relation containing A_u, and clustered directly (the cost v_S(H_u) is exact,
so r_u needs no inflation). At an inner node u with children v, z:
X = S_v × S_z (≤ k² candidates), r = r_v + r_z, and Algorithm 2 (or 1)
reduces back to k centers with certificate r_u. The root's S is the final
(1+ε)γ-approximation (Theorem 4.2).
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.clustering import cluster
from repro.clustering.cost import weighted_cost
from repro.core.coreset_fast import rel_clustering_fast
from repro.core.coreset_slow import rel_clustering_slow
from repro.joins.yannakakis import RelQuery


@dataclass
class NodeResult:
    """Per-tree-node output: attribute subset A_u, centers S_u, certificate r_u."""

    attrs: tuple[str, ...]
    S: np.ndarray
    r: float
    coreset_size: int = 0


@dataclass
class ClusterResult:
    """Final output of the relational clustering pipeline."""

    centers: np.ndarray
    r: float
    features: tuple[str, ...]
    n: int
    nodes: list[NodeResult] = field(default_factory=list)
    timings: dict = field(default_factory=dict)


def cross_product(Sv: np.ndarray, Sz: np.ndarray) -> np.ndarray:
    """X = S_v × S_z: every concatenation of a left and a right center."""
    Sv = np.atleast_2d(Sv)
    Sz = np.atleast_2d(Sz)
    left = np.repeat(Sv, len(Sz), axis=0)
    right = np.tile(Sz, (len(Sv), 1))
    return np.hstack([left, right])


def _alpha(eps: float, gamma: float, objective: str, discrete: bool) -> float:
    """The α certificate for X = S_v × S_z (Lemma 4.1 / Lemma A.9)."""
    if objective == "median":
        return (
            2 * (2 + eps) * gamma * np.sqrt(2) if discrete else (1 + eps) * gamma * np.sqrt(2)
        )
    return 4 * (1 + eps) * gamma if discrete else (1 + eps) * gamma


def _leaf(
    Q: RelQuery,
    attr: str,
    k: int,
    objective: str,
    discrete: bool,
    rng: np.random.Generator,
) -> NodeResult:
    """Algorithm 3 lines 1–8: exact weighted 1-D projection, clustered."""
    H: pd.DataFrame = Q.engine.to_pandas(Q.leaf_weights(attr))
    P = H["value"].to_numpy(dtype=np.float64)[:, None]
    w = H["weight"].to_numpy(dtype=np.float64)
    S, _ = cluster(P, w, k, objective, discrete=discrete, rng=rng)
    r = weighted_cost(P, S, w, objective)  # exact: H_u IS q_u(D)
    return NodeResult((attr,), S, r)


def relational_cluster(
    Q: RelQuery,
    k: int,
    eps: float = 0.5,
    objective: str = "median",
    *,
    gamma: float = 2.0,
    method: str = "fast",
    discrete: bool = False,
    pool_size: int = 20_000,
    seed: int = 0,
    coreset_kwargs: dict | None = None,
) -> ClusterResult:
    """End-to-end relational k-median / k-means (Theorems 4.2 / A.10).

    method: "fast" (Algorithm 2 at inner nodes, randomized) or "slow"
    (Algorithm 1, deterministic exact counting — small instances only).
    """
    rng = np.random.default_rng(seed)
    ck = dict(coreset_kwargs or {})
    feats = list(Q.tree.all_features)
    if not feats:
        raise ValueError("query has no feature attributes")
    t0 = time.perf_counter()
    n = Q.total_count()
    t_count = time.perf_counter() - t0

    pool = None
    t_pool = 0.0
    if method == "fast":
        t0 = time.perf_counter()
        pool_pdf = Q.sample(min(pool_size, max(10 * n, 1)), rng, attrs=feats)
        pool = pool_pdf.to_numpy(dtype=np.float64)
        t_pool = time.perf_counter() - t0
    elif method != "slow":
        raise ValueError(f"unknown method {method!r}")

    nodes: list[NodeResult] = []
    t0 = time.perf_counter()

    def solve(lo: int, hi: int) -> NodeResult:
        if hi - lo == 1:
            res = _leaf(Q, feats[lo], k, objective, discrete, rng)
            nodes.append(res)
            return res
        mid = (lo + hi) // 2
        left = solve(lo, mid)
        right = solve(mid, hi)
        attrs = left.attrs + right.attrs
        X = cross_product(left.S, right.S)
        r = left.r + right.r
        alpha = _alpha(eps, gamma, objective, discrete)
        if method == "fast":
            cols = [feats.index(a) for a in attrs]
            S, r_u, C = rel_clustering_fast(
                pool[:, cols], n, X, alpha, r, eps, k, objective,
                discrete=discrete, rng=rng, **ck,
            )
        else:
            S, r_u, C = rel_clustering_slow(
                Q, list(attrs), X, alpha, r, eps, k, objective,
                discrete=discrete, rng=rng, **ck,
            )
        res = NodeResult(attrs, S, r_u, coreset_size=len(C))
        nodes.append(res)
        return res

    root = solve(0, len(feats))
    t_tree = time.perf_counter() - t0
    # Root attrs may be a permutation of feats (balanced split order);
    # reorder center columns to the canonical feature order.
    perm = [root.attrs.index(f) for f in feats]
    centers = np.atleast_2d(root.S)[:, perm]
    return ClusterResult(
        centers=centers,
        r=root.r,
        features=tuple(feats),
        n=n,
        nodes=nodes,
        timings={"count": t_count, "pool": t_pool, "tree": t_tree},
    )
