"""Baseline [23] — Curtin et al. "Rk-means: fast clustering for relational data".

Per relation R_j: run k-means on its feature columns → k_j centers. The grid
coreset is the cross product of the per-relation center sets (≤ k^m points in
the full feature space); the weight of a grid point is the number of join
results whose per-relation projections are assigned to that center
combination. The weights are computed **relationally** with the counting DP
carrying the assigned-center id columns (``grouped_counts``) — no join
materialization. A standard weighted k-means on the grid gives the final
centers, with the paper-reported γ² + 4γ√γ + 4γ approximation factor.
"""
from __future__ import annotations

import time

import numpy as np

from repro.clustering import cluster
from repro.core.coreset_fast import Coreset
from repro.joins.yannakakis import CNT, RelQuery, grouped_counts


def rkmeans(
    Q: RelQuery,
    k: int,
    objective: str = "means",
    *,
    seed: int = 0,
    per_relation_sample: int = 100_000,
) -> tuple[np.ndarray, Coreset, dict]:
    """Rk-means grid-coreset clustering. Returns (centers, grid coreset, timings)."""
    rng = np.random.default_rng(seed)
    eng = Q.engine
    feats = list(Q.tree.all_features)
    t0 = time.perf_counter()
    rel_centers: dict[str, np.ndarray] = {}
    tagged: dict[str, object] = {}
    for name, rel in Q.tree.relations.items():
        df = Q.dfs[name]
        if not rel.features:
            tagged[name] = df
            continue
        fp = eng.to_pandas(eng.project(df, list(rel.features)))
        P = fp.to_numpy(dtype=np.float64)
        if len(P) > per_relation_sample:
            P = P[rng.choice(len(P), per_relation_sample, replace=False)]
        C, _ = cluster(P, None, k, objective, rng=rng)
        rel_centers[name] = np.atleast_2d(C)
        tagged[name] = eng.assign_nearest(df, list(rel.features), rel_centers[name], f"__cid_{name}")
    t_assign = time.perf_counter() - t0

    t0 = time.perf_counter()
    carry = {name: [f"__cid_{name}"] for name in rel_centers}
    weights_pdf = grouped_counts(eng, Q.tree, tagged, carry)
    t_weights = time.perf_counter() - t0

    # Build grid points in canonical feature order from the cid combinations.
    pts = np.empty((len(weights_pdf), len(feats)))
    for name, C in rel_centers.items():
        cids = weights_pdf[f"__cid_{name}"].to_numpy(dtype=np.int64)
        rel_feats = Q.tree.relations[name].features
        for fi, f in enumerate(rel_feats):
            pts[:, feats.index(f)] = C[cids, fi]
    w = weights_pdf[CNT].to_numpy(dtype=np.float64)
    grid = Coreset(pts, w, {"grid_points": len(pts)})

    t0 = time.perf_counter()
    S, _ = cluster(grid.points, grid.weights, k, objective, rng=rng)
    t_cluster = time.perf_counter() - t0
    return (
        np.atleast_2d(S),
        grid,
        {"assign": t_assign, "weights": t_weights, "cluster": t_cluster},
    )
