"""Weighted k-median (GkMedianAlg_γ / DkMedianAlg_γ).

k-median++ seeding (D¹ sampling) + alternation: assign to nearest center,
recompute each center as the weighted geometric median of its cluster
(Weiszfeld iterations). The discrete variant snaps centers to weighted
medoids. Constant-factor in practice — the γ black box of the paper.
"""
from __future__ import annotations

import numpy as np

from repro.clustering.cost import assign, weighted_cost
from repro.clustering.kmeans import _dedupe, _medoids, pp_init


def geometric_median(
    Q: np.ndarray, w: np.ndarray, n_iter: int = 50, tol: float = 1e-9
) -> np.ndarray:
    """Weighted geometric median via Weiszfeld's algorithm."""
    x = (Q * w[:, None]).sum(axis=0) / w.sum()
    for _ in range(n_iter):
        d = np.sqrt(((Q - x) ** 2).sum(axis=1))
        hit = d < 1e-12
        if hit.any():
            # Weiszfeld is singular at data points; nudge off the point.
            d = np.maximum(d, 1e-12)
        inv = w / d
        x_new = (Q * inv[:, None]).sum(axis=0) / inv.sum()
        if np.sqrt(((x_new - x) ** 2).sum()) <= tol * (1.0 + np.sqrt((x**2).sum())):
            return x_new
        x = x_new
    return x


def weighted_kmedian(
    points,
    weights,
    k: int,
    *,
    discrete: bool = False,
    rng: np.random.Generator | None = None,
    n_iter: int = 40,
    n_init: int = 3,
    tol: float = 1e-7,
):
    """γ-approximate weighted k-median. Returns (centers, cost on the input)."""
    rng = rng or np.random.default_rng(0)
    P = np.atleast_2d(np.asarray(points, dtype=np.float64))
    w = (
        np.full(len(P), 1.0)
        if weights is None
        else np.asarray(weights, dtype=np.float64)
    )
    keep = w > 0
    P, w = _dedupe(P[keep], w[keep])
    if len(P) == 0:
        raise ValueError("empty input")
    if len(P) <= k:
        return P, 0.0
    best_c, best_cost = None, np.inf
    for _ in range(n_init):
        C = pp_init(P, w, k, rng, power=1.0)
        prev = np.inf
        for _ in range(n_iter):
            lab = assign(P, C)
            newC = []
            for i in range(len(C)):
                m = lab == i
                if m.any():
                    newC.append(geometric_median(P[m], w[m]))
                else:
                    newC.append(P[rng.choice(len(P), p=w / w.sum())])
            C = np.asarray(newC)
            cost = weighted_cost(P, C, w, "median")
            if prev - cost <= tol * max(prev, 1.0):
                break
            prev = cost
        cost = weighted_cost(P, C, w, "median")
        if cost < best_cost:
            best_c, best_cost = C, cost
    if discrete:
        best_c = _medoids(P, w, best_c, "median")
        best_cost = weighted_cost(P, best_c, w, "median")
    return best_c, float(best_cost)
