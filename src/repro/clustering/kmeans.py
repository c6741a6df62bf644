"""Weighted k-means (GkMeansAlg_γ / DkMeansAlg_γ): k-means++ seeding + Lloyd.

Runs on the driver over coreset-sized weighted point sets (O(k² log N) points),
which is exactly the paper's model: the relational machinery shrinks the input
so a standard-setting γ-approximation algorithm finishes the job.
"""
from __future__ import annotations

import numpy as np

from repro.clustering.cost import assign, weighted_cost


def _dedupe(P: np.ndarray, w: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Merge duplicate points, summing weights."""
    uniq, inv = np.unique(P, axis=0, return_inverse=True)
    wu = np.zeros(len(uniq))
    np.add.at(wu, inv, w)
    return uniq, wu


def pp_init(
    P: np.ndarray, w: np.ndarray, k: int, rng: np.random.Generator, power: float = 2.0
) -> np.ndarray:
    """Weighted D^power sampling seeding (power=2: k-means++; power=1: k-median++)."""
    n = len(P)
    first = rng.choice(n, p=w / w.sum())
    centers = [P[first]]
    d = np.sqrt(((P - centers[0]) ** 2).sum(axis=1))
    for _ in range(1, min(k, n)):
        prob = w * d**power
        tot = prob.sum()
        if tot <= 0:
            break
        nxt = rng.choice(n, p=prob / tot)
        centers.append(P[nxt])
        d = np.minimum(d, np.sqrt(((P - P[nxt]) ** 2).sum(axis=1)))
    return np.asarray(centers)


def _medoids(P: np.ndarray, w: np.ndarray, centers: np.ndarray, objective: str) -> np.ndarray:
    """Snap each center to the best input point of its cluster (discrete)."""
    lab = assign(P, centers)
    out = []
    for i in range(len(centers)):
        m = lab == i
        if not m.any():
            # Empty cluster: snap to the globally nearest input point.
            d = ((P - centers[i]) ** 2).sum(axis=1)
            out.append(P[d.argmin()])
            continue
        Q, wq = P[m], w[m]
        d = np.sqrt(((Q[:, None, :] - Q[None, :, :]) ** 2).sum(axis=2))
        if objective == "means":
            d = d**2
        out.append(Q[(d * wq[None, :]).sum(axis=1).argmin()])
    return np.unique(np.asarray(out), axis=0)


def weighted_kmeans(
    points,
    weights,
    k: int,
    *,
    discrete: bool = False,
    rng: np.random.Generator | None = None,
    n_iter: int = 60,
    n_init: int = 3,
    tol: float = 1e-7,
):
    """γ-approximate weighted k-means. Returns (centers, cost on the input)."""
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
        C = pp_init(P, w, k, rng, power=2.0)
        prev = np.inf
        for _ in range(n_iter):
            lab = assign(P, C)
            newC = []
            for i in range(len(C)):
                m = lab == i
                if m.any():
                    newC.append((P[m] * w[m, None]).sum(axis=0) / w[m].sum())
                else:
                    newC.append(P[rng.choice(len(P), p=w / w.sum())])
            C = np.asarray(newC)
            cost = weighted_cost(P, C, w, "means")
            if prev - cost <= tol * max(prev, 1.0):
                break
            prev = cost
        cost = weighted_cost(P, C, w, "means")
        if cost < best_cost:
            best_c, best_cost = C, cost
    if discrete:
        best_c = _medoids(P, w, best_c, "means")
        best_cost = weighted_cost(P, best_c, w, "means")
    return best_c, float(best_cost)
