"""Clustering cost functions v_C(P) (k-median) and μ_C(P) (k-means)."""
from __future__ import annotations

import numpy as np

_CHUNK = 262_144


def _min_dists(P: np.ndarray, C: np.ndarray) -> np.ndarray:
    """Distance from each point in P (n, d) to its nearest center in C (k, d).

    Chunked so n × k distance matrices never exceed a few hundred MB.
    """
    P = np.atleast_2d(np.asarray(P, dtype=np.float64))
    C = np.atleast_2d(np.asarray(C, dtype=np.float64))
    out = np.empty(len(P), dtype=np.float64)
    for s in range(0, len(P), _CHUNK):
        blk = P[s : s + _CHUNK]
        d2 = ((blk[:, None, :] - C[None, :, :]) ** 2).sum(axis=2)
        out[s : s + _CHUNK] = np.sqrt(d2.min(axis=1))
    return out


def assign(P: np.ndarray, C: np.ndarray) -> np.ndarray:
    """Index of the nearest center for each point."""
    P = np.atleast_2d(np.asarray(P, dtype=np.float64))
    C = np.atleast_2d(np.asarray(C, dtype=np.float64))
    out = np.empty(len(P), dtype=np.int64)
    for s in range(0, len(P), _CHUNK):
        blk = P[s : s + _CHUNK]
        d2 = ((blk[:, None, :] - C[None, :, :]) ** 2).sum(axis=2)
        out[s : s + _CHUNK] = d2.argmin(axis=1)
    return out


def weighted_cost(P, C, weights=None, objective: str = "median") -> float:
    """v_C(P) = Σ w(p)·φ(p,C) or μ_C(P) = Σ w(p)·φ²(p,C)."""
    P = np.atleast_2d(np.asarray(P, dtype=np.float64))
    if len(P) == 0:
        return 0.0
    d = _min_dists(P, C)
    if objective == "means":
        d = d**2
    elif objective != "median":
        raise ValueError(f"unknown objective {objective!r}")
    if weights is None:
        return float(d.sum())
    return float((np.asarray(weights, dtype=np.float64) * d).sum())
