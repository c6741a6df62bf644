"""Public entry points for relational clustering.

``rel_kmedian`` / ``rel_kmeans`` solve Definitions 1.1 / 1.2 on a
:class:`RelQuery` (acyclic; build cyclic queries with
:func:`repro.joins.ghd.ghd_to_acyclic` first — Theorem 4.3).
"""
from __future__ import annotations

from repro.core.hierarchy import ClusterResult, relational_cluster
from repro.joins.yannakakis import RelQuery


def rel_kmedian(Q: RelQuery, k: int, eps: float = 0.5, **kw) -> ClusterResult:
    """Relational k-median (Definition 1.1; Theorem 4.2).

    Geometric by default; pass ``discrete=True`` for the (2+ε)γ discrete
    variant (centers are projections of actual join results).
    """
    return relational_cluster(Q, k, eps, objective="median", **kw)


def rel_kmeans(Q: RelQuery, k: int, eps: float = 0.5, **kw) -> ClusterResult:
    """Relational k-means (Definition 1.2; Theorem A.10).

    Geometric by default; pass ``discrete=True`` for the (4+ε)γ discrete
    variant.
    """
    return relational_cluster(Q, k, eps, objective="means", **kw)
