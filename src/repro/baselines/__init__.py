"""Baselines from Table 1: the two-step materialize-then-cluster strawman,
Curtin et al. [23] Rk-means (grid coreset), and a Moseley et al. [43]-style
relational k-means++ coreset."""
from repro.baselines.full_join import exact_cost, full_join_cluster
from repro.baselines.kmeanspp_rel import rel_kmeanspp
from repro.baselines.rkmeans import rkmeans

__all__ = ["full_join_cluster", "exact_cost", "rkmeans", "rel_kmeanspp"]
