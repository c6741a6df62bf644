"""The paper's contribution: coreset constructions from many centers
(Algorithms 1 & 2) and the hierarchical attribute-tree algorithm (Algorithm 3).
"""
from repro.core.api import rel_kmeans, rel_kmedian, relational_cluster

__all__ = ["rel_kmedian", "rel_kmeans", "relational_cluster"]
