"""Yannakakis-style dynamic programs over an acyclic join tree.

Everything here runs on the engine abstraction (Spark DataFrames in
production), and never materializes the join result:

- ``full_reduce``: semi-join reduction — keep only non-dangling tuples.
- ``subtree_counts``: bottom-up counting DP; node tuple t gets ``__cnt`` =
  number of join results of the subtree below t. At the root this yields the
  per-root-tuple counts c(h) of Algorithm 3 and the total |q(D)|.
- ``grouped_counts``: the counting DP additionally grouped by carried columns
  (used by the Rk-means baseline to weight grid cells relationally).
- ``sample_join``: uniform sampling of z join results with replacement —
  weighted root pick, then top-down per-key weighted picks (Lemma 2.1's
  SampleRect machinery, Zhao et al. style).

``RelQuery`` packages a query instance (tree + tables) with caching and the
rectangle variants CountRect / SampleRect (box filter on every relation,
re-reduce, re-run the DP).
"""
from __future__ import annotations

from typing import Mapping, Sequence

import numpy as np
import pandas as pd

from repro.joins.engine import Engine
from repro.joins.join_tree import JoinTree

RID = "__rid"
CNT = "__cnt"


def full_reduce(engine: Engine, tree: JoinTree, dfs: Mapping[str, object]) -> dict[str, object]:
    """Two semi-join passes (bottom-up, then top-down): every surviving tuple
    participates in at least one join result."""
    out = dict(dfs)
    for u in tree.postorder():
        p = tree.parent[u]
        if p is not None:
            out[p] = engine.semijoin(out[p], out[u], tree.join_attrs(u, p))
    for u in reversed(tree.postorder()):  # preorder: parents before children
        for c in tree.children[u]:
            out[c] = engine.semijoin(out[c], out[u], tree.join_attrs(c, u))
    return out


def subtree_counts(
    engine: Engine, tree: JoinTree, dfs: Mapping[str, object]
) -> dict[str, object]:
    """Bottom-up counting DP: ``__cnt`` per tuple = #join results below it."""
    counts: dict[str, object] = {}
    for u in tree.postorder():
        df = engine.with_lit(dfs[u], CNT, 1)
        for c in tree.children[u]:
            jk = tree.join_attrs(c, u)
            agg = engine.groupby_sum(counts[c], jk, CNT, f"__cnt_{c}")
            df = engine.join(df, agg, on=jk)
            df = engine.multiply_into(df, CNT, f"__cnt_{c}")
        counts[u] = df
    return counts


def total_count(engine: Engine, tree: JoinTree, dfs: Mapping[str, object]) -> int:
    """|q(D)| without materializing the join."""
    counts = subtree_counts(engine, tree, dfs)
    return int(round(engine.sum_col(counts[tree.root], CNT)))


def grouped_counts(
    engine: Engine,
    tree: JoinTree,
    dfs: Mapping[str, object],
    carry: Mapping[str, Sequence[str]],
) -> pd.DataFrame:
    """Counting DP that carries extra per-relation group columns to the root.

    ``carry[rel]`` are columns of ``dfs[rel]`` (e.g. assigned-center ids).
    Returns a pandas frame with all carried columns and ``__cnt`` = number of
    join results having that carried-column combination — i.e. the weights of
    the Rk-means grid coreset, computed with joins + aggregations only.
    """
    counts: dict[str, object] = {}
    carried: dict[str, list[str]] = {}
    for u in tree.postorder():
        df = engine.with_lit(dfs[u], CNT, 1)
        cols = list(carry.get(u, []))
        for c in tree.children[u]:
            jk = tree.join_attrs(c, u)
            agg = engine.groupby_sum(
                counts[c], [*jk, *carried[c]], CNT, f"__cnt_{c}"
            )
            df = engine.join(df, agg, on=jk)
            df = engine.multiply_into(df, CNT, f"__cnt_{c}")
            cols += carried[c]
        counts[u] = df
        carried[u] = cols
    root = tree.root
    if carried[root]:
        agg = engine.groupby_sum(counts[root], carried[root], CNT, CNT)
    else:
        agg = engine.groupby_sum(engine.with_lit(counts[root], "__g", 0), ["__g"], CNT, CNT)
    return engine.to_pandas(agg)


def sample_join(
    engine: Engine,
    tree: JoinTree,
    dfs: Mapping[str, object],
    z: int,
    rng: np.random.Generator,
    attrs: Sequence[str] | None = None,
) -> pd.DataFrame:
    """z uniform (with replacement) samples from q(D), never materializing it.

    Requires every relation to carry a unique ``__rid`` column. Root tuples
    are drawn proportionally to their subtree counts (the per-relation
    (rid, count) vector is O(N) and collected to the driver, which is within
    the paper's O(N)-memory model); descent uses per-key weighted picks
    executed with cogrouped applyInPandas on Spark.
    """
    if z <= 0:
        return pd.DataFrame(columns=list(attrs or []))
    counts = subtree_counts(engine, tree, dfs)
    root = tree.root
    root_w = engine.to_pandas(engine.project(counts[root], [RID, CNT]))
    if len(root_w) == 0:
        return pd.DataFrame(columns=list(attrs or []))
    w = root_w[CNT].to_numpy(dtype=np.float64)
    picked_rids = rng.choice(root_w[RID].to_numpy(), size=z, p=w / w.sum())
    sel = pd.DataFrame({RID: picked_rids, "__sid": np.arange(z, dtype=np.int64)})
    root_cols = [c for c in engine.columns(dfs[root]) if c != RID]
    root_rows = engine.to_pandas(
        engine.join(engine.from_pandas(sel), engine.project(counts[root], [RID, *root_cols]), on=[RID])
    )
    cur = root_rows.drop(columns=[RID])

    def descend(node: str, cur: pd.DataFrame) -> pd.DataFrame:
        for c in tree.children[node]:
            jk = list(tree.join_attrs(c, node))
            reqs = cur[[*jk, "__sid"]].copy()
            reqs["__u"] = rng.random(len(reqs))
            new_cols = [
                x for x in engine.columns(dfs[c]) if x not in cur.columns and x != RID
            ]
            picked = engine.weighted_pick(counts[c], jk, CNT, reqs, new_cols)
            cur = cur.merge(picked, on="__sid", how="inner")
            cur = descend(c, cur)
        return cur

    cur = descend(root, cur).sort_values("__sid").reset_index(drop=True)
    keep = list(attrs) if attrs is not None else [c for c in cur.columns if c != "__sid"]
    return cur[keep]


class RelQuery:
    """A query instance: acyclic join tree + engine-native tables.

    All public methods operate on the semi-join-reduced database and never
    materialize q(D) (except :meth:`materialize`, which exists only for the
    two-step baseline and for exact cost evaluation in the harness).
    """

    def __init__(self, engine: Engine, tree: JoinTree, tables: Mapping[str, object]):
        self.engine = engine
        self.tree = tree
        missing = set(tree.relations) - set(tables)
        if missing:
            raise ValueError(f"missing tables for relations {missing}")
        dfs = {}
        for name, rel in tree.relations.items():
            df = engine.project(tables[name], list(rel.attrs))
            dfs[name] = engine.add_row_id(df, RID)
        reduced = full_reduce(engine, tree, dfs)
        self.dfs = {n: engine.cache(df) for n, df in reduced.items()}
        self._n: int | None = None
        self._bounds: dict[str, tuple[float, float]] | None = None

    # -- counting ---------------------------------------------------------
    def total_count(self) -> int:
        """|q(D)| (cached)."""
        if self._n is None:
            self._n = total_count(self.engine, self.tree, self.dfs)
        return self._n

    def root_counts(self, root_rel: str):
        """Engine frame of the tuples of ``root_rel`` with c(h) = ``__cnt``."""
        tree = self.tree.rerooted(root_rel)
        return subtree_counts(self.engine, tree, self.dfs)[root_rel]

    def leaf_weights(self, attr: str):
        """Weighted 1-D projection H_u of q(D) on ``attr`` (Algorithm 3 leaf).

        Returns an engine frame (value, weight): weight = multiplicity of the
        value in the multiset projection, via the counting DP re-rooted at a
        relation containing ``attr``.
        """
        rel = self.tree.relation_with_attr(attr)
        rc = self.root_counts(rel)
        agg = self.engine.groupby_sum(rc, [attr], CNT, "weight")
        return self.engine.rename(agg, {attr: "value"})

    def feature_bounds(self) -> dict[str, tuple[float, float]]:
        """Exact per-feature min/max of the join multiset (every reduced tuple
        appears in ≥1 result, so per-relation bounds are join bounds)."""
        if self._bounds is None:
            out: dict[str, tuple[float, float]] = {}
            for name, rel in self.tree.relations.items():
                if rel.features:
                    out.update(self.engine.minmax(self.dfs[name], list(rel.features)))
            self._bounds = out
        return self._bounds

    # -- sampling ---------------------------------------------------------
    def sample(self, z: int, rng: np.random.Generator, attrs: Sequence[str] | None = None) -> pd.DataFrame:
        """z uniform samples of q(D) projected to ``attrs`` (default: features)."""
        attrs = list(attrs) if attrs is not None else list(self.tree.all_features)
        return sample_join(self.engine, self.tree, self.dfs, z, rng, attrs)

    # -- rectangle queries (Lemma 2.1) ------------------------------------
    def _filtered(
        self, box: Mapping[str, tuple[float, float]], right_closed: bool = True
    ) -> dict[str, object]:
        dfs = {}
        for name, rel in self.tree.relations.items():
            df = self.dfs[name]
            for attr, (lo, hi) in box.items():
                if attr in rel.attrs:
                    df = self.engine.filter_range(df, attr, lo, hi, right_closed)
            dfs[name] = df
        return full_reduce(self.engine, self.tree, dfs)

    def count_rect(
        self, box: Mapping[str, tuple[float, float]], right_closed: bool = True
    ) -> int:
        """CountRect: |q(D) ∩ box| (box constrains a subset of attributes;
        equals the multiset-projection count |π̄_B(q(D)) ∩ box|).

        ``right_closed=False`` counts over half-open [lo, hi) boxes — used for
        grid cells, which must partition space without double-counting.
        """
        return total_count(self.engine, self.tree, self._filtered(box, right_closed))

    def sample_rect(
        self,
        box: Mapping[str, tuple[float, float]],
        z: int,
        rng: np.random.Generator,
        attrs: Sequence[str] | None = None,
        right_closed: bool = True,
    ) -> pd.DataFrame:
        """SampleRect: z uniform samples from q(D) ∩ box."""
        attrs = list(attrs) if attrs is not None else list(self.tree.all_features)
        return sample_join(
            self.engine, self.tree, self._filtered(box, right_closed), z, rng, attrs
        )

    # -- baseline/evaluation only -----------------------------------------
    def materialize(self, attrs: Sequence[str] | None = None):
        """The full join result (multiset), projected to ``attrs``.

        Exists for the two-step baseline and for exact cost evaluation in the
        experiment harness — the paper's algorithms never call this.
        """
        attrs = list(attrs) if attrs is not None else list(self.tree.all_features)
        cur = None
        for u in reversed(self.tree.postorder()):
            df = self.engine.project(
                self.dfs[u], [c for c in self.engine.columns(self.dfs[u]) if c != RID]
            )
            if cur is None:
                cur = df
            else:
                jk = self.tree.join_attrs(u, self.tree.parent[u])
                new_cols = [c for c in self.engine.columns(df) if c in jk or c not in self.engine.columns(cur)]
                cur = self.engine.join(cur, self.engine.project(df, new_cols), on=list(jk))
        return self.engine.project(cur, attrs)
