"""Workload definitions: query trees + tables for the experiments.

- ``star_query``: TPC-H-lite lineitem ⋈ orders ⋈ customer (acyclic star,
  |q(D)| = |lineitem|), features scaled to comparable ranges.
- ``chain_query``: many-to-many R1 ⋈ R2 ⋈ R3 with Zipf keys and planted
  Gaussian cluster structure, |q(D)| ≫ N — the join-blowup regime.
- ``cycle4_query``: 4-cycle via GHD (fhw = 2), exercising Theorem 4.3.

All builders take an :class:`Engine` and return a ready :class:`RelQuery`;
tables are generated in pandas (deterministic in the seed) and lifted through
``engine.from_pandas`` so the same data flows through Spark and the local
cross-check engine.
"""
from __future__ import annotations

import pandas as pd

from repro import synth_data
from repro.joins.engine import Engine
from repro.joins.ghd import GHD, Bag, ghd_to_acyclic
from repro.joins.join_tree import JoinTree, Relation
from repro.joins.yannakakis import RelQuery


def star_tables(sf: float = 0.01, seed: int = 0) -> dict[str, pd.DataFrame]:
    """TPC-H-lite tables with scaled numeric feature columns added."""
    li = synth_data.lineitem_pdf(sf=sf, seed=seed)
    o = synth_data.orders_pdf(sf=sf, seed=seed + 1)
    c = synth_data.customer_pdf(sf=sf, seed=seed + 2)
    li = li.assign(
        l_quantity_s=li["l_quantity"] / 50.0,
        l_price_s=li["l_extendedprice"] / 100_000.0,
    )
    o = o.assign(o_price_s=o["o_totalprice"] / 500_000.0)
    c = c.assign(c_acctbal_s=(c["c_acctbal"] + 1000.0) / 11_000.0)
    return {"lineitem": li, "orders": o, "customer": c}


def star_tree() -> JoinTree:
    return JoinTree(
        [
            Relation(
                "lineitem",
                ("l_orderkey", "l_quantity_s", "l_price_s"),
                ("l_quantity_s", "l_price_s"),
            ),
            Relation("orders", ("l_orderkey", "o_custkey", "o_price_s"), ("o_price_s",)),
            Relation("customer", ("o_custkey", "c_acctbal_s"), ("c_acctbal_s",)),
        ],
        [
            ("lineitem", "orders", ["l_orderkey"]),
            ("orders", "customer", ["o_custkey"]),
        ],
        root="lineitem",
    )


def star_query(engine: Engine, sf: float = 0.01, seed: int = 0) -> RelQuery:
    tables = star_tables(sf=sf, seed=seed)
    # Join keys must share a name across relations for equi-joins on names.
    tables["orders"] = tables["orders"].rename(columns={"o_orderkey": "l_orderkey"})
    tables["customer"] = tables["customer"].rename(columns={"c_custkey": "o_custkey"})
    tree = star_tree()
    native = {
        n: engine.from_pandas(t[list(tree.relations[n].attrs)]) for n, t in tables.items()
    }
    return RelQuery(engine, tree, native)


def chain_tree() -> JoinTree:
    return JoinTree(
        [
            Relation("R1", ("k1", "x1"), ("x1",)),
            Relation("R2", ("k1", "k2", "x2"), ("x2",)),
            Relation("R3", ("k2", "x3"), ("x3",)),
        ],
        [("R1", "R2", ["k1"]), ("R2", "R3", ["k2"])],
        root="R2",
    )


def chain_query(
    engine: Engine,
    *,
    n: int = 2000,
    n_keys: int = 200,
    k_true: int = 4,
    sigma: float = 0.05,
    zipf_alpha: float = 1.1,
    seed: int = 0,
) -> RelQuery:
    tables = synth_data.clustered_chain_pdfs(
        n=n, n_keys=n_keys, k_true=k_true, sigma=sigma, zipf_alpha=zipf_alpha, seed=seed
    )
    tree = chain_tree()
    native = {name: engine.from_pandas(t) for name, t in tables.items()}
    return RelQuery(engine, tree, native)


CYCLE4_SCHEMAS = {"R1": ("a", "b"), "R2": ("b", "c"), "R3": ("c", "d"), "R4": ("d", "a")}

CYCLE4_GHD = GHD(
    bags=(
        Bag("B1", ("R1", "R2"), ("a", "b", "c"), features=("a", "b", "c")),
        Bag("B2", ("R3", "R4"), ("c", "d", "a"), features=("d",)),
    ),
    edges=((("B1"), ("B2"), ("a", "c")),),
    root="B1",
)


def cycle4_query(engine: Engine, *, n: int = 300, n_keys: int = 12, seed: int = 0) -> RelQuery:
    """The 4-cycle query as an acyclic RelQuery via its GHD (Theorem 4.3)."""
    tables = synth_data.cycle4_pdfs(n=n, n_keys=n_keys, seed=seed)
    native = {name: engine.from_pandas(t) for name, t in tables.items()}
    return ghd_to_acyclic(engine, CYCLE4_GHD, native, CYCLE4_SCHEMAS)
