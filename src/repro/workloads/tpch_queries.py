"""TPC-H-lite workload for the multi-query experiments (Fig. 7).

The paper builds join queries over TPC-H "based on present primary,
foreign keys and, additionally, type compatible data", yielding a mix of
PK/FK joins, high-selectivity joins (``l_linestatus = o_orderstatus``)
and low-selectivity joins (``c_custkey = n_nationkey``, where only the
lowest customer keys match). We reproduce the same join-graph structure
over the TPC-H-lite schema (lineitem, orders, customer, part, supplier,
nation) and draw random connected queries from it — "selecting a random
relation and then randomly adding joins until the desired query size is
reached".
"""
from __future__ import annotations

from typing import Mapping

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from .. import synth_data
from ..core.query import Predicate, Query, pred
from ..streams.microbatch import StreamSet

# --- the TPC-H-lite join graph ---------------------------------------------

#: PK/FK joins of the schema
PK_FK_PREDS = [
    pred("lineitem", "l_orderkey", "orders", "o_orderkey"),
    pred("orders", "o_custkey", "customer", "c_custkey"),
    pred("lineitem", "l_partkey", "part", "p_partkey"),
    pred("customer", "c_nationkey", "nation", "n_nationkey"),
    pred("supplier", "s_nationkey", "nation", "n_nationkey"),
]

#: type-compatible joins (the paper's high/low-selectivity mixture)
TYPE_COMPATIBLE_PREDS = [
    pred("lineitem", "l_linestatus", "orders", "o_orderstatus"),  # domain {F,O,P}
    pred("customer", "c_custkey", "nation", "n_nationkey"),  # lowest keys only
    pred("lineitem", "l_quantity", "part", "p_size"),  # ints 1..50
    pred("supplier", "s_suppkey", "customer", "c_custkey"),
]

ALL_PREDS = PK_FK_PREDS + TYPE_COMPATIBLE_PREDS

#: predicates with bounded fanout — the *executed* workloads draw from
#: this pool so result sizes stay tractable at laptop scale (the paper
#: runs on a 96-worker cluster; its huge-fanout joins such as
#: ``l_linestatus = o_orderstatus`` would produce ~|L|·|O|/3 results,
#: which no single-node reproduction can materialize; they remain in the
#: join graph for cost-model and optimizer tests)
BOUNDED_PREDS = PK_FK_PREDS + [
    pred("customer", "c_custkey", "nation", "n_nationkey"),
    pred("supplier", "s_suppkey", "customer", "c_custkey"),
]

RELATIONS = sorted({r for p in ALL_PREDS for r in p.relations})


def tpch_tables(
    spark: SparkSession, *, sf: float = 0.01, seed: int = 0
) -> dict[str, DataFrame]:
    """All six TPC-H-lite tables at the given scale factor."""
    return {
        "lineitem": synth_data.lineitem(spark, sf=sf, seed=seed),
        "orders": synth_data.orders(spark, sf=sf, seed=seed + 1),
        "customer": synth_data.customer(spark, sf=sf, seed=seed + 2),
        "part": synth_data.part(spark, sf=sf, seed=seed + 5),
        "supplier": synth_data.supplier(spark, sf=sf, seed=seed + 6),
        "nation": synth_data.nation(spark, seed=seed + 7),
    }


def tpch_columns(tables: Mapping[str, DataFrame]) -> dict[str, list[str]]:
    """Data columns per relation (for the oracle SQL builder)."""
    return {rel: [c for c in df.columns if c != "__tau"] for rel, df in tables.items()}


def tpch_streams(
    spark: SparkSession,
    *,
    sf: float = 0.01,
    duration: float = 10.0,
    seed: int = 0,
) -> StreamSet:
    """Stream-ified TPC-H-lite: every table gets uniform arrival
    timestamps over ``[0, duration)`` (the paper feeds TPC-H through
    Kafka; order within the stream is arbitrary)."""
    return StreamSet.of(tpch_tables(spark, sf=sf, seed=seed), duration=duration, seed=seed)


def _connected_queries(
    n_queries: int, sizes: tuple[int, ...], seed: int, pool=None
) -> list[Query]:
    rng = np.random.default_rng(seed)
    pool = list(pool) if pool is not None else list(ALL_PREDS)
    by_rel: dict[str, list[Predicate]] = {r: [] for r in RELATIONS}
    for p in pool:
        for r in p.relations:
            by_rel[r].append(p)
    out: list[Query] = []
    seen: set[tuple] = set()
    guard = 0
    while len(out) < n_queries and guard < 10_000:
        guard += 1
        size = int(sizes[int(rng.integers(len(sizes)))])
        start = RELATIONS[int(rng.integers(len(RELATIONS)))]
        members = {start}
        preds: list[Predicate] = []
        stuck = 0
        while len(members) < size and stuck < 50:
            stuck += 1
            anchor = sorted(members)[int(rng.integers(len(members)))]
            cands = [p for p in by_rel[anchor] if p.other(anchor).rel not in members]
            if not cands:
                continue
            p = cands[int(rng.integers(len(cands)))]
            preds.append(p)
            members.add(p.other(anchor).rel)
        if len(members) != size:
            continue
        sig = (frozenset(members), frozenset(preds))
        if sig in seen:
            continue
        seen.add(sig)
        out.append(Query.of(f"q{len(out) + 1}", preds))
    return out


def fig7_workload_5(seed: int = 9) -> list[Query]:
    """Five random 2–3-way queries (the Fig. 7a-style workload), drawn
    from the bounded-fanout predicate pool (see BOUNDED_PREDS). The
    default seed picks a workload with substantial relation/predicate
    overlap across queries — the regime Fig. 7 studies."""
    return _connected_queries(5, (2, 3, 3), seed, pool=BOUNDED_PREDS)


def fig7_workload_10(seed: int = 67) -> list[Query]:
    """Ten queries with more, partly overlapping joins (2–4-way)."""
    return _connected_queries(10, (2, 3, 3, 4), seed, pool=BOUNDED_PREDS)


def sample_statistics(
    tables: Mapping[str, DataFrame],
    queries: list[Query],
    *,
    duration: float,
    sample_rows: int = 20_000,
    parallelism: int = 4,
) -> "repro.core.cost.Statistics":  # noqa: F821
    """Measured statistics from (a sample of) the input tables — rates
    from table sizes over the stream duration, selectivities from exact
    sampled join counts (repro.stats.estimator)."""
    from ..stats.estimator import estimate_statistics

    samples = {}
    sizes = {}
    for rel, df in tables.items():
        sizes[rel] = df.count()
        frac = min(1.0, sample_rows / max(1, sizes[rel]))
        samples[rel] = (
            df.sample(fraction=frac, seed=1).toPandas() if frac < 1.0 else df.toPandas()
        )
    stats = estimate_statistics(samples, queries, epoch=duration, parallelism=parallelism)
    # rates from full table sizes (sampling only affects selectivities)
    stats.rates = {rel: sizes[rel] / duration for rel in tables}
    # full-history mode: windows default to the stream duration
    stats.default_window = duration
    return stats
