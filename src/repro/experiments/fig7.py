"""Fig. 7 — multi-query performance on TPC-H-lite (§VII-A).

Strategies (DESIGN.md §2 maps them to the paper's five systems):

* ``independent`` (≈ FI/SI) — one topology per query, executed
  separately; duplicated stores and probe work,
* ``shared`` (≈ FS/SS) — per-query-optimal plans merged, common
  subplans executed once,
* ``mqo`` (CMQO) — the global ILP plan.

Metrics per strategy: wall-clock throughput (input tuples/s through the
Spark executor), total probe messages (the cost the ILP minimizes),
peak stored state (Fig. 7c), and modeled mean latency (Fig. 7d; see
``repro.engine.metrics.LatencyModel``).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Sequence

from pyspark.sql import SparkSession

from ..core.optimizer import (
    optimize_independent,
    optimize_mqo,
    optimize_shared,
)
from ..core.plan import build_topology
from ..engine.executor import Engine
from ..engine.metrics import LatencyModel, mean_latency_ms
from ..streams.microbatch import StreamSet
from ..workloads.tpch_queries import sample_statistics, tpch_tables


@dataclass
class Fig7Row:
    strategy: str
    n_queries: int
    throughput: float  # input tuples per wall-clock second
    wall_seconds: float
    probe_messages: float
    peak_state: int
    mean_latency_ms: float | None
    avg_hops: float
    plan_cost: float


def multi_query_experiment(
    spark: SparkSession,
    queries: Sequence,
    *,
    sf: float = 0.01,
    duration: float = 10.0,
    epoch: float = 2.0,
    seed: int = 0,
    parallelism: int = 4,
    time_limit: float = 20.0,
    capacity_factor: float = 2.0,
    strategies: Sequence[str] = ("independent", "shared", "mqo"),
    use_mirs: bool = False,
) -> list[Fig7Row]:
    """Run the Fig. 7 comparison for one workload. The latency model's
    capacity is set to ``capacity_factor ×`` the *shared* strategy's mean
    per-epoch message load, so relative utilisation mirrors the paper's
    fixed cluster capacity."""
    tables = tpch_tables(spark, sf=sf, seed=seed)
    stats = sample_statistics(tables, list(queries), duration=duration,
                              parallelism=parallelism)
    streams = StreamSet.of(tables, duration=duration, seed=seed)

    shared_plan, singles = optimize_shared(
        queries, stats, use_mirs=use_mirs, time_limit=time_limit / 2
    )
    plans: dict[str, object] = {}
    if "independent" in strategies:
        plans["independent"] = [r.plan for r in singles]
    if "shared" in strategies:
        plans["shared"] = shared_plan
    if "mqo" in strategies:
        plans["mqo"] = optimize_mqo(
            queries,
            stats,
            use_mirs=use_mirs,
            time_limit=time_limit,
            warm_start_plan=shared_plan,
        ).plan

    rows: list[Fig7Row] = []
    capacity = None
    for strategy in strategies:
        plan = plans[strategy]
        if strategy == "independent":
            runs = []
            for p in plan:
                q = next(iter(p.queries.values()))
                topo = build_topology(p)
                eng = Engine(spark, topo, parallelism=parallelism,
                             collect_results=False)
                sub = StreamSet(
                    {r: streams.relations[r] for r in q.relations}, streams.t_end
                )
                runs.append(eng.run(sub, epoch=epoch))
            wall = sum(r.wall_seconds for r in runs)
            # throughput denominator: the *stream's* tuples, each counted
            # once (the paper divides by the number of input tuples; a
            # tuple consumed by several independent topologies is still
            # one input tuple)
            used_rels = set()
            for p in plan:
                for q in p.queries.values():
                    used_rels |= q.relations
            inputs = sum(
                streams.relations[r].count() for r in sorted(used_rels)
            )
            messages = sum(r.total_messages for r in runs)
            peak = sum(r.peak_state for r in runs)
            batches = _merge_batches(runs)
            cost = sum(p.cost() for p in plan)
        else:
            topo = build_topology(plan)
            eng = Engine(spark, topo, parallelism=parallelism,
                         collect_results=False)
            run = eng.run(streams, epoch=epoch)
            wall, inputs = run.wall_seconds, run.input_tuples
            messages, peak = run.total_messages, run.peak_state
            batches = run.batches
            cost = plan.cost()
        if capacity is None:
            # calibrate capacity on the first strategy's load
            capacity = capacity_factor * max(
                1.0, messages / max(1, len(batches)) / epoch
            )
        model = LatencyModel(capacity=capacity, base_ms=5.0, per_hop_ms=10.0)
        lat = model.latencies(batches, epoch)
        hops_n = sum(b.hops_weighted for b in batches)
        hops_d = sum(b.hops_results for b in batches)
        rows.append(
            Fig7Row(
                strategy=strategy,
                n_queries=len(queries),
                throughput=inputs / wall if wall else 0.0,
                wall_seconds=wall,
                probe_messages=messages,
                peak_state=peak,
                mean_latency_ms=mean_latency_ms(lat),
                avg_hops=hops_n / hops_d if hops_d else 0.0,
                plan_cost=cost,
            )
        )
    return rows


def _merge_batches(runs):
    """Sum per-epoch metrics of independent runs (they execute the same
    stream timeline, so batch i of each run is the same epoch)."""
    from ..engine.metrics import BatchMetrics

    n = max(len(r.batches) for r in runs)
    merged = []
    for i in range(n):
        bm = BatchMetrics(t=i)
        for r in runs:
            if i < len(r.batches):
                src = r.batches[i]
                bm.input_tuples += src.input_tuples
                bm.probe_messages += src.probe_messages
                bm.state_size += src.state_size
                bm.hops_weighted += src.hops_weighted
                bm.hops_results += src.hops_results
        merged.append(bm)
    return merged


def render_table(rows: Sequence[Fig7Row]) -> str:
    out = [
        "| strategy | n_Q | throughput (tuples/s) | probe messages | peak state | mean latency | avg hops | plan cost |",
        "|---|---|---|---|---|---|---|---|",
    ]
    for r in rows:
        lat = "crashed" if r.mean_latency_ms is None else f"{r.mean_latency_ms:.1f} ms"
        out.append(
            f"| {r.strategy} | {r.n_queries} | {r.throughput:.0f} | {r.probe_messages:.0f} "
            f"| {r.peak_state} | {lat} | {r.avg_hops:.2f} | {r.plan_cost:.0f} |"
        )
    return "\n".join(out)
