"""Adaptive join processing (Section VI).

Reproduces the paper's epoch-based reconfiguration loop (Fig. 5):
statistics sampled during epoch *i* are evaluated at the start of epoch
*i+1*; if the ILP optimum changes, the new configuration becomes active
at epoch *i+2*. The engine is rewired in place: stores shared between
the old and new topology keep their state; newly introduced MIR stores
are **backfilled** from the current base-store states.

Backfilling substitutes the paper's per-epoch store containers
(Algorithm 4): instead of keeping one container per epoch and routing
probes to every epoch that may hold partners, we materialize the new
MIR store's content for the whole live window at switch time. The
observable behaviour — no missing results and no downtime across a
switch — is preserved, which is what Fig. 8 measures.
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field
from typing import Callable, Mapping, Sequence

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..core.cost import Statistics
from ..core.optimizer import OptimizeResult, optimize_mqo
from ..core.plan import Topology, build_topology
from ..core.probe_orders import StoreRef
from ..core.query import Query
from ..stats.estimator import estimate_statistics
from .executor import Engine, _col
from .metrics import BatchMetrics, LatencyModel, LatencyPoint


def backfill_mir(engine: Engine, ref: StoreRef) -> DataFrame | None:
    """Compute a newly introduced MIR store's content from the current
    base-store states (join under the MIR predicates + window validity:
    for every member k, greatest(τ) − τ_k ≤ W_k)."""
    rels = sorted(ref.rels)
    parts = []
    for rel in rels:
        bases = engine.topology.base_stores_of(rel)
        state = None
        for b in bases:
            if engine.states.get(b) is not None:
                state = engine.states[b]
                break
        if state is None:
            return None
        parts.append(state)
    joined = parts[0]
    for df in parts[1:]:
        joined = joined.crossJoin(df)
    cond = None
    for p in sorted(ref.preds):
        c = F.col(_col(p.left)) == F.col(_col(p.right))
        cond = c if cond is None else cond & c
    if cond is not None:
        joined = joined.filter(cond)
    taus = [F.col(f"{r}__tau") for r in rels]
    greatest = F.greatest(*taus) if len(taus) > 1 else taus[0]
    for rel in rels:
        w = engine.windows.get(rel, math.inf)
        if math.isfinite(w):
            joined = joined.filter(greatest - F.col(f"{rel}__tau") <= F.lit(w))
    return joined


def reconfigure(engine: Engine, topology: Topology) -> None:
    """Rewire the engine to a new topology, carrying over shared store
    state and backfilling newly introduced MIR stores."""
    old_states = engine.states
    engine.topology = topology
    engine.windows = dict(topology.windows)
    engine.states = {}
    for ref in topology.stores:
        if ref in old_states:
            engine.states[ref] = old_states[ref]
        else:
            # a differently-partitioned instance of existing content can
            # adopt state from any sibling instance
            sibling = next(
                (
                    s
                    for r, s in old_states.items()
                    if r.content_key == ref.content_key and s is not None
                ),
                None,
            )
            engine.states[ref] = sibling
    engine._parents = {}
    engine._start_of = {}
    engine._ships = {}
    for start, roots in topology.trees.items():
        for root in roots:
            engine._index(root, None, start)
    for ref in topology.mir_stores():
        if engine.states.get(ref) is None:
            delta = backfill_mir(engine, ref)
            if delta is not None:
                cnt = delta.count()
                if cnt:
                    engine.states[ref] = delta.localCheckpoint(eager=True)
    for q in topology.plan.queries:
        engine.results.setdefault(q, [])


@dataclass
class AdaptiveRun:
    """Per-epoch metrics of an adaptive (or static) execution."""

    batches: list[BatchMetrics]
    latencies: list[LatencyPoint]
    reconfigurations: list[tuple[int, float]]  # (epoch idx, new objective)
    crashed: bool
    initial_mir_stores: list[str] = field(default_factory=list)
    final_mir_stores: list[str] = field(default_factory=list)

    @property
    def crash_epoch(self) -> int | None:
        for i, p in enumerate(self.latencies):
            if p.crashed:
                return i
        return None


def run_adaptive(
    spark: SparkSession,
    queries: Sequence[Query],
    batch_source: Callable[[int], Mapping[str, DataFrame]],
    *,
    n_epochs: int,
    epoch: float,
    initial_stats: Statistics,
    latency_model: LatencyModel,
    adaptive: bool = True,
    windows: Mapping[str, float] | None = None,
    optimizer_kwargs: dict | None = None,
    parallelism: int = 4,
    hysteresis: float = 0.9,
) -> AdaptiveRun:
    """Run the epoch loop of Fig. 5.

    ``batch_source(i)`` yields epoch i's arriving tuples per relation
    (Spark DataFrames with a ``__tau`` column inside
    ``[i·epoch, (i+1)·epoch)``). With ``adaptive=False`` the initial plan
    stays installed for the whole run (the paper's static baseline).
    """
    kw = dict(optimizer_kwargs or {})
    kw.setdefault("windows", windows)
    kw.setdefault("time_limit", 5.0)  # reoptimization must fit an epoch
    res = optimize_mqo(queries, initial_stats, **kw)
    topo = build_topology(res.plan, windows=windows)
    engine = Engine(
        spark, topo, parallelism=parallelism, collect_results=False
    )
    current_objective = res.objective
    pending: dict[int, Topology] = {}
    reconfigs: list[tuple[int, float]] = []
    batches: list[BatchMetrics] = []
    samples: dict[int, dict[str, pd.DataFrame]] = {}
    for i in range(n_epochs):
        if adaptive and i in pending:
            reconfigure(engine, pending.pop(i))
        batch = dict(batch_source(i))
        bm = engine.process_batch(batch, i * epoch)
        batches.append(bm)
        # sample epoch data for statistics (Fig. 2 statistics computation)
        samples[i] = {rel: df.toPandas() for rel, df in batch.items()}
        if adaptive and i - 1 in samples:
            stats = estimate_statistics(
                samples.pop(i - 1),
                queries,
                epoch=epoch,
                parallelism=parallelism,
                windows=windows,
            )
            # keep base rates sane when an epoch had no arrivals
            for rel, r in initial_stats.rates.items():
                stats.rates.setdefault(rel, 0.0)
            new_res = optimize_mqo(queries, stats, **kw)
            # §VI-A: "If the optimization result differs from the previous
            # one, a new configuration is created." Structural difference
            # with hysteresis: the new plan must beat the *current* plan
            # re-costed under the fresh statistics by a margin, so rate
            # jitter and cost ties do not cause reconfiguration churn.
            cur_cost = _plan_cost_under(engine.topology.plan, stats)
            if _plan_differs(new_res, engine.topology) and (
                new_res.objective < hysteresis * cur_cost
            ):
                pending[i + 1] = build_topology(new_res.plan, windows=windows)
                reconfigs.append((i + 1, new_res.objective))
                current_objective = new_res.objective
    lat = latency_model.latencies(batches, epoch)
    return AdaptiveRun(
        batches=batches,
        latencies=lat,
        reconfigurations=reconfigs,
        crashed=any(p.crashed for p in lat),
        initial_mir_stores=[s.label for s in topo.mir_stores()],
        final_mir_stores=[s.label for s in engine.topology.mir_stores()],
    )


def _plan_differs(res: OptimizeResult, topo: Topology) -> bool:
    chosen = {k: po.label for k, po in res.plan.chosen.items()}
    current = {k: po.label for k, po in topo.plan.chosen.items()}
    return chosen != current


def _plan_cost_under(plan, stats: Statistics) -> float:
    """Re-cost the currently installed plan under fresh statistics."""
    from ..core.plan import Plan

    return Plan(
        plan.queries, plan.chosen, plan.maintenance, stats, shared=plan.shared
    ).cost()
