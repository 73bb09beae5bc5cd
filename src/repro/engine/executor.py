"""Micro-batch executor for CLASH topologies (Algorithm 3 semantics).

Execution per micro-batch (all tuples arriving in one epoch slice):

1. **Store** — new tuples are appended to every materialized store of
   their relation (columns prefixed ``rel__``; arrival time ``rel__tau``).
   Because every probe applies a *strictly-earlier* timestamp predicate,
   appending before probing is correct even within a batch.
2. **Maintain** — MIR stores receive their deltas through the plan's
   maintenance probe orders (ship nodes), in ascending MIR size, so any
   probe against an MIR store sees same-batch state.
3. **Probe** — probe trees are traversed from each arriving relation;
   every node joins the routed intermediate with the probed store under
   the step's predicates, the strictly-earlier condition and the
   per-relation window conditions. Nodes with ``emits`` deliver final
   join results for those queries.

Each node's routed-message count (``|intermediate| · χ``) is recorded —
this is *exactly* the probe cost the ILP minimizes, so model vs measured
cost can be compared (tests do).

A result tuple (s₁,…,s_m) is produced exactly once: by the probe tree of
the relation whose tuple arrived last (timestamps are globally unique).
Windows are per relation: the result is valid iff for every member k,
``τ_latest − τ_k ≤ W_k`` — which each probe enforces against the stored
side, and which also bounds MIR store contents (any pair inside a valid
result is itself within window).
"""
from __future__ import annotations

import math
import time
from dataclasses import dataclass, field
from typing import Iterable, Mapping

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..core.plan import Topology, TreeNode
from ..core.probe_orders import StoreRef, chi
from ..core.query import Attr
from ..streams.microbatch import TAU, StreamSet
from .metrics import BatchMetrics


def _prefix(df: DataFrame, rel: str) -> DataFrame:
    cols = []
    for c in df.columns:
        if c == TAU:
            cols.append(F.col(c).alias(f"{rel}__tau"))
        else:
            cols.append(F.col(c).alias(f"{rel}__{c}"))
    return df.select(*cols)


def _col(a: Attr) -> str:
    return f"{a.rel}__{a.name}"


@dataclass
class EngineRun:
    """Outcome of streaming a StreamSet through a topology."""

    batches: list[BatchMetrics]
    results: dict[str, pd.DataFrame]
    wall_seconds: float
    input_tuples: int

    @property
    def throughput(self) -> float:
        """Input tuples processed per wall-clock second."""
        return self.input_tuples / self.wall_seconds if self.wall_seconds else 0.0

    @property
    def total_messages(self) -> float:
        return sum(b.probe_messages for b in self.batches)

    @property
    def peak_state(self) -> int:
        return max((b.state_size for b in self.batches), default=0)


class Engine:
    """Executes one topology over micro-batches on a SparkSession."""

    def __init__(
        self,
        spark: SparkSession,
        topology: Topology,
        *,
        parallelism: int = 4,
        collect_results: bool = True,
        track_state: bool = True,
    ):
        self.spark = spark
        self.topology = topology
        self.parallelism = parallelism
        self.collect_results = collect_results
        self.track_state = track_state
        self.windows: dict[str, float] = dict(topology.windows)
        self.states: dict[StoreRef, DataFrame | None] = {
            ref: None for ref in topology.stores
        }
        self.results: dict[str, list[pd.DataFrame]] = {
            q: [] for q in topology.plan.queries
        }
        # parent pointers + ship indexing for dependency-ordered updates
        self._parents: dict[int, TreeNode | None] = {}
        self._start_of: dict[int, str] = {}
        self._ships: dict[StoreRef, list[TreeNode]] = {}
        for start, roots in topology.trees.items():
            for root in roots:
                self._index(root, None, start)

    def _index(self, node: TreeNode, parent: TreeNode | None, start: str) -> None:
        self._parents[id(node)] = parent
        self._start_of[id(node)] = start
        if node.is_ship:
            self._ships.setdefault(node.store, []).append(node)
        for c in node.children:
            self._index(c, node, start)

    # ---- store helpers -------------------------------------------------
    def _append(self, ref: StoreRef, delta: DataFrame) -> None:
        cur = self.states.get(ref)
        if cur is None:
            self.states[ref] = delta.localCheckpoint(eager=True)
        else:
            self.states[ref] = cur.unionByName(delta).localCheckpoint(eager=True)

    def _expire(self, t_now: float) -> None:
        """Drop tuples that can no longer join (outside every window)."""
        for ref, state in list(self.states.items()):
            if state is None:
                continue
            conds = []
            for rel in ref.rels:
                w = self.windows.get(rel, math.inf)
                if math.isfinite(w):
                    conds.append(F.col(f"{rel}__tau") >= F.lit(t_now - w))
            if conds:
                keep = conds[0]
                for c in conds[1:]:
                    keep = keep & c
                self.states[ref] = state.filter(keep).localCheckpoint(eager=True)

    def _join_cond(self, node: TreeNode):
        step = node.step
        conds = []
        drive_tau = F.col(f"{self._start_of[id(node)]}__tau")
        for p in sorted(step.preds):
            if p.left.rel in step.covered_before and p.right.rel in step.target.rels:
                conds.append(F.col(_col(p.left)) == F.col(_col(p.right)))
            elif p.right.rel in step.covered_before and p.left.rel in step.target.rels:
                conds.append(F.col(_col(p.right)) == F.col(_col(p.left)))
        for rel in sorted(step.target.rels):
            conds.append(drive_tau > F.col(f"{rel}__tau"))
            w = self.windows.get(rel, math.inf)
            if math.isfinite(w):
                conds.append(drive_tau - F.col(f"{rel}__tau") <= F.lit(w))
        cond = conds[0]
        for c in conds[1:]:
            cond = cond & c
        return cond

    # ---- batch processing ----------------------------------------------
    def process_batch(
        self, batches: Mapping[str, DataFrame], t: float
    ) -> BatchMetrics:
        bm = BatchMetrics(t)
        self._expire(t)
        prefixed: dict[str, DataFrame] = {}
        counts: dict[str, int] = {}
        for rel, df in batches.items():
            p = _prefix(df, rel).localCheckpoint(eager=True)
            n = p.count()
            if n:
                prefixed[rel] = p
                counts[rel] = n
                bm.input_tuples += n
        # 1. store input tuples
        for rel, p in prefixed.items():
            for ref in self.topology.base_stores_of(rel):
                self._append(ref, p)

        value_cache: dict[int, tuple[DataFrame | None, int]] = {}
        mirs_done: set[StoreRef] = set()

        def node_value(node: TreeNode) -> tuple[DataFrame | None, int]:
            if id(node) in value_cache:
                return value_cache[id(node)]
            if not node.is_ship and not node.store.is_base:
                ensure_mir(node.store)
            parent = self._parents[id(node)]
            if parent is None:
                start = self._start_of[id(node)]
                pdf, pcnt = prefixed.get(start), counts.get(start, 0)
            else:
                pdf, pcnt = node_value(parent)
            x = chi(node.step, self.parallelism)
            bm.add_step(node.step.label, pcnt * x)
            if node.is_ship:
                val, cnt = pdf, pcnt
            elif pcnt == 0 or self.states.get(node.store) is None:
                val, cnt = None, 0
            else:
                joined = pdf.join(self.states[node.store], on=self._join_cond(node))
                cnt = joined.count()
                val = joined if cnt else None
            value_cache[id(node)] = (val, cnt)
            return val, cnt

        def ensure_mir(ref: StoreRef) -> None:
            if ref in mirs_done:
                return
            mirs_done.add(ref)
            for ship in self._ships.get(ref, []):
                val, cnt = node_value(ship)
                if cnt:
                    self._append(ref, val)

        # 2. maintain every MIR store (ascending size via recursion)
        for ref in sorted(self._ships, key=lambda r: len(r.rels)):
            ensure_mir(ref)
        # 3. probe everything, collect emits
        for roots in self.topology.trees.values():
            for root in roots:
                for node in root.walk():
                    val, cnt = node_value(node)
                    if node.emits:
                        bm.hops_weighted += cnt * len(node.step.targets)
                        bm.hops_results += cnt
                        for q in node.emits:
                            bm.results_per_query[q] = (
                                bm.results_per_query.get(q, 0) + cnt
                            )
                            if cnt and self.collect_results:
                                self.results[q].append(val.toPandas())
        if self.track_state:
            bm.state_size = sum(
                s.count() for s in self.states.values() if s is not None
            )
        return bm

    def run(self, streams: StreamSet, *, epoch: float) -> EngineRun:
        t0 = time.perf_counter()
        out: list[BatchMetrics] = []
        for t, batch in streams.slices(epoch):
            out.append(self.process_batch(batch, t))
        wall = time.perf_counter() - t0
        return EngineRun(
            batches=out,
            results=self.collected_results(),
            wall_seconds=wall,
            input_tuples=sum(b.input_tuples for b in out),
        )

    def collected_results(self) -> dict[str, pd.DataFrame]:
        out = {}
        for q, parts in self.results.items():
            out[q] = (
                pd.concat(parts, ignore_index=True) if parts else pd.DataFrame()
            )
        return out
