"""Fig. 8 — impact of adaptation to individual queries (§VII-B).

Scenario (a): linear query R(a),S(a,b),T(b,c),U(c); equal rates; the
optimizer is initialized with a higher S-T selectivity so ⟨S,R,T,U⟩ /
⟨T,U,R,S⟩ are chosen. After the shift, S-tuples find many partners in R
and none in T (vice versa for T with U): the static plan's probe load
explodes and its buffer overflows ("workers failed due to memory
overflow"), while the adaptive plan rewires within ~a window and
recovers.

Scenario (b): R streams orders of magnitude faster than S, T, U; after
the shift |S⋈T⋈U| collapses, the adaptive optimizer materializes an
STU store, and R-tuples complete in one hop — average latency drops.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Sequence

from pyspark.sql import SparkSession

from ..engine.adaptive import AdaptiveRun, run_adaptive
from ..engine.metrics import LatencyModel
from ..workloads.synthetic import (
    fig8a_initial_stats,
    fig8a_source,
    fig8b_initial_stats,
    fig8b_source,
    rstu_query,
)


@dataclass
class Fig8Result:
    label: str
    run: AdaptiveRun

    def timeline(self) -> list[tuple[float, float | None]]:
        return [(p.t, p.latency_ms) for p in self.run.latencies]


def scenario_a(
    spark: SparkSession,
    *,
    rows_per_epoch: int = 60,
    n_epochs: int = 12,
    shift_epoch: int = 4,
    window: float = 3.0,
    fanout_after: int = 10,
    capacity: float | None = None,
    buffer_limit: float | None = None,
    parallelism: int = 4,
    seed: int = 0,
) -> tuple[Fig8Result, Fig8Result]:
    """Static vs adaptive under the selectivity spike (Fig. 8a).

    The latency model's capacity is calibrated *between* the post-shift
    steady loads of the adaptive and static plans (unless given) — the
    paper's fixed cluster sits exactly there: it absorbs the unavoidable
    R-side/U-side probe load of the spiked join, but not the extra load
    the static plan's stale probe orders add on top.
    """
    W = {r: window for r in "RSTU"}
    stats = fig8a_initial_stats(rows_per_epoch=rows_per_epoch, window=window)
    stats.windows = dict(W)
    # run both engines under an uncapped model first; latency/crash are
    # pure functions of the measured loads, recomputed afterwards
    huge = LatencyModel(capacity=1e12)
    common = dict(
        n_epochs=n_epochs,
        epoch=1.0,
        initial_stats=stats,
        latency_model=huge,
        windows=W,
        optimizer_kwargs={"use_mirs": False},
        parallelism=parallelism,
    )
    static = run_adaptive(
        spark, [rstu_query(windows=W)],
        fig8a_source(spark, rows_per_epoch=rows_per_epoch,
                     shift_epoch=shift_epoch, fanout_after=fanout_after,
                     seed=seed),
        adaptive=False, **common,
    )
    adaptive = run_adaptive(
        spark, [rstu_query(windows=W)],
        fig8a_source(spark, rows_per_epoch=rows_per_epoch,
                     shift_epoch=shift_epoch, fanout_after=fanout_after,
                     seed=seed),
        adaptive=True, **common,
    )
    if capacity is None:
        tail = max(1, n_epochs - shift_epoch - 3)
        s_steady = sum(b.probe_messages for b in static.batches[-tail:]) / tail
        a_steady = sum(b.probe_messages for b in adaptive.batches[-tail:]) / tail
        capacity = max(1.0, (s_steady * a_steady) ** 0.5)
    if buffer_limit is None:
        # a worker buffers ~a second of its capacity; the static plan's
        # unbounded backlog overruns it a few epochs after the shift
        buffer_limit = 1.2 * capacity
    model = LatencyModel(
        capacity=capacity, base_ms=5.0, per_hop_ms=10.0, buffer_limit=buffer_limit
    )
    for run in (static, adaptive):
        run.latencies = model.latencies(run.batches, 1.0)
        run.crashed = any(p.crashed for p in run.latencies)
    return Fig8Result("static", static), Fig8Result("adaptive", adaptive)


def scenario_b(
    spark: SparkSession,
    *,
    r_rows_per_epoch: int = 400,
    slow_rows_per_epoch: int = 15,
    n_epochs: int = 12,
    shift_epoch: int = 4,
    window: float = 3.0,
    fanout_before: int = 20,
    parallelism: int = 4,
    seed: int = 0,
) -> Fig8Result:
    """Adaptive MIR-store introduction under a collapsing intermediate
    (Fig. 8b). Returns the adaptive run; its latency timeline should
    drop once the STU store is installed (~shift + 2 epochs)."""
    W = {r: window for r in "RSTU"}
    stats = fig8b_initial_stats(
        r_rows_per_epoch=r_rows_per_epoch,
        slow_rows_per_epoch=slow_rows_per_epoch,
        window=window,
        fanout_before=fanout_before,
    )
    stats.windows = dict(W)
    model = LatencyModel(
        capacity=r_rows_per_epoch * 20.0, base_ms=5.0, per_hop_ms=10.0
    )
    run = run_adaptive(
        spark, [rstu_query(windows=W)],
        fig8b_source(spark, r_rows_per_epoch=r_rows_per_epoch,
                     slow_rows_per_epoch=slow_rows_per_epoch,
                     shift_epoch=shift_epoch, fanout_before=fanout_before,
                     seed=seed),
        n_epochs=n_epochs,
        epoch=1.0,
        initial_stats=stats,
        latency_model=model,
        adaptive=True,
        windows=W,
        optimizer_kwargs={"use_mirs": True, "mir_max_size": 3},
        parallelism=parallelism,
    )
    return Fig8Result("adaptive+MIR", run)


def render_timeline(results: Sequence[Fig8Result]) -> str:
    out = ["| epoch | " + " | ".join(r.label for r in results) + " |"]
    out.append("|" + "---|" * (len(results) + 1))
    n = max(len(r.run.latencies) for r in results)
    for i in range(n):
        cells = []
        for r in results:
            if i < len(r.run.latencies):
                p = r.run.latencies[i]
                cells.append("CRASH" if p.latency_ms is None else f"{p.latency_ms:.1f}")
            else:
                cells.append("")
        out.append(f"| {i} | " + " | ".join(cells) + " |")
    return "\n".join(out)
