"""Engine metrics and the queueing latency model.

The paper reports wall-clock end-to-end latencies measured on a Storm
cluster (Fig. 7d, Fig. 8). Our substrate executes on a single Spark
session, so latency is *modeled* from the measured probe load of the
very same plans (documented substitution, DESIGN.md §2):

* per-epoch utilisation ``ρ = probe_messages / (capacity · Δ)``,
* a backlog that accumulates work beyond capacity
  (``backlog' = max(0, backlog + work − capacity·Δ)``),
* ``latency = base + avg_hops · per_hop + backlog'/capacity`` (ms),
* a bounded buffer: exceeding it is the paper's "workers failed due to
  memory overflow" of the static plan in Fig. 8a.

Hops are result-weighted probe-path depths measured by the executor, so
CMQO's locally suboptimal (longer) probe orders raise the latency term
exactly as in Fig. 7d while lowering total work.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Sequence


@dataclass
class BatchMetrics:
    """Measured quantities of one processed micro-batch (epoch)."""

    t: float
    input_tuples: int = 0
    probe_messages: float = 0.0
    messages_per_step: dict[str, float] = field(default_factory=dict)
    results_per_query: dict[str, int] = field(default_factory=dict)
    state_size: int = 0
    hops_weighted: float = 0.0  # Σ result_count · path_depth
    hops_results: int = 0  # Σ result_count

    @property
    def avg_hops(self) -> float:
        if self.hops_results == 0:
            return 0.0
        return self.hops_weighted / self.hops_results

    def add_step(self, label: str, messages: float) -> None:
        self.probe_messages += messages
        self.messages_per_step[label] = (
            self.messages_per_step.get(label, 0.0) + messages
        )


@dataclass
class LatencyPoint:
    t: float
    latency_ms: float | None  # None once crashed
    backlog: float
    utilisation: float
    crashed: bool


@dataclass
class LatencyModel:
    """Queueing model mapping measured probe load to latency (ms)."""

    capacity: float  # probe messages the cluster absorbs per time unit
    base_ms: float = 5.0
    per_hop_ms: float = 10.0
    buffer_limit: float = float("inf")  # backlog tuples before crash

    def latencies(
        self, batches: Sequence[BatchMetrics], epoch: float
    ) -> list[LatencyPoint]:
        backlog = 0.0
        crashed = False
        out: list[LatencyPoint] = []
        for bm in batches:
            work = bm.probe_messages
            cap = self.capacity * epoch
            rho = work / cap if cap > 0 else float("inf")
            backlog = max(0.0, backlog + work - cap)
            if backlog > self.buffer_limit:
                crashed = True
            lat = (
                None
                if crashed
                else self.base_ms
                + bm.avg_hops * self.per_hop_ms
                + backlog / self.capacity * 1000.0
            )
            out.append(LatencyPoint(bm.t, lat, backlog, rho, crashed))
        return out


def mean_latency_ms(points: Sequence[LatencyPoint]) -> float | None:
    vals = [p.latency_ms for p in points if p.latency_ms is not None]
    return sum(vals) / len(vals) if vals else None


def peak_state(batches: Sequence[BatchMetrics]) -> int:
    return max((bm.state_size for bm in batches), default=0)


def total_messages(batches: Sequence[BatchMetrics]) -> float:
    return sum(bm.probe_messages for bm in batches)
