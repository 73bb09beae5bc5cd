"""Probe-cost model — Equation 1 of the paper.

For a probe order ``σ = ⟨S₁, S₂, …⟩`` the cost of step *j* (routing the
partial join of the first *j* covered relations to the (j+1)-th store)
is::

    StepCost(ρ_j) = card(first j relations) · (1/j) · χ(target store)

which reproduces the paper's worked numbers (§V-2): with rates 100 and
|S⋈T| = 150, step ⟨S,T⟩ costs 100 (= |S|·1/1), step ⟨S,T⟩→R costs 75
(= 150·1/2), step ⟨S,R⟩→T costs 50 (= 100·1/2). The ``1/j`` factor is
the fraction of partial results in which the probe order's start tuple
is the *latest* arrival among the j relations.

χ is 1 when the routed tuple carries the target's partitioning
attribute (directly or via predicate transitivity) and the store
parallelism otherwise (broadcast, Fig. 2 ⑦).

Cardinalities come from a :class:`Statistics` object: per-relation
arrival rates, per-predicate selectivities and per-relation windows,
with optional exact overrides per relation set (used when statistics
are *measured* per epoch rather than modeled).
"""
from __future__ import annotations

from dataclasses import dataclass, field
import math
from typing import Iterable, Mapping

from .probe_orders import ProbeOrder, Step, chi
from .query import Predicate, Query


@dataclass
class Statistics:
    """Data characteristics feeding the cost model.

    ``rates``: tuples per time unit per relation. ``selectivities``: per
    canonical predicate; missing predicates use ``default_selectivity``.
    ``windows``: per relation, default ``default_window``. Join output
    rate for a relation set A (|A| = m ≥ 2) is modeled as::

        card(A) = Π rate_r · Π sel_p · W̄^(m-1)

    with W̄ the smallest window among A — i.e. each extra relation
    contributes its windowed state (rate·W) scaled by the predicate
    selectivities. ``card_overrides`` short-circuits the model with
    measured values (keyed by frozenset of relations).
    """

    rates: dict[str, float]
    selectivities: dict[Predicate, float] = field(default_factory=dict)
    windows: dict[str, float] = field(default_factory=dict)
    default_selectivity: float = 1.0
    default_window: float = 1.0
    parallelism: int = 4
    card_overrides: dict[frozenset, float] = field(default_factory=dict)

    def rate(self, rel: str) -> float:
        return self.rates[rel]

    def selectivity(self, p: Predicate) -> float:
        return self.selectivities.get(p, self.default_selectivity)

    def window(self, rel: str) -> float:
        return self.windows.get(rel, self.default_window)

    def card(self, rels: Iterable[str], preds: Iterable[Predicate]) -> float:
        """Per-time-unit output rate of the join over ``rels``."""
        rels = frozenset(rels)
        if rels in self.card_overrides:
            return self.card_overrides[rels]
        if len(rels) == 1:
            return self.rate(next(iter(rels)))
        card = 1.0
        for r in rels:
            card *= self.rate(r)
        for p in preds:
            if p.relations <= rels:
                card *= self.selectivity(p)
        w = min(self.window(r) for r in rels)
        card *= w ** (len(rels) - 1)
        return card


def step_cost(step: Step, stats: Statistics) -> float:
    """StepCost(ρ) — see module docstring."""
    covered = step.covered_before
    j = len(covered)
    routed = stats.card(covered, step.preds)
    return routed * (1.0 / j) * chi(step, stats.parallelism)


def probe_order_cost(order: ProbeOrder, query: Query, stats: Statistics) -> float:
    """PCost(σ) = Σ_j StepCost(ρ_j) (Eq. 1, single probe order)."""
    return sum(step_cost(s, stats) for s in order.steps(query))


def query_probe_cost(
    orders_by_start: Mapping[str, ProbeOrder], query: Query, stats: Statistics
) -> float:
    """PCost(Q): sum over the probe orders of all starting relations."""
    return sum(
        probe_order_cost(o, query, stats) for o in orders_by_start.values()
    )


def plan_cost(steps: Iterable[Step], stats: Statistics) -> float:
    """Cost of a set of (already deduplicated) steps — the ILP objective
    value Σ StepCost(ρ_i)·y_i for the chosen steps."""
    return sum(step_cost(s, stats) for s in set(steps))
