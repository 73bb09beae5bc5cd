"""End-to-end optimizer with the three strategies of the evaluation.

* ``optimize_independent`` — every query optimized and *executed* in
  isolation (the paper's FI/SI baselines): one plan per query, duplicate
  steps and stores billed per query.
* ``optimize_shared`` — every query optimized individually, common
  subplans executed once (FS/SS): the per-query-optimal plans are merged
  and identical steps/stores deduplicate.
* ``optimize_mqo`` — the paper's contribution (CMQO): one global ILP
  whose shared step variables make locally suboptimal probe orders win
  when they enable sharing (§V-2).
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import Mapping, Sequence

from ..ilp.solver import Solution, solve
from .cost import Statistics
from .ilp_build import IlpArtifacts, build_ilp
from .plan import Plan, decode_plan
from .query import Query


@dataclass
class OptimizeResult:
    """A plan plus solver/problem-size diagnostics (Fig. 9 metrics)."""

    plan: Plan
    objective: float
    num_variables: int
    num_constraints: int
    probe_orders: int
    solver_nodes: int
    runtime: float
    status: str

    @property
    def cost(self) -> float:
        return self.plan.cost()


def warm_start_assignment(art: IlpArtifacts, plan: Plan) -> dict[str, int] | None:
    """Translate a feasible plan (e.g. the naively shared FS/SS plan)
    into an assignment of the global ILP's variables, used to seed the
    solver's incumbent. Returns None if a probe order of the plan is not
    among the artifacts' candidates."""
    assign: dict[str, int] = {}
    chosen_x: list[str] = []
    for key, group in art.choice_groups.items():
        target = plan.chosen.get(key)
        if target is None:
            return None
        match = [v for v in group if art.x_vars[v] == target]
        if not match:
            return None
        assign[match[0]] = 1
        chosen_x.append(match[0])
    for key, group in art.maintenance_groups.items():
        target = plan.maintenance.get(key)
        if target is None:
            continue
        match = [v for v in group if art.x_vars[v] == target]
        if match:
            assign[match[0]] = 1
            chosen_x.append(match[0])
    for xv in chosen_x:
        for yv in art.implications.get(xv, []):
            assign[yv] = 1
    return assign


def _solve_artifacts(
    art: IlpArtifacts,
    *,
    time_limit: float | None,
    warm_start: dict[str, int] | None = None,
) -> tuple[Plan, Solution]:
    sol = solve(
        art.model,
        time_limit=time_limit,
        implications=art.implications,
        order_bias=art.order_bias,
        warm_start=warm_start,
        equiv_tags=art.equiv_tags,
    )
    if sol.status in ("infeasible", "unknown"):
        raise RuntimeError(f"ILP solve failed: {sol.status}")
    return decode_plan(art, sol), sol


def optimize_mqo(
    queries: Sequence[Query],
    stats: Statistics,
    *,
    use_mirs: bool = True,
    mir_max_size: int | None = None,
    partition_consistency: bool = False,
    windows: Mapping[str, float] | None = None,
    time_limit: float | None = None,
    warm_start_plan: Plan | None = None,
) -> OptimizeResult:
    """Global multi-query optimization (CLASH-MQO).

    ``warm_start_plan`` (typically the naively shared plan) seeds the
    branch-and-bound incumbent, making a timed-out solve never worse
    than naive sharing."""
    t0 = time.perf_counter()
    art = build_ilp(
        queries,
        stats,
        use_mirs=use_mirs,
        mir_max_size=mir_max_size,
        partition_consistency=partition_consistency,
        windows=windows,
    )
    ws = warm_start_assignment(art, warm_start_plan) if warm_start_plan else None
    plan, sol = _solve_artifacts(art, time_limit=time_limit, warm_start=ws)
    return OptimizeResult(
        plan=plan,
        objective=sol.objective,
        num_variables=art.num_variables,
        num_constraints=art.num_constraints,
        probe_orders=art.probe_order_count,
        solver_nodes=sol.nodes,
        runtime=time.perf_counter() - t0,
        status=sol.status,
    )


def optimize_single(
    query: Query,
    stats: Statistics,
    **kwargs,
) -> OptimizeResult:
    """Optimize one query in isolation (still multi-query *within* the
    query: its per-start probe orders share steps, §IV-A)."""
    return optimize_mqo([query], stats, **kwargs)


def optimize_independent(
    queries: Sequence[Query],
    stats: Statistics,
    **kwargs,
) -> list[OptimizeResult]:
    """FI/SI: one isolated plan per query, no sharing anywhere."""
    out = []
    for q in queries:
        res = optimize_single(q, stats, **kwargs)
        res.plan.shared = False
        out.append(res)
    return out


def merge_plans(plans: Sequence[Plan], stats: Statistics) -> Plan:
    """Merge per-query plans, deduplicating identical probe orders,
    steps and stores (the FS/SS 'naive sharing' strategy)."""
    queries: dict[str, Query] = {}
    chosen = {}
    maintenance = {}
    for p in plans:
        queries.update(p.queries)
        chosen.update(p.chosen)
        for key, po in p.maintenance.items():
            maintenance.setdefault(key, po)
    merged = Plan(queries, chosen, maintenance, stats, shared=True)
    merged.validate()
    return merged


def optimize_shared(
    queries: Sequence[Query],
    stats: Statistics,
    **kwargs,
) -> tuple[Plan, list[OptimizeResult]]:
    """FS/SS: per-query-optimal plans with common subplans shared."""
    singles = optimize_independent(queries, stats, **kwargs)
    for r in singles:
        r.plan.shared = True
    plan = merge_plans([r.plan for r in singles], stats)
    return plan, singles


def individual_cost(results: Sequence[OptimizeResult]) -> float:
    """Σ of per-query optimal probe costs, duplicates billed per query
    (the 'individual optimization' line of Fig. 9a/9c)."""
    total = 0.0
    for r in results:
        p = r.plan
        dup = Plan(p.queries, p.chosen, p.maintenance, p.stats, shared=False)
        total += dup.cost()
    return total
