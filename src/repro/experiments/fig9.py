"""Fig. 9 — ILP optimization experiments (§VII-C).

Environment: n input relations, three attributes each, uniform arrival
rates, pairwise join selectivity rate⁻¹. Random connected queries of a
given size, exact duplicates eliminated. For every query count we
report the probe cost of individual optimization (per-query optima,
duplicates billed per query), of naive sharing, and of the global MQO
ILP, plus problem sizes (variables / probe orders) and solver runtime.

The paper solves with Gurobi; our from-scratch branch-and-bound is
exact but slower, so solves carry a time limit — a timed-out solve
returns the best incumbent (warm-started with the shared plan, hence
never worse than naive sharing) and is flagged in ``status``.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Sequence

from ..core.optimizer import (
    individual_cost,
    optimize_mqo,
    optimize_shared,
)
from ..workloads.synthetic import IlpEnvironment


@dataclass
class Fig9Row:
    n_relations: int
    query_size: int
    n_queries: int
    individual: float
    shared: float
    mqo: float
    variables: int
    constraints: int
    probe_orders: int
    runtime_s: float
    solver_nodes: int
    status: str

    @property
    def savings_pct(self) -> float:
        """Probe cost saved by MQO vs individual optimization."""
        if self.individual == 0:
            return 0.0
        return (1.0 - self.mqo / self.individual) * 100.0


def probe_cost_experiment(
    *,
    n_relations: int,
    n_query_list: Sequence[int],
    query_size: int = 3,
    rate: float = 100.0,
    seed: int = 42,
    time_limit: float = 30.0,
    use_mirs: bool = True,
) -> list[Fig9Row]:
    """Fig. 9a–9d: probe cost and problem size vs number of queries."""
    env = IlpEnvironment(n_relations, rate=rate)
    stats = env.statistics()
    rows: list[Fig9Row] = []
    for nq in n_query_list:
        queries = env.random_queries(nq, query_size, seed=seed)
        shared_plan, singles = optimize_shared(
            queries, stats, use_mirs=use_mirs, time_limit=time_limit / 3
        )
        ind = individual_cost(singles)
        res = optimize_mqo(
            queries,
            stats,
            use_mirs=use_mirs,
            time_limit=time_limit,
            warm_start_plan=shared_plan,
        )
        rows.append(
            Fig9Row(
                n_relations=n_relations,
                query_size=query_size,
                n_queries=len(queries),
                individual=ind,
                shared=shared_plan.cost(),
                mqo=res.objective,
                variables=res.num_variables,
                constraints=res.num_constraints,
                probe_orders=res.probe_orders,
                runtime_s=res.runtime,
                solver_nodes=res.solver_nodes,
                status=res.status,
            )
        )
    return rows


def runtime_experiment(
    *,
    n_relations: int = 100,
    configs: Sequence[tuple[int, int]] = ((3, 10), (3, 50), (3, 100), (4, 10), (5, 10)),
    rate: float = 100.0,
    seed: int = 7,
    time_limit: float = 120.0,
    use_mirs: bool = True,
) -> list[Fig9Row]:
    """Fig. 9e/9f: optimization runtime vs query count and query size.

    ``configs`` is a list of (query_size, n_queries) pairs."""
    env = IlpEnvironment(n_relations, rate=rate)
    stats = env.statistics()
    rows: list[Fig9Row] = []
    for size, nq in configs:
        queries = env.random_queries(nq, size, seed=seed)
        # the full optimization pipeline warm-starts the global solve
        # from the naively shared plan (as the cost experiments do);
        # reported runtime covers the whole pipeline. Per-query solves
        # get a small cap so the warm start never dominates.
        shared_plan, _ = optimize_shared(
            queries, stats, use_mirs=use_mirs,
            time_limit=min(5.0, time_limit / 10),
        )
        res = optimize_mqo(
            queries,
            stats,
            use_mirs=use_mirs,
            time_limit=time_limit,
            warm_start_plan=shared_plan,
        )
        rows.append(
            Fig9Row(
                n_relations=n_relations,
                query_size=size,
                n_queries=len(queries),
                individual=float("nan"),
                shared=float("nan"),
                mqo=res.objective,
                variables=res.num_variables,
                constraints=res.num_constraints,
                probe_orders=res.probe_orders,
                runtime_s=res.runtime,
                solver_nodes=res.solver_nodes,
                status=res.status,
            )
        )
    return rows


def render_cost_table(rows: Sequence[Fig9Row]) -> str:
    out = [
        "| n_rel | size | n_Q | individual | shared | MQO | savings | vars | probe orders | runtime | status |",
        "|---|---|---|---|---|---|---|---|---|---|---|",
    ]
    for r in rows:
        out.append(
            f"| {r.n_relations} | {r.query_size} | {r.n_queries} | {r.individual:.0f} "
            f"| {r.shared:.0f} | {r.mqo:.0f} | {r.savings_pct:.1f}% | {r.variables} "
            f"| {r.probe_orders} | {r.runtime_s:.2f}s | {r.status} |"
        )
    return "\n".join(out)


def render_runtime_table(rows: Sequence[Fig9Row]) -> str:
    out = [
        "| n_rel | size | n_Q | vars | probe orders | runtime | nodes | status |",
        "|---|---|---|---|---|---|---|---|",
    ]
    for r in rows:
        out.append(
            f"| {r.n_relations} | {r.query_size} | {r.n_queries} | {r.variables} "
            f"| {r.probe_orders} | {r.runtime_s:.2f}s | {r.solver_nodes} | {r.status} |"
        )
    return "\n".join(out)
