"""ILP construction — Algorithm 2 of the paper.

Given queries, statistics and (optionally) MIRs, builds the 0/1 ILP:

* one **choice constraint** ``Σ x = 1`` per (query, starting relation)
  over that start's decorated candidate probe orders (Fig. 3 constr. 1);
* **subquery constraints** for every candidate that probes an MIR store:
  for each input relation of the MIR at least one maintenance probe
  order must be installed (Fig. 3 constr. 2–3). The paper prints the
  coefficient ``-k_j`` (number of alternatives) on the x-term, which
  would force *all* alternatives; the accompanying text ("out of these
  probe orders we need two — one for each relation") shows the intent,
  so we emit ``-x + Σ x' ≥ 0`` per (MIR store, start relation);
* a **cost constraint** ``-PCost(σ)·x + Σ StepCost(ρ)·y ≥ 0`` per probe
  order (Eq. 3 pattern, Fig. 3 constr. 4–5), with *step variables shared
  across all probe orders and queries* that contain the same step;
* the **goal** ``min Σ StepCost(ρ_i)·y_i``;
* optionally, **partition-consistency constraints**: one attribute per
  store (``Σ_p z[store,p] = 1``, ``y ≤ z[target store, target attr]``) —
  enforcing the paper's "each store is only partitioned according to one
  attribute" globally. Off by default to match the paper's literal
  formulation (probe orders under different partitionings are simply
  different decorated stores).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterable, Mapping, Sequence

from ..ilp.model import IlpModel
from .cost import Statistics, probe_order_cost, step_cost
from .mir import Mir, mirs_for_queries
from .probe_orders import (
    ProbeOrder,
    Step,
    StoreRef,
    apply_partitioning,
    generate_maintenance_orders,
    generate_probe_orders,
    partition_candidates,
)
from .query import Query


@dataclass
class IlpArtifacts:
    """The built model plus everything needed to decode a solution."""

    model: IlpModel
    queries: dict[str, Query]
    stats: Statistics
    x_vars: dict[str, ProbeOrder] = field(default_factory=dict)
    y_vars: dict[str, Step] = field(default_factory=dict)
    choice_groups: dict[tuple[str, str], list[str]] = field(default_factory=dict)
    maintenance_groups: dict[tuple[StoreRef, str], list[str]] = field(
        default_factory=dict
    )
    implications: dict[str, list[str]] = field(default_factory=dict)
    subqueries: dict[str, Query] = field(default_factory=dict)  # per x var
    pcosts: dict[str, float] = field(default_factory=dict)  # PCost per x var
    order_bias: dict[str, float] = field(default_factory=dict)
    equiv_tags: dict[str, object] = field(default_factory=dict)
    probe_order_count: int = 0
    mirs: frozenset[Mir] = frozenset()

    @property
    def num_variables(self) -> int:
        return self.model.num_variables

    @property
    def num_constraints(self) -> int:
        return self.model.num_constraints


def build_ilp(
    queries: Sequence[Query],
    stats: Statistics,
    *,
    use_mirs: bool = True,
    mir_max_size: int | None = None,
    partition_consistency: bool = False,
    windows: Mapping[str, float] | None = None,
) -> IlpArtifacts:
    """Construct the multi-query optimization ILP (Algorithm 2)."""
    queries = list(queries)
    names = [q.name for q in queries]
    if len(set(names)) != len(names):
        raise ValueError("query names must be unique")
    mirs = (
        mirs_for_queries(queries, max_size=mir_max_size) if use_mirs else frozenset()
    )
    part_cands = partition_candidates(queries, mirs)
    art = IlpArtifacts(IlpModel(), {q.name: q for q in queries}, stats, mirs=mirs)
    model = art.model

    y_index: dict[Step, str] = {}
    z_index: dict[tuple, str] = {}
    # decorated MIR store → per-start maintenance x' variables (built lazily)
    built_maintenance: dict[StoreRef, dict[str, list[str]]] = {}

    def y_var(step: Step) -> str:
        name = y_index.get(step)
        if name is None:
            name = f"y{len(y_index)}"
            y_index[name_step := step] = name
            art.y_vars[name] = name_step
            model.add_var(name, obj=step_cost(step, stats))
        return name

    def add_cost_constraint(x: str, po: ProbeOrder, q: Query) -> None:
        steps = po.steps(q)
        pcost = sum(step_cost(s, stats) for s in steps)
        coeffs: dict[str, float] = {x: -pcost}
        implied: list[str] = []
        for s in steps:
            yv = y_var(s)
            sc = step_cost(s, stats)
            coeffs[yv] = coeffs.get(yv, 0.0) + sc
            implied.append(yv)
            if partition_consistency and s.target.part is not None:
                zkey = (s.target.content_key, s.target.part)
                zv = z_index.get(zkey)
                if zv is None:
                    zv = f"z{len(z_index)}"
                    z_index[zkey] = zv
                    model.add_var(zv)
                model.add_constraint({yv: -1.0, zv: 1.0}, ">=", 0.0)
        art.implications[x] = implied
        art.pcosts[x] = pcost
        model.add_constraint(coeffs, ">=", 0.0)

    def add_subquery_constraints(x: str, po: ProbeOrder, q: Query) -> None:
        """Probing (or shipping into) a decorated MIR store requires its
        maintenance probe orders to be installed."""
        for ref in po.mir_targets:
            maint = ensure_maintenance(ref)
            for start, xs in maint.items():
                coeffs = {x: -1.0}
                for xv in xs:
                    coeffs[xv] = coeffs.get(xv, 0.0) + 1.0
                model.add_constraint(coeffs, ">=", 0.0)

    def ensure_maintenance(ref: StoreRef) -> dict[str, list[str]]:
        if ref in built_maintenance:
            return built_maintenance[ref]
        built_maintenance[ref] = {}  # placeholder guards recursion
        mir = Mir(ref.rels, ref.preds)
        sub = [m for m in mirs if m.rels < mir.rels]
        raw = generate_maintenance_orders(mir, sub, windows=windows)
        subq = mir.subquery(windows=windows)
        per_start: dict[str, list[str]] = {}
        for start, orders in sorted(raw.items()):
            decorated = apply_partitioning(orders, part_cands)
            xs: list[str] = []
            for po in decorated:
                # pin the final ship target to this decorated store instance
                if po.targets[-1].part != ref.part:
                    if po.targets[-1].content_key != ref.content_key:
                        raise AssertionError("ship target mismatch")
                    po = ProbeOrder(
                        po.query,
                        po.start,
                        po.targets[:-1] + (ref,),
                        maintains=po.maintains,
                    )
                xv = f"x{len(art.x_vars)}"
                art.x_vars[xv] = po
                art.subqueries[xv] = subq
                model.add_var(xv)
                xs.append(xv)
                art.probe_order_count += 1
                add_cost_constraint(xv, po, subq)
                add_subquery_constraints(xv, po, subq)
            per_start[start] = xs
            art.maintenance_groups[(ref, start)] = xs
            # at most one maintenance order per (store, start): keeps the
            # decoded topology unambiguous without forcing unused stores
            model.add_constraint({xv: -1.0 for xv in xs}, ">=", -1.0)
        # dedupe: decoration may produce identical decorated orders
        built_maintenance[ref] = per_start
        return per_start

    # ---- query-level candidates (Algorithm 2 main loop) ----
    for q in queries:
        raw = generate_probe_orders(q, mirs)
        for start in sorted(q.relations):
            decorated = apply_partitioning(raw[start], part_cands)
            if not decorated:
                raise ValueError(
                    f"no probe order candidates for query {q.name}, start {start}"
                )
            group: list[str] = []
            for po in decorated:
                xv = f"x{len(art.x_vars)}"
                art.x_vars[xv] = po
                art.subqueries[xv] = q
                model.add_var(xv)
                group.append(xv)
                art.probe_order_count += 1
                add_cost_constraint(xv, po, q)
                add_subquery_constraints(xv, po, q)
            art.choice_groups[(q.name, start)] = group
            model.add_constraint({v: 1.0 for v in group}, "==", 1.0)

    if partition_consistency:
        # Σ_p z[store, p] = 1 per store that has candidates
        per_store: dict[tuple, list[str]] = {}
        for (content_key, _attr), zv in z_index.items():
            per_store.setdefault(content_key, []).append(zv)
        for zvs in per_store.values():
            model.add_constraint({v: 1.0 for v in zvs}, "==", 1.0)

    # Ordering heuristic: estimated maintenance cost of every MIR-probing
    # probe order (cheapest maintenance chain, nested MIRs included) —
    # guides the solver's greedy dives, never its bounds.
    maint_refs: dict[StoreRef, list[str]] = {}
    for (ref, _start), group in art.maintenance_groups.items():
        maint_refs.setdefault(ref, []).extend(group)
    est: dict[StoreRef, float] = {}
    for ref in sorted(maint_refs, key=lambda r: len(r.rels)):
        total = 0.0
        for (r2, _start), group in art.maintenance_groups.items():
            if r2 != ref or not group:
                continue
            total += min(
                art.pcosts[xv]
                + sum(est.get(t, 0.0) for t in art.x_vars[xv].mir_targets)
                for xv in group
            )
        est[ref] = total
    for xv, po in art.x_vars.items():
        b = sum(est.get(t, 0.0) for t in po.mir_targets)
        if b:
            art.order_bias[xv] = b
        # interchangeability tag: identical maintenance obligations
        art.equiv_tags[xv] = tuple(
            sorted((t.label, r) for t in po.mir_targets for r in t.rels)
        )
    return art
