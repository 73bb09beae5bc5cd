"""Plan decoding and transformation to executable strategies (§V-B).

The ILP solution assigns probe-order variables; probe orders with the
same starting relation merge into **probe trees** on common decorated
prefixes (Fig. 4): multiple outgoing edges mean the routed tuple is
copied to several targets. Distinct decorated store labels become
stores of the topology; maintenance probe orders end in a **ship** node
feeding an MIR store. Reference counts per store support query removal
(§VI-B).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterable, Mapping

from ..ilp.solver import Solution
from .cost import Statistics, probe_order_cost, step_cost
from .ilp_build import IlpArtifacts
from .probe_orders import ProbeOrder, Step, StoreRef
from .query import Query


@dataclass
class Plan:
    """Selected probe orders for every query and every used MIR store."""

    queries: dict[str, Query]
    chosen: dict[tuple[str, str], ProbeOrder]  # (query name, start) → σ
    maintenance: dict[tuple[StoreRef, str], ProbeOrder]  # (MIR store, start) → σ
    stats: Statistics
    shared: bool = True  # False: duplicated steps billed per query (FI/SI)

    def probe_orders(self) -> list[tuple[Query, ProbeOrder]]:
        out = []
        for (qname, _start), po in sorted(self.chosen.items()):
            out.append((self.queries[qname], po))
        for (ref, _start), po in sorted(self.maintenance.items()):
            mirq = po.maintains.subquery(windows=None)
            out.append((mirq, po))
        return out

    def steps(self) -> list[Step]:
        out: list[Step] = []
        for q, po in self.probe_orders():
            out.extend(po.steps(q))
        return out

    def cost(self) -> float:
        """Probe cost: distinct steps once when shared, else every use."""
        steps = self.steps()
        if self.shared:
            return sum(step_cost(s, self.stats) for s in set(steps))
        return sum(step_cost(s, self.stats) for s in steps)

    def validate(self) -> None:
        """Every query covered from every start; every probed MIR fed."""
        for qname, q in self.queries.items():
            for start in q.relations:
                po = self.chosen.get((qname, start))
                assert po is not None, f"missing probe order for ({qname}, {start})"
                covered = {start}
                for t in po.targets:
                    covered |= t.rels
                assert covered == set(q.relations), f"incomplete σ for {qname}/{start}"
        needed: set[StoreRef] = set()
        for _q, po in self.probe_orders():
            needed.update(po.mir_targets)
        for ref in needed:
            for rel in ref.rels:
                assert (ref, rel) in self.maintenance, (
                    f"MIR store {ref.label} probed but not maintained from {rel}"
                )


def decode_plan(art: IlpArtifacts, sol: Solution) -> Plan:
    """Translate an optimal ILP assignment back into a Plan."""
    if sol.status not in ("optimal", "feasible"):
        raise ValueError(f"cannot decode solution with status {sol.status}")
    chosen: dict[tuple[str, str], ProbeOrder] = {}
    for (qname, start), group in art.choice_groups.items():
        picked = [v for v in group if sol[v] == 1]
        assert len(picked) == 1, f"choice group ({qname},{start}) picked {picked}"
        chosen[(qname, start)] = art.x_vars[picked[0]]
    maintenance: dict[tuple[StoreRef, str], ProbeOrder] = {}
    for (ref, start), group in art.maintenance_groups.items():
        picked = [v for v in group if sol[v] == 1]
        if picked:
            maintenance[(ref, start)] = art.x_vars[picked[0]]
    plan = Plan(dict(art.queries), chosen, maintenance, art.stats)
    plan.validate()
    return plan


@dataclass
class TreeNode:
    """One node of a probe tree: probe (or ship into) ``step.target``."""

    step: Step
    children: list["TreeNode"] = field(default_factory=list)
    emits: list[str] = field(default_factory=list)  # completed query names

    @property
    def store(self) -> StoreRef:
        return self.step.target

    @property
    def is_ship(self) -> bool:
        """Ship nodes deliver an already-complete subresult to an MIR
        store (their target overlaps the covered relations)."""
        return bool(self.step.target.rels & self.step.covered_before)

    def walk(self) -> Iterable["TreeNode"]:
        yield self
        for c in self.children:
            yield from c.walk()


@dataclass
class Topology:
    """Executable strategy: probe trees per input relation + stores."""

    plan: Plan
    trees: dict[str, list[TreeNode]]  # start relation → merged roots
    stores: dict[StoreRef, set[str]]  # store → names of queries it serves
    windows: dict[str, float] = field(default_factory=dict)

    def nodes(self) -> Iterable[TreeNode]:
        for roots in self.trees.values():
            for r in roots:
                yield from r.walk()

    def base_stores_of(self, rel: str) -> list[StoreRef]:
        return [s for s in self.stores if s.is_base and rel in s.rels]

    def mir_stores(self) -> list[StoreRef]:
        return sorted(
            (s for s in self.stores if not s.is_base), key=lambda s: len(s.rels)
        )

    def remove_query(self, qname: str) -> list[StoreRef]:
        """Reference-counting removal (§VI-B): drop the query from every
        store's serving set; stores whose count reaches zero are
        deregistered and returned."""
        dropped = []
        for store, serving in list(self.stores.items()):
            serving.discard(qname)
            if not serving:
                dropped.append(store)
                del self.stores[store]
        self.trees = {
            rel: [r for r in roots if _prune(r, set(self.plan.queries) - {qname})]
            for rel, roots in self.trees.items()
        }
        self.plan.queries.pop(qname, None)
        self.plan.chosen = {
            k: v for k, v in self.plan.chosen.items() if k[0] != qname
        }
        return dropped


def _prune(node: TreeNode, keep: set[str]) -> bool:
    """Drop emits of removed queries; prune branches that serve nobody.
    Returns True if the node is still useful (emits or ships or has
    useful children)."""
    node.emits = [q for q in node.emits if q in keep]
    node.children = [c for c in node.children if _prune(c, keep)]
    return bool(node.emits or node.children or node.is_ship)


def build_topology(
    plan: Plan, *, windows: Mapping[str, float] | None = None
) -> Topology:
    """Merge the plan's probe orders into probe trees (Fig. 4) and
    collect the stores to materialize."""
    trees: dict[str, list[TreeNode]] = {}
    node_index: dict[tuple[str, Step], TreeNode] = {}

    def insert(start: str, q: Query, po: ProbeOrder, emit: str | None) -> None:
        roots = trees.setdefault(start, [])
        parent_children = roots
        steps = po.steps(q)
        for i, s in enumerate(steps):
            key = (start, s)
            node = node_index.get(key)
            if node is None:
                node = TreeNode(s)
                node_index[key] = node
                parent_children.append(node)
            if i == len(steps) - 1 and emit is not None:
                if emit not in node.emits:
                    node.emits.append(emit)
            parent_children = node.children

    for (qname, start), po in sorted(plan.chosen.items()):
        insert(start, plan.queries[qname], po, emit=qname)
    for (_ref, start), po in sorted(plan.maintenance.items()):
        mirq = po.maintains.subquery(windows=windows)
        insert(start, mirq, po, emit=None)

    # Stores: every probed or shipped-to store, plus one store per input
    # relation ("the input relations are always materialized").
    stores: dict[StoreRef, set[str]] = {}
    all_rels: set[str] = set()
    for q in plan.queries.values():
        all_rels |= q.relations

    def serving_queries(node: TreeNode) -> set[str]:
        out = set(node.emits)
        for c in node.children:
            out |= serving_queries(c)
        return out

    def paths() -> Iterable[tuple[TreeNode, tuple[TreeNode, ...]]]:
        for roots in trees.values():
            for root in roots:
                stack: list[tuple[TreeNode, tuple[TreeNode, ...]]] = [(root, (root,))]
                while stack:
                    node, path = stack.pop()
                    yield node, path
                    for c in node.children:
                        stack.append((c, path + (c,)))

    # pass 1: stores serve the queries whose results flow through them
    mir_serves: dict[tuple, set[str]] = {}
    for node, _path in paths():
        stores.setdefault(node.store, set()).update(serving_queries(node))
    # pass 2 (fixpoint for nested MIRs): a maintenance path serves
    # whatever the MIR store it ships into serves
    for _ in range(max(1, len(plan.maintenance))):
        changed = False
        for node, _path in paths():
            if not node.store.is_base:
                served = stores.get(node.store, set())
                prev = mir_serves.setdefault(node.store.content_key, set())
                if not served <= prev:
                    prev |= served
                    changed = True
        for node, path in paths():
            if node.is_ship:
                served = mir_serves.get(node.store.content_key, set())
                for n in path:
                    cur = stores.setdefault(n.store, set())
                    if not served <= cur:
                        cur |= served
                        changed = True
        if not changed:
            break
    for rel in sorted(all_rels):
        if not any(s.is_base and rel in s.rels for s in stores):
            stores[StoreRef.base(rel)] = {
                q.name for q in plan.queries.values() if rel in q.relations
            }
    return Topology(plan, trees, stores, dict(windows or {}))
