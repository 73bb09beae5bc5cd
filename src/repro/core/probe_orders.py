"""Candidate probe orders (Algorithm 1) and partitioning decoration.

A probe order for a starting relation is a permutation over a subset of
the installed stores (base relation stores and MIR stores) that covers
the query without ever forming a cross product. After generation, probe
orders are *decorated*: each probed store is annotated with one of its
candidate partitioning attributes (Section V, Fig. 3 — e.g.
``⟨R, S[b], T[c]⟩``), and the broadcast factor χ of every step follows
from whether the probing tuple carries the partition attribute.

Probe orders decompose into :class:`Step`s (probe-order prefixes).
Steps are plain values: *equal steps used in candidates of other queries
get the same ILP variable* (Section V), which is what enables sharing.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Iterable, Sequence

from .mir import Mir, usable_mirs
from .query import Attr, Predicate, Query, can_route


@dataclass(frozen=True)
class StoreRef:
    """A (possibly decorated) reference to a store.

    ``rels``/``preds`` identify the store's content (base relation or MIR
    subquery); ``part`` is the partitioning attribute, ``None`` while
    undecorated.
    """

    rels: frozenset[str]
    preds: frozenset[Predicate]
    part: Attr | None = None

    def __lt__(self, other: "StoreRef") -> bool:
        return self._key() < other._key()

    def _key(self):
        return (
            sorted(self.rels),
            sorted(map(str, self.preds)),
            "" if self.part is None else str(self.part),
        )

    @property
    def is_base(self) -> bool:
        return len(self.rels) == 1

    @property
    def content_key(self) -> tuple[frozenset[str], frozenset[Predicate]]:
        """Store identity ignoring partitioning (what state it holds)."""
        return (self.rels, self.preds)

    @property
    def label(self) -> str:
        base = "".join(sorted(self.rels))
        return base if self.part is None else f"{base}[{self.part}]"

    def with_part(self, part: Attr | None) -> "StoreRef":
        return StoreRef(self.rels, self.preds, part)

    @staticmethod
    def base(rel: str, part: Attr | None = None) -> "StoreRef":
        return StoreRef(frozenset({rel}), frozenset(), part)

    @staticmethod
    def of_mir(m: Mir, part: Attr | None = None) -> "StoreRef":
        return StoreRef(m.rels, m.preds, part)


@dataclass(frozen=True)
class Step:
    """A probe-order prefix ρ_j: route the partial join of ``start`` plus
    ``targets[:-1]`` to the store ``targets[-1]``.

    ``preds`` is the cumulative predicate set applied up to and including
    this step; it is part of the identity so that two queries share a
    step only if they compute the same subresult.
    """

    start: str
    targets: tuple[StoreRef, ...]
    preds: frozenset[Predicate]

    def __lt__(self, other: "Step") -> bool:
        return (self.start, self.targets, sorted(map(str, self.preds))) < (
            other.start,
            other.targets,
            sorted(map(str, other.preds)),
        )

    @property
    def covered_before(self) -> frozenset[str]:
        """Relations joined before this step's probe (the routed tuple)."""
        out = {self.start}
        for t in self.targets[:-1]:
            out |= t.rels
        return frozenset(out)

    @property
    def target(self) -> StoreRef:
        return self.targets[-1]

    @property
    def label(self) -> str:
        return f"⟨{self.start}," + ",".join(t.label for t in self.targets) + "⟩"


@dataclass(frozen=True)
class ProbeOrder:
    """A full probe order σ for ``query`` starting at relation ``start``.

    ``maintains`` is set when this is a *maintenance* probe order keeping
    an MIR store up to date: its final target is the MIR store itself
    (the "ship" step, Fig. 2 ⑤).
    """

    query: str
    start: str
    targets: tuple[StoreRef, ...]
    maintains: Mir | None = None

    def __lt__(self, other: "ProbeOrder") -> bool:
        return (self.query, self.start, self.targets) < (
            other.query,
            other.start,
            other.targets,
        )

    @property
    def label(self) -> str:
        return f"⟨{self.start}," + ",".join(t.label for t in self.targets) + "⟩"

    @property
    def mir_targets(self) -> tuple[StoreRef, ...]:
        """Probed MIR stores, excluding the final ship target (if any)."""
        probed = self.targets[:-1] if self.maintains else self.targets
        return tuple(t for t in probed if not t.is_base)

    def steps(self, query: Query) -> tuple[Step, ...]:
        """Decompose into shared-identity steps (probe-order prefixes)."""
        out = []
        covered = {self.start}
        cum_preds: set[Predicate] = set()
        for i, t in enumerate(self.targets):
            if self.maintains is not None and i == len(self.targets) - 1:
                # ship step: no new predicates, target is the MIR store
                cum_preds |= set(t.preds)
            else:
                cum_preds |= set(query.predicates_between(covered, t.rels))
                cum_preds |= set(t.preds)
            out.append(Step(self.start, self.targets[: i + 1], frozenset(cum_preds)))
            covered |= t.rels
        return tuple(out)


def generate_probe_orders(
    query: Query, mirs: Iterable[Mir] = ()
) -> dict[str, tuple[ProbeOrder, ...]]:
    """Algorithm 1: candidate probe orders per starting relation.

    Stores available for probing are the base relation stores of the
    query and the usable MIR stores. Every extension must be joinable
    with the current head (no cross products) and disjoint from it.
    """
    usable = sorted(usable_mirs(query, mirs))
    result: dict[str, tuple[ProbeOrder, ...]] = {}
    for start in sorted(query.relations):
        orders: list[ProbeOrder] = []

        def construct_rec(covered: frozenset[str], targets: tuple[StoreRef, ...]):
            candidates: list[StoreRef] = [
                StoreRef.base(r) for r in sorted(query.relations - covered)
            ] + [StoreRef.of_mir(m) for m in usable if not (m.rels & covered)]
            for ref in candidates:
                if not any(query.joins_with(covered, r) for r in ref.rels):
                    continue
                new_covered = covered | ref.rels
                new_targets = targets + (ref,)
                if new_covered == query.relations:
                    orders.append(ProbeOrder(query.name, start, new_targets))
                else:
                    construct_rec(new_covered, new_targets)

        construct_rec(frozenset({start}), ())
        result[start] = tuple(orders)
    return result


def generate_maintenance_orders(
    mir: Mir, sub_mirs: Iterable[Mir] = (), windows=None
) -> dict[str, tuple[ProbeOrder, ...]]:
    """Probe orders that keep an MIR store up to date.

    "For intermediate relations, we also generate probe orders using the
    subquery for the intermediate result as input" — recursively, smaller
    MIRs may be probed. Each maintenance order ends with a *ship* step
    delivering the fresh subresult to the (undecorated) MIR store.
    """
    sub = [m for m in sub_mirs if m.rels < mir.rels]
    q = mir.subquery(windows=windows)
    raw = generate_probe_orders(q, sub)
    out: dict[str, tuple[ProbeOrder, ...]] = {}
    for start, orders in raw.items():
        out[start] = tuple(
            ProbeOrder(
                q.name,
                o.start,
                o.targets + (StoreRef.of_mir(mir),),
                maintains=mir,
            )
            for o in orders
        )
    return out


def partition_candidates(
    queries: Iterable[Query], mirs: Iterable[Mir] = ()
) -> dict[tuple[frozenset[str], frozenset[Predicate]], tuple[Attr, ...]]:
    """Candidate partitioning attributes per store (Section V).

    For a store ``r`` the candidates are "all attributes which define a
    join with another relation that is not part of r" — taken over every
    query that can use the store, so a store shared by several queries
    offers the union of their routing attributes (Fig. 3: T[c] from q1/q2
    and T[d] from q2).
    """
    queries = list(queries)
    stores: dict[tuple[frozenset[str], frozenset[Predicate]], set[Attr]] = {}
    # Base relation stores.
    for q in queries:
        for rel in q.relations:
            key = (frozenset({rel}), frozenset())
            attrs = stores.setdefault(key, set())
            for p in q.predicates:
                if p.touches(rel):
                    attrs.add(p.attr_of(rel))
    # MIR stores.
    for m in mirs:
        key = (m.rels, m.preds)
        attrs = stores.setdefault(key, set())
        for q in queries:
            if m.rels < q.relations and q.induced(m.rels) == m.preds:
                for p in q.predicates:
                    inside = p.relations & m.rels
                    outside = p.relations - m.rels
                    if inside and outside:
                        attrs.add(p.attr_of(next(iter(inside))))
    return {k: tuple(sorted(v)) for k, v in stores.items()}


def apply_partitioning(
    orders: Sequence[ProbeOrder],
    candidates: dict[tuple[frozenset[str], frozenset[Predicate]], tuple[Attr, ...]],
) -> tuple[ProbeOrder, ...]:
    """Decorate probe orders with every combination of partitioning
    attributes of the probed stores (Fig. 3: σ1..σ6)."""
    out: list[ProbeOrder] = []
    for o in orders:
        options_per_target: list[list[StoreRef]] = []
        for t in o.targets:
            opts = candidates.get(t.content_key, ())
            if opts:
                options_per_target.append([t.with_part(a) for a in opts])
            else:
                options_per_target.append([t])  # un-routable store: broadcast-only
        combos: list[tuple[StoreRef, ...]] = [()]
        for opts in options_per_target:
            combos = [c + (ref,) for c in combos for ref in opts]
        for targets in combos:
            out.append(ProbeOrder(o.query, o.start, targets, maintains=o.maintains))
    return tuple(out)


def chi(step: Step, parallelism: int) -> int:
    """Broadcast factor χ of Eq. 1: 1 if the routed tuple carries (an
    equivalent of) the target store's partition attribute, else the
    store's parallelism. Undecorated stores (``part is None``) model the
    paper's partitioning-agnostic examples (§V-2) and cost 1."""
    part = step.target.part
    if part is None:
        return 1
    if can_route(step.covered_before, part, step.preds):
        return 1
    return parallelism
