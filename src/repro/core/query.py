"""Query model for multi-way windowed stream equi-joins.

Relations are streamed; each tuple of relation ``S`` carries a timestamp
``tau``. A :class:`Query` is a set of relations plus equi-join
predicates over pairs of them (Section I-A of the paper). Windows are
per-relation: a tuple of relation ``k`` is joinable with a later tuple
iff the time difference is at most ``window(k)``.

All objects are immutable and hashable so that identical probe-order
*steps* across different queries compare equal — shared step variables
are the heart of the paper's ILP (Section V).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from functools import lru_cache
import itertools
import math
from typing import Iterable, Mapping


@dataclass(frozen=True, order=True)
class Attr:
    """A named attribute of a named relation, e.g. ``S.b``."""

    rel: str
    name: str

    def __str__(self) -> str:  # pragma: no cover - repr sugar
        return f"{self.rel}.{self.name}"


@dataclass(frozen=True, order=True)
class Predicate:
    """Canonicalized equi-join predicate ``left = right``.

    ``left <= right`` lexicographically, so the same predicate written in
    either direction hashes identically.
    """

    left: Attr
    right: Attr

    @staticmethod
    def of(a: Attr, b: Attr) -> "Predicate":
        if a.rel == b.rel:
            raise ValueError(f"self-join predicate not supported: {a} = {b}")
        return Predicate(*sorted((a, b)))

    @property
    def relations(self) -> frozenset[str]:
        return frozenset({self.left.rel, self.right.rel})

    def touches(self, rel: str) -> bool:
        return rel in (self.left.rel, self.right.rel)

    def attr_of(self, rel: str) -> Attr:
        if self.left.rel == rel:
            return self.left
        if self.right.rel == rel:
            return self.right
        raise KeyError(rel)

    def other(self, rel: str) -> Attr:
        if self.left.rel == rel:
            return self.right
        if self.right.rel == rel:
            return self.left
        raise KeyError(rel)

    def __str__(self) -> str:  # pragma: no cover - repr sugar
        return f"{self.left}={self.right}"


def pred(rel_a: str, attr_a: str, rel_b: str, attr_b: str) -> Predicate:
    """Shorthand constructor: ``pred("R", "a", "S", "a")``."""
    return Predicate.of(Attr(rel_a, attr_a), Attr(rel_b, attr_b))


@dataclass(frozen=True)
class Query:
    """A multi-way windowed equi-join query.

    ``windows`` maps relation name to window length in time units;
    relations absent from the mapping have an unbounded window
    (``math.inf`` — the paper's "full history" mode used in Fig. 7).
    """

    name: str
    relations: frozenset[str]
    predicates: frozenset[Predicate]
    windows: tuple[tuple[str, float], ...] = ()

    def __post_init__(self) -> None:
        for p in self.predicates:
            if not p.relations <= self.relations:
                raise ValueError(f"predicate {p} references relation outside query")
        for r, _ in self.windows:
            if r not in self.relations:
                raise ValueError(f"window for unknown relation {r}")
        if len(self.relations) >= 2 and not is_connected(self.relations, self.predicates):
            raise ValueError(
                f"query {self.name} contains a cross product; "
                "add artificial true-join predicates ([12]) before optimizing"
            )

    @staticmethod
    def of(
        name: str,
        predicates: Iterable[Predicate],
        *,
        relations: Iterable[str] = (),
        windows: Mapping[str, float] | None = None,
    ) -> "Query":
        preds = frozenset(predicates)
        rels = frozenset(relations) | frozenset(
            r for p in preds for r in p.relations
        )
        win = tuple(sorted((windows or {}).items()))
        return Query(name, rels, preds, win)

    def window(self, rel: str) -> float:
        for r, w in self.windows:
            if r == rel:
                return w
        return math.inf

    def induced(self, rels: Iterable[str]) -> frozenset[Predicate]:
        """Predicates of this query with both sides inside ``rels``."""
        rs = frozenset(rels)
        return frozenset(p for p in self.predicates if p.relations <= rs)

    def predicates_between(
        self, left: Iterable[str], right: Iterable[str]
    ) -> frozenset[Predicate]:
        """Predicates with one side in ``left`` and the other in ``right``."""
        ls, rs = frozenset(left), frozenset(right)
        return frozenset(
            p
            for p in self.predicates
            if (p.left.rel in ls and p.right.rel in rs)
            or (p.left.rel in rs and p.right.rel in ls)
        )

    def joins_with(self, rels: Iterable[str], rel: str) -> bool:
        return bool(self.predicates_between(rels, [rel]))

    def attrs(self, rel: str) -> frozenset[Attr]:
        """All attributes of ``rel`` mentioned in this query's predicates."""
        out = set()
        for p in self.predicates:
            if p.touches(rel):
                out.add(p.attr_of(rel))
        return frozenset(out)


def is_connected(rels: frozenset[str], preds: Iterable[Predicate]) -> bool:
    """True iff the join graph induced by ``preds`` connects all ``rels``."""
    rels = frozenset(rels)
    if len(rels) <= 1:
        return True
    adj: dict[str, set[str]] = {r: set() for r in rels}
    for p in preds:
        a, b = tuple(p.relations)
        if a in adj and b in adj:
            adj[a].add(b)
            adj[b].add(a)
    seen = set()
    stack = [next(iter(rels))]
    while stack:
        r = stack.pop()
        if r in seen:
            continue
        seen.add(r)
        stack.extend(adj[r] - seen)
    return seen == rels


def equivalence_classes(preds: Iterable[Predicate]) -> dict[Attr, frozenset[Attr]]:
    """Union-find closure of attribute equality induced by equi-predicates.

    Used for χ (Eq. 1): a probing tuple can be *routed* to a single
    partition of a store partitioned on attribute ``p`` iff some attribute
    it carries is in the same equivalence class as ``p``.
    """
    parent: dict[Attr, Attr] = {}

    def find(a: Attr) -> Attr:
        while parent[a] != a:
            parent[a] = parent[parent[a]]
            a = parent[a]
        return a

    for p in preds:
        for a in (p.left, p.right):
            parent.setdefault(a, a)
        ra, rb = find(p.left), find(p.right)
        if ra != rb:
            parent[ra] = rb
    groups: dict[Attr, set[Attr]] = {}
    for a in parent:
        groups.setdefault(find(a), set()).add(a)
    return {a: frozenset(g) for g in groups.values() for a in g}


def can_route(
    carried_rels: Iterable[str],
    partition_attr: Attr,
    preds: Iterable[Predicate],
) -> bool:
    """Does a tuple covering ``carried_rels`` know the value of
    ``partition_attr`` (directly or through predicate transitivity)?

    ``preds`` is the cumulative predicate set of the (sub)query joining
    the carried relations with the target store.
    """
    carried = frozenset(carried_rels)
    if partition_attr.rel in carried:
        return True
    classes = equivalence_classes(preds)
    cls = classes.get(partition_attr)
    if cls is None:
        return False
    return any(a.rel in carried for a in cls)
