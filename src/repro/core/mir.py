"""Materializable intermediate results (MIRs), Section V of the paper.

An MIR of a query is a *connected* proper subset of the query's
relations together with the induced join predicates — connectedness
guarantees cross products are avoided ("for query R(a),S(a,b),T(b) the
materializable intermediate results would be (R,S) and (S,T) but not
(R,T)"). Singleton relation stores always exist and the full query is
never an MIR (materializing the full result *is* the answer, it cannot
help probing).

Across queries, two MIRs are the same store iff both the relation set
and the induced predicate set agree — a store's content is defined by
its subquery, not by who uses it.
"""
from __future__ import annotations

from dataclasses import dataclass
import itertools
from typing import Iterable

from .query import Predicate, Query, is_connected


@dataclass(frozen=True)
class Mir:
    """A materializable intermediate result: subquery ``rels``/``preds``."""

    rels: frozenset[str]
    preds: frozenset[Predicate]

    def __post_init__(self) -> None:
        if len(self.rels) < 2:
            raise ValueError("an MIR spans at least two relations")
        if not is_connected(self.rels, self.preds):
            raise ValueError(f"MIR over {set(self.rels)} is not connected")

    def __lt__(self, other: "Mir") -> bool:  # deterministic ordering
        return (sorted(self.rels), sorted(map(str, self.preds))) < (
            sorted(other.rels),
            sorted(map(str, other.preds)),
        )

    @property
    def label(self) -> str:
        return "".join(sorted(self.rels))

    def subquery(self, name: str | None = None, windows=None) -> Query:
        """The subquery whose continuously-maintained result this MIR is.

        ``windows`` may be a global per-relation mapping; only the
        entries for this MIR's relations apply."""
        win = {r: w for r, w in (windows or {}).items() if r in self.rels}
        return Query.of(
            name or f"mir:{self.label}",
            self.preds,
            relations=self.rels,
            windows=win,
        )


def enumerate_mirs(
    query: Query, *, max_size: int | None = None
) -> frozenset[Mir]:
    """All MIRs of ``query``: connected subsets of size 2..n-1.

    §V-A: for a clique query this is Θ(2^n); for a linear query the MIRs
    are the consecutive subsequences. ``max_size`` caps the subset size
    (the optimizer uses it to bound candidate blow-up).
    """
    rels = sorted(query.relations)
    n = len(rels)
    hi = n - 1 if max_size is None else min(max_size, n - 1)
    out: set[Mir] = set()
    for size in range(2, hi + 1):
        for combo in itertools.combinations(rels, size):
            sub = frozenset(combo)
            preds = query.induced(sub)
            if is_connected(sub, preds):
                out.add(Mir(sub, preds))
    return frozenset(out)


def mirs_for_queries(
    queries: Iterable[Query], *, max_size: int | None = None
) -> frozenset[Mir]:
    """Union of MIRs over all queries (shared stores dedupe by identity)."""
    out: set[Mir] = set()
    for q in queries:
        out |= enumerate_mirs(q, max_size=max_size)
    return frozenset(out)


def usable_mirs(query: Query, mirs: Iterable[Mir]) -> frozenset[Mir]:
    """MIRs a probe order of ``query`` may use: a store only serves a
    query if its content is exactly the query's induced subresult."""
    return frozenset(
        m
        for m in mirs
        if m.rels < query.relations and m.preds == query.induced(m.rels)
    )
