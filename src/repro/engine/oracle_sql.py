"""SQL builder for the DuckDB correctness oracle.

Generates, for a windowed multi-way join query, the SQL whose result
(over the same timestamped inputs) must equal the engine's emitted
result for that query: every pairing of tuples satisfying the equi-join
predicates with, for every member relation k,
``τ_latest − τ_k ≤ W_k`` (per-relation window, ``τ_latest`` = greatest
member timestamp). Output columns use the engine's ``rel__col`` naming
so ``repro.oracle.assert_equivalent`` can diff directly.
"""
from __future__ import annotations

import math
from typing import Mapping, Sequence

from ..core.query import Query
from ..streams.microbatch import TAU


def windowed_join_sql(
    query: Query,
    columns: Mapping[str, Sequence[str]],
    *,
    windows: Mapping[str, float] | None = None,
) -> str:
    """Build the oracle SQL for ``query``.

    ``columns`` maps relation name → its data columns (without ``__tau``;
    the τ column is added automatically). ``windows`` maps relation →
    window length; missing/inf → no window condition for that relation.
    """
    windows = dict(windows or {})
    rels = sorted(query.relations)
    select = []
    for rel in rels:
        for c in columns[rel]:
            select.append(f'{rel}."{c}" AS {rel}__{c}')
        select.append(f'{rel}."{TAU}" AS {rel}__tau')
    where = [
        f'{p.left.rel}."{p.left.name}" = {p.right.rel}."{p.right.name}"'
        for p in sorted(query.predicates)
    ]
    taus = ", ".join(f'{r}."{TAU}"' for r in rels)
    greatest = f"GREATEST({taus})" if len(rels) > 1 else f'{rels[0]}."{TAU}"'
    for rel in rels:
        w = windows.get(rel, math.inf)
        if math.isfinite(w):
            where.append(f'{greatest} - {rel}."{TAU}" <= {w!r}')
    sql = "SELECT " + ", ".join(select) + " FROM " + ", ".join(rels)
    if where:
        sql += " WHERE " + " AND ".join(where)
    return sql
