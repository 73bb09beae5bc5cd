"""Synthetic environments for the ILP experiments (Fig. 9) and the
adaptive-processing scenarios (Fig. 8).

Fig. 9 environment (§VII-C): n input relations with three attributes
each; all relations share one arrival rate; the join between any two
relations has selectivity rate⁻¹ (so any 2-way join output rate equals
the input rate). Queries of a given size are random connected
(tree-shaped) subqueries; exact duplicates are eliminated.

Fig. 8 scenarios (§VII-B): the linear query R(a),S(a,b),T(b,c),U(c)
with rate/selectivity shifts after 15 s — see the builder docstrings.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable, Mapping

import numpy as np
import pandas as pd

from ..core.cost import Statistics
from ..core.query import Attr, Predicate, Query, pred


# ---------------------------------------------------------------------------
# Fig. 9 — ILP environment
# ---------------------------------------------------------------------------

N_ATTRS = 3


def rel_name(i: int) -> str:
    return f"R{i:02d}"


def pair_predicate(i: int, j: int) -> Predicate:
    """The canonical join predicate between relations i and j: both use
    the attribute indexed by (i+j) mod 3 — deterministic, symmetric."""
    if i == j:
        raise ValueError("no self joins")
    a = f"a{(i + j) % N_ATTRS}"
    return pred(rel_name(i), a, rel_name(j), a)


@dataclass
class IlpEnvironment:
    """The simulated multi-relation environment of §VII-C.

    "We simulate an environment consisting of multiple relations that
    can be joined together" — i.e. a fixed joinability graph, which we
    model as a ring where every relation is joinable with its ``degree``
    nearest neighbours on each side. A bounded-degree graph is what
    makes cross-query sharing appear at all with many input relations
    (with all ~n²/2 pairs joinable, 50 random 3-way queries over 100
    relations would essentially never share a join edge, contradicting
    the ~15 % savings of Fig. 9c)."""

    n_relations: int
    rate: float = 100.0
    parallelism: int = 4
    degree: int = 2

    def statistics(self) -> Statistics:
        """Uniform rates; selectivity = rate⁻¹ for every joinable pair."""
        return Statistics(
            rates={rel_name(i): self.rate for i in range(self.n_relations)},
            default_selectivity=1.0 / self.rate,
            parallelism=self.parallelism,
        )

    def joinable(self, i: int, j: int) -> bool:
        """Ring joinability: within ``degree`` hops (and never self)."""
        if i == j:
            return False
        d = abs(i - j)
        return min(d, self.n_relations - d) <= self.degree

    def neighbors(self, i: int) -> list[int]:
        return [
            j for j in range(self.n_relations) if self.joinable(i, j)
        ]

    def random_query(
        self, name: str, size: int, rng: np.random.Generator
    ) -> Query:
        """A random connected query: start anywhere, repeatedly join a
        fresh relation (joinable with a current member) to the query."""
        if size > self.n_relations:
            raise ValueError("query larger than the environment")
        members = [int(rng.integers(self.n_relations))]
        preds = []
        guard = 0
        while len(members) < size and guard < 10_000:
            guard += 1
            anchor = members[int(rng.integers(len(members)))]
            cands = [j for j in self.neighbors(anchor) if j not in members]
            if not cands:
                continue
            nxt = cands[int(rng.integers(len(cands)))]
            preds.append(pair_predicate(anchor, nxt))
            members.append(nxt)
        if len(members) < size:
            raise RuntimeError("joinability graph too sparse for query size")
        return Query.of(name, preds)

    def random_queries(
        self, n: int, size: int, *, seed: int = 0
    ) -> list[Query]:
        """n distinct random queries (exact duplicates eliminated, §VII-C)."""
        rng = np.random.default_rng(seed)
        out: list[Query] = []
        seen: set[tuple] = set()
        attempts = 0
        while len(out) < n and attempts < n * 200:
            attempts += 1
            q = self.random_query(f"q{len(out)}", size, rng)
            sig = (q.relations, q.predicates)
            if sig in seen:
                continue
            seen.add(sig)
            out.append(q)
        return out


# ---------------------------------------------------------------------------
# Fig. 8 — adaptive scenarios
# ---------------------------------------------------------------------------

RSTU_PREDS = [
    pred("R", "a", "S", "a"),
    pred("S", "b", "T", "b"),
    pred("T", "c", "U", "c"),
]


def rstu_query(windows: Mapping[str, float] | None = None) -> Query:
    """The four-way linear join R(a),S(a,b),T(b,c),U(c) of §VII-B."""
    return Query.of("rstu", RSTU_PREDS, windows=windows)


def _epoch_frame(
    spark,
    rel: str,
    cols: dict[str, np.ndarray],
    *,
    epoch_idx: int,
    epoch_len: float,
    rng: np.random.Generator,
    jitter: int,
) -> "pyspark.sql.DataFrame":  # noqa: F821
    n = len(next(iter(cols.values())))
    taus = np.sort(rng.random(n)) * epoch_len + epoch_idx * epoch_len
    taus = taus + (np.arange(n) * 1e-9) + jitter * 1e-11
    pdf = pd.DataFrame({**{k: v for k, v in cols.items()}, "__tau": taus})
    return spark.createDataFrame(pdf)


def fig8a_source(
    spark,
    *,
    rows_per_epoch: int = 100,
    shift_epoch: int = 5,
    epoch_len: float = 1.0,
    fanout_after: int = 10,
    seed: int = 0,
) -> Callable[[int], dict]:
    """Fig. 8a input: equal rates; initially every tuple finds ~one join
    partner per window; from ``shift_epoch`` on, S-tuples find
    ``fanout_after`` partners in R but none in T (vice versa for T with
    U), so the S⋈R (and T⋈U) intermediates explode while S⋈T dries up."""
    n = rows_per_epoch

    # pools span ~a window's worth of arrivals so that pre-shift every
    # tuple finds O(1) join partners over the window ("the join
    # attributes set such that each tuple will be part of one join
    # result") instead of compounding multiplicatively
    pool = 3 * n

    def source(i: int) -> dict:
        rng = np.random.default_rng(seed * 100_003 + i)
        key = lambda size, p: rng.integers(0, p, size)
        if i < shift_epoch:
            a_r, a_s = key(n, pool), key(n, pool)
            b_s, b_t = key(n, pool), key(n, pool)
            c_t, c_u = key(n, pool), key(n, pool)
        else:
            # R⋈S explodes: both sides draw a from a tiny hot pool
            hot = max(1, n // fanout_after)
            a_s = key(n, hot)
            a_r = np.concatenate([key(n // 2, hot), key(n - n // 2, pool)])
            # S⋈T dries up: disjoint b pools
            b_s, b_t = key(n, pool), key(n, pool) + 10 * pool
            # T⋈U explodes symmetrically on c
            c_t = key(n, hot)
            c_u = np.concatenate([key(n // 2, hot), key(n - n // 2, pool)])
        mk = lambda rel, cols, j: _epoch_frame(
            spark, rel, cols, epoch_idx=i, epoch_len=epoch_len, rng=rng, jitter=j
        )
        return {
            "R": mk("R", {"a": a_r}, 1),
            "S": mk("S", {"a": a_s, "b": b_s}, 2),
            "T": mk("T", {"b": b_t, "c": c_t}, 3),
            "U": mk("U", {"c": c_u}, 4),
        }

    return source


def fig8a_initial_stats(
    *, rows_per_epoch: int = 100, epoch_len: float = 1.0, window: float = 5.0,
    parallelism: int = 4,
) -> Statistics:
    """Initial optimizer statistics for Fig. 8a: the paper initializes
    with a slightly higher S-T selectivity so the probe orders
    ⟨S,R,T,U⟩ and ⟨T,U,R,S⟩ (avoiding the S⋈T step early) win."""
    rate = rows_per_epoch / epoch_len
    sel = 1.0 / rows_per_epoch
    return Statistics(
        rates={r: rate for r in "RSTU"},
        selectivities={
            pred("R", "a", "S", "a"): sel,
            pred("S", "b", "T", "b"): 3.0 * sel,  # the paper's nudge
            pred("T", "c", "U", "c"): sel,
        },
        windows={r: window for r in "RSTU"},
        parallelism=parallelism,
    )


def fig8b_source(
    spark,
    *,
    r_rows_per_epoch: int = 1000,
    slow_rows_per_epoch: int = 20,
    shift_epoch: int = 5,
    epoch_len: float = 1.0,
    fanout_before: int = 20,
    seed: int = 0,
) -> Callable[[int], dict]:
    """Fig. 8b input: R streams orders of magnitude faster than S, T, U.
    Initially |S⋈T⋈U| is large (T-U fanout high); from ``shift_epoch``
    on it becomes very small, so materializing an STU store pays off and
    R-tuples complete in a single probe."""
    nr, ns = r_rows_per_epoch, slow_rows_per_epoch

    def source(i: int) -> dict:
        rng = np.random.default_rng(seed * 100_019 + i)
        a_r = rng.integers(0, ns, nr)
        a_s = np.arange(ns) % ns
        b_s = rng.integers(0, ns, ns)
        b_t = rng.integers(0, ns, ns)
        if i < shift_epoch:
            c_t = rng.integers(0, max(1, ns // fanout_before), ns)
            c_u = rng.integers(0, max(1, ns // fanout_before), ns)
        else:
            # sparse overlap: |S⋈T⋈U| becomes very low but nonzero, so
            # results still flow through the 1-hop MIR path
            c_t = rng.integers(0, 10 * ns, ns)
            c_u = rng.integers(0, 10 * ns, ns)
        mk = lambda rel, cols, j: _epoch_frame(
            spark, rel, cols, epoch_idx=i, epoch_len=epoch_len, rng=rng, jitter=j
        )
        return {
            "R": mk("R", {"a": a_r}, 1),
            "S": mk("S", {"a": a_s, "b": b_s}, 2),
            "T": mk("T", {"b": b_t, "c": c_t}, 3),
            "U": mk("U", {"c": c_u}, 4),
        }

    return source


def fig8b_initial_stats(
    *,
    r_rows_per_epoch: int = 1000,
    slow_rows_per_epoch: int = 20,
    epoch_len: float = 1.0,
    window: float = 5.0,
    fanout_before: int = 20,
    parallelism: int = 4,
) -> Statistics:
    """Initial statistics for Fig. 8b (pre-shift: STU is large, so the
    iterative plan wins; its T-U selectivity models the high fanout)."""
    rr = r_rows_per_epoch / epoch_len
    rs = slow_rows_per_epoch / epoch_len
    return Statistics(
        rates={"R": rr, "S": rs, "T": rs, "U": rs},
        selectivities={
            pred("R", "a", "S", "a"): 1.0 / slow_rows_per_epoch,
            pred("S", "b", "T", "b"): 1.0 / slow_rows_per_epoch,
            pred("T", "c", "U", "c"): fanout_before / slow_rows_per_epoch,
        },
        windows={r: window for r in "RSTU"},
        parallelism=parallelism,
    )
