"""Exact branch-and-bound solver for 0/1 ILPs.

Search strategy, tailored to (but not limited to) the paper's plan
selection ILP (Section V):

* **Normalization** — every constraint becomes one or two ``a·x ≥ b``
  rows; per-row achievable-LHS intervals ``[lo, hi]`` are maintained
  incrementally with a trail for backtracking.
* **Unit propagation** — a row fails when ``hi < b``; a variable whose
  opposite value would make the row fail is forced. This makes the
  paper's cost constraints (``-PCost·x + Σ StepCost·y ≥ 0``) drive all
  step variables of a chosen probe order to 1 without branching.
* **SOS1 branching** — equality rows ``Σ x = 1`` with unit coefficients
  are detected as choice groups (one probe order per query and start
  relation); the search branches n-ary over the group's candidates,
  cheapest implied marginal cost first, so the first leaf reached is a
  greedy shared plan that seeds the incumbent.
* **Bounding** — lower bound = objective committed so far + the largest
  over unresolved groups of the cheapest *marginal* objective any of its
  open candidates would still have to pay (via the ``implications`` map
  from probe-order variables to their step variables). Valid because at
  least one candidate of every unresolved group must be selected and all
  of its implied variables end up at 1.
* **Cheap completion** — once no group is unresolved, all unassigned
  variables are tentatively set to their objective-preferred value and
  the full assignment is verified; on failure the solver falls back to
  per-variable branching, keeping the solver exact for arbitrary models.

An optional ``time_limit`` turns the solver into an anytime algorithm:
the best incumbent is returned with status ``"feasible"``.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field
from typing import Iterable, Mapping, Sequence

from .model import Constraint, IlpModel

_EPS = 1e-9


@dataclass
class Solution:
    status: str  # "optimal" | "feasible" | "infeasible" | "unknown"
    objective: float | None
    assignment: dict[str, int]
    nodes: int
    runtime: float

    def __getitem__(self, var: str) -> int:
        return self.assignment.get(var, 0)

    def selected(self, prefix: str = "") -> list[str]:
        return sorted(
            v for v, val in self.assignment.items() if val == 1 and v.startswith(prefix)
        )


class _Row:
    __slots__ = ("idx", "coef", "rhs", "lo", "hi")

    def __init__(self, idx: list[int], coef: list[float], rhs: float):
        self.idx = idx
        self.coef = coef
        self.rhs = rhs
        self.lo = sum(min(0.0, c) for c in coef)
        self.hi = sum(max(0.0, c) for c in coef)


def _detect_groups(model: IlpModel, var_index: dict[str, int]) -> list[list[int]]:
    """SOS1 groups: equality constraints Σ x_i = 1 with unit coefficients."""
    groups = []
    for con in model.constraints:
        if (
            con.sense == "=="
            and abs(con.rhs - 1.0) < _EPS
            and len(con.coeffs) >= 2
            and all(abs(c - 1.0) < _EPS for _, c in con.coeffs)
        ):
            groups.append([var_index[v] for v, _ in con.coeffs])
    return groups


def solve(
    model: IlpModel,
    *,
    time_limit: float | None = None,
    branch_groups: Sequence[Sequence[str]] | None = None,
    implications: Mapping[str, Iterable[str]] | None = None,
    order_bias: Mapping[str, float] | None = None,
    warm_start: Mapping[str, int] | None = None,
    equiv_tags: Mapping[str, object] | None = None,
    node_limit: int | None = None,
    decompose: bool = True,
) -> Solution:
    """Minimize the model's objective exactly (see module docstring).

    With ``decompose`` (default), the model first splits into connected
    components of its variable/constraint graph, solved independently —
    the paper's ILP naturally decomposes because step identities include
    the probe order's starting relation, so sharing (and thus coupling)
    only exists among probe orders with related starts/stores.
    """
    if decompose:
        comps = _components(model)
        if len(comps) > 1:
            return _solve_decomposed(
                model,
                comps,
                time_limit=time_limit,
                branch_groups=branch_groups,
                implications=implications,
                order_bias=order_bias,
                warm_start=warm_start,
                equiv_tags=equiv_tags,
                node_limit=node_limit,
            )
    return _solve_monolithic(
        model,
        time_limit=time_limit,
        branch_groups=branch_groups,
        implications=implications,
        order_bias=order_bias,
        warm_start=warm_start,
        equiv_tags=equiv_tags,
        node_limit=node_limit,
    )


def _components(model: IlpModel) -> list[set[str]]:
    """Connected components over variables (constraints as hyperedges)."""
    parent: dict[str, str] = {v: v for v in model.variables}

    def find(v: str) -> str:
        while parent[v] != v:
            parent[v] = parent[parent[v]]
            v = parent[v]
        return v

    for con in model.constraints:
        vs = [v for v, _ in con.coeffs]
        for other in vs[1:]:
            ra, rb = find(vs[0]), find(other)
            if ra != rb:
                parent[ra] = rb
    comps: dict[str, set[str]] = {}
    for v in model.variables:
        comps.setdefault(find(v), set()).add(v)
    return list(comps.values())


def _solve_decomposed(
    model: IlpModel,
    comps: list[set[str]],
    *,
    time_limit,
    branch_groups,
    implications,
    order_bias,
    warm_start,
    equiv_tags,
    node_limit,
) -> Solution:
    t0 = time.perf_counter()
    assignment: dict[str, int] = {}
    objective = 0.0
    nodes = 0
    worst = "optimal"
    for comp in sorted(comps, key=len, reverse=True):
        sub = IlpModel()
        for v in sorted(comp):
            sub.add_var(v, obj=model.objective.get(v, 0.0))
        for con in model.constraints:
            if any(v in comp for v, _ in con.coeffs):
                sub.add_constraint(dict(con.coeffs), con.sense, con.rhs)
        remaining = None
        if time_limit is not None:
            remaining = max(0.5, time_limit - (time.perf_counter() - t0))
        sol = _solve_monolithic(
            sub,
            time_limit=remaining,
            branch_groups=None
            if branch_groups is None
            else [g for g in branch_groups if any(v in comp for v in g)],
            implications=None
            if implications is None
            else {v: ws for v, ws in implications.items() if v in comp},
            order_bias=None
            if order_bias is None
            else {v: b for v, b in order_bias.items() if v in comp},
            warm_start=None
            if warm_start is None
            else {v: x for v, x in warm_start.items() if v in comp},
            equiv_tags=None
            if equiv_tags is None
            else {v: t for v, t in equiv_tags.items() if v in comp},
            node_limit=node_limit,
        )
        nodes += sol.nodes
        if sol.status in ("infeasible", "unknown"):
            return Solution(sol.status, None, {}, nodes, time.perf_counter() - t0)
        if sol.status == "feasible":
            worst = "feasible"
        assignment.update(sol.assignment)
        objective += sol.objective
    return Solution(worst, objective, assignment, nodes, time.perf_counter() - t0)


def _solve_monolithic(
    model: IlpModel,
    *,
    time_limit: float | None = None,
    branch_groups: Sequence[Sequence[str]] | None = None,
    implications: Mapping[str, Iterable[str]] | None = None,
    order_bias: Mapping[str, float] | None = None,
    warm_start: Mapping[str, int] | None = None,
    equiv_tags: Mapping[str, object] | None = None,
    node_limit: int | None = None,
) -> Solution:
    """Single-component branch and bound (see module docstring).

    ``order_bias`` adds a per-variable heuristic cost used *only* for
    candidate ordering inside choice groups (e.g. estimated maintenance
    cost of MIR-probing probe orders) — it never affects the lower
    bound, so exactness is preserved. ``warm_start`` seeds the incumbent
    with a known-feasible assignment (e.g. the naively shared plan), so
    a timeout can never return something worse than the warm start.
    """
    t0 = time.perf_counter()
    import sys

    old_limit = sys.getrecursionlimit()
    sys.setrecursionlimit(max(old_limit, 4 * model.num_variables + 10_000))
    names = model.variables
    n = len(names)
    var_index = {v: i for i, v in enumerate(names)}
    obj = [0.0] * n
    for v, c in model.objective.items():
        obj[var_index[v]] = c

    # Normalize constraints to >= rows.
    rows: list[_Row] = []
    for con in model.constraints:
        idx = [var_index[v] for v, _ in con.coeffs]
        coef = [c for _, c in con.coeffs]
        rows.append(_Row(list(idx), list(coef), con.rhs))
        if con.sense == "==":
            rows.append(_Row(list(idx), [-c for c in coef], -con.rhs))
    rows_of_var: list[list[tuple[int, float]]] = [[] for _ in range(n)]
    for ri, row in enumerate(rows):
        for vi, c in zip(row.idx, row.coef):
            rows_of_var[vi].append((ri, c))

    if branch_groups is not None:
        groups = [[var_index[v] for v in g] for g in branch_groups]
    else:
        groups = _detect_groups(model, var_index)
    impl: list[list[int]] = [[] for _ in range(n)]
    if implications:
        for v, ws in implications.items():
            impl[var_index[v]] = [var_index[w] for w in ws]

    assign = [-1] * n
    trail: list[tuple[int, list[tuple[int, float, float]]]] = []
    committed = 0.0

    def push(vi: int, val: int) -> bool:
        """Assign and update row intervals; False on immediate failure."""
        nonlocal committed
        changes: list[tuple[int, float, float]] = []
        assign[vi] = val
        if val == 1:
            committed += obj[vi]
        for ri, c in rows_of_var[vi]:
            row = rows[ri]
            d_lo = c * val - min(0.0, c)
            d_hi = c * val - max(0.0, c)
            changes.append((ri, d_lo, d_hi))
            row.lo += d_lo
            row.hi += d_hi
        trail.append((vi, changes))
        for ri, _, _ in changes:
            if rows[ri].hi < rows[ri].rhs - _EPS:
                return False
        return True

    def undo_to(mark: int) -> None:
        nonlocal committed
        while len(trail) > mark:
            vi, changes = trail.pop()
            if assign[vi] == 1:
                committed -= obj[vi]
            assign[vi] = -1
            for ri, d_lo, d_hi in changes:
                rows[ri].lo -= d_lo
                rows[ri].hi -= d_hi

    def propagate(queue: list[int]) -> bool:
        """Unit propagation from freshly assigned variables."""
        qi = 0
        while qi < len(queue):
            vi = queue[qi]
            qi += 1
            for ri, _ in rows_of_var[vi]:
                row = rows[ri]
                if row.hi < row.rhs - _EPS:
                    return False
                slack = row.hi - row.rhs
                for wj, c in zip(row.idx, row.coef):
                    if assign[wj] != -1:
                        continue
                    if c > _EPS and c > slack + _EPS:
                        # setting wj = 0 would lose c from hi → must be 1
                        if not push(wj, 1):
                            return False
                        queue.append(wj)
                    elif c < -_EPS and -c > slack + _EPS:
                        if not push(wj, 0):
                            return False
                        queue.append(wj)
        return True

    def assign_and_propagate(vi: int, val: int) -> bool:
        if not push(vi, val):
            return False
        return propagate([vi])

    bias = [0.0] * n
    if order_bias:
        for v, b in order_bias.items():
            bias[var_index[v]] = b
    # equivalence tags: candidates are interchangeable (for dedupe at a
    # branch point) only when BOTH their unset implied-step sets and
    # their tags agree — the tag carries constraint obligations the
    # implied set cannot see (e.g. required MIR maintenance groups).
    tags: list[object] = [None] * n
    if equiv_tags:
        for v, tg in equiv_tags.items():
            tags[var_index[v]] = tg

    def marginal(vi: int) -> float:
        """Objective still to pay if candidate vi is selected (valid
        lower bound on the candidate's marginal cost)."""
        m = obj[vi] if assign[vi] != 1 else 0.0
        for wj in impl[vi]:
            if assign[wj] != 1:
                m += obj[wj]
        return m

    def order_key(vi: int) -> float:
        """Heuristic ordering: marginal plus bias (never used in bounds)."""
        return marginal(vi) + bias[vi]

    def group_state(g: list[int]) -> tuple[bool, list[int]]:
        """(resolved?, open candidates)."""
        open_c = []
        for vi in g:
            if assign[vi] == 1:
                return True, []
            if assign[vi] == -1:
                open_c.append(vi)
        return False, open_c

    def unset_implied(vi: int) -> list[int]:
        out = [wj for wj in impl[vi] if assign[wj] != 1]
        if assign[vi] != 1 and obj[vi]:
            out.append(vi)
        return out

    def lower_bound() -> float:
        """committed + Σ obj(inevitable steps) + max over groups of the
        cheapest non-inevitable marginal.

        A step is *inevitable* for a group when every open candidate of
        the group still implies it — any completion pays it. On top of
        the union of inevitable steps, every unresolved group pays at
        least its cheapest candidate's non-inevitable marginal; the max
        over groups of that quantity is a valid additional bound."""
        inevitable: set[int] = set()
        opens: list[list[list[int]]] = []
        for g in groups:
            resolved, open_c = group_state(g)
            if resolved or not open_c:
                continue
            sets = [unset_implied(vi) for vi in open_c]
            common = set(sets[0])
            for s in sets[1:]:
                common &= set(s)
                if not common:
                    break
            inevitable |= common
            opens.append(sets)
        extra = sum(obj[y] for y in inevitable)
        best_rest = 0.0
        for sets in opens:
            m = min(sum(obj[y] for y in s if y not in inevitable) for s in sets)
            if m > best_rest:
                best_rest = m
        return committed + extra + best_rest

    best_obj: float | None = None
    best_assign: dict[str, int] = {}
    nodes = 0
    timed_out = False

    def record_leaf() -> None:
        nonlocal best_obj, best_assign
        val = committed
        if best_obj is None or val < best_obj - _EPS:
            best_obj = val
            best_assign = {names[i]: assign[i] for i in range(n)}

    def out_of_budget() -> bool:
        nonlocal timed_out
        if time_limit is not None and time.perf_counter() - t0 > time_limit:
            timed_out = True
            return True
        if node_limit is not None and nodes > node_limit:
            timed_out = True
            return True
        return False

    def cheap_completion() -> bool:
        """Check whether completing every unassigned variable with its
        objective-preferred value is feasible. If so this completion is
        the optimal extension of the current partial assignment (each
        free variable's contribution is minimized independently), so it
        can be recorded and the subtree closed. No propagation: a forced
        non-preferred value would invalidate the optimality argument."""
        nonlocal best_obj, best_assign
        full = {}
        val = 0.0
        for i in range(n):
            if assign[i] == -1:
                v = 0 if obj[i] >= 0 else 1
            else:
                v = assign[i]
            full[names[i]] = v
            if v:
                val += obj[i]
        if not model.is_feasible(full):
            return False
        if best_obj is None or val < best_obj - _EPS:
            best_obj = val
            best_assign = full
        return True

    def search() -> None:
        nonlocal nodes, timed_out
        nodes += 1
        if node_limit is not None and nodes > node_limit:
            timed_out = True
            return
        if nodes % 512 == 0 and out_of_budget():
            return
        if best_obj is not None and lower_bound() >= best_obj - _EPS:
            return
        # pick the unresolved group with the most expensive cheapest
        # candidate ("most costly first" raises the bound fastest)
        target_group = None
        target_score = -1.0
        for g in groups:
            resolved, open_c = group_state(g)
            if resolved:
                continue
            if not open_c:
                return  # group unsatisfiable
            score = min(marginal(vi) for vi in open_c)
            if score > target_score:
                target_score = score
                target_group = open_c
        if target_group is not None:
            # dedupe candidates whose unset implied-step sets coincide —
            # they are interchangeable for both objective and sharing
            # Dedupe is only sound when the caller supplied a COMPLETE
            # implications map (the implied set then fully describes a
            # candidate's objective effect) and tagged the candidate
            # with its remaining constraint obligations.
            can_dedupe = implications is not None and equiv_tags is not None
            seen_sets: set[tuple] = set()
            ordered = []
            for vi in sorted(target_group, key=order_key):
                if not can_dedupe or tags[vi] is None or not impl[vi]:
                    ordered.append(vi)
                    continue
                key = (frozenset(unset_implied(vi)), tags[vi])
                if key in seen_sets:
                    continue
                seen_sets.add(key)
                ordered.append(vi)
            for vi in ordered:
                if timed_out:
                    return
                mark = len(trail)
                if assign_and_propagate(vi, 1):
                    search()
                undo_to(mark)
            return
        # no unresolved groups → complete remaining variables
        if all(a != -1 for a in assign):
            if rows and not all(r.lo >= r.rhs - _EPS for r in rows):
                return
            record_leaf()
            return
        if cheap_completion():
            return
        vi = next(i for i in range(n) if assign[i] == -1)
        first = 0 if obj[vi] >= 0 else 1
        for val in (first, 1 - first):
            if timed_out:
                return
            mark = len(trail)
            if assign_and_propagate(vi, val):
                search()
            undo_to(mark)

    if warm_start is not None:
        full = {v: int(warm_start.get(v, 0)) for v in names}
        if model.is_feasible(full):
            best_obj = model.objective_value(full)
            best_assign = full

    # Root propagation (constraints that force variables unconditionally,
    # e.g. a choice group of size one).
    feasible_root = True
    for row in rows:
        if row.hi < row.rhs - _EPS:
            feasible_root = False
    if feasible_root:
        feasible_root = propagate(list(range(n))) if n else True
    if feasible_root:
        search()
    sys.setrecursionlimit(old_limit)

    runtime = time.perf_counter() - t0
    if best_obj is None:
        status = "unknown" if timed_out else "infeasible"
        return Solution(status, None, {}, nodes, runtime)
    status = "feasible" if timed_out else "optimal"
    return Solution(status, best_obj, best_assign, nodes, runtime)


def brute_force(model: IlpModel) -> Solution:
    """Reference solver: exhaustive enumeration (tests only, n ≤ ~18)."""
    t0 = time.perf_counter()
    names = model.variables
    n = len(names)
    if n > 22:
        raise ValueError("brute_force is for small test models only")
    best: float | None = None
    best_assign: dict[str, int] = {}
    for mask in range(1 << n):
        assignment = {names[i]: (mask >> i) & 1 for i in range(n)}
        if not model.is_feasible(assignment):
            continue
        val = model.objective_value(assignment)
        if best is None or val < best - _EPS:
            best = val
            best_assign = assignment
    runtime = time.perf_counter() - t0
    if best is None:
        return Solution("infeasible", None, {}, 1 << n, runtime)
    return Solution("optimal", best, best_assign, 1 << n, runtime)
