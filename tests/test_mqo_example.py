"""T10 — the paper's worked multi-query optimization example (§V-2).

q1 = R(a),S(a,b),T(b) and q2 = S(b),T(b,c),U(c); every relation streams
at 100 tuples per time unit; |S⋈T| = 150 intermediate results per time
unit, the other joins produce 100.

Paper numbers: optimizing each query individually installs ⟨S,R,T⟩ and
⟨T,U,S⟩ and sends 475 tuples per query → **950 in total**. Sharing the
⟨S,T⟩ prefix makes the locally suboptimal ⟨S,T,R⟩ worthwhile.

The paper's narrative swaps only the S-start probe orders; an exact
solver additionally shares the ⟨T,S⟩ prefix between q1's forced ⟨T,S,R⟩
and q2's ⟨T,S,U⟩, reaching **800** (< the 875 a single swap yields).
"""
import pytest

from repro.core.cost import Statistics
from repro.core.optimizer import (
    individual_cost,
    optimize_independent,
    optimize_mqo,
    optimize_shared,
)
from repro.core.query import Query, pred


@pytest.fixture()
def example():
    q1 = Query.of("q1", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")])
    q2 = Query.of("q2", [pred("S", "b", "T", "b"), pred("T", "c", "U", "c")])
    stats = Statistics(
        rates={"R": 100.0, "S": 100.0, "T": 100.0, "U": 100.0},
        selectivities={
            pred("R", "a", "S", "a"): 0.01,
            pred("S", "b", "T", "b"): 0.015,
            pred("T", "c", "U", "c"): 0.01,
        },
        parallelism=4,
    )
    return [q1, q2], stats


def test_individual_cost_is_950(example):
    queries, stats = example
    singles = optimize_independent(queries, stats, use_mirs=False)
    assert individual_cost(singles) == pytest.approx(950.0)


def test_mqo_shares_st_prefix(example):
    queries, stats = example
    res = optimize_mqo(queries, stats, use_mirs=False)
    assert res.status == "optimal"
    # exact optimum: 800 (see module docstring); at most the paper's 875
    assert res.objective == pytest.approx(800.0)
    assert res.objective <= 875.0 + 1e-9
    # q1 installs the locally suboptimal ⟨S,T,R⟩ to share ⟨S,T⟩ with q2
    chosen_s = res.plan.chosen[("q1", "S")]
    assert [sorted(t.rels) for t in chosen_s.targets] == [["T"], ["R"]]


def test_mqo_objective_equals_plan_cost(example):
    queries, stats = example
    res = optimize_mqo(queries, stats, use_mirs=False)
    assert res.cost == pytest.approx(res.objective)


def test_shared_between_individual_and_mqo(example):
    queries, stats = example
    singles = optimize_independent(queries, stats, use_mirs=False)
    shared_plan, _ = optimize_shared(queries, stats, use_mirs=False)
    mqo = optimize_mqo(queries, stats, use_mirs=False)
    ind = individual_cost(singles)
    assert mqo.objective <= shared_plan.cost() + 1e-9 <= ind + 1e-9


def test_with_mirs_never_worse(example):
    queries, stats = example
    plain = optimize_mqo(queries, stats, use_mirs=False)
    with_mirs = optimize_mqo(queries, stats, use_mirs=True)
    assert with_mirs.objective <= plain.objective + 1e-9
