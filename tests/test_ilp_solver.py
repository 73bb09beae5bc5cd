"""Unit and property tests for the exact 0/1 ILP solver."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.ilp import IlpModel, solve
from repro.ilp.solver import brute_force


def make_model(n_vars, objective, constraints):
    m = IlpModel()
    for i in range(n_vars):
        m.add_var(f"v{i}", obj=objective.get(i, 0.0))
    for coeffs, sense, rhs in constraints:
        m.add_constraint({f"v{i}": c for i, c in coeffs.items()}, sense, rhs)
    return m


class TestModel:
    def test_add_var_idempotent(self):
        m = IlpModel()
        m.add_var("x", obj=2.0)
        m.add_var("x", obj=2.0)
        assert m.num_variables == 1

    def test_add_var_conflicting_objective_rejected(self):
        m = IlpModel()
        m.add_var("x", obj=2.0)
        with pytest.raises(ValueError):
            m.add_var("x", obj=3.0)

    def test_unknown_variable_rejected(self):
        m = IlpModel()
        with pytest.raises(KeyError):
            m.add_constraint({"nope": 1.0}, ">=", 0.0)

    def test_bad_sense_rejected(self):
        m = IlpModel()
        m.add_var("x")
        with pytest.raises(ValueError):
            m.add_constraint({"x": 1.0}, "<=", 1.0)

    def test_feasibility_check(self):
        m = make_model(2, {}, [({0: 1.0, 1: 1.0}, ">=", 1.0)])
        assert m.is_feasible({"v0": 1, "v1": 0})
        assert not m.is_feasible({"v0": 0, "v1": 0})


class TestSolveBasics:
    def test_empty_model(self):
        sol = solve(IlpModel())
        assert sol.status == "optimal"
        assert sol.objective == 0.0

    def test_unconstrained_minimum_is_zero(self):
        m = make_model(3, {0: 1.0, 1: 2.0, 2: 3.0}, [])
        sol = solve(m)
        assert sol.objective == 0.0
        assert all(v == 0 for v in sol.assignment.values())

    def test_cover_constraint(self):
        m = make_model(
            3, {0: 5.0, 1: 3.0, 2: 4.0}, [({0: 1, 1: 1, 2: 1}, ">=", 1.0)]
        )
        sol = solve(m)
        assert sol.objective == 3.0
        assert sol["v1"] == 1

    def test_choice_group(self):
        m = make_model(
            3, {0: 5.0, 1: 3.0, 2: 4.0}, [({0: 1, 1: 1, 2: 1}, "==", 1.0)]
        )
        sol = solve(m)
        assert sol.objective == 3.0
        assert sum(sol.assignment.values()) == 1

    def test_implication_pattern(self):
        # -C x + c1 y1 + c2 y2 >= 0 forces both ys when x chosen (Eq. 3)
        m = make_model(
            3,
            {1: 2.0, 2: 3.0},
            [
                ({0: 1}, "==", 1.0),
                ({0: -5.0, 1: 2.0, 2: 3.0}, ">=", 0.0),
            ],
        )
        sol = solve(m)
        assert sol.status == "optimal"
        assert sol.assignment == {"v0": 1, "v1": 1, "v2": 1}
        assert sol.objective == 5.0

    def test_infeasible(self):
        m = make_model(1, {}, [({0: 1.0}, ">=", 2.0)])
        assert solve(m).status == "infeasible"

    def test_conflicting_equalities_infeasible(self):
        m = make_model(1, {}, [({0: 1.0}, "==", 1.0), ({0: 1.0}, "==", 0.0)])
        assert solve(m).status == "infeasible"

    def test_negative_objective_prefers_one(self):
        m = make_model(1, {0: -4.0}, [])
        sol = solve(m)
        assert sol.objective == -4.0
        assert sol["v0"] == 1

    def test_sharing_beats_local_optimum(self):
        # miniature of §V-2: two groups, candidate B of each shares step s
        m = IlpModel()
        m.add_var("a1")
        m.add_var("b1")
        m.add_var("a2")
        m.add_var("b2")
        m.add_var("sA1", obj=10.0)
        m.add_var("sB", obj=12.0)
        m.add_var("sA2", obj=10.0)
        m.add_constraint({"a1": 1, "b1": 1}, "==", 1)
        m.add_constraint({"a2": 1, "b2": 1}, "==", 1)
        m.add_constraint({"a1": -10, "sA1": 10}, ">=", 0)
        m.add_constraint({"b1": -12, "sB": 12}, ">=", 0)
        m.add_constraint({"a2": -10, "sA2": 10}, ">=", 0)
        m.add_constraint({"b2": -12, "sB": 12}, ">=", 0)
        sol = solve(m)
        # sharing sB (12) beats two locally optimal sA (20)
        assert sol.objective == 12.0
        assert sol["b1"] == 1 and sol["b2"] == 1

    def test_node_limit_returns_feasible_or_unknown(self):
        m = make_model(
            8,
            {i: float(i + 1) for i in range(8)},
            [({i: 1.0 for i in range(8)}, ">=", 4.0)],
        )
        sol = solve(m, node_limit=1)
        assert sol.status in ("feasible", "optimal", "unknown")

    def test_implications_bound_does_not_change_optimum(self):
        m = IlpModel()
        m.add_var("x1")
        m.add_var("x2")
        m.add_var("y1", obj=7.0)
        m.add_var("y2", obj=9.0)
        m.add_constraint({"x1": 1, "x2": 1}, "==", 1)
        m.add_constraint({"x1": -7, "y1": 7}, ">=", 0)
        m.add_constraint({"x2": -9, "y2": 9}, ">=", 0)
        plain = solve(m)
        bounded = solve(m, implications={"x1": ["y1"], "x2": ["y2"]})
        assert plain.objective == bounded.objective == 7.0


@st.composite
def small_ilps(draw):
    n = draw(st.integers(2, 7))
    objective = {
        i: draw(st.integers(-5, 9)) for i in range(n) if draw(st.booleans())
    }
    n_cons = draw(st.integers(0, 5))
    constraints = []
    for _ in range(n_cons):
        size = draw(st.integers(1, min(4, n)))
        idx = draw(
            st.lists(st.integers(0, n - 1), min_size=size, max_size=size, unique=True)
        )
        coeffs = {i: draw(st.integers(-4, 4)) for i in idx}
        sense = draw(st.sampled_from([">=", "=="]))
        rhs = draw(st.integers(-4, 4))
        constraints.append((coeffs, sense, rhs))
    return make_model(n, {k: float(v) for k, v in objective.items()}, constraints)


class TestAgainstBruteForce:
    @settings(max_examples=120, deadline=None)
    @given(small_ilps())
    def test_matches_brute_force(self, model):
        exact = solve(model)
        ref = brute_force(model)
        assert exact.status == ref.status
        if ref.status == "optimal":
            assert exact.objective == pytest.approx(ref.objective)
            assert model.is_feasible(exact.assignment)

    @settings(max_examples=40, deadline=None)
    @given(small_ilps())
    def test_solution_always_feasible(self, model):
        sol = solve(model)
        if sol.status == "optimal":
            assert model.is_feasible(sol.assignment)
            assert sol.objective == pytest.approx(
                model.objective_value(sol.assignment)
            )


class TestDecomposition:
    def test_components_detected(self):
        from repro.ilp.solver import _components

        m = make_model(4, {}, [({0: 1, 1: 1}, ">=", 1.0), ({2: 1, 3: 1}, ">=", 1.0)])
        comps = _components(m)
        assert sorted(sorted(c) for c in comps) == [["v0", "v1"], ["v2", "v3"]]

    def test_decomposed_equals_monolithic(self):
        m = make_model(
            6,
            {i: float(i + 1) for i in range(6)},
            [
                ({0: 1, 1: 1}, "==", 1.0),
                ({2: 1, 3: 1}, "==", 1.0),
                ({4: 1, 5: 1}, ">=", 1.0),
            ],
        )
        a = solve(m, decompose=True)
        b = solve(m, decompose=False)
        assert a.status == b.status == "optimal"
        assert a.objective == pytest.approx(b.objective)

    def test_isolated_variable_component(self):
        m = make_model(2, {0: 3.0, 1: -2.0}, [])
        sol = solve(m)
        assert sol.objective == -2.0
        assert sol.assignment == {"v0": 0, "v1": 1}

    def test_infeasible_component_propagates(self):
        m = make_model(3, {}, [({0: 1}, ">=", 2.0), ({1: 1, 2: 1}, ">=", 1.0)])
        assert solve(m).status == "infeasible"


class TestWarmStart:
    def test_warm_start_feasible_used_as_incumbent(self):
        m = make_model(
            3, {0: 5.0, 1: 3.0, 2: 4.0}, [({0: 1, 1: 1, 2: 1}, "==", 1.0)]
        )
        sol = solve(m, warm_start={"v0": 1}, node_limit=0)
        # node_limit=0: search aborts immediately → incumbent = warm start
        assert sol.status == "feasible"
        assert sol.objective == 5.0

    def test_warm_start_not_binding_when_search_completes(self):
        m = make_model(
            3, {0: 5.0, 1: 3.0, 2: 4.0}, [({0: 1, 1: 1, 2: 1}, "==", 1.0)]
        )
        sol = solve(m, warm_start={"v0": 1})
        assert sol.status == "optimal"
        assert sol.objective == 3.0

    def test_infeasible_warm_start_ignored(self):
        m = make_model(2, {0: 1.0}, [({0: 1, 1: 1}, "==", 1.0)])
        sol = solve(m, warm_start={"v0": 1, "v1": 1})
        assert sol.status == "optimal"
        assert sol.objective == 0.0
