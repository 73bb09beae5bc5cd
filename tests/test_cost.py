"""Unit tests for the cost model (Eq. 1) — checked against the paper's
worked numbers in §V-2."""
import pytest

from repro.core.cost import Statistics, plan_cost, probe_order_cost, step_cost
from repro.core.mir import Mir
from repro.core.probe_orders import (
    generate_maintenance_orders,
    generate_probe_orders,
)
from repro.core.query import Query, pred


@pytest.fixture()
def example_stats():
    """§V-2: rates 100 everywhere; |S⋈T| = 150, other joins 100."""
    return Statistics(
        rates={"R": 100.0, "S": 100.0, "T": 100.0, "U": 100.0},
        selectivities={
            pred("R", "a", "S", "a"): 0.01,
            pred("S", "b", "T", "b"): 0.015,
            pred("T", "c", "U", "c"): 0.01,
        },
        parallelism=4,
    )


@pytest.fixture()
def q1():
    return Query.of("q1", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")])


@pytest.fixture()
def q2():
    return Query.of("q2", [pred("S", "b", "T", "b"), pred("T", "c", "U", "c")])


class TestStatistics:
    def test_single_relation_card_is_rate(self, example_stats):
        assert example_stats.card({"R"}, frozenset()) == 100.0

    def test_pair_card(self, example_stats):
        # |S⋈T| = 100·100·0.015 = 150 (paper's number)
        assert example_stats.card(
            {"S", "T"}, {pred("S", "b", "T", "b")}
        ) == pytest.approx(150.0)

    def test_triple_card(self, example_stats, q1):
        # |R⋈S⋈T| = 1e6 · 0.01 · 0.015 = 150
        assert example_stats.card(q1.relations, q1.predicates) == pytest.approx(150.0)

    def test_card_override(self, example_stats):
        example_stats.card_overrides[frozenset({"S", "T"})] = 999.0
        assert example_stats.card({"S", "T"}, frozenset()) == 999.0

    def test_window_scales_card(self):
        st = Statistics(
            rates={"R": 10.0, "S": 10.0},
            windows={"R": 2.0, "S": 3.0},
            default_selectivity=0.1,
        )
        # 10·10·0.1 · min(2,3)^1 = 20
        assert st.card(
            {"R", "S"}, {pred("R", "a", "S", "a")}
        ) == pytest.approx(20.0)

    def test_default_selectivity(self):
        st = Statistics(rates={"R": 2.0, "S": 4.0})
        assert st.card({"R", "S"}, {pred("R", "a", "S", "a")}) == 8.0


class TestStepCost:
    def test_first_step_costs_rate(self, example_stats, q1):
        # sending S-tuples to any first store costs rate(S) = 100
        for o in generate_probe_orders(q1)["S"]:
            assert step_cost(o.steps(q1)[0], example_stats) == pytest.approx(100.0)

    def test_second_step_fractions(self, example_stats, q1):
        # ⟨S,R,T⟩: |S⋈R|/2 = 50; ⟨S,T,R⟩: |S⋈T|/2 = 75 (paper's numbers)
        orders = {o.label: o for o in generate_probe_orders(q1)["S"]}
        assert step_cost(
            orders["⟨S,R,T⟩"].steps(q1)[1], example_stats
        ) == pytest.approx(50.0)
        assert step_cost(
            orders["⟨S,T,R⟩"].steps(q1)[1], example_stats
        ) == pytest.approx(75.0)

    def test_probe_order_cost_sums_steps(self, example_stats, q1):
        orders = {o.label: o for o in generate_probe_orders(q1)["S"]}
        assert probe_order_cost(
            orders["⟨S,R,T⟩"], q1, example_stats
        ) == pytest.approx(150.0)
        assert probe_order_cost(
            orders["⟨S,T,R⟩"], q1, example_stats
        ) == pytest.approx(175.0)

    def test_pcost_per_query_is_475(self, example_stats, q1):
        # paper: optimal per-start probe orders cost 475 in total for q1
        total = 0.0
        for start, orders in generate_probe_orders(q1).items():
            total += min(probe_order_cost(o, q1, example_stats) for o in orders)
        assert total == pytest.approx(475.0)

    def test_broadcast_multiplies_cost(self, q1):
        from repro.core.probe_orders import apply_partitioning, partition_candidates

        stats = Statistics(rates={"R": 10, "S": 10, "T": 10}, parallelism=7)
        pc = partition_candidates([q1])
        decorated = apply_partitioning(generate_probe_orders(q1)["R"], pc)
        # ⟨R,S[S.b],...⟩: R carries only a; S partitioned on b → broadcast
        bcast = [o for o in decorated if "S[S.b]" in o.label][0]
        routed = [o for o in decorated if "S[S.a]" in o.label][0]
        assert step_cost(bcast.steps(q1)[0], stats) == 7 * step_cost(
            routed.steps(q1)[0], stats
        )

    def test_ship_step_cost(self, example_stats):
        # maintenance ⟨S,T,ST⟩: ship |S⋈T|/2 = 75 with χ=1
        m = Mir(frozenset({"S", "T"}), frozenset({pred("S", "b", "T", "b")}))
        o = generate_maintenance_orders(m)["S"][0]
        ship = o.steps(m.subquery())[-1]
        assert step_cost(ship, example_stats) == pytest.approx(75.0)


class TestPlanCost:
    def test_duplicate_steps_counted_once(self, example_stats, q1, q2):
        o1 = [o for o in generate_probe_orders(q1)["S"] if o.label == "⟨S,T,R⟩"][0]
        o2 = [o for o in generate_probe_orders(q2)["S"] if o.label == "⟨S,T,U⟩"][0]
        steps = list(o1.steps(q1)) + list(o2.steps(q2))
        # 4 steps, but the shared ⟨S,T⟩ prefix counted once:
        # 100 + 75 + 75 = 250
        assert plan_cost(steps, example_stats) == pytest.approx(250.0)
