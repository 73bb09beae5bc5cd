"""Unit tests for Algorithm 1 and partitioning decoration."""
import pytest

from repro.core.mir import Mir, mirs_for_queries
from repro.core.probe_orders import (
    ProbeOrder,
    Step,
    StoreRef,
    apply_partitioning,
    chi,
    generate_maintenance_orders,
    generate_probe_orders,
    partition_candidates,
)
from repro.core.query import Attr, Query, pred

from .test_mir import linear_query, star_query


@pytest.fixture()
def fig3_queries():
    q1 = Query.of("q1", [pred("R", "b", "S", "b"), pred("S", "c", "T", "c")])
    q2 = Query.of("q2", [pred("S", "c", "T", "c"), pred("T", "d", "U", "d")])
    return q1, q2


class TestGeneration:
    def test_fig3_candidates_q1(self, fig3_queries):
        q1, q2 = fig3_queries
        mirs = mirs_for_queries([q1, q2])
        po = generate_probe_orders(q1, mirs)
        assert {o.label for o in po["R"]} == {"⟨R,S,T⟩", "⟨R,ST⟩"}
        assert {o.label for o in po["S"]} == {"⟨S,R,T⟩", "⟨S,T,R⟩"}
        assert {o.label for o in po["T"]} == {"⟨T,S,R⟩", "⟨T,RS⟩"}

    def test_fig3_candidates_q2(self, fig3_queries):
        q1, q2 = fig3_queries
        mirs = mirs_for_queries([q1, q2])
        po = generate_probe_orders(q2, mirs)
        assert {o.label for o in po["S"]} == {"⟨S,T,U⟩", "⟨S,TU⟩"}
        assert {o.label for o in po["T"]} == {"⟨T,S,U⟩", "⟨T,U,S⟩"}
        assert {o.label for o in po["U"]} == {"⟨U,T,S⟩", "⟨U,ST⟩"}

    def test_no_cross_products(self):
        # chain R-S-T: starting at R, T can never be probed first
        q = Query.of("q", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")])
        po = generate_probe_orders(q)
        assert [o.label for o in po["R"]] == ["⟨R,S,T⟩"]

    def test_every_order_covers_query(self):
        q = linear_query(4)
        for start, orders in generate_probe_orders(q).items():
            for o in orders:
                covered = {start}
                for t in o.targets:
                    covered |= t.rels
                assert covered == set(q.relations)

    @pytest.mark.parametrize("n", [3, 4, 5])
    def test_linear_count_without_mirs(self, n):
        # §V-A: a linear query has 2^(n-2) probe orders ... per *middle*
        # choice structure; ends have exactly 1. Verify by brute count:
        # from an end, the chain forces a unique order; from position i
        # the two directions interleave: C(n-1, i) orders from R_i.
        from math import comb

        q = linear_query(n)
        po = generate_probe_orders(q)
        for i in range(n):
            assert len(po[f"R{i}"]) == comb(n - 1, i)

    def test_star_count_without_mirs(self):
        # from the hub, satellites are probed in any order
        from math import factorial

        q = star_query(4)  # hub + 3 satellites
        po = generate_probe_orders(q)
        assert len(po["H"]) == factorial(3)
        # from a satellite: hub first, then the rest in any order
        assert len(po["L0"]) == factorial(2)

    def test_mir_not_combined_with_overlapping(self, fig3_queries):
        q1, q2 = fig3_queries
        mirs = mirs_for_queries([q1, q2])
        po = generate_probe_orders(q1, mirs)
        for orders in po.values():
            for o in orders:
                seen = set()
                for t in o.targets:
                    assert not (t.rels & seen)
                    seen |= t.rels


class TestSteps:
    def test_step_decomposition(self):
        q = Query.of("q", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")])
        [o] = generate_probe_orders(q)["R"]
        steps = o.steps(q)
        assert len(steps) == 2
        assert steps[0].covered_before == frozenset({"R"})
        assert steps[0].preds == frozenset({pred("R", "a", "S", "a")})
        assert steps[1].covered_before == frozenset({"R", "S"})
        assert steps[1].preds == q.predicates

    def test_shared_step_identity_across_queries(self, fig3_queries):
        # the ⟨S,T⟩ prefix of q1's ⟨S,T,R⟩ and q2's ⟨S,T,U⟩ is the SAME step
        q1, q2 = fig3_queries
        o1 = [o for o in generate_probe_orders(q1)["S"] if o.label == "⟨S,T,R⟩"][0]
        o2 = [o for o in generate_probe_orders(q2)["S"] if o.label == "⟨S,T,U⟩"][0]
        assert o1.steps(q1)[0] == o2.steps(q2)[0]

    def test_steps_differ_when_predicates_differ(self):
        q1 = Query.of("q1", [pred("S", "b", "T", "b")])
        q2 = Query.of("q2", [pred("S", "c", "T", "c")])
        s1 = generate_probe_orders(q1)["S"][0].steps(q1)[0]
        s2 = generate_probe_orders(q2)["S"][0].steps(q2)[0]
        assert s1 != s2

    def test_reverse_direction_is_different_step(self):
        q = Query.of("q", [pred("S", "b", "T", "b")])
        s_st = generate_probe_orders(q)["S"][0].steps(q)[0]
        s_ts = generate_probe_orders(q)["T"][0].steps(q)[0]
        assert s_st != s_ts


class TestMaintenance:
    def test_ends_with_ship_into_mir_store(self):
        m = Mir(frozenset({"S", "T"}), frozenset({pred("S", "c", "T", "c")}))
        orders = generate_maintenance_orders(m)
        assert set(orders) == {"S", "T"}
        for start, os in orders.items():
            for o in os:
                assert o.maintains == m
                assert o.targets[-1].content_key == (m.rels, m.preds)

    def test_ship_step_covers_all_relations(self):
        m = Mir(frozenset({"S", "T"}), frozenset({pred("S", "c", "T", "c")}))
        o = generate_maintenance_orders(m)["S"][0]
        ship = o.steps(m.subquery())[-1]
        assert ship.covered_before == frozenset({"S", "T"})

    def test_nested_mirs_probed(self):
        q = linear_query(4)  # R0-R1-R2-R3
        mirs = mirs_for_queries([q])
        big = [m for m in mirs if m.label == "R0R1R2"][0]
        orders = generate_maintenance_orders(big, mirs)
        labels = {o.label for os in orders.values() for o in os}
        assert "⟨R2,R0R1,R0R1R2⟩" in labels


class TestPartitioning:
    def test_fig3_partition_candidates(self, fig3_queries):
        q1, q2 = fig3_queries
        mirs = mirs_for_queries([q1, q2])
        pc = partition_candidates([q1, q2], mirs)
        by_label = {
            "".join(sorted(rels)): {str(a) for a in attrs}
            for (rels, _preds), attrs in pc.items()
        }
        assert by_label["S"] == {"S.b", "S.c"}
        assert by_label["T"] == {"T.c", "T.d"}
        assert by_label["ST"] == {"S.b", "T.d"}
        assert by_label["RS"] == {"S.c"}
        assert by_label["TU"] == {"T.c"}

    def test_fig3_decorated_count(self, fig3_queries):
        q1, q2 = fig3_queries
        mirs = mirs_for_queries([q1, q2])
        pc = partition_candidates([q1, q2], mirs)
        dec = apply_partitioning(generate_probe_orders(q1, mirs)["R"], pc)
        assert len(dec) == 6  # σ1..σ6

    def test_decoration_preserves_sequence(self, fig3_queries):
        q1, q2 = fig3_queries
        pc = partition_candidates([q1, q2])
        for o in apply_partitioning(generate_probe_orders(q1)["S"], pc):
            assert [sorted(t.rels) for t in o.targets] in (
                [["R"], ["T"]],
                [["T"], ["R"]],
            )
            assert all(t.part is not None for t in o.targets)


class TestChi:
    def test_routable_is_one(self):
        q = Query.of("q", [pred("R", "a", "S", "a")])
        step = Step(
            "R",
            (StoreRef.base("S", Attr("S", "a")),),
            frozenset({pred("R", "a", "S", "a")}),
        )
        assert chi(step, parallelism=5) == 1

    def test_broadcast_is_parallelism(self):
        # Fig 2 ⑦: T probing S partitioned on a (unknown to T) broadcasts
        preds = frozenset({pred("S", "b", "T", "b")})
        step = Step("T", (StoreRef.base("S", Attr("S", "a")),), preds)
        assert chi(step, parallelism=5) == 5

    def test_undecorated_store_is_partitioning_agnostic(self):
        # §V-2 mode: partitioning ignored → no broadcast penalty
        step = Step("T", (StoreRef.base("S"),), frozenset())
        assert chi(step, parallelism=3) == 1
