"""Unit tests for Algorithm 2 (ILP construction)."""
import pytest

from repro.core.cost import Statistics, step_cost
from repro.core.ilp_build import build_ilp
from repro.core.query import Query, pred
from repro.ilp import solve


@pytest.fixture()
def fig3_queries():
    q1 = Query.of("q1", [pred("R", "b", "S", "b"), pred("S", "c", "T", "c")])
    q2 = Query.of("q2", [pred("S", "c", "T", "c"), pred("T", "d", "U", "d")])
    return [q1, q2]


@pytest.fixture()
def uniform_stats():
    return Statistics(
        rates={r: 100.0 for r in "RSTU"},
        default_selectivity=0.01,
        parallelism=4,
    )


class TestStructure:
    def test_one_choice_group_per_query_and_start(self, fig3_queries, uniform_stats):
        art = build_ilp(fig3_queries, uniform_stats, use_mirs=False)
        assert set(art.choice_groups) == {
            ("q1", "R"), ("q1", "S"), ("q1", "T"),
            ("q2", "S"), ("q2", "T"), ("q2", "U"),
        }

    def test_fig3_choice_group_sizes(self, fig3_queries, uniform_stats):
        # (q1, R) has 6 decorated candidates σ1..σ6 (Fig 3)
        art = build_ilp(fig3_queries, uniform_stats, use_mirs=True)
        assert len(art.choice_groups[("q1", "R")]) == 6

    def test_choice_constraints_are_sum_to_one(self, fig3_queries, uniform_stats):
        art = build_ilp(fig3_queries, uniform_stats, use_mirs=False)
        eq = [c for c in art.model.constraints if c.sense == "=="]
        groups = {frozenset(v for v, _ in c.coeffs) for c in eq}
        for g in art.choice_groups.values():
            assert frozenset(g) in groups

    def test_step_variables_shared_across_queries(self, uniform_stats):
        # §V-2: q1 and q2 both contain the ⟨S,T⟩ step → one shared y var
        q1 = Query.of("q1", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")])
        q2 = Query.of("q2", [pred("S", "b", "T", "b"), pred("T", "c", "U", "c")])
        art = build_ilp([q1, q2], uniform_stats, use_mirs=False)
        st_steps = [
            name
            for name, s in art.y_vars.items()
            if s.covered_before == frozenset({"S"})
            and s.target.rels == frozenset({"T"})
        ]
        # one per decoration of the T store, but NOT one per query
        parts = {art.y_vars[n].target.part for n in st_steps}
        assert len(st_steps) == len(parts)

    def test_cost_constraint_shape(self, fig3_queries, uniform_stats):
        # every x var appears in exactly one cost constraint with -PCost
        art = build_ilp(fig3_queries, uniform_stats, use_mirs=False)
        for xv, po in art.x_vars.items():
            rows = [
                c
                for c in art.model.constraints
                if c.sense == ">=" and any(v == xv and co < 0 for v, co in c.coeffs)
            ]
            assert len(rows) == 1
            row = dict(rows[0].coeffs)
            q = art.subqueries[xv]
            pcost = sum(step_cost(s, uniform_stats) for s in po.steps(q))
            assert row[xv] == pytest.approx(-pcost)
            # positive coefficients sum back to PCost (Eq. 3: C = Σ c_i)
            assert sum(c for v, c in row.items() if v != xv) == pytest.approx(pcost)

    def test_objective_is_step_costs(self, fig3_queries, uniform_stats):
        art = build_ilp(fig3_queries, uniform_stats, use_mirs=False)
        for yv, s in art.y_vars.items():
            assert art.model.objective.get(yv, 0.0) == pytest.approx(
                step_cost(s, uniform_stats)
            )

    def test_maintenance_groups_only_with_mirs(self, fig3_queries, uniform_stats):
        no_mirs = build_ilp(fig3_queries, uniform_stats, use_mirs=False)
        assert not no_mirs.maintenance_groups
        with_mirs = build_ilp(fig3_queries, uniform_stats, use_mirs=True)
        assert with_mirs.maintenance_groups
        # every maintained MIR store has one group per member relation
        for (ref, start), group in with_mirs.maintenance_groups.items():
            assert start in ref.rels
            assert group

    def test_subquery_constraint_links_x_to_maintenance(
        self, fig3_queries, uniform_stats
    ):
        art = build_ilp(fig3_queries, uniform_stats, use_mirs=True)
        # find an x that probes an MIR store; it must appear (negatively)
        # in at least two constraints beyond its cost constraint
        for xv, po in art.x_vars.items():
            if po.maintains is None and po.mir_targets:
                neg_rows = [
                    c
                    for c in art.model.constraints
                    if any(v == xv and co < 0 for v, co in c.coeffs)
                ]
                assert len(neg_rows) >= 1 + len(po.mir_targets[0].rels)
                break
        else:
            pytest.fail("no MIR-probing candidate found")

    def test_duplicate_query_names_rejected(self, uniform_stats):
        q = Query.of("q", [pred("R", "a", "S", "a")])
        with pytest.raises(ValueError):
            build_ilp([q, q], uniform_stats)


class TestPartitionConsistency:
    def test_z_vars_present_only_when_enabled(self, fig3_queries, uniform_stats):
        off = build_ilp(fig3_queries, uniform_stats, use_mirs=False)
        assert not any(v.startswith("z") for v in off.model.variables)
        on = build_ilp(
            fig3_queries, uniform_stats, use_mirs=False, partition_consistency=True
        )
        assert any(v.startswith("z") for v in on.model.variables)

    def test_consistent_solution_uses_one_partition_per_store(
        self, fig3_queries, uniform_stats
    ):
        art = build_ilp(
            fig3_queries, uniform_stats, use_mirs=False, partition_consistency=True
        )
        sol = solve(art.model, implications=art.implications)
        assert sol.status == "optimal"
        # gather the partitioning of each probed store across chosen orders
        from repro.core.plan import decode_plan

        plan = decode_plan(art, sol)
        parts = {}
        for _q, po in plan.probe_orders():
            for t in po.targets:
                prev = parts.setdefault(t.content_key, t.part)
                assert prev == t.part, "store partitioned two ways"

    def test_consistency_never_cheaper(self, fig3_queries, uniform_stats):
        free = build_ilp(fig3_queries, uniform_stats, use_mirs=False)
        cons = build_ilp(
            fig3_queries, uniform_stats, use_mirs=False, partition_consistency=True
        )
        s_free = solve(free.model, implications=free.implications)
        s_cons = solve(cons.model, implications=cons.implications)
        assert s_cons.objective >= s_free.objective - 1e-9
