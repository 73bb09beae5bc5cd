"""Tests for the workload generators (Fig. 7 TPC-H and Fig. 8/9 synthetic)."""
import numpy as np
import pytest

from repro.core.query import Query, is_connected
from repro.workloads.synthetic import (
    IlpEnvironment,
    fig8a_initial_stats,
    fig8b_initial_stats,
    pair_predicate,
    rel_name,
    rstu_query,
)
from repro.workloads.tpch_queries import (
    ALL_PREDS,
    RELATIONS,
    fig7_workload_5,
    fig7_workload_10,
)


class TestIlpEnvironment:
    def test_pair_predicate_symmetric(self):
        assert pair_predicate(1, 2) == pair_predicate(2, 1)

    def test_pair_predicate_self_join_rejected(self):
        with pytest.raises(ValueError):
            pair_predicate(3, 3)

    def test_statistics_selectivity_is_inverse_rate(self):
        env = IlpEnvironment(10, rate=100.0)
        st = env.statistics()
        assert st.default_selectivity == pytest.approx(0.01)
        # any 2-way join output rate equals the input rate
        p = pair_predicate(0, 1)
        assert st.card({rel_name(0), rel_name(1)}, {p}) == pytest.approx(100.0)

    def test_joinable_ring(self):
        env = IlpEnvironment(10, degree=2)
        assert env.joinable(0, 1) and env.joinable(0, 2)
        assert not env.joinable(0, 3)
        assert env.joinable(0, 9) and env.joinable(0, 8)  # wraparound
        assert not env.joinable(4, 4)

    def test_neighbors_size(self):
        env = IlpEnvironment(100, degree=2)
        assert len(env.neighbors(50)) == 4

    def test_random_query_respects_joinability(self):
        env = IlpEnvironment(20, degree=2)
        rng = np.random.default_rng(5)
        for i in range(10):
            q = env.random_query(f"q{i}", 4, rng)
            for p in q.predicates:
                a, b = sorted(int(r[1:]) for r in p.relations)
                assert env.joinable(a, b)

    def test_random_query_connected(self):
        env = IlpEnvironment(10)
        rng = np.random.default_rng(0)
        for i in range(20):
            q = env.random_query(f"q{i}", 3, rng)
            assert len(q.relations) == 3
            assert is_connected(q.relations, q.predicates)

    def test_random_queries_unique(self):
        env = IlpEnvironment(10)
        qs = env.random_queries(30, 3, seed=1)
        sigs = {(q.relations, q.predicates) for q in qs}
        assert len(sigs) == len(qs) == 30

    def test_query_size_bounded_by_env(self):
        env = IlpEnvironment(3)
        with pytest.raises(ValueError):
            env.random_query("q", 4, np.random.default_rng(0))

    def test_more_relations_less_overlap(self):
        # Fig 9c rationale: queries drawn from 100 relations share little
        small = IlpEnvironment(10).random_queries(30, 3, seed=2)
        big = IlpEnvironment(100).random_queries(30, 3, seed=2)

        def overlap(queries):
            rels = [q.relations for q in queries]
            return sum(
                1
                for i in range(len(rels))
                for j in range(i + 1, len(rels))
                if rels[i] & rels[j]
            )

        assert overlap(big) < overlap(small)


class TestRstu:
    def test_query_shape(self):
        q = rstu_query(windows={r: 5.0 for r in "RSTU"})
        assert q.relations == frozenset("RSTU")
        assert len(q.predicates) == 3
        assert q.window("R") == 5.0

    def test_fig8a_initial_stats_nudges_st(self):
        st = fig8a_initial_stats(rows_per_epoch=100)
        from repro.core.query import pred

        assert st.selectivity(pred("S", "b", "T", "b")) > st.selectivity(
            pred("R", "a", "S", "a")
        )

    def test_fig8a_initial_plan_avoids_st_first(self):
        # the paper's initialization makes ⟨S,R,T,U⟩ and ⟨T,U,R,S⟩ win
        from repro.core.optimizer import optimize_mqo

        st = fig8a_initial_stats(rows_per_epoch=100)
        q = rstu_query(windows={r: 5.0 for r in "RSTU"})
        res = optimize_mqo([q], st, use_mirs=False,
                           windows={r: 5.0 for r in "RSTU"})
        s_order = res.plan.chosen[("rstu", "S")]
        assert sorted(s_order.targets[0].rels) == ["R"]
        t_order = res.plan.chosen[("rstu", "T")]
        assert sorted(t_order.targets[0].rels) == ["U"]

    def test_fig8b_initial_stats_rates(self):
        st = fig8b_initial_stats(r_rows_per_epoch=1000, slow_rows_per_epoch=20)
        assert st.rate("R") == 1000.0
        assert st.rate("S") == 20.0


class TestTpchWorkload:
    def test_join_graph_relations(self):
        assert set(RELATIONS) == {
            "lineitem", "orders", "customer", "part", "supplier", "nation",
        }

    def test_all_preds_touch_known_relations(self):
        for p in ALL_PREDS:
            assert p.relations <= set(RELATIONS)

    def test_workload5_shape(self):
        qs = fig7_workload_5()
        assert len(qs) == 5
        for q in qs:
            assert 2 <= len(q.relations) <= 3
            assert is_connected(q.relations, q.predicates)

    def test_workload10_shape(self):
        qs = fig7_workload_10()
        assert len(qs) == 10
        assert any(len(q.relations) >= 4 for q in qs)

    def test_workload10_has_overlapping_joins(self):
        qs = fig7_workload_10()
        preds = [frozenset(q.predicates) for q in qs]
        shared = sum(
            1
            for i in range(len(preds))
            for j in range(i + 1, len(preds))
            if preds[i] & preds[j]
        )
        assert shared > 0

    def test_workloads_deterministic(self):
        a = [q.predicates for q in fig7_workload_5()]
        b = [q.predicates for q in fig7_workload_5()]
        assert a == b


class TestTpchData:
    def test_tables_and_columns(self, spark):
        from repro.workloads.tpch_queries import tpch_columns, tpch_tables

        tables = tpch_tables(spark, sf=0.001)
        cols = tpch_columns(tables)
        assert set(tables) == set(RELATIONS)
        assert "l_orderkey" in cols["lineitem"]
        assert "s_suppkey" in cols["supplier"]
        assert "n_nationkey" in cols["nation"]

    def test_sample_statistics(self, spark):
        from repro.workloads.tpch_queries import (
            fig7_workload_5,
            sample_statistics,
            tpch_tables,
        )

        tables = tpch_tables(spark, sf=0.001)
        queries = fig7_workload_5()
        stats = sample_statistics(tables, queries, duration=10.0)
        for rel in RELATIONS:
            assert stats.rate(rel) > 0
        # every query predicate got a measured selectivity
        for q in queries:
            for p in q.predicates:
                assert p in stats.selectivities
