"""Tests for the three optimization strategies and their invariants."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.cost import Statistics
from repro.core.optimizer import (
    individual_cost,
    merge_plans,
    optimize_independent,
    optimize_mqo,
    optimize_shared,
    optimize_single,
)
from repro.core.query import Query, pred
from repro.workloads.synthetic import IlpEnvironment


@pytest.fixture()
def env():
    return IlpEnvironment(8, rate=100.0)


class TestSingle:
    def test_single_query_diagnostics(self, env):
        q = env.random_queries(1, 3, seed=0)[0]
        res = optimize_single(q, env.statistics(), use_mirs=False)
        assert res.status == "optimal"
        assert res.num_variables > 0
        assert res.probe_orders >= len(q.relations)
        assert res.runtime > 0

    def test_single_equals_mqo_of_one(self, env):
        q = env.random_queries(1, 3, seed=1)[0]
        a = optimize_single(q, env.statistics(), use_mirs=False)
        b = optimize_mqo([q], env.statistics(), use_mirs=False)
        assert a.objective == pytest.approx(b.objective)


class TestStrategyInvariants:
    @settings(max_examples=15, deadline=None)
    @given(st.integers(0, 10_000), st.integers(2, 4), st.integers(2, 4))
    def test_mqo_le_shared_le_individual(self, seed, n_queries, size):
        env = IlpEnvironment(6, rate=50.0)
        queries = env.random_queries(n_queries, size, seed=seed)
        stats = env.statistics()
        singles = optimize_independent(queries, stats, use_mirs=False)
        ind = individual_cost(singles)
        shared_plan, _ = optimize_shared(queries, stats, use_mirs=False)
        mqo = optimize_mqo(queries, stats, use_mirs=False)
        assert mqo.objective <= shared_plan.cost() + 1e-6
        assert shared_plan.cost() <= ind + 1e-6

    def test_merge_plans_dedupes_maintenance(self, env):
        queries = env.random_queries(2, 3, seed=3)
        stats = env.statistics()
        singles = optimize_independent(queries, stats, use_mirs=True)
        for r in singles:
            r.plan.shared = True
        merged = merge_plans([r.plan for r in singles], stats)
        merged.validate()
        assert set(merged.queries) == {q.name for q in queries}

    def test_individual_cost_counts_duplicates(self, env):
        # two identical-structure queries: individual cost is exactly 2×
        q1 = Query.of("qa", [pred("A", "x", "B", "x")])
        q2 = Query.of("qb", [pred("A", "x", "B", "x")])
        stats = Statistics(rates={"A": 10.0, "B": 10.0}, default_selectivity=0.1)
        singles = optimize_independent([q1, q2], stats, use_mirs=False)
        ind = individual_cost(singles)
        one = optimize_single(q1, stats, use_mirs=False).objective
        assert ind == pytest.approx(2 * one)
        # while MQO collapses them entirely
        mqo = optimize_mqo([q1, q2], stats, use_mirs=False)
        assert mqo.objective == pytest.approx(one)


class TestDiagnostics:
    def test_problem_size_grows_with_queries(self, env):
        stats = env.statistics()
        small = optimize_mqo(env.random_queries(2, 3, seed=4), stats, use_mirs=False)
        large = optimize_mqo(env.random_queries(6, 3, seed=4), stats, use_mirs=False)
        assert large.num_variables > small.num_variables
        assert large.probe_orders > small.probe_orders

    def test_time_limit_anytime(self, env):
        queries = env.random_queries(4, 4, seed=5)
        res = optimize_mqo(queries, env.statistics(), use_mirs=False, time_limit=60.0)
        assert res.status in ("optimal", "feasible")
        res.plan.validate()
