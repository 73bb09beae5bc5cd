"""Smoke tests for the experiment harnesses (tiny scales) and the jobs'
driver-side paths."""
import math

import pytest

from repro.experiments.fig9 import (
    Fig9Row,
    probe_cost_experiment,
    render_cost_table,
    render_runtime_table,
    runtime_experiment,
)


class TestFig9Harness:
    def test_probe_cost_rows_consistent(self):
        rows = probe_cost_experiment(
            n_relations=8, n_query_list=(3, 6), time_limit=5.0
        )
        assert [r.n_queries for r in rows] == [3, 6]
        for r in rows:
            assert r.mqo <= r.shared + 1e-6 <= r.individual + 1e-6
            assert 0.0 <= r.savings_pct <= 100.0
            assert r.variables > 0 and r.probe_orders > 0

    def test_problem_size_monotone_in_queries(self):
        rows = probe_cost_experiment(
            n_relations=8, n_query_list=(2, 5), time_limit=5.0
        )
        assert rows[1].variables > rows[0].variables

    def test_runtime_experiment_rows(self):
        rows = runtime_experiment(
            n_relations=20, configs=((3, 3), (4, 2)), time_limit=20.0
        )
        assert rows[0].query_size == 3 and rows[1].query_size == 4
        assert rows[1].variables > rows[0].variables
        assert all(math.isnan(r.individual) for r in rows)

    def test_render_tables(self):
        rows = probe_cost_experiment(
            n_relations=8, n_query_list=(2,), time_limit=5.0
        )
        cost_md = render_cost_table(rows)
        assert cost_md.count("\n") >= 2 and "savings" in cost_md
        rt = runtime_experiment(n_relations=10, configs=((3, 2),), time_limit=5.0)
        rt_md = render_runtime_table(rt)
        assert "runtime" in rt_md

    def test_savings_pct_zero_individual(self):
        r = Fig9Row(1, 3, 0, 0.0, 0.0, 0.0, 0, 0, 0, 0.0, 0, "optimal")
        assert r.savings_pct == 0.0


class TestFig7HarnessTiny:
    def test_shared_and_mqo_strategies(self, spark):
        from repro.experiments.fig7 import multi_query_experiment
        from repro.workloads.tpch_queries import fig7_workload_5

        rows = multi_query_experiment(
            spark,
            fig7_workload_5()[:2],
            sf=0.002,
            duration=10.0,
            epoch=5.0,
            time_limit=10.0,
            strategies=("shared", "mqo"),
        )
        assert {r.strategy for r in rows} == {"shared", "mqo"}
        mq = next(r for r in rows if r.strategy == "mqo")
        sh = next(r for r in rows if r.strategy == "shared")
        assert mq.plan_cost <= sh.plan_cost + 1e-9
        assert mq.probe_messages <= sh.probe_messages + 1e-9
        for r in rows:
            assert r.throughput > 0
