"""Benchmarks for T6–T10 (Fig. 9 — ILP optimization).

Each benchmark measures one optimization workload; pedantic mode with a
single round since solves carry internal time limits.
"""
import pytest

from repro.core.cost import Statistics
from repro.core.optimizer import optimize_mqo
from repro.core.query import Query, pred
from repro.experiments.fig9 import probe_cost_experiment, runtime_experiment
from repro.workloads.synthetic import IlpEnvironment


def test_t10_worked_example_solve(benchmark):
    """T10 — §V-2 example: exact MQO solve of the two-query ILP."""
    q1 = Query.of("q1", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")])
    q2 = Query.of("q2", [pred("S", "b", "T", "b"), pred("T", "c", "U", "c")])
    stats = Statistics(
        rates={r: 100.0 for r in "RSTU"},
        selectivities={
            pred("R", "a", "S", "a"): 0.01,
            pred("S", "b", "T", "b"): 0.015,
            pred("T", "c", "U", "c"): 0.01,
        },
    )
    res = benchmark(lambda: optimize_mqo([q1, q2], stats, use_mirs=False))
    assert res.objective == pytest.approx(800.0)


def test_t6_probe_cost_10_relations(benchmark):
    """T6 — Fig 9a/9b at benchmark scale (n_Q = 20 over 10 relations)."""
    rows = benchmark.pedantic(
        lambda: probe_cost_experiment(
            n_relations=10, n_query_list=(20,), time_limit=15.0
        ),
        rounds=1,
        iterations=1,
    )
    r = rows[0]
    assert r.mqo <= r.shared + 1e-6 <= r.individual + 1e-6


def test_t7_probe_cost_100_relations(benchmark):
    """T7 — Fig 9c/9d at benchmark scale (n_Q = 20 over 100 relations)."""
    rows = benchmark.pedantic(
        lambda: probe_cost_experiment(
            n_relations=100, n_query_list=(20,), time_limit=15.0
        ),
        rounds=1,
        iterations=1,
    )
    r = rows[0]
    assert r.mqo <= r.individual + 1e-6


def test_t8_runtime_vs_queries(benchmark):
    """T8 — Fig 9e: size-3 queries over 100 relations scale mildly."""
    rows = benchmark.pedantic(
        lambda: runtime_experiment(
            configs=((3, 10), (3, 30), (3, 50)), time_limit=30.0
        ),
        rounds=1,
        iterations=1,
    )
    assert [r.status for r in rows].count("optimal") >= 2


def test_t9_runtime_vs_query_size(benchmark):
    """T9 — Fig 9f: runtime explodes with query size (3 → 4)."""
    rows = benchmark.pedantic(
        lambda: runtime_experiment(
            configs=((3, 5), (4, 5)), time_limit=60.0
        ),
        rounds=1,
        iterations=1,
    )
    small, big = rows
    assert big.variables > 2 * small.variables
    assert big.runtime_s > small.runtime_s
