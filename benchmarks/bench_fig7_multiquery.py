"""Benchmarks for T1–T3 (Fig. 7 — multi-query performance on TPC-H-lite).

One benchmark per strategy at SF=0.1; assertions pin the paper's shape:
shared beats independent, MQO beats shared on probe load and memory.
Results feed EXPERIMENTS.md via jobs/fig7_multiquery.py.
"""
import os

import pytest

from repro.experiments.fig7 import multi_query_experiment
from repro.workloads.tpch_queries import fig7_workload_5

SF = float(os.environ.get("BENCH_SF", "0.1"))


@pytest.fixture(scope="module")
def fig7_rows(spark):
    """Run the full three-strategy comparison once for the module."""
    return multi_query_experiment(
        spark,
        fig7_workload_5(),
        sf=SF,
        duration=10.0,
        epoch=2.5,
        time_limit=20.0,
    )


def _row(rows, strategy):
    return next(r for r in rows if r.strategy == strategy)


def test_t1_throughput_ordering(benchmark, spark, fig7_rows):
    """T1 — Fig 7b: wall-clock throughput; MQO ≥ shared ≥ independent
    on probe work, hence at least comparable throughput."""
    rows = benchmark.pedantic(
        lambda: multi_query_experiment(
            spark, fig7_workload_5(), sf=min(SF, 0.02), duration=10.0,
            epoch=5.0, time_limit=10.0, strategies=("shared", "mqo"),
        ),
        rounds=1,
        iterations=1,
    )
    mq, sh = _row(rows, "mqo"), _row(rows, "shared")
    assert mq.probe_messages <= sh.probe_messages + 1e-9


def test_t2_memory_independent_vs_shared(benchmark, fig7_rows):
    """T2 — Fig 7c: independent execution stores ~k× the state of the
    shared topology (paper: 3.1× at 5 queries)."""
    ind, sh = _row(fig7_rows, "independent"), _row(fig7_rows, "shared")
    benchmark.pedantic(lambda: ind.peak_state / sh.peak_state, rounds=1, iterations=1)
    assert ind.peak_state > 1.3 * sh.peak_state

    mq = _row(fig7_rows, "mqo")
    assert mq.probe_messages <= sh.probe_messages + 1e-9
    assert sh.probe_messages <= ind.probe_messages + 1e-9


def test_t3_latency_mqo_overhead(benchmark, fig7_rows):
    """T3 — Fig 7d: MQO's longer shared probe paths may cost latency
    (paper: +14–16%) while total probe load drops."""
    sh, mq = _row(fig7_rows, "shared"), _row(fig7_rows, "mqo")
    benchmark.pedantic(lambda: (sh.mean_latency_ms, mq.mean_latency_ms),
                       rounds=1, iterations=1)
    assert mq.mean_latency_ms is not None and sh.mean_latency_ms is not None
    # MQO never loses on the cost it optimizes…
    assert mq.plan_cost <= sh.plan_cost + 1e-9
    # …and its average probe path is at least as long (sharing pressure)
    assert mq.avg_hops >= sh.avg_hops - 0.5
