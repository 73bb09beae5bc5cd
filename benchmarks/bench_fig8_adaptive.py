"""Benchmarks for T4–T5 (Fig. 8 — adaptive execution)."""
import pytest

from repro.experiments.fig8 import scenario_a, scenario_b


def test_t4_static_crashes_adaptive_recovers(benchmark, spark):
    """T4 — Fig 8a: the static plan overflows its buffer after the
    selectivity spike; the adaptive plan rewires and survives."""
    static, adaptive = benchmark.pedantic(
        lambda: scenario_a(spark, rows_per_epoch=60, n_epochs=10, shift_epoch=3),
        rounds=1,
        iterations=1,
    )
    assert static.run.crashed
    assert not adaptive.run.crashed
    assert adaptive.run.reconfigurations
    # pre-shift latencies are similar (same initial plan)
    s0 = static.run.latencies[1].latency_ms
    a0 = adaptive.run.latencies[1].latency_ms
    assert s0 == pytest.approx(a0, rel=0.5)


def test_t5_mir_introduction_lowers_latency(benchmark, spark):
    """T5 — Fig 8b: after the intermediate collapses, the adaptive
    optimizer introduces an STU store and R-tuples finish in one hop —
    average post-adaptation latency drops."""
    res = benchmark.pedantic(
        lambda: scenario_b(
            spark, r_rows_per_epoch=300, slow_rows_per_epoch=12,
            n_epochs=10, shift_epoch=3,
        ),
        rounds=1,
        iterations=1,
    )
    run = res.run
    assert run.reconfigurations
    first_cfg = min(e for e, _ in run.reconfigurations)
    pre = [p.latency_ms for p in run.latencies[1:3] if p.latency_ms is not None]
    post = [
        p.latency_ms
        for p in run.latencies[first_cfg + 1:]
        if p.latency_ms is not None
    ]
    assert pre and post
    assert min(post) < sum(pre) / len(pre)
