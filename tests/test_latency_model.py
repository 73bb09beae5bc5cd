"""Tests for the queueing latency model (documented substitution for the
paper's wall-clock cluster latencies)."""
import pytest

from repro.engine.metrics import (
    BatchMetrics,
    LatencyModel,
    mean_latency_ms,
    peak_state,
    total_messages,
)


def batch(t, msgs, hops=2.0, results=10):
    bm = BatchMetrics(t)
    bm.probe_messages = msgs
    bm.hops_weighted = hops * results
    bm.hops_results = results
    return bm


class TestBatchMetrics:
    def test_avg_hops(self):
        bm = batch(0, 100, hops=3.0)
        assert bm.avg_hops == 3.0

    def test_avg_hops_empty(self):
        assert BatchMetrics(0).avg_hops == 0.0

    def test_add_step_accumulates(self):
        bm = BatchMetrics(0)
        bm.add_step("s1", 10)
        bm.add_step("s1", 5)
        bm.add_step("s2", 2)
        assert bm.probe_messages == 17
        assert bm.messages_per_step == {"s1": 15, "s2": 2}


class TestLatencyModel:
    def test_underloaded_latency_is_service_time(self):
        m = LatencyModel(capacity=1000, base_ms=5, per_hop_ms=10)
        pts = m.latencies([batch(0, 100, hops=2.0)], epoch=1.0)
        assert pts[0].latency_ms == pytest.approx(5 + 20)
        assert pts[0].backlog == 0.0

    def test_overload_builds_backlog(self):
        m = LatencyModel(capacity=100, base_ms=0, per_hop_ms=0)
        pts = m.latencies([batch(0, 150), batch(1, 150)], epoch=1.0)
        assert pts[0].backlog == 50
        assert pts[1].backlog == 100
        assert pts[1].latency_ms > pts[0].latency_ms

    def test_backlog_drains(self):
        m = LatencyModel(capacity=100, base_ms=0, per_hop_ms=0)
        pts = m.latencies([batch(0, 180), batch(1, 20), batch(2, 20)], epoch=1.0)
        assert pts[0].backlog == 80
        assert pts[1].backlog == 0
        assert pts[2].latency_ms == 0.0

    def test_crash_on_buffer_overflow(self):
        m = LatencyModel(capacity=10, buffer_limit=100)
        pts = m.latencies([batch(i, 100) for i in range(5)], epoch=1.0)
        assert pts[-1].crashed
        assert pts[-1].latency_ms is None
        first_crash = next(i for i, p in enumerate(pts) if p.crashed)
        assert all(p.crashed for p in pts[first_crash:])

    def test_utilisation(self):
        m = LatencyModel(capacity=200)
        pts = m.latencies([batch(0, 100)], epoch=1.0)
        assert pts[0].utilisation == pytest.approx(0.5)

    def test_more_hops_more_latency(self):
        m = LatencyModel(capacity=1000, base_ms=0, per_hop_ms=10)
        short = m.latencies([batch(0, 10, hops=1.0)], epoch=1.0)[0]
        long = m.latencies([batch(0, 10, hops=3.0)], epoch=1.0)[0]
        assert long.latency_ms == pytest.approx(3 * short.latency_ms)


class TestAggregates:
    def test_mean_latency(self):
        m = LatencyModel(capacity=1000, base_ms=10, per_hop_ms=0)
        pts = m.latencies([batch(0, 1), batch(1, 1)], epoch=1.0)
        assert mean_latency_ms(pts) == pytest.approx(10.0)

    def test_mean_latency_all_crashed_is_none(self):
        m = LatencyModel(capacity=1, buffer_limit=0.5)
        pts = m.latencies([batch(0, 100)], epoch=1.0)
        assert mean_latency_ms(pts) is None

    def test_peak_state_and_total_messages(self):
        b1, b2 = batch(0, 10), batch(1, 30)
        b1.state_size, b2.state_size = 5, 9
        assert peak_state([b1, b2]) == 9
        assert total_messages([b1, b2]) == 40
