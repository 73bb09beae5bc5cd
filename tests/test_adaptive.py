"""Tests for epoch-based adaptive processing (Section VI)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.cost import Statistics
from repro.core.optimizer import optimize_mqo
from repro.core.plan import build_topology
from repro.core.query import Query, pred
from repro.engine.adaptive import backfill_mir, reconfigure, run_adaptive
from repro.engine.executor import Engine
from repro.engine.metrics import LatencyModel
from repro.streams.microbatch import StreamSet
from repro.workloads.synthetic import (
    fig8a_initial_stats,
    fig8a_source,
    fig8b_initial_stats,
    fig8b_source,
    rstu_query,
)

W4 = {r: 3.0 for r in "RSTU"}


def small_plan(stats, windows=None, use_mirs=False):
    q = rstu_query(windows=windows)
    return optimize_mqo([q], stats, use_mirs=use_mirs, windows=windows).plan


class TestReconfigure:
    def _engine(self, spark, stats, windows=None):
        plan = small_plan(stats, windows)
        topo = build_topology(plan, windows=windows)
        return Engine(spark, topo, parallelism=4, collect_results=False)

    def test_state_carries_over(self, spark):
        stats = Statistics(rates={r: 5.0 for r in "RSTU"}, default_selectivity=0.1)
        eng = self._engine(spark, stats)
        rng = np.random.default_rng(0)
        batch = {
            "R": spark.createDataFrame(pd.DataFrame({"a": rng.integers(0, 5, 10), "__tau": np.linspace(0, 0.9, 10)})),
            "S": spark.createDataFrame(pd.DataFrame({"a": rng.integers(0, 5, 10), "b": rng.integers(0, 5, 10), "__tau": np.linspace(0.01, 0.91, 10)})),
            "T": spark.createDataFrame(pd.DataFrame({"b": rng.integers(0, 5, 10), "c": rng.integers(0, 5, 10), "__tau": np.linspace(0.02, 0.92, 10)})),
            "U": spark.createDataFrame(pd.DataFrame({"c": rng.integers(0, 5, 10), "__tau": np.linspace(0.03, 0.93, 10)})),
        }
        eng.process_batch(batch, 0.0)
        stored_before = {
            ref: s.count() for ref, s in eng.states.items() if s is not None
        }
        # reconfigure with different statistics → possibly different plan
        stats2 = Statistics(
            rates={"R": 50.0, "S": 5.0, "T": 5.0, "U": 5.0},
            default_selectivity=0.01,
        )
        topo2 = build_topology(small_plan(stats2))
        reconfigure(eng, topo2)
        for ref, s in eng.states.items():
            if ref in stored_before:
                assert s is not None and s.count() == stored_before[ref]

    def test_backfill_computes_subquery_join(self, spark):
        stats = Statistics(rates={r: 5.0 for r in "RSTU"}, default_selectivity=0.2)
        eng = self._engine(spark, stats)
        rng = np.random.default_rng(1)
        batch = {
            "R": spark.createDataFrame(pd.DataFrame({"a": rng.integers(0, 3, 8), "__tau": np.linspace(0, 0.9, 8)})),
            "S": spark.createDataFrame(pd.DataFrame({"a": rng.integers(0, 3, 8), "b": rng.integers(0, 3, 8), "__tau": np.linspace(0.01, 0.91, 8)})),
            "T": spark.createDataFrame(pd.DataFrame({"b": rng.integers(0, 3, 8), "c": rng.integers(0, 3, 8), "__tau": np.linspace(0.02, 0.92, 8)})),
            "U": spark.createDataFrame(pd.DataFrame({"c": rng.integers(0, 3, 8), "__tau": np.linspace(0.03, 0.93, 8)})),
        }
        eng.process_batch(batch, 0.0)
        from repro.core.probe_orders import StoreRef
        from repro.core.mir import Mir

        mir = Mir(frozenset({"S", "T"}), frozenset({pred("S", "b", "T", "b")}))
        ref = StoreRef.of_mir(mir)
        content = backfill_mir(eng, ref)
        s_pdf = batch["S"].toPandas()
        t_pdf = batch["T"].toPandas()
        expected = s_pdf.merge(t_pdf, on="b")
        assert content.count() == len(expected)

    def test_reconfigure_to_mir_plan_backfills(self, spark):
        stats = Statistics(rates={r: 5.0 for r in "RSTU"}, default_selectivity=0.2)
        eng = self._engine(spark, stats)
        rng = np.random.default_rng(2)
        batch = {
            "R": spark.createDataFrame(pd.DataFrame({"a": rng.integers(0, 3, 8), "__tau": np.linspace(0, 0.9, 8)})),
            "S": spark.createDataFrame(pd.DataFrame({"a": rng.integers(0, 3, 8), "b": rng.integers(0, 3, 8), "__tau": np.linspace(0.01, 0.91, 8)})),
            "T": spark.createDataFrame(pd.DataFrame({"b": rng.integers(0, 3, 8), "c": rng.integers(0, 3, 8), "__tau": np.linspace(0.02, 0.92, 8)})),
            "U": spark.createDataFrame(pd.DataFrame({"c": rng.integers(0, 3, 8), "__tau": np.linspace(0.03, 0.93, 8)})),
        }
        eng.process_batch(batch, 0.0)
        # force an MIR-using plan via statistics
        stats2 = Statistics(
            rates={"R": 500.0, "S": 2.0, "T": 2.0, "U": 2.0},
            selectivities={
                pred("R", "a", "S", "a"): 0.3,
                pred("S", "b", "T", "b"): 0.01,
                pred("T", "c", "U", "c"): 0.01,
            },
        )
        q = rstu_query()
        plan2 = optimize_mqo([q], stats2, use_mirs=True).plan
        topo2 = build_topology(plan2)
        mirs = topo2.mir_stores()
        assert mirs, "statistics should force an MIR plan"
        reconfigure(eng, topo2)
        for ref in mirs:
            # backfilled (state present) or genuinely empty subresult
            state = eng.states.get(ref)
            assert state is None or state.count() >= 0


class TestRunAdaptive:
    def test_adaptive_reconfigures_on_shift(self, spark):
        source = fig8a_source(spark, rows_per_epoch=40, shift_epoch=3, fanout_after=8)
        stats = fig8a_initial_stats(rows_per_epoch=40, window=3.0)
        stats.windows = W4
        run = run_adaptive(
            spark,
            [rstu_query(windows=W4)],
            source,
            n_epochs=7,
            epoch=1.0,
            initial_stats=stats,
            latency_model=LatencyModel(capacity=100000),
            adaptive=True,
            windows=W4,
            optimizer_kwargs={"use_mirs": False},
        )
        assert len(run.batches) == 7
        assert run.reconfigurations, "expected at least one reconfiguration"
        # first possible activation is epoch 2 (Fig. 5: i → i+2)
        assert min(e for e, _ in run.reconfigurations) >= 2

    def test_static_never_reconfigures(self, spark):
        source = fig8a_source(spark, rows_per_epoch=30, shift_epoch=2)
        stats = fig8a_initial_stats(rows_per_epoch=30, window=3.0)
        stats.windows = W4
        run = run_adaptive(
            spark,
            [rstu_query(windows=W4)],
            source,
            n_epochs=5,
            epoch=1.0,
            initial_stats=stats,
            latency_model=LatencyModel(capacity=100000),
            adaptive=False,
            windows=W4,
            optimizer_kwargs={"use_mirs": False},
        )
        assert run.reconfigurations == []
        assert not run.crashed

    def test_static_overload_crashes_adaptive_recovers(self, spark):
        # the Fig. 8a shape at miniature scale: after the shift the static
        # plan's probe load exceeds capacity and the buffer overflows,
        # while the adaptive plan rewires and survives
        from repro.experiments.fig8 import scenario_a

        static, adaptive = scenario_a(
            spark, rows_per_epoch=60, n_epochs=9, shift_epoch=3,
            fanout_after=10,
        )
        assert static.run.crashed
        assert not adaptive.run.crashed
        # the static plan's steady post-shift load clearly exceeds the
        # adaptive plan's (the avoidable S-side/T-side traffic)
        s_tail = sum(b.probe_messages for b in static.run.batches[-3:])
        a_tail = sum(b.probe_messages for b in adaptive.run.batches[-3:])
        assert s_tail > 1.2 * a_tail

    def test_fig8b_introduces_mir_store(self, spark):
        from repro.experiments.fig8 import scenario_b

        res = scenario_b(
            spark, r_rows_per_epoch=200, slow_rows_per_epoch=10,
            n_epochs=8, shift_epoch=3,
        )
        run = res.run
        # pre-shift: no STU store; post-shift: the optimizer introduces it
        assert not any("STU" in s for s in run.initial_mir_stores)
        assert run.reconfigurations
        assert any("STU" in s for s in run.final_mir_stores)
        assert not run.crashed
