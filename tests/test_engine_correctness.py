"""Engine result correctness against the DuckDB oracle.

Every test streams synthetic relations through an optimized topology and
asserts the emitted windowed join results equal the oracle's (full SQL
join with window predicates over identical timestamped inputs).
"""
import math

import numpy as np
import pandas as pd
import pytest

from repro.core.cost import Statistics
from repro.core.optimizer import optimize_mqo, optimize_shared
from repro.core.plan import build_topology
from repro.core.query import Query, pred
from repro.engine.executor import Engine
from repro.engine.oracle_sql import windowed_join_sql
from repro.oracle import assert_equivalent
from repro.streams.microbatch import StreamSet


def run_and_check(spark, queries, stats, tables, columns, *, windows=None,
                  use_mirs=False, epoch=2.0, duration=8.0, seed=0,
                  strategy="mqo", parallelism=4):
    """Optimize → topology → stream → compare every query vs the oracle."""
    streams = StreamSet.of(tables, duration=duration, seed=seed)
    if strategy == "mqo":
        plan = optimize_mqo(queries, stats, use_mirs=use_mirs, windows=windows).plan
    else:
        plan, _ = optimize_shared(queries, stats, use_mirs=use_mirs, windows=windows)
    topo = build_topology(plan, windows=windows)
    eng = Engine(spark, topo, parallelism=parallelism)
    run = eng.run(streams, epoch=epoch)
    inputs = {rel: df.toPandas() for rel, df in streams.relations.items()}
    for q in queries:
        sql = windowed_join_sql(
            q, {r: columns[r] for r in q.relations}, windows=windows
        )
        got = run.results[q.name]
        got_spark = spark.createDataFrame(got) if len(got) else None
        assert_equivalent(got_spark, sql, **inputs)
    return run


def mk(spark, rng, spec, n):
    cols = {c: rng.integers(0, dom, n) for c, dom in spec.items()}
    return spark.createDataFrame(pd.DataFrame(cols))


@pytest.fixture()
def rng():
    return np.random.default_rng(7)


class TestTwoWay:
    def test_windowed(self, spark, rng):
        tables = {
            "R": mk(spark, rng, {"a": 8}, 60),
            "S": mk(spark, rng, {"a": 8}, 60),
        }
        q = Query.of("q", [pred("R", "a", "S", "a")], windows={"R": 3.0, "S": 3.0})
        stats = Statistics(rates={"R": 8, "S": 8}, default_selectivity=0.1)
        run_and_check(
            spark, [q], stats, tables, {"R": ["a"], "S": ["a"]},
            windows={"R": 3.0, "S": 3.0},
        )

    def test_full_history(self, spark, rng):
        tables = {
            "R": mk(spark, rng, {"a": 5}, 40),
            "S": mk(spark, rng, {"a": 5}, 40),
        }
        q = Query.of("q", [pred("R", "a", "S", "a")])
        stats = Statistics(rates={"R": 5, "S": 5}, default_selectivity=0.2)
        run = run_and_check(spark, [q], stats, tables, {"R": ["a"], "S": ["a"]})
        # full history: every matching pair appears exactly once
        joined = (
            tables["R"].toPandas().merge(tables["S"].toPandas(), on="a")
        )
        assert sum(len(r) for r in run.results.values()) == len(joined)

    def test_single_batch(self, spark, rng):
        # intra-batch ordering: all tuples arrive in one epoch
        tables = {
            "R": mk(spark, rng, {"a": 4}, 25),
            "S": mk(spark, rng, {"a": 4}, 25),
        }
        q = Query.of("q", [pred("R", "a", "S", "a")])
        stats = Statistics(rates={"R": 5, "S": 5})
        run_and_check(
            spark, [q], stats, tables, {"R": ["a"], "S": ["a"]},
            epoch=10.0, duration=10.0,
        )


class TestThreeWay:
    def test_windowed_chain(self, spark, rng):
        tables = {
            "R": mk(spark, rng, {"a": 10, "x": 100}, 50),
            "S": mk(spark, rng, {"a": 10, "b": 10}, 50),
            "T": mk(spark, rng, {"b": 10}, 50),
        }
        W = {"R": 3.0, "S": 3.0, "T": 3.0}
        q = Query.of("q", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")], windows=W)
        stats = Statistics(
            rates={"R": 6, "S": 6, "T": 6}, default_selectivity=0.1, windows=W
        )
        run_and_check(
            spark, [q], stats, tables,
            {"R": ["a", "x"], "S": ["a", "b"], "T": ["b"]}, windows=W,
        )

    def test_asymmetric_windows(self, spark, rng):
        tables = {
            "R": mk(spark, rng, {"a": 6}, 40),
            "S": mk(spark, rng, {"a": 6, "b": 6}, 40),
            "T": mk(spark, rng, {"b": 6}, 40),
        }
        W = {"R": 1.5, "S": 6.0, "T": 3.0}
        q = Query.of("q", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")], windows=W)
        stats = Statistics(rates={"R": 5, "S": 5, "T": 5}, windows=W,
                           default_selectivity=0.15)
        run_and_check(
            spark, [q], stats, tables,
            {"R": ["a"], "S": ["a", "b"], "T": ["b"]}, windows=W,
        )

    def test_mir_store_plan(self, spark, rng):
        # statistics force the optimizer to materialize ST (fast R, tiny S⋈T)
        tables = {
            "R": mk(spark, rng, {"a": 5}, 150),
            "S": mk(spark, rng, {"a": 5, "b": 25}, 20),
            "T": mk(spark, rng, {"b": 25}, 20),
        }
        W = {"R": 4.0, "S": 4.0, "T": 4.0}
        q = Query.of("q", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")], windows=W)
        stats = Statistics(
            rates={"R": 15, "S": 2, "T": 2},
            selectivities={pred("R", "a", "S", "a"): 0.2,
                           pred("S", "b", "T", "b"): 1 / 25},
            windows=W,
        )
        run = run_and_check(
            spark, [q], stats, tables,
            {"R": ["a"], "S": ["a", "b"], "T": ["b"]},
            windows=W, use_mirs=True,
        )
        # the plan must actually exercise the MIR path
        assert any("ST" in lbl for b in run.batches for lbl in b.messages_per_step)


class TestFourWay:
    def test_linear_rstu(self, spark, rng):
        tables = {
            "R": mk(spark, rng, {"a": 8}, 30),
            "S": mk(spark, rng, {"a": 8, "b": 8}, 30),
            "T": mk(spark, rng, {"b": 8, "c": 8}, 30),
            "U": mk(spark, rng, {"c": 8}, 30),
        }
        W = {r: 4.0 for r in "RSTU"}
        q = Query.of(
            "q",
            [pred("R", "a", "S", "a"), pred("S", "b", "T", "b"), pred("T", "c", "U", "c")],
            windows=W,
        )
        stats = Statistics(rates={r: 4 for r in "RSTU"}, windows=W,
                           default_selectivity=0.12)
        run_and_check(
            spark, [q], stats, tables,
            {"R": ["a"], "S": ["a", "b"], "T": ["b", "c"], "U": ["c"]}, windows=W,
        )


class TestMultiQuery:
    def _setup(self, spark, rng):
        tables = {
            "R": mk(spark, rng, {"a": 8}, 40),
            "S": mk(spark, rng, {"a": 8, "b": 8}, 40),
            "T": mk(spark, rng, {"b": 8, "c": 8}, 40),
            "U": mk(spark, rng, {"c": 8}, 40),
        }
        q1 = Query.of("q1", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")])
        q2 = Query.of("q2", [pred("S", "b", "T", "b"), pred("T", "c", "U", "c")])
        stats = Statistics(rates={r: 5 for r in "RSTU"}, default_selectivity=0.12)
        cols = {"R": ["a"], "S": ["a", "b"], "T": ["b", "c"], "U": ["c"]}
        return tables, [q1, q2], stats, cols

    def test_mqo_topology_answers_both(self, spark, rng):
        tables, queries, stats, cols = self._setup(spark, rng)
        run_and_check(spark, queries, stats, tables, cols, strategy="mqo")

    def test_shared_topology_answers_both(self, spark, rng):
        tables, queries, stats, cols = self._setup(spark, rng)
        run_and_check(spark, queries, stats, tables, cols, strategy="shared")

    def test_same_results_for_all_strategies(self, spark, rng):
        tables, queries, stats, cols = self._setup(spark, rng)
        r1 = run_and_check(spark, queries, stats, tables, cols, strategy="mqo")
        r2 = run_and_check(spark, queries, stats, tables, cols, strategy="shared")
        for q in queries:
            assert len(r1.results[q.name]) == len(r2.results[q.name])
