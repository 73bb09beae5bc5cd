"""§VI-B — supporting query changes at runtime: removal with reference
counting, plus assorted engine edge cases."""
import numpy as np
import pandas as pd
import pytest

from repro.core.cost import Statistics
from repro.core.optimizer import optimize_shared
from repro.core.plan import build_topology
from repro.core.query import Query, pred
from repro.engine.executor import Engine
from repro.streams.microbatch import StreamSet


@pytest.fixture()
def two_query_engine(spark):
    rng = np.random.default_rng(11)
    n = 30
    tables = {
        "R": spark.createDataFrame(pd.DataFrame({"a": rng.integers(0, 6, n)})),
        "S": spark.createDataFrame(
            pd.DataFrame({"a": rng.integers(0, 6, n), "b": rng.integers(0, 6, n)})
        ),
        "T": spark.createDataFrame(
            pd.DataFrame({"b": rng.integers(0, 6, n), "c": rng.integers(0, 6, n)})
        ),
        "U": spark.createDataFrame(pd.DataFrame({"c": rng.integers(0, 6, n)})),
    }
    q1 = Query.of("q1", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")])
    q2 = Query.of("q2", [pred("S", "b", "T", "b"), pred("T", "c", "U", "c")])
    stats = Statistics(rates={r: 5 for r in "RSTU"}, default_selectivity=0.15)
    plan, _ = optimize_shared([q1, q2], stats, use_mirs=False)
    topo = build_topology(plan)
    eng = Engine(spark, topo, parallelism=4)
    streams = StreamSet.of(tables, duration=8.0, seed=4)
    return eng, streams


class TestQueryRemoval:
    def test_removed_query_stops_emitting(self, spark, two_query_engine):
        eng, streams = two_query_engine
        slices = list(streams.slices(4.0))
        eng.process_batch(slices[0][1], slices[0][0])
        assert eng.results["q2"]
        # remove q2 mid-stream (§VI-B) and reindex the probe trees
        eng.topology.remove_query("q2")
        eng._parents, eng._start_of, eng._ships = {}, {}, {}
        for start, roots in eng.topology.trees.items():
            for root in roots:
                eng._index(root, None, start)
        before = len(eng.results["q2"])
        eng.process_batch(slices[1][1], slices[1][0])
        assert len(eng.results["q2"]) == before  # no new q2 results
        assert eng.results["q1"]  # q1 keeps flowing

    def test_unused_store_dropped(self, two_query_engine):
        eng, _ = two_query_engine
        dropped = eng.topology.remove_query("q2")
        assert any("U" in s.rels for s in dropped)
        assert all("U" not in s.rels for s in eng.topology.stores)


class TestEngineEdgeCases:
    def test_empty_batches_are_noop(self, spark, two_query_engine):
        eng, streams = two_query_engine
        empty = {
            rel: df.limit(0) for rel, df in streams.relations.items()
        }
        bm = eng.process_batch(empty, 0.0)
        assert bm.input_tuples == 0
        assert bm.probe_messages == 0
        assert not eng.results["q1"]

    def test_expiry_shrinks_state(self, spark):
        rng = np.random.default_rng(3)
        tables = {
            "R": spark.createDataFrame(pd.DataFrame({"a": rng.integers(0, 4, 40)})),
            "S": spark.createDataFrame(pd.DataFrame({"a": rng.integers(0, 4, 40)})),
        }
        W = {"R": 1.0, "S": 1.0}
        q = Query.of("q", [pred("R", "a", "S", "a")], windows=W)
        stats = Statistics(rates={"R": 4, "S": 4}, windows=W)
        from repro.core.optimizer import optimize_mqo

        plan = optimize_mqo([q], stats, use_mirs=False, windows=W).plan
        topo = build_topology(plan, windows=W)
        eng = Engine(spark, topo, parallelism=4, collect_results=False)
        run = eng.run(StreamSet.of(tables, duration=10.0, seed=5), epoch=1.0)
        sizes = [b.state_size for b in run.batches]
        # with a 1s window over a 10s stream, state plateaus well below
        # the total input size (80 tuples across materialized stores)
        assert max(sizes[3:]) < 80

    def test_missing_relation_batch_ok(self, spark, two_query_engine):
        eng, streams = two_query_engine
        slices = list(streams.slices(4.0))
        only_r = {"R": slices[0][1]["R"]}
        bm = eng.process_batch(only_r, 0.0)
        assert bm.input_tuples > 0  # R stored; no partners yet → no results
        assert not eng.results["q1"]
