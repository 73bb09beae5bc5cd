"""Unit tests for plan decoding, probe-tree merging (Fig. 4) and the
topology builder (§V-B)."""
import pytest

from repro.core.cost import Statistics
from repro.core.optimizer import optimize_mqo, optimize_shared
from repro.core.plan import build_topology, decode_plan
from repro.core.query import Query, pred


@pytest.fixture()
def example():
    q1 = Query.of("q1", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")])
    q2 = Query.of("q2", [pred("S", "b", "T", "b"), pred("T", "c", "U", "c")])
    stats = Statistics(
        rates={"R": 100.0, "S": 100.0, "T": 100.0, "U": 100.0},
        selectivities={
            pred("R", "a", "S", "a"): 0.01,
            pred("S", "b", "T", "b"): 0.015,
            pred("T", "c", "U", "c"): 0.01,
        },
        parallelism=4,
    )
    return [q1, q2], stats


@pytest.fixture()
def mqo_plan(example):
    queries, stats = example
    return optimize_mqo(queries, stats, use_mirs=False).plan


class TestPlan:
    def test_validate_passes_for_decoded_plan(self, mqo_plan):
        mqo_plan.validate()  # raises on failure

    def test_every_query_start_covered(self, example, mqo_plan):
        queries, _ = example
        for q in queries:
            for start in q.relations:
                assert (q.name, start) in mqo_plan.chosen

    def test_shared_cost_not_more_than_unshared(self, mqo_plan):
        shared = mqo_plan.cost()
        mqo_plan.shared = False
        unshared = mqo_plan.cost()
        mqo_plan.shared = True
        assert shared <= unshared


class TestProbeTreeMerging:
    def test_common_prefix_merges(self, example):
        # q1 ⟨S,T,R⟩ and q2 ⟨S,T,U⟩ share the first node (Fig. 4)
        queries, stats = example
        plan = optimize_mqo(queries, stats, use_mirs=False).plan
        topo = build_topology(plan)
        s_roots = topo.trees["S"]
        assert len(s_roots) == 1  # single ⟨S,T⟩ first step
        assert len(s_roots[0].children) == 2  # branches to R and U

    def test_emits_at_leaves(self, example):
        queries, stats = example
        plan = optimize_mqo(queries, stats, use_mirs=False).plan
        topo = build_topology(plan)
        emitted = [q for n in topo.nodes() for q in n.emits]
        # each query emitted once per start relation (3 starts each)
        assert sorted(emitted) == ["q1", "q1", "q1", "q2", "q2", "q2"]

    def test_every_tree_node_has_step(self, example):
        queries, stats = example
        plan = optimize_mqo(queries, stats, use_mirs=False).plan
        topo = build_topology(plan)
        for node in topo.nodes():
            assert node.step.targets
            assert node.store == node.step.targets[-1]


class TestTopologyStores:
    def test_all_input_relations_materialized(self, example):
        queries, stats = example
        plan = optimize_mqo(queries, stats, use_mirs=False).plan
        topo = build_topology(plan)
        for rel in "RSTU":
            assert topo.base_stores_of(rel)

    def test_mir_store_materialized_when_used(self):
        # force an MIR store: R probing a tiny ST is far cheaper than
        # iterating when |S⋈T| is small and |R⋈S| is huge
        q = Query.of("q", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")])
        stats = Statistics(
            rates={"R": 1000.0, "S": 10.0, "T": 10.0},
            selectivities={
                pred("R", "a", "S", "a"): 1.0,
                pred("S", "b", "T", "b"): 0.001,
            },
            parallelism=4,
        )
        res = optimize_mqo([q], stats, use_mirs=True)
        topo = build_topology(res.plan)
        mir_stores = topo.mir_stores()
        assert mir_stores, "expected the optimizer to materialize ST"
        assert any(s.rels == frozenset({"S", "T"}) for s in mir_stores)

    def test_ship_nodes_feed_mir_stores(self):
        q = Query.of("q", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")])
        stats = Statistics(
            rates={"R": 1000.0, "S": 10.0, "T": 10.0},
            selectivities={
                pred("R", "a", "S", "a"): 1.0,
                pred("S", "b", "T", "b"): 0.001,
            },
            parallelism=4,
        )
        topo = build_topology(optimize_mqo([q], stats, use_mirs=True).plan)
        ships = [n for n in topo.nodes() if n.is_ship]
        assert ships
        for n in ships:
            assert not n.store.is_base

    def test_store_serving_sets(self, example):
        queries, stats = example
        plan = optimize_mqo(queries, stats, use_mirs=False).plan
        topo = build_topology(plan)
        # the T store serves both queries (both probe it)
        t_stores = topo.base_stores_of("T")
        served = set().union(*(topo.stores[s] for s in t_stores))
        assert served == {"q1", "q2"}


class TestQueryRemoval:
    def test_refcount_removal(self, example):
        queries, stats = example
        plan, _ = optimize_shared(queries, stats, use_mirs=False)
        topo = build_topology(plan)
        dropped = topo.remove_query("q2")
        # U serves only q2 → its store must be deregistered
        assert any("U" in s.rels for s in dropped)
        assert not topo.base_stores_of("U")
        # R, S, T still serve q1
        for rel in "RST":
            assert topo.base_stores_of(rel)

    def test_emits_pruned_after_removal(self, example):
        queries, stats = example
        plan, _ = optimize_shared(queries, stats, use_mirs=False)
        topo = build_topology(plan)
        topo.remove_query("q2")
        emitted = {q for n in topo.nodes() for q in n.emits}
        assert emitted == {"q1"}

    def test_removing_all_queries_empties_topology(self, example):
        queries, stats = example
        plan, _ = optimize_shared(queries, stats, use_mirs=False)
        topo = build_topology(plan)
        topo.remove_query("q1")
        topo.remove_query("q2")
        assert not topo.stores
        assert not any(topo.trees.values())
