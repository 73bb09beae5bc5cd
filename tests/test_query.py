"""Unit tests for the query model (repro.core.query)."""
import math

import pytest

from repro.core.query import (
    Attr,
    Predicate,
    Query,
    can_route,
    equivalence_classes,
    is_connected,
    pred,
)


class TestAttr:
    def test_ordering(self):
        assert Attr("R", "a") < Attr("R", "b") < Attr("S", "a")

    def test_str(self):
        assert str(Attr("R", "a")) == "R.a"

    def test_hashable(self):
        assert len({Attr("R", "a"), Attr("R", "a"), Attr("R", "b")}) == 2


class TestPredicate:
    def test_canonical_direction(self):
        p1 = pred("R", "a", "S", "b")
        p2 = pred("S", "b", "R", "a")
        assert p1 == p2
        assert hash(p1) == hash(p2)

    def test_left_is_smaller(self):
        p = pred("S", "b", "R", "a")
        assert p.left == Attr("R", "a")

    def test_relations(self):
        assert pred("R", "a", "S", "b").relations == frozenset({"R", "S"})

    def test_touches(self):
        p = pred("R", "a", "S", "b")
        assert p.touches("R") and p.touches("S") and not p.touches("T")

    def test_attr_of(self):
        p = pred("R", "a", "S", "b")
        assert p.attr_of("R") == Attr("R", "a")
        assert p.attr_of("S") == Attr("S", "b")
        with pytest.raises(KeyError):
            p.attr_of("T")

    def test_other(self):
        p = pred("R", "a", "S", "b")
        assert p.other("R") == Attr("S", "b")
        assert p.other("S") == Attr("R", "a")

    def test_self_join_rejected(self):
        with pytest.raises(ValueError):
            pred("R", "a", "R", "b")


class TestQuery:
    def test_relations_inferred_from_predicates(self):
        q = Query.of("q", [pred("R", "a", "S", "a")])
        assert q.relations == frozenset({"R", "S"})

    def test_cross_product_rejected(self):
        with pytest.raises(ValueError, match="cross product"):
            Query.of(
                "q",
                [pred("R", "a", "S", "a")],
                relations={"R", "S", "T"},
            )

    def test_window_default_is_unbounded(self):
        q = Query.of("q", [pred("R", "a", "S", "a")])
        assert q.window("R") == math.inf

    def test_window_lookup(self):
        q = Query.of("q", [pred("R", "a", "S", "a")], windows={"R": 5.0})
        assert q.window("R") == 5.0
        assert q.window("S") == math.inf

    def test_window_for_unknown_relation_rejected(self):
        with pytest.raises(ValueError, match="unknown relation"):
            Query.of("q", [pred("R", "a", "S", "a")], windows={"X": 1.0})

    def test_predicate_outside_relations_rejected(self):
        with pytest.raises(ValueError):
            Query("q", frozenset({"R"}), frozenset({pred("R", "a", "S", "a")}))

    def test_induced(self):
        q = Query.of(
            "q", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")]
        )
        assert q.induced({"R", "S"}) == frozenset({pred("R", "a", "S", "a")})
        assert q.induced({"R", "T"}) == frozenset()

    def test_predicates_between(self):
        q = Query.of(
            "q", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")]
        )
        assert q.predicates_between({"R"}, {"S"}) == frozenset(
            {pred("R", "a", "S", "a")}
        )
        assert q.predicates_between({"R"}, {"T"}) == frozenset()
        assert q.predicates_between({"R", "S"}, {"T"}) == frozenset(
            {pred("S", "b", "T", "b")}
        )

    def test_joins_with(self):
        q = Query.of(
            "q", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")]
        )
        assert q.joins_with({"R"}, "S")
        assert not q.joins_with({"R"}, "T")
        assert q.joins_with({"R", "S"}, "T")

    def test_attrs(self):
        q = Query.of(
            "q", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")]
        )
        assert q.attrs("S") == frozenset({Attr("S", "a"), Attr("S", "b")})

    def test_hashable(self):
        q1 = Query.of("q", [pred("R", "a", "S", "a")])
        q2 = Query.of("q", [pred("S", "a", "R", "a")])
        assert q1 == q2


class TestConnectivity:
    def test_single_relation_connected(self):
        assert is_connected(frozenset({"R"}), [])

    def test_two_joined(self):
        assert is_connected(frozenset({"R", "S"}), [pred("R", "a", "S", "a")])

    def test_two_disjoint(self):
        assert not is_connected(frozenset({"R", "S"}), [])

    def test_chain(self):
        preds = [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")]
        assert is_connected(frozenset({"R", "S", "T"}), preds)

    def test_disconnected_component(self):
        preds = [pred("R", "a", "S", "a"), pred("T", "b", "U", "b")]
        assert not is_connected(frozenset({"R", "S", "T", "U"}), preds)

    def test_ignores_predicates_outside_set(self):
        preds = [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")]
        assert is_connected(frozenset({"R", "S"}), preds)


class TestEquivalenceClasses:
    def test_single_predicate(self):
        classes = equivalence_classes([pred("R", "a", "S", "a")])
        assert classes[Attr("R", "a")] == frozenset({Attr("R", "a"), Attr("S", "a")})

    def test_transitive_closure(self):
        classes = equivalence_classes(
            [pred("R", "a", "S", "a"), pred("S", "a", "T", "a")]
        )
        expected = frozenset({Attr("R", "a"), Attr("S", "a"), Attr("T", "a")})
        assert classes[Attr("R", "a")] == expected
        assert classes[Attr("T", "a")] == expected

    def test_separate_classes(self):
        classes = equivalence_classes(
            [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")]
        )
        assert Attr("T", "b") not in classes[Attr("R", "a")]


class TestCanRoute:
    def test_direct_attribute(self):
        # tuple covering R routed to a store partitioned on R.a
        assert can_route({"R"}, Attr("R", "a"), [])

    def test_via_predicate(self):
        # R-tuple carries R.a; S-store partitioned on S.a with R.a = S.a
        assert can_route({"R"}, Attr("S", "a"), [pred("R", "a", "S", "a")])

    def test_via_transitivity(self):
        preds = [pred("R", "a", "S", "a"), pred("S", "a", "T", "a")]
        assert can_route({"R"}, Attr("T", "a"), preds)

    def test_unroutable_requires_broadcast(self):
        # Fig 2 ⑦: T-tuple cannot route to S partitioned on an unknown attr
        preds = [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")]
        assert not can_route({"T"}, Attr("S", "a"), preds)

    def test_unknown_attribute(self):
        assert not can_route({"R"}, Attr("S", "z"), [pred("R", "a", "S", "a")])
