"""Unit tests for MIR enumeration (repro.core.mir) — §V-A combinatorics."""
import pytest

from repro.core.mir import Mir, enumerate_mirs, mirs_for_queries, usable_mirs
from repro.core.query import Query, pred


def linear_query(n: int, name: str = "lin") -> Query:
    """R0(a0), R1(a0,a1), ..., R{n-1}(a{n-2}) — a chain query."""
    preds = [pred(f"R{i}", f"a{i}", f"R{i+1}", f"a{i}") for i in range(n - 1)]
    return Query.of(name, preds)


def star_query(n: int, name: str = "star") -> Query:
    """Hub H joined with n-1 satellites on distinct attributes."""
    preds = [pred("H", f"a{i}", f"L{i}", "k") for i in range(n - 1)]
    return Query.of(name, preds)


def clique_query(n: int, name: str = "clique") -> Query:
    preds = [
        pred(f"R{i}", f"x{i}{j}", f"R{j}", f"x{i}{j}")
        for i in range(n)
        for j in range(i + 1, n)
    ]
    return Query.of(name, preds)


class TestMir:
    def test_requires_two_relations(self):
        with pytest.raises(ValueError):
            Mir(frozenset({"R"}), frozenset())

    def test_requires_connected(self):
        with pytest.raises(ValueError, match="not connected"):
            Mir(frozenset({"R", "S"}), frozenset())

    def test_label_sorted(self):
        m = Mir(frozenset({"T", "S"}), frozenset({pred("S", "c", "T", "c")}))
        assert m.label == "ST"

    def test_subquery_roundtrip(self):
        m = Mir(frozenset({"S", "T"}), frozenset({pred("S", "c", "T", "c")}))
        sq = m.subquery()
        assert sq.relations == m.rels
        assert sq.predicates == m.preds


class TestEnumerate:
    def test_two_way_query_has_no_mirs(self):
        q = Query.of("q", [pred("R", "a", "S", "a")])
        assert enumerate_mirs(q) == frozenset()

    def test_three_way_chain(self):
        # R(a),S(a,b),T(b): MIRs are (R,S) and (S,T), not (R,T)
        q = Query.of("q", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")])
        labels = {m.label for m in enumerate_mirs(q)}
        assert labels == {"RS", "ST"}

    @pytest.mark.parametrize("n", [3, 4, 5, 6])
    def test_linear_count(self, n):
        # consecutive subsequences of length 2..n-1:
        # sum_{l=2}^{n-1} (n-l+1)
        q = linear_query(n)
        expected = sum(n - l + 1 for l in range(2, n))
        assert len(enumerate_mirs(q)) == expected

    @pytest.mark.parametrize("n", [3, 4, 5])
    def test_star_count(self, n):
        # every connected subset must contain the hub: choose any
        # nonempty proper subset of the n-1 satellites → 2^(n-1) - 2
        # of size >= 1 and < n-1 ... plus subsets with hub only excluded
        q = star_query(n)
        expected = (1 << (n - 1)) - 2  # nonempty, proper satellite subsets
        assert len(enumerate_mirs(q)) == expected

    @pytest.mark.parametrize("n", [3, 4, 5])
    def test_clique_count(self, n):
        # §V-A: worst case Θ(2^n) — every subset of size 2..n-1 connected
        q = clique_query(n)
        expected = (1 << n) - 2 - n  # all subsets minus {}, singletons, full
        assert len(enumerate_mirs(q)) == expected

    def test_max_size_cap(self):
        q = linear_query(5)
        mirs = enumerate_mirs(q, max_size=2)
        assert all(len(m.rels) == 2 for m in mirs)

    def test_mirs_carry_induced_predicates(self):
        q = Query.of("q", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")])
        for m in enumerate_mirs(q):
            assert m.preds == q.induced(m.rels)


class TestAcrossQueries:
    def test_fig3_mir_set(self):
        # Fig 3: MIR = R, S, T, U (base, implicit), RS, ST, TU
        q1 = Query.of("q1", [pred("R", "b", "S", "b"), pred("S", "c", "T", "c")])
        q2 = Query.of("q2", [pred("S", "c", "T", "c"), pred("T", "d", "U", "d")])
        labels = sorted(m.label for m in mirs_for_queries([q1, q2]))
        assert labels == ["RS", "ST", "TU"]

    def test_shared_mir_identity(self):
        # the ST MIR from q1 and q2 is the same store (same predicates)
        q1 = Query.of("q1", [pred("R", "b", "S", "b"), pred("S", "c", "T", "c")])
        q2 = Query.of("q2", [pred("S", "c", "T", "c"), pred("T", "d", "U", "d")])
        m1 = [m for m in mirs_for_queries([q1]) if m.label == "ST"]
        m2 = [m for m in mirs_for_queries([q2]) if m.label == "ST"]
        assert m1 == m2

    def test_different_predicates_distinct_stores(self):
        # same relations but different join attributes → different MIRs
        q1 = Query.of("q1", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")])
        q2 = Query.of("q2", [pred("R", "a", "S", "a"), pred("S", "z", "T", "z")])
        sts = [m for m in mirs_for_queries([q1, q2]) if m.label == "ST"]
        assert len(sts) == 2

    def test_usable_requires_exact_induced_predicates(self):
        q1 = Query.of("q1", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")])
        q2 = Query.of("q2", [pred("S", "z", "T", "z"), pred("T", "c", "U", "c")])
        mirs = mirs_for_queries([q1, q2])
        # q1 can use its own ST (on b) but not q2's ST (on z)
        u = usable_mirs(q1, mirs)
        st = [m for m in u if m.label == "ST"]
        assert len(st) == 1
        assert st[0].preds == frozenset({pred("S", "b", "T", "b")})

    def test_full_query_never_usable(self):
        q = Query.of("q", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")])
        big = Mir(q.relations, q.predicates)
        assert usable_mirs(q, [big]) == frozenset()
