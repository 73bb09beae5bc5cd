"""Tests for the oracle SQL builder (pure string construction + a DuckDB
round trip)."""
import duckdb
import numpy as np
import pandas as pd
import pytest

from repro.core.query import Query, pred
from repro.engine.oracle_sql import windowed_join_sql


@pytest.fixture()
def q3():
    return Query.of("q", [pred("R", "a", "S", "a"), pred("S", "b", "T", "b")])


class TestSqlText:
    def test_columns_aliased_with_prefix(self, q3):
        sql = windowed_join_sql(q3, {"R": ["a"], "S": ["a", "b"], "T": ["b"]})
        assert 'R."a" AS R__a' in sql
        assert 'S."b" AS S__b' in sql
        assert 'R."__tau" AS R__tau' in sql

    def test_predicates_present(self, q3):
        sql = windowed_join_sql(q3, {"R": ["a"], "S": ["a", "b"], "T": ["b"]})
        assert 'R."a" = S."a"' in sql
        assert 'S."b" = T."b"' in sql

    def test_no_window_conditions_by_default(self, q3):
        sql = windowed_join_sql(q3, {"R": ["a"], "S": ["a", "b"], "T": ["b"]})
        assert "GREATEST" not in sql

    def test_window_conditions(self, q3):
        sql = windowed_join_sql(
            q3, {"R": ["a"], "S": ["a", "b"], "T": ["b"]},
            windows={"R": 2.0, "T": 4.0},
        )
        assert sql.count("GREATEST") == 2
        assert '- R."__tau" <= 2.0' in sql
        assert '- T."__tau" <= 4.0' in sql
        assert 'S."__tau" <=' not in sql.replace('GREATEST', '')


class TestDuckDbRoundTrip:
    def test_executes_and_counts(self):
        rng = np.random.default_rng(0)
        R = pd.DataFrame({"a": rng.integers(0, 4, 20), "__tau": np.arange(20) * 0.5})
        S = pd.DataFrame({"a": rng.integers(0, 4, 20), "__tau": np.arange(20) * 0.5 + 0.25})
        q = Query.of("q", [pred("R", "a", "S", "a")])
        sql = windowed_join_sql(q, {"R": ["a"], "S": ["a"]}, windows={"R": 1.0, "S": 1.0})
        con = duckdb.connect()
        con.register("R", R)
        con.register("S", S)
        out = con.execute(sql).fetchdf()
        con.close()
        assert set(out.columns) == {"R__a", "R__tau", "S__a", "S__tau"}
        # manual check
        expected = 0
        for _, r in R.iterrows():
            for _, s in S.iterrows():
                if r["a"] == s["a"] and abs(r["__tau"] - s["__tau"]) <= 1.0:
                    expected += 1
        assert len(out) == expected
