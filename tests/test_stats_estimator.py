"""Tests for per-epoch statistics estimation."""
import numpy as np
import pandas as pd
import pytest

from repro.core.query import Query, pred
from repro.stats.estimator import estimate_statistics, predicate_selectivity


class TestPredicateSelectivity:
    def test_exact_match(self):
        left = pd.DataFrame({"a": [1, 2, 3]})
        right = pd.DataFrame({"a": [1, 1, 4]})
        p = pred("R", "a", "S", "a")
        # join count = 2 (1 joins both 1s); 2 / (3·3)
        assert predicate_selectivity(left, right, p) == pytest.approx(2 / 9)

    def test_no_matches(self):
        left = pd.DataFrame({"a": [1]})
        right = pd.DataFrame({"a": [2]})
        assert predicate_selectivity(left, right, pred("R", "a", "S", "a")) == 0.0

    def test_empty_side(self):
        left = pd.DataFrame({"a": []})
        right = pd.DataFrame({"a": [1]})
        assert predicate_selectivity(left, right, pred("R", "a", "S", "a")) == 0.0

    def test_cross_product_keys(self):
        left = pd.DataFrame({"a": [7] * 4})
        right = pd.DataFrame({"a": [7] * 5})
        assert predicate_selectivity(left, right, pred("R", "a", "S", "a")) == 1.0

    def test_uses_correct_attribute_sides(self):
        left = pd.DataFrame({"a": [1], "b": [9]})
        right = pd.DataFrame({"c": [9]})
        p = pred("R", "b", "S", "c")
        assert p.left.rel == "R"  # canonical: R before S
        assert predicate_selectivity(left, right, p) == 1.0


class TestEstimateStatistics:
    def test_rates_from_sample_sizes(self):
        q = Query.of("q", [pred("R", "a", "S", "a")])
        samples = {
            "R": pd.DataFrame({"a": np.arange(20)}),
            "S": pd.DataFrame({"a": np.arange(10)}),
        }
        st = estimate_statistics(samples, [q], epoch=2.0)
        assert st.rate("R") == 10.0
        assert st.rate("S") == 5.0

    def test_selectivities_for_query_predicates(self):
        q = Query.of("q", [pred("R", "a", "S", "a")])
        samples = {
            "R": pd.DataFrame({"a": [1, 2]}),
            "S": pd.DataFrame({"a": [1, 3]}),
        }
        st = estimate_statistics(samples, [q], epoch=1.0)
        assert st.selectivity(pred("R", "a", "S", "a")) == pytest.approx(0.25)

    def test_card_model_consistency(self):
        # measured stats reproduce the measured join size: |R⋈S| =
        # rate_R·rate_S·sel with unit epoch and unit windows
        q = Query.of("q", [pred("R", "a", "S", "a")])
        rng = np.random.default_rng(1)
        samples = {
            "R": pd.DataFrame({"a": rng.integers(0, 10, 40)}),
            "S": pd.DataFrame({"a": rng.integers(0, 10, 30)}),
        }
        st = estimate_statistics(samples, [q], epoch=1.0)
        joined = samples["R"].merge(samples["S"], on="a")
        assert st.card(q.relations, q.predicates) == pytest.approx(len(joined))

    def test_windows_passed_through(self):
        q = Query.of("q", [pred("R", "a", "S", "a")])
        samples = {"R": pd.DataFrame({"a": [1]}), "S": pd.DataFrame({"a": [1]})}
        st = estimate_statistics(samples, [q], epoch=1.0, windows={"R": 9.0})
        assert st.window("R") == 9.0
