"""Tests for the query oracle: counting, caching, budget, certification."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.tasks.monotonic import BudgetExhausted, QueryOracle


def _counter_fn(values):
    calls = {"n": 0}

    def fn(ids):
        calls["n"] += 1
        return values.get(ids, 0.0)

    return fn, calls


class TestCounting:
    def test_base_query_counts_one(self):
        fn, calls = _counter_fn({frozenset(): 0.1})
        o = QueryOracle(fn)
        assert o.queries == 1
        assert o.base_utility == 0.1

    def test_distinct_sets_count(self):
        fn, calls = _counter_fn({})
        o = QueryOracle(fn)
        o.query(frozenset({"a"}))
        o.query(frozenset({"b"}))
        assert o.queries == 3

    def test_repeat_query_cached(self):
        fn, calls = _counter_fn({})
        o = QueryOracle(fn)
        o.query(frozenset({"a"}))
        o.query(frozenset({"a"}))
        assert o.queries == 2
        assert calls["n"] == 2

    def test_seen(self):
        fn, _ = _counter_fn({})
        o = QueryOracle(fn)
        o.query(frozenset({"a"}))
        assert o.seen(frozenset({"a"}))
        assert not o.seen(frozenset({"b"}))


class TestBudget:
    def test_budget_exhaustion_raises(self):
        fn, _ = _counter_fn({})
        o = QueryOracle(fn, budget=2)
        o.query(frozenset({"a"}))
        with pytest.raises(BudgetExhausted):
            o.query(frozenset({"b"}))

    def test_cached_query_free_after_exhaustion(self):
        fn, _ = _counter_fn({})
        o = QueryOracle(fn, budget=2)
        o.query(frozenset({"a"}))
        assert o.query(frozenset({"a"})) == 0.0  # cached, no raise

    def test_remaining(self):
        fn, _ = _counter_fn({})
        o = QueryOracle(fn, budget=5)
        assert o.remaining() == 4
        o.query(frozenset({"a"}))
        assert o.remaining() == 3

    def test_no_budget_remaining_none(self):
        fn, _ = _counter_fn({})
        assert QueryOracle(fn).remaining() is None


class TestCertification:
    def test_superset_certified_to_subset_max(self):
        # 'bad' worsens utility; certification must ignore it (P3).
        vals = {frozenset(): 0.2, frozenset({"good"}): 0.8,
                frozenset({"good", "bad"}): 0.5}
        fn, _ = _counter_fn(vals)
        o = QueryOracle(fn)
        assert o.query(frozenset({"good"})) == 0.8
        assert o.query(frozenset({"good", "bad"})) == 0.8

    def test_certified_includes_empty_set(self):
        vals = {frozenset(): 0.5, frozenset({"a"}): 0.1}
        fn, _ = _counter_fn(vals)
        o = QueryOracle(fn)
        assert o.query(frozenset({"a"})) == 0.5

    def test_monotone_disabled_returns_raw(self):
        vals = {frozenset(): 0.5, frozenset({"a"}): 0.1}
        fn, _ = _counter_fn(vals)
        o = QueryOracle(fn, monotone=False)
        assert o.query(frozenset({"a"})) == 0.1

    def test_raw_accessor(self):
        vals = {frozenset(): 0.5, frozenset({"a"}): 0.1}
        fn, _ = _counter_fn(vals)
        o = QueryOracle(fn)
        o.query(frozenset({"a"}))
        assert o.raw(frozenset({"a"})) == 0.1

    def test_history_best_is_nondecreasing(self):
        vals = {frozenset(): 0.3, frozenset({"a"}): 0.9, frozenset({"b"}): 0.1}
        fn, _ = _counter_fn(vals)
        o = QueryOracle(fn)
        o.query(frozenset({"a"}))
        o.query(frozenset({"b"}))
        bests = [u for _, u in o.history]
        assert bests == sorted(bests)

    @settings(max_examples=25, deadline=None)
    @given(st.lists(st.sets(st.sampled_from("abcd")), min_size=1, max_size=8))
    def test_certified_ge_raw_always(self, sets):
        fn, _ = _counter_fn(
            {frozenset(s): (hash(frozenset(s)) % 100) / 100 for s in sets}
        )
        o = QueryOracle(fn)
        for s in sets:
            assert o.query(frozenset(s)) >= o.raw(frozenset(s))

    @settings(max_examples=25, deadline=None)
    @given(st.lists(st.sets(st.sampled_from("abcd")), min_size=2, max_size=8))
    def test_certified_monotone_over_observed_chain(self, sets):
        """For any observed pair T ⊆ S, certified u(S) ≥ certified u(T)."""
        fn, _ = _counter_fn(
            {frozenset(s): (hash(frozenset(s)) % 100) / 100 for s in sets}
        )
        o = QueryOracle(fn)
        certified = {frozenset(s): o.query(frozenset(s)) for s in sets}
        # re-query to pick up later-observed subsets
        certified = {k: o.query(k) for k in certified}
        for s in certified:
            for t in certified:
                if t < s:
                    assert certified[s] >= certified[t]
