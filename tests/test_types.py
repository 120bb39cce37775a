"""Unit tests for core datatypes."""
import pytest

from repro.core.types import Augmentation, JoinStep, SearchResult


def _aug(table="t1", left="k", right="id", col="v"):
    return Augmentation(steps=(JoinStep(table, left, right),), column=col)


class TestAugmentation:
    def test_depth_one(self):
        assert _aug().depth == 1

    def test_depth_two(self):
        a = Augmentation(
            steps=(JoinStep("t1", "k", "id"), JoinStep("t2", "fk", "id2")),
            column="v",
        )
        assert a.depth == 2

    def test_table_is_last_hop(self):
        a = Augmentation(
            steps=(JoinStep("t1", "k", "id"), JoinStep("t2", "fk", "id2")),
            column="v",
        )
        assert a.table == "t2"

    def test_aug_id_stable(self):
        assert _aug().aug_id == _aug().aug_id

    def test_aug_id_distinct_per_column(self):
        assert _aug(col="a").aug_id != _aug(col="b").aug_id

    def test_aug_id_distinct_per_table(self):
        assert _aug(table="x").aug_id != _aug(table="y").aug_id

    def test_aug_id_sanitizes_special_chars(self):
        a = _aug(table="my table!", col="weird col")
        assert " " not in a.aug_id
        assert "!" not in a.aug_id

    def test_hashable_and_frozen(self):
        a, b = _aug(), _aug()
        assert a == b and hash(a) == hash(b)
        with pytest.raises(AttributeError):
            a.column = "other"


class TestSearchResult:
    def _res(self):
        return SearchResult(
            selected=["a"],
            utility=0.9,
            queries=5,
            history=[(1, 0.2), (3, 0.5), (5, 0.9)],
            base_utility=0.1,
        )

    def test_utility_at_zero_budget_is_base(self):
        assert self._res().utility_at(0) == 0.1

    def test_utility_at_partial_budget(self):
        assert self._res().utility_at(3) == 0.5

    def test_utility_at_full_budget(self):
        assert self._res().utility_at(100) == 0.9

    def test_queries_to_reach_hit(self):
        assert self._res().queries_to_reach(0.5) == 3

    def test_queries_to_reach_exact_start(self):
        assert self._res().queries_to_reach(0.2) == 1

    def test_queries_to_reach_miss(self):
        assert self._res().queries_to_reach(0.95) is None
