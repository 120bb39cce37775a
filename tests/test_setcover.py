"""Tests for the set-cover / adversarial utility gadgets."""
import pytest

from repro.tasks.setcover import AdversarialUtility, SetCoverUtility


class TestSetCover:
    def _util(self):
        return SetCoverUtility(
            sets={
                "a": frozenset({0, 1, 2}),
                "b": frozenset({2, 3}),
                "c": frozenset({4}),
                "d": frozenset(),
            },
            n_universe=5,
        )

    def test_empty_zero(self):
        assert self._util()(frozenset()) == 0.0

    def test_single(self):
        assert self._util()(frozenset({"a"})) == pytest.approx(0.6)

    def test_union(self):
        assert self._util()(frozenset({"a", "b", "c"})) == 1.0

    def test_monotone(self):
        u = self._util()
        assert u(frozenset({"a", "d"})) >= u(frozenset({"a"}))

    def test_submodular_diminishing_returns(self):
        u = self._util()
        # marginal of b on empty ≥ marginal of b on {a}
        m_empty = u(frozenset({"b"})) - u(frozenset())
        m_a = u(frozenset({"a", "b"})) - u(frozenset({"a"}))
        assert m_empty >= m_a

    def test_zero_universe(self):
        u = SetCoverUtility(sets={"a": frozenset()}, n_universe=0)
        assert u(frozenset({"a"})) == 0.0


class TestAdversarial:
    def test_flat_until_hidden(self):
        adv = AdversarialUtility(hidden=frozenset({"x", "y"}), theta=1.0)
        assert adv(frozenset({"x"})) == 0.0
        assert adv(frozenset({"x", "y", "z"})) == 0.0

    def test_hidden_hits_theta(self):
        adv = AdversarialUtility(hidden=frozenset({"x", "y"}), theta=0.9)
        assert adv(frozenset({"x", "y"})) == 0.9
