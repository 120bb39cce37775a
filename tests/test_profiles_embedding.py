"""Tests for the hashed-token embedding (BERT substitute)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.profiles.embedding import cosine, jaccard, text_embedding, token_embedding

_token = st.text(
    alphabet=st.characters(whitelist_categories=("Ll", "Lu", "Nd")),
    min_size=1,
    max_size=12,
)


class TestTokenEmbedding:
    def test_deterministic(self):
        np.testing.assert_allclose(
            token_embedding("taxi"), token_embedding("taxi")
        )

    def test_case_insensitive(self):
        np.testing.assert_allclose(
            token_embedding("Taxi"), token_embedding("taxi")
        )

    def test_unit_norm(self):
        assert np.linalg.norm(token_embedding("crime")) == pytest.approx(1.0)

    def test_distinct_tokens_distinct_vectors(self):
        assert not np.allclose(token_embedding("a"), token_embedding("b"))

    @settings(max_examples=30, deadline=None)
    @given(_token)
    def test_unit_norm_property(self, tok):
        assert np.linalg.norm(token_embedding(tok)) == pytest.approx(1.0)


class TestTextEmbedding:
    def test_empty_zero_vector(self):
        np.testing.assert_allclose(text_embedding(()), 0.0)

    def test_shared_tokens_high_cosine(self):
        a = text_embedding(("taxi", "trips", "daily"))
        b = text_embedding(("taxi", "trips", "count"))
        c = text_embedding(("finance", "budget", "audit"))
        assert cosine(a, b) > cosine(a, c) + 0.3

    def test_order_invariant(self):
        np.testing.assert_allclose(
            text_embedding(("a", "b")), text_embedding(("b", "a"))
        )


class TestCosine:
    def test_self_similarity_one(self):
        v = token_embedding("x")
        assert cosine(v, v) == pytest.approx(1.0)

    def test_zero_vector_zero(self):
        assert cosine(np.zeros(4), np.ones(4)) == 0.0

    @settings(max_examples=30, deadline=None)
    @given(st.lists(_token, min_size=1, max_size=5, unique=True),
           st.lists(_token, min_size=1, max_size=5, unique=True))
    def test_bounds(self, ta, tb):
        c = cosine(text_embedding(tuple(ta)), text_embedding(tuple(tb)))
        assert -1.0 - 1e-9 <= c <= 1.0 + 1e-9


class TestJaccard:
    def test_identical(self):
        assert jaccard({"a", "b"}, {"a", "b"}) == 1.0

    def test_disjoint(self):
        assert jaccard({"a"}, {"b"}) == 0.0

    def test_empty_both(self):
        assert jaccard(set(), set()) == 0.0

    @settings(max_examples=30, deadline=None)
    @given(st.sets(_token, max_size=6), st.sets(_token, max_size=6))
    def test_bounds_and_symmetry(self, a, b):
        j = jaccard(a, b)
        assert 0.0 <= j <= 1.0
        assert j == jaccard(b, a)
