"""Deterministic hashed token embeddings — offline substitute for BERT.

The semantic profile only needs a similarity signal: related tables (shared
descriptive tokens) must land near each other, unrelated tables far apart.
Feature-hashing each token into a fixed-dimensional Gaussian vector and
averaging gives exactly that, deterministically and offline. DESIGN.md
documents this substitution.
"""
from __future__ import annotations

import hashlib
from functools import lru_cache

import numpy as np

DIM = 32


@lru_cache(maxsize=65536)
def token_embedding(token: str, dim: int = DIM) -> np.ndarray:
    """Unit-norm embedding of a single token, deterministic in the token."""
    seed = int.from_bytes(
        hashlib.sha256(token.lower().encode()).digest()[:8], "little"
    )
    v = np.random.default_rng(seed).normal(size=dim)
    return v / np.linalg.norm(v)


def text_embedding(tokens: tuple[str, ...] | list[str], dim: int = DIM) -> np.ndarray:
    """Average of token embeddings (the paper averages token vectors)."""
    if not tokens:
        return np.zeros(dim)
    m = np.mean([token_embedding(t, dim) for t in tokens], axis=0)
    n = np.linalg.norm(m)
    return m / n if n > 0 else m


def cosine(a: np.ndarray, b: np.ndarray) -> float:
    """Cosine similarity, 0.0 when either side is a zero vector."""
    na, nb = np.linalg.norm(a), np.linalg.norm(b)
    if na == 0 or nb == 0:
        return 0.0
    return float(np.dot(a, b) / (na * nb))


def jaccard(a: set[str], b: set[str]) -> float:
    """Jaccard similarity of two token sets (metadata profile)."""
    if not a and not b:
        return 0.0
    return len(a & b) / len(a | b)
