"""Deterministic hashed bucket vectors.

Every embedder in this repo maps string tokens to vectors through the
same mechanism real fastText uses for subwords: hash the token into one
of ``n_buckets`` buckets and look up a bucket vector. Here the bucket
table is random but *deterministic* in (dim, n_buckets, seed), so every
executor and every test sees identical embeddings without shipping a
pretrained matrix.
"""
from __future__ import annotations

import zlib
from functools import lru_cache
from typing import List, Sequence

import numpy as np


@lru_cache(maxsize=16)
def _bucket_table(dim: int, n_buckets: int, seed: int) -> np.ndarray:
    g = np.random.default_rng(seed)
    # unit-ish rows: standard normal / sqrt(dim) keeps norms ~1
    return (g.standard_normal((n_buckets, dim)) / np.sqrt(dim)).astype(np.float32)


class HashedVectors:
    """Token → vector via CRC32 hashing into a deterministic bucket table."""

    def __init__(self, dim: int = 64, n_buckets: int = 1 << 16, seed: int = 0):
        self.dim = dim
        self.n_buckets = n_buckets
        self.seed = seed
        self.table = _bucket_table(dim, n_buckets, seed)

    def bucket(self, token: str) -> int:
        return zlib.crc32(token.encode("utf-8")) % self.n_buckets

    def vectors(self, tokens: Sequence[str]) -> np.ndarray:
        """(len(tokens), dim) float32 matrix of bucket vectors."""
        if not tokens:
            return np.zeros((0, self.dim), dtype=np.float32)
        idx = np.fromiter((self.bucket(t) for t in tokens), dtype=np.int64, count=len(tokens))
        return self.table[idx]

    def sum_vector(self, tokens: Sequence[str], normalize: bool = True) -> np.ndarray:
        """Sum of token vectors, optionally L2-normalized (fastText-style)."""
        v = self.vectors(tokens).sum(axis=0)
        if normalize:
            n = float(np.linalg.norm(v))
            if n > 0:
                v = v / n
        return v.astype(np.float32)


def normalize_rows(m: np.ndarray) -> np.ndarray:
    """Row-wise L2 normalization; zero rows stay zero."""
    n = np.linalg.norm(m, axis=1, keepdims=True)
    n[n == 0] = 1.0
    return (m / n).astype(np.float32)
