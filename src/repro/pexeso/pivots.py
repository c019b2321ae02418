"""Pivot selection and pivot-space mapping for PEXESO-lite."""
from __future__ import annotations

import numpy as np


def select_pivots(vectors: np.ndarray, n_pivots: int, seed: int = 0) -> np.ndarray:
    """Farthest-point sampling: well-spread pivots give tight triangle-
    inequality bounds. Deterministic in ``seed``."""
    g = np.random.default_rng(seed)
    n = len(vectors)
    if n == 0:
        return np.zeros((0, vectors.shape[1] if vectors.ndim == 2 else 0), np.float32)
    n_pivots = min(n_pivots, n)
    first = int(g.integers(0, n))
    chosen = [first]
    d = np.linalg.norm(vectors - vectors[first], axis=1)
    for _ in range(n_pivots - 1):
        nxt = int(np.argmax(d))
        chosen.append(nxt)
        d = np.minimum(d, np.linalg.norm(vectors - vectors[nxt], axis=1))
    return vectors[chosen].astype(np.float32)


def pivot_distances(vectors: np.ndarray, pivots: np.ndarray) -> np.ndarray:
    """(n, n_pivots) Euclidean distances to each pivot."""
    if len(vectors) == 0:
        return np.zeros((0, len(pivots)), np.float32)
    d2 = (
        (vectors ** 2).sum(1, keepdims=True)
        - 2.0 * vectors @ pivots.T
        + (pivots ** 2).sum(1)[None, :]
    )
    return np.sqrt(np.maximum(d2, 0.0)).astype(np.float32)
