"""IVFPQ: inverted file over a k-means coarse quantizer + product
quantization (Jégou et al. 2011) — the paper's billion-scale option.

Search probes the ``nprobe`` nearest coarse cells and ranks their
residual-encoded members with asymmetric distance computation (ADC)
lookup tables.
"""
from __future__ import annotations

from typing import Tuple

import numpy as np


def _kmeans(x: np.ndarray, k: int, iters: int, g: np.random.Generator) -> np.ndarray:
    """Plain Lloyd's k-means; returns (k, dim) centroids."""
    k = min(k, len(x))
    cent = x[g.choice(len(x), k, replace=False)].astype(np.float32)
    for _ in range(iters):
        d = ((x[:, None, :] - cent[None, :, :]) ** 2).sum(-1) if len(x) * k * x.shape[1] < 2e8 else None
        if d is None:
            # blocked assignment for big inputs
            assign = np.empty(len(x), dtype=np.int64)
            for i in range(0, len(x), 8192):
                blk = x[i : i + 8192]
                dd = ((blk[:, None, :] - cent[None, :, :]) ** 2).sum(-1)
                assign[i : i + 8192] = dd.argmin(1)
        else:
            assign = d.argmin(1)
        for j in range(k):
            mask = assign == j
            if mask.any():
                cent[j] = x[mask].mean(0)
    return cent


class IVFPQIndex:
    """nlist coarse cells; PQ with ``m_sub`` subspaces × 256 codes."""

    def __init__(self, dim: int, nlist: int = 64, m_sub: int = 8,
                 nbits: int = 8, nprobe: int = 8, seed: int = 0):
        assert dim % m_sub == 0, "dim must divide into m_sub subspaces"
        self.dim, self.nlist, self.m_sub = dim, nlist, m_sub
        self.ksub = 1 << nbits
        self.nprobe = nprobe
        self.seed = seed
        self.coarse: np.ndarray | None = None
        self.codebooks: np.ndarray | None = None  # (m_sub, ksub, dsub)
        self.lists: list[np.ndarray] = []  # member ids per cell
        self.codes: list[np.ndarray] = []  # (len(list), m_sub) uint8 per cell

    def fit(self, x: np.ndarray):
        x = np.asarray(x, dtype=np.float32)
        g = np.random.default_rng(self.seed)
        self.coarse = _kmeans(x, self.nlist, 8, g)
        assign = self._assign(x)
        resid = x - self.coarse[assign]
        dsub = self.dim // self.m_sub
        self.codebooks = np.stack([
            _kmeans(resid[:, s * dsub : (s + 1) * dsub], self.ksub, 6, g)
            for s in range(self.m_sub)
        ])
        codes = self._encode(resid)
        self.lists, self.codes = [], []
        for c in range(len(self.coarse)):
            ids = np.nonzero(assign == c)[0]
            self.lists.append(ids.astype(np.int64))
            self.codes.append(codes[ids])
        return self

    def _assign(self, x: np.ndarray) -> np.ndarray:
        d = ((x[:, None, :] - self.coarse[None, :, :]) ** 2).sum(-1)
        return d.argmin(1)

    def _encode(self, resid: np.ndarray) -> np.ndarray:
        dsub = self.dim // self.m_sub
        out = np.empty((len(resid), self.m_sub), dtype=np.uint8)
        for s in range(self.m_sub):
            blk = resid[:, s * dsub : (s + 1) * dsub]
            d = ((blk[:, None, :] - self.codebooks[s][None, :, :]) ** 2).sum(-1)
            out[:, s] = d.argmin(1)
        return out

    def search(self, q: np.ndarray, k: int) -> Tuple[np.ndarray, np.ndarray]:
        q = np.asarray(q, dtype=np.float32)
        dc = ((self.coarse - q) ** 2).sum(1)
        probe = np.argsort(dc)[: self.nprobe]
        dsub = self.dim // self.m_sub
        ids_all, d_all = [], []
        for c in probe:
            ids, codes = self.lists[c], self.codes[c]
            if len(ids) == 0:
                continue
            r = q - self.coarse[c]
            # ADC tables: (m_sub, ksub) distances from residual query
            tables = np.stack([
                ((self.codebooks[s] - r[s * dsub : (s + 1) * dsub]) ** 2).sum(1)
                for s in range(self.m_sub)
            ])
            d = tables[np.arange(self.m_sub)[None, :], codes.astype(np.int64)].sum(1)
            ids_all.append(ids)
            d_all.append(d)
        if not ids_all:
            return np.array([], dtype=np.int64), np.array([], dtype=np.float32)
        ids = np.concatenate(ids_all)
        d = np.concatenate(d_all)
        order = np.argsort(d)[:k]
        return ids[order], np.sqrt(d[order])
