"""Hierarchical Navigable Small World index (from scratch, numpy).

Follows Malkov & Yashunin 2020: geometric level assignment, greedy
descent through upper layers, beam search (ef) at each level, simple
closest-M neighbor selection with degree capping. Distances are
Euclidean (squared internally). Search complexity is logarithmic in the
number of indexed vectors, which is what gives DeepJoin its flat search
time in Tables 13–15.
"""
from __future__ import annotations

import heapq
from typing import List, Tuple

import numpy as np


class HNSWIndex:
    """Build with ``add_batch``; query with ``search``.

    Parameters mirror the usual HNSW knobs: ``m`` max out-degree on
    upper layers (2m on layer 0), ``ef_construction`` build beam width,
    ``ef_search`` default query beam width.
    """

    def __init__(self, dim: int, m: int = 16, ef_construction: int = 100,
                 ef_search: int = 64, seed: int = 0):
        self.dim = dim
        self.m = m
        self.m0 = 2 * m
        self.efc = ef_construction
        self.ef = ef_search
        self._g = np.random.default_rng(seed)
        self._ml = 1.0 / np.log(m)
        self.vecs = np.zeros((0, dim), dtype=np.float32)
        self.levels: List[int] = []
        # adjacency: one list per level; each entry maps node -> int32 array
        self.graph: List[dict] = []
        self.entry: int = -1
        self.max_level: int = -1

    # ---------------- internals ----------------
    def _dist(self, q: np.ndarray, ids) -> np.ndarray:
        d = self.vecs[ids] - q
        return np.einsum("ij,ij->i", d, d)

    def _search_layer(self, q: np.ndarray, entry: int, entry_d: float,
                      level: int, ef: int) -> List[Tuple[float, int]]:
        """Beam search at one level; returns up to ef (dist, id) sorted asc."""
        adj = self.graph[level]
        visited = {entry}
        cand = [(entry_d, entry)]  # min-heap by distance
        best = [(-entry_d, entry)]  # max-heap (negated) of current ef best
        while cand:
            d, u = heapq.heappop(cand)
            if d > -best[0][0] and len(best) >= ef:
                break
            neigh = adj.get(u)
            if neigh is None or len(neigh) == 0:
                continue
            new = [v for v in neigh.tolist() if v not in visited]
            if not new:
                continue
            visited.update(new)
            dists = self._dist(q, new)
            for v, dv in zip(new, dists.tolist()):
                if len(best) < ef or dv < -best[0][0]:
                    heapq.heappush(cand, (dv, v))
                    heapq.heappush(best, (-dv, v))
                    if len(best) > ef:
                        heapq.heappop(best)
        out = sorted((-nd, v) for nd, v in best)
        return out

    def _select_neighbors(self, cands: List[Tuple[float, int]], m: int) -> List[int]:
        return [v for _, v in cands[:m]]

    def _link(self, level: int, u: int, vs: List[int]):
        adj = self.graph[level]
        cap = self.m0 if level == 0 else self.m
        adj[u] = np.array(vs[:cap], dtype=np.int32)
        uvec = self.vecs[u]
        for v in vs:
            cur = adj.get(v)
            if cur is None:
                adj[v] = np.array([u], dtype=np.int32)
            elif len(cur) < cap:
                adj[v] = np.append(cur, np.int32(u))
            else:
                # keep the cap closest among cur + u
                ids = np.append(cur, np.int32(u))
                d = self.vecs[ids] - self.vecs[v]
                dd = np.einsum("ij,ij->i", d, d)
                adj[v] = ids[np.argsort(dd)[:cap]]
        _ = uvec  # (kept for clarity; vecs indexed directly above)

    # ---------------- public API ----------------
    def add_batch(self, vecs: np.ndarray):
        vecs = np.asarray(vecs, dtype=np.float32)
        # grow storage once (per-insert vstack would be O(n²))
        self.vecs = np.vstack([self.vecs, vecs]) if len(self.levels) else vecs.copy()
        for v in vecs:
            self._add_one(v)

    def _add_one(self, vec: np.ndarray):
        nid = len(self.levels)
        level = int(-np.log(self._g.random() + 1e-12) * self._ml)
        self.levels.append(level)
        while len(self.graph) <= level:
            self.graph.append({})
        if self.entry < 0:
            self.entry, self.max_level = nid, level
            for lv in range(level + 1):
                self.graph[lv][nid] = np.array([], dtype=np.int32)
            return
        ep, epd = self.entry, float(self._dist(vec, [self.entry])[0])
        for lv in range(self.max_level, level, -1):
            res = self._search_layer(vec, ep, epd, lv, 1)
            epd, ep = res[0]
        for lv in range(min(level, self.max_level), -1, -1):
            res = self._search_layer(vec, ep, epd, lv, self.efc)
            vs = self._select_neighbors(res, self.m0 if lv == 0 else self.m)
            self._link(lv, nid, vs)
            epd, ep = res[0]
        if level > self.max_level:
            self.entry, self.max_level = nid, level

    def search(self, q: np.ndarray, k: int, ef: int | None = None) -> Tuple[np.ndarray, np.ndarray]:
        """(ids, dists) of the ~k nearest neighbors (Euclidean)."""
        if self.entry < 0:
            return np.array([], dtype=np.int64), np.array([], dtype=np.float32)
        q = np.asarray(q, dtype=np.float32)
        ef = max(ef or self.ef, k)
        ep, epd = self.entry, float(self._dist(q, [self.entry])[0])
        for lv in range(self.max_level, 0, -1):
            res = self._search_layer(q, ep, epd, lv, 1)
            epd, ep = res[0]
        res = self._search_layer(q, ep, epd, 0, ef)[:k]
        ids = np.array([v for _, v in res], dtype=np.int64)
        dists = np.sqrt(np.array([d for d, _ in res], dtype=np.float32))
        return ids, dists

    def __len__(self) -> int:
        return len(self.levels)
