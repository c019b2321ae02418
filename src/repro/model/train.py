"""Fine-tuning DeepJoin (§ 4 of the paper).

* Positive pairs come from the exact self-join (``repro.joinability``).
* Cell-shuffle augmentation: a ``shuffle_rate`` fraction of pairs (X, Y)
  contributes an extra positive (X', Y) with X's cells permuted, so the
  model learns order-insensitive joinability (§ 4.1).
* Negatives are in-batch: inside a batch {(X_i, Y_i)}, every (X_i, Y_j),
  j != i is a negative (§ 4.1).
* Loss: multiple-negatives-ranking — softmax cross-entropy over scaled
  cosine scores (§ 4.2). Search later uses Euclidean distance.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List, Optional, Tuple

import numpy as np
import pandas as pd

from repro.model.deepjoin import DeepJoinModel, head_backward, head_forward, pad_states
from repro.model.optim import Adam
from repro.text.transform import render


@dataclass
class TrainConfig:
    """Paper settings: batch 32, lr 2e-5, warmup 10000, weight decay
    0.01 — tuned for a full PLM on GPU. The numpy head is much smaller,
    so defaults differ: larger lr, few epochs, no warmup. Batch size and
    weight decay follow the paper."""

    batch_size: int = 32
    epochs: int = 5
    lr: float = 2e-3
    weight_decay: float = 0.01
    scale: float = 20.0  # cosine logit scale (sentence-transformers default)
    shuffle_rate: float = 0.2
    max_pairs: int = 4000
    seed: int = 0


def mnr_loss_and_grads(ex: np.ndarray, ey: np.ndarray, scale: float) -> Tuple[float, np.ndarray, np.ndarray]:
    """Multiple-negatives-ranking loss and dL/dex, dL/dey.

    ex, ey: (B, E) raw embeddings; score = scale * cosine.
    """
    nx = np.linalg.norm(ex, axis=1, keepdims=True) + 1e-9
    ny = np.linalg.norm(ey, axis=1, keepdims=True) + 1e-9
    xh, yh = ex / nx, ey / ny
    s = scale * (xh @ yh.T)
    s = s - s.max(axis=1, keepdims=True)
    p = np.exp(s)
    p /= p.sum(axis=1, keepdims=True)
    b = len(ex)
    loss = float(-np.mean(np.log(p[np.arange(b), np.arange(b)] + 1e-12)))
    ds = (p - np.eye(b, dtype=p.dtype)) / b  # dL/d(scaled cos)
    dc = scale * ds
    dxh = dc @ yh
    dyh = dc.T @ xh
    # backprop through row normalization
    dex = (dxh - xh * (dxh * xh).sum(axis=1, keepdims=True)) / nx
    dey = (dyh - yh * (dyh * yh).sum(axis=1, keepdims=True)) / ny
    return loss, dex.astype(np.float32), dey.astype(np.float32)


def prepare_pairs(
    columns: pd.DataFrame,
    positives: pd.DataFrame,
    *,
    option: str,
    shuffle_rate: float = 0.2,
    max_pairs: int = 4000,
    max_cells: int = 64,
    freq: Optional[Dict[str, int]] = None,
    seed: int = 0,
) -> List[Tuple[str, str]]:
    """(text_X, text_Y) training pairs with cell-shuffle augmentation.

    ``columns`` is the lake pandas frame (col_id-indexed fields);
    ``positives`` has (x_id, y_id). A ``shuffle_rate`` fraction of the
    sampled pairs contributes an extra (shuffled-X, Y) positive, so out
    of all pairs r/(1+r) are shuffled, as in § 4.1.
    """
    g = np.random.default_rng(seed)
    cols = columns.set_index("col_id")
    pos = positives
    if len(pos) > max_pairs:
        pos = pos.sample(n=max_pairs, random_state=seed)

    def _text(row, cells) -> str:
        return render(option, cells=cells, col_name=row.col_name,
                      table_title=row.table_title, context=row.context,
                      max_cells=max_cells, freq=freq)

    out: List[Tuple[str, str]] = []
    for r in pos.itertuples():
        x, y = cols.loc[r.x_id], cols.loc[r.y_id]
        tx, ty = _text(x, list(x.cells)), _text(y, list(y.cells))
        out.append((tx, ty))
        if g.random() < shuffle_rate:
            shuffled = list(x.cells)
            g.shuffle(shuffled)
            out.append((_text(x, shuffled), ty))
    return out


def train(model: DeepJoinModel, pairs: List[Tuple[str, str]],
          cfg: TrainConfig = TrainConfig()) -> List[float]:
    """Fine-tune the head; returns per-epoch mean losses."""
    g = np.random.default_rng(cfg.seed)
    opt = Adam(model.params, lr=cfg.lr, weight_decay=cfg.weight_decay)
    # precompute token states once per distinct text (frozen backbone)
    for tx, ty in pairs:
        model.token_states(tx)
        model.token_states(ty)
    losses = []
    idx = np.arange(len(pairs))
    for _ in range(cfg.epochs):
        g.shuffle(idx)
        epoch_losses = []
        for s in range(0, len(idx), cfg.batch_size):
            batch = [pairs[i] for i in idx[s : s + cfg.batch_size]]
            if len(batch) < 2:
                continue
            hx, mx = pad_states([model.token_states(t) for t, _ in batch])
            hy, my = pad_states([model.token_states(t) for _, t in batch])
            ex, cx = head_forward(model.params, hx, mx, want_cache=True)
            ey, cy = head_forward(model.params, hy, my, want_cache=True)
            loss, dex, dey = mnr_loss_and_grads(ex, ey, cfg.scale)
            gx = head_backward(model.params, cx, dex)
            gy = head_backward(model.params, cy, dey)
            opt.step({k: gx[k] + gy[k] for k in gx})
            epoch_losses.append(loss)
        losses.append(float(np.mean(epoch_losses)))
    return losses
