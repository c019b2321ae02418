"""DeepJoin column encoder: PLM-lite backbone + trainable head.

The head is the fine-tuned part (the backbone stays frozen, standing in
for PLM weights we cannot pretrain offline): attention pooling with a
trainable query vector, then a 2-layer tanh projection. Training uses
cosine scoring (§ 4.2); retrieval uses Euclidean distance on the raw
(unnormalized) output, matching the paper's observation that embedding
length carries joinability signal.

Two encode paths mirror the paper's CPU/GPU split: ``encode_batch``
performs one padded vectorized pass over many columns (the accelerator
analogue — batched BLAS), ``encode_loop`` encodes one column at a time
(the CPU analogue). Both produce identical embeddings; only the speed
differs (Tables 13–15).
"""
from __future__ import annotations

from typing import Dict, Iterator, List, Optional, Sequence, Tuple

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from repro.embed.fasttext import EMB_SCHEMA
from repro.embed.plm import PLMConfig, PLMLite


def init_head(dim: int, hidden: int, out_dim: int, seed: int) -> Dict[str, np.ndarray]:
    g = np.random.default_rng(seed)
    xav = lambda a, b: (g.standard_normal((a, b)) * np.sqrt(2.0 / (a + b))).astype(np.float32)
    return {
        # bilinear attention a_i = h_i · (Wa ᵀ h̄): zero init = uniform
        # attention, i.e. the head starts as a projected mean-pool and
        # learns content-conditioned focusing on top (the lite analogue
        # of fine-tuning self-attention)
        "Wa": np.zeros((dim, dim), dtype=np.float32),
        "W1": xav(dim, hidden),
        "b1": np.zeros(hidden, dtype=np.float32),
        # residual design: e = z @ R + tanh(zW1+b1) @ W2 + b2 with fixed
        # rotation R and W2 zero-init — the untrained model embeds
        # exactly like the frozen backbone (rotated mean-pool), and
        # fine-tuning adds a learned correction instead of replacing the
        # representation (which collapses within-domain ranking)
        "W2": np.zeros((hidden, out_dim), dtype=np.float32),
        "b2": np.zeros(out_dim, dtype=np.float32),
        "R": _fixed_rotation(dim, out_dim, seed),
    }


TRAINABLE = ("Wa", "W1", "b1", "W2", "b2")  # "R" stays fixed


def _fixed_rotation(dim: int, out_dim: int, seed: int) -> np.ndarray:
    g = np.random.default_rng(seed + 777)
    n = max(dim, out_dim)
    q, _ = np.linalg.qr(g.standard_normal((n, n)))
    return q[:dim, :out_dim].astype(np.float32)


def pad_states(states: Sequence[np.ndarray]) -> Tuple[np.ndarray, np.ndarray]:
    """Pad a list of (T_i, D) matrices to (B, Tmax, D) + bool mask."""
    b = len(states)
    tmax = max(s.shape[0] for s in states)
    d = states[0].shape[1]
    H = np.zeros((b, tmax, d), dtype=np.float32)
    mask = np.zeros((b, tmax), dtype=bool)
    for i, s in enumerate(states):
        H[i, : s.shape[0]] = s
        mask[i, : s.shape[0]] = True
    return H, mask


def head_forward(params: Dict[str, np.ndarray], H: np.ndarray, mask: np.ndarray,
                 want_cache: bool = False):
    """Batched forward: (B, T, D) token states → (B, E) embeddings."""
    counts = mask.sum(axis=1, keepdims=True).astype(np.float32)
    zbar = (H * mask[:, :, None]).sum(axis=1) / counts  # masked mean state
    q = zbar @ params["Wa"]  # content-conditioned attention query
    a = np.einsum("btd,bd->bt", H, q)
    a = np.where(mask, a, -np.inf)
    a = a - a.max(axis=1, keepdims=True)
    ea = np.exp(a)
    alpha = ea / ea.sum(axis=1, keepdims=True)
    z = np.einsum("bt,btd->bd", alpha, H)
    pre = z @ params["W1"] + params["b1"]
    y = np.tanh(pre)
    e = z @ params["R"] + y @ params["W2"] + params["b2"]
    if want_cache:
        return e, {"H": H, "mask": mask, "alpha": alpha, "z": z, "y": y, "zbar": zbar}
    return e


def head_backward(params: Dict[str, np.ndarray], cache: dict, dE: np.ndarray) -> Dict[str, np.ndarray]:
    """Gradients of the head parameters given dL/dE."""
    H, mask, alpha, z, y = cache["H"], cache["mask"], cache["alpha"], cache["z"], cache["y"]
    dW2 = y.T @ dE
    db2 = dE.sum(axis=0)
    dy = dE @ params["W2"].T
    dpre = dy * (1.0 - y * y)
    dW1 = z.T @ dpre
    db1 = dpre.sum(axis=0)
    dz = dpre @ params["W1"].T + dE @ params["R"].T  # MLP path + residual path
    dalpha = np.einsum("btd,bd->bt", H, dz)
    dalpha = np.where(mask, dalpha, 0.0)
    # softmax backward: da = alpha * (dalpha - sum_t alpha*dalpha)
    da = alpha * (dalpha - (alpha * dalpha).sum(axis=1, keepdims=True))
    # a = H · q with q = zbar @ Wa; H (and hence zbar) is frozen, so the
    # only attention parameter gradient is dWa = zbarᵀ dq
    dq = np.einsum("bt,btd->bd", da, H)
    dWa = cache["zbar"].T @ dq
    return {"Wa": dWa.astype(np.float32), "W1": dW1.astype(np.float32),
            "b1": db1.astype(np.float32), "W2": dW2.astype(np.float32),
            "b2": db2.astype(np.float32)}


class DeepJoinModel:
    """Fine-tunable DeepJoin encoder over a PLM-lite backbone."""

    def __init__(self, plm_cfg: PLMConfig, hidden: int = 128, out_dim: int = 128,
                 seed: int = 0):
        self.plm_cfg = plm_cfg
        self.plm = PLMLite(plm_cfg)
        self.params = init_head(plm_cfg.dim, hidden, out_dim, seed)
        self.out_dim = out_dim
        self._state_cache: dict[str, np.ndarray] = {}

    # -- token states (frozen backbone; cached by text) ----------------
    def token_states(self, text: str) -> np.ndarray:
        h = self._state_cache.get(text)
        if h is None:
            h = self.plm.token_states(text)
            self._state_cache[text] = h
        return h

    # -- encoding ------------------------------------------------------
    def encode_batch(self, texts: List[str], chunk: int = 512) -> np.ndarray:
        """Vectorized padded pass — the 'GPU' path of the paper."""
        out = np.zeros((len(texts), self.out_dim), dtype=np.float32)
        for i in range(0, len(texts), chunk):
            states = [self.token_states(t) for t in texts[i : i + chunk]]
            H, mask = pad_states(states)
            out[i : i + chunk] = head_forward(self.params, H, mask)
        return out

    def encode_loop(self, texts: List[str]) -> np.ndarray:
        """One column at a time — the 'CPU' path of the paper."""
        out = np.zeros((len(texts), self.out_dim), dtype=np.float32)
        for i, t in enumerate(texts):
            h = self.token_states(t)
            out[i] = head_forward(self.params, h[None, :, :],
                                  np.ones((1, h.shape[0]), dtype=bool))[0]
        return out

    def encode_columns(self, df: DataFrame) -> DataFrame:
        """Distributed encoding of a corpus DataFrame with a ``text``
        column; head parameters ship to executors via closure capture."""
        cfg, params, hidden, out_dim = self.plm_cfg, self.params, None, self.out_dim

        def _mapper(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
            enc = PLMLite(cfg)
            for pdf in batches:
                states = [enc.token_states(t) for t in pdf["text"]]
                H, mask = pad_states(states)
                e = head_forward(params, H, mask)
                yield pd.DataFrame({"col_id": pdf["col_id"], "emb": [v.tolist() for v in e]})

        return df.select("col_id", "text").mapInPandas(_mapper, schema=EMB_SCHEMA)
