"""PLM-lite: frozen contextual token encoders (DistilBERT / MPNet stand-ins).

A pre-trained transformer is unavailable offline; the experiments need a
frozen encoder with three properties (DESIGN.md § 2):

1. Token states carry *subword* content (hashed char-n-gram embeddings —
   misspellings stay close) plus *positional* information (sinusoidal
   encodings) plus a *contextual* mix (window or global mean), so the raw
   mean-pooled sentence vector is order-sensitive — which is exactly why
   frozen BERT/MPNet underperform order-insensitive fastText averaging on
   joinability in the paper's Table 3.
2. The token states are informative enough that a small trained head
   (attention pooling + projection, ``repro.model``) fine-tuned with the
   MNR loss beats every frozen baseline — DeepJoin's core claim.
3. "MPNet-lite" has more capacity than "DistilBERT-lite" (wider, global
   context vs local window), mirroring why MPNet wins in the paper.
"""
from __future__ import annotations

from dataclasses import dataclass
from functools import lru_cache
from typing import Iterator, List

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from repro.embed.fasttext import EMB_SCHEMA
from repro.embed.hashing import HashedVectors, normalize_rows
from repro.text.tokenizer import char_ngrams, words


@dataclass(frozen=True)
class PLMConfig:
    name: str
    dim: int
    seed: int
    window: int | None  # contextual mixing window; None = global mean
    max_tokens: int = 128
    pos_scale: float = 0.2
    ctx_scale: float = 0.4


DISTILBERT_LITE = PLMConfig("distilbert-lite", dim=96, seed=101, window=4)
MPNET_LITE = PLMConfig("mpnet-lite", dim=128, seed=202, window=None)


@lru_cache(maxsize=8)
def _posenc(max_tokens: int, dim: int) -> np.ndarray:
    """Standard sinusoidal positional encodings, (max_tokens, dim)."""
    pos = np.arange(max_tokens)[:, None]
    i = np.arange(dim)[None, :]
    angle = pos / np.power(10000.0, (2 * (i // 2)) / dim)
    pe = np.where(i % 2 == 0, np.sin(angle), np.cos(angle))
    return pe.astype(np.float32)


class PLMLite:
    """Frozen encoder: text → token states (T, dim) → sentence vector."""

    def __init__(self, cfg: PLMConfig):
        self.cfg = cfg
        self.hv = HashedVectors(dim=cfg.dim, seed=cfg.seed)
        self._word_cache: dict[str, np.ndarray] = {}

    # -- tokenization -------------------------------------------------
    def tokenize(self, text: str) -> List[str]:
        return words(text)[: self.cfg.max_tokens]

    def _word_vec(self, w: str) -> np.ndarray:
        v = self._word_cache.get(w)
        if v is None:
            v = self.hv.sum_vector(char_ngrams(w), normalize=True)
            self._word_cache[w] = v
        return v

    # -- encoding -----------------------------------------------------
    def token_states(self, text: str) -> np.ndarray:
        """(T, dim) contextualized token states; T >= 1 (zero row if empty)."""
        toks = self.tokenize(text)
        if not toks:
            return np.zeros((1, self.cfg.dim), dtype=np.float32)
        e = np.stack([self._word_vec(w) for w in toks])
        # multiplicative position-content coupling: an additive positional
        # term would cancel under mean pooling (same Σpos for any
        # permutation), leaving the frozen embedding order-insensitive;
        # elementwise modulation keeps order information through pooling,
        # as attention does in a real transformer
        pe = _posenc(self.cfg.max_tokens, self.cfg.dim)[: len(toks)]
        base = e * (1.0 + self.cfg.pos_scale * pe)
        if self.cfg.window is None:
            ctx = base.mean(axis=0, keepdims=True)
            mixed = base + self.cfg.ctx_scale * ctx
        else:
            w = self.cfg.window
            csum = np.cumsum(np.vstack([np.zeros((1, base.shape[1]), np.float32), base]), axis=0)
            lo = np.maximum(np.arange(len(toks)) - w, 0)
            hi = np.minimum(np.arange(len(toks)) + w + 1, len(toks))
            ctx = (csum[hi] - csum[lo]) / (hi - lo)[:, None]
            mixed = base + self.cfg.ctx_scale * ctx
        return normalize_rows(mixed)

    def sentence_vec(self, text: str) -> np.ndarray:
        """Frozen baseline embedding: normalized mean-pool of token states."""
        h = self.token_states(text)
        v = h.mean(axis=0)
        n = float(np.linalg.norm(v))
        return (v / n).astype(np.float32) if n > 0 else v.astype(np.float32)

    def encode_texts(self, texts: List[str]) -> np.ndarray:
        return np.stack([self.sentence_vec(t) for t in texts]) if texts else np.zeros((0, self.cfg.dim), np.float32)

    def encode_columns(self, df: DataFrame) -> DataFrame:
        """Distributed frozen encoding of a corpus DataFrame that already
        has a ``text`` column (see ``repro.text.transform.contextualize``)."""
        cfg = self.cfg

        def _mapper(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
            enc = PLMLite(cfg)
            for pdf in batches:
                embs = [enc.sentence_vec(t).tolist() for t in pdf["text"]]
                yield pd.DataFrame({"col_id": pdf["col_id"], "emb": embs})

        return df.select("col_id", "text").mapInPandas(_mapper, schema=EMB_SCHEMA)
