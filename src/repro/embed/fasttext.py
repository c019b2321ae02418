"""fastText-lite: character-n-gram embeddings for cells and columns.

Provides the metric space V of Definition 2.2 (semantic joins match
cell vectors within Euclidean distance τ) and the frozen "fastText"
baseline of the experiments (column embedding = normalized mean of cell
vectors). Misspellings and format variants of a value share most
character n-grams, so they land close; unrelated values land near-
orthogonal — the geometry the paper's semantic-join definition needs.
"""
from __future__ import annotations

from typing import Iterator, List, Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql.types import ArrayType, FloatType, LongType, StructField, StructType

from repro.embed.hashing import HashedVectors, normalize_rows
from repro.text.tokenizer import char_ngrams, words

EMB_SCHEMA = StructType(
    [
        StructField("col_id", LongType(), False),
        StructField("emb", ArrayType(FloatType(), False), False),
    ]
)


class FastTextLite:
    """Hashed char-n-gram embedder; deterministic in (dim, seed)."""

    def __init__(self, dim: int = 64, seed: int = 13, n_buckets: int = 1 << 16):
        self.dim = dim
        self.hv = HashedVectors(dim=dim, n_buckets=n_buckets, seed=seed)
        self._word_cache: dict[str, np.ndarray] = {}

    def word_vec(self, word: str) -> np.ndarray:
        """Normalized sum of the word's char-n-gram bucket vectors."""
        v = self._word_cache.get(word)
        if v is None:
            v = self.hv.sum_vector(char_ngrams(word), normalize=True)
            self._word_cache[word] = v
        return v

    def cell_vec(self, cell: str) -> np.ndarray:
        """Normalized mean of word vectors — one point in V per cell."""
        ws = words(cell)
        if not ws:
            return np.zeros(self.dim, dtype=np.float32)
        v = np.mean([self.word_vec(w) for w in ws], axis=0)
        n = float(np.linalg.norm(v))
        return (v / n).astype(np.float32) if n > 0 else v.astype(np.float32)

    def cell_matrix(self, cells: Sequence[str]) -> np.ndarray:
        """(n_cells, dim) matrix of cell vectors."""
        if not len(cells):
            return np.zeros((0, self.dim), dtype=np.float32)
        return np.stack([self.cell_vec(c) for c in cells])

    def column_vec(self, cells: Sequence[str]) -> np.ndarray:
        """Frozen fastText column embedding: normalized mean of cell vecs."""
        m = self.cell_matrix(cells)
        if m.shape[0] == 0:
            return np.zeros(self.dim, dtype=np.float32)
        v = m.mean(axis=0)
        n = float(np.linalg.norm(v))
        return (v / n).astype(np.float32) if n > 0 else v.astype(np.float32)

    def encode_columns(self, df: DataFrame) -> DataFrame:
        """Distributed column embedding: (col_id, emb) via mapInPandas."""
        dim, seed, n_buckets = self.dim, self.hv.seed, self.hv.n_buckets

        def _mapper(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
            enc = FastTextLite(dim=dim, seed=seed, n_buckets=n_buckets)
            for pdf in batches:
                embs = [enc.column_vec(list(c)).tolist() for c in pdf["cells"]]
                yield pd.DataFrame({"col_id": pdf["col_id"], "emb": embs})

        return df.select("col_id", "cells").mapInPandas(_mapper, schema=EMB_SCHEMA)


def unique_cell_vectors(cells: Sequence[str], ft: FastTextLite) -> tuple[List[str], np.ndarray]:
    """Distinct cell strings and their (n, dim) normalized vector matrix."""
    uniq = list(dict.fromkeys(cells))
    return uniq, normalize_rows(ft.cell_matrix(uniq))
