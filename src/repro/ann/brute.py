"""Exact kNN oracles: distributed (Spark) and local (numpy).

``brute_force_knn`` is the DataFrame dataflow version: each partition
computes its local top-k per query with numpy (mapInPandas), then a
window keeps the global top-k — the classic scan+search pattern for
embedding retrieval over a data lake, and the recall oracle for HNSW
and IVFPQ.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F
from pyspark.sql.types import (
    DoubleType,
    LongType,
    StructField,
    StructType,
)

KNN_SCHEMA = StructType(
    [
        StructField("q_idx", LongType(), False),
        StructField("col_id", LongType(), False),
        StructField("dist", DoubleType(), False),
    ]
)


def knn_exact_numpy(queries: np.ndarray, vecs: np.ndarray, k: int) -> tuple[np.ndarray, np.ndarray]:
    """(ids, dists) arrays of shape (n_queries, k), exact Euclidean."""
    d2 = (
        (queries ** 2).sum(1, keepdims=True)
        - 2.0 * queries @ vecs.T
        + (vecs ** 2).sum(1)[None, :]
    )
    k = min(k, vecs.shape[0])
    idx = np.argpartition(d2, k - 1, axis=1)[:, :k]
    row = np.arange(len(queries))[:, None]
    order = np.argsort(d2[row, idx], axis=1)
    ids = idx[row, order]
    return ids, np.sqrt(np.maximum(d2[row, ids], 0.0))


def brute_force_knn(emb: DataFrame, queries: np.ndarray, k: int) -> DataFrame:
    """Exact top-k per query over an embeddings DataFrame (col_id, emb).

    Returns (q_idx, col_id, dist, rank) with rank 1..k per query.
    """
    q = np.asarray(queries, dtype=np.float32)

    def _mapper(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            if not len(pdf):
                continue
            vecs = np.stack(pdf["emb"].map(np.asarray)).astype(np.float32)
            ids, dists = knn_exact_numpy(q, vecs, k)
            n_q, kk = ids.shape
            yield pd.DataFrame(
                {
                    "q_idx": np.repeat(np.arange(n_q), kk),
                    "col_id": pdf["col_id"].to_numpy()[ids.ravel()],
                    "dist": dists.ravel().astype(np.float64),
                }
            )

    local = emb.mapInPandas(_mapper, schema=KNN_SCHEMA)
    w = Window.partitionBy("q_idx").orderBy(F.asc("dist"), F.asc("col_id"))
    return (
        local.withColumn("rank", F.row_number().over(w))
        .filter(F.col("rank") <= k)
    )
