"""PEXESO-lite search: exact semantic top-k with pivot + grid pruning.

Index layout (Spark DataFrame, cached): one row per distinct repository
cell — (x_id, vec, pdist, grid key). The grid key quantizes the first
pivot distances; per-grid-cell bounding boxes prune whole groups via the
triangle inequality before pairwise lower bounds and exact verification.
All pruning is conservative, so results are exact (tested against the
all-pairs semantic oracle).
"""
from __future__ import annotations

from typing import Iterator, List

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F
from pyspark.sql.types import (
    ArrayType,
    FloatType,
    LongType,
    StringType,
    StructField,
    StructType,
)

from repro.embed.fasttext import FastTextLite
from repro.pexeso.pivots import pivot_distances, select_pivots

_VEC_SCHEMA = StructType(
    [
        StructField("x_id", LongType(), False),
        StructField("vec", ArrayType(FloatType(), False), False),
        StructField("pdist", ArrayType(FloatType(), False), False),
        StructField("gkey", LongType(), False),
    ]
)

_MATCH_SCHEMA = StructType(
    [
        StructField("q_id", LongType(), False),
        StructField("q_idx", LongType(), False),
        StructField("x_id", LongType(), False),
    ]
)


class PexesoIndex:
    """Build once over a repository; query many times."""

    def __init__(self, ft: FastTextLite | None = None, n_pivots: int = 8,
                 grid_dims: int = 2, grid_width: float = 0.5,
                 sample_size: int = 2000, seed: int = 0):
        self.ft = ft or FastTextLite()
        self.n_pivots = n_pivots
        self.grid_dims = grid_dims
        self.grid_width = grid_width
        self.sample_size = sample_size
        self.seed = seed
        self.pivots: np.ndarray | None = None
        self.vec_df: DataFrame | None = None

    # ---------------- build ----------------
    def fit(self, spark: SparkSession, repo: DataFrame) -> "PexesoIndex":
        exploded = repo.select(
            F.col("col_id").alias("x_id"),
            F.explode(F.array_distinct("cells")).alias("cell"),
        )
        sample = [
            r.cell
            for r in exploded.select("cell").distinct().limit(self.sample_size).collect()
        ]
        self.pivots = select_pivots(self.ft.cell_matrix(sample), self.n_pivots, self.seed)
        ft_dim, ft_seed = self.ft.dim, self.ft.hv.seed
        pivots, gdims, gwidth = self.pivots, self.grid_dims, self.grid_width

        def _keys(pdists: np.ndarray) -> np.ndarray:
            q = np.floor(pdists[:, :gdims] / gwidth).astype(np.int64)
            key = np.zeros(len(pdists), dtype=np.int64)
            for j in range(q.shape[1]):
                key = key * 64 + np.clip(q[:, j], 0, 63)
            return key

        def _mapper(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
            ft = FastTextLite(dim=ft_dim, seed=ft_seed)
            for pdf in batches:
                vecs = ft.cell_matrix(list(pdf["cell"]))
                pd_ = pivot_distances(vecs, pivots)
                keys = _keys(pd_)
                yield pd.DataFrame(
                    {
                        "x_id": pdf["x_id"].to_numpy(),
                        "vec": [v.tolist() for v in vecs],
                        "pdist": [p.tolist() for p in pd_],
                        "gkey": keys,
                    }
                )

        self.vec_df = exploded.mapInPandas(_mapper, schema=_VEC_SCHEMA).cache()
        self.vec_df.count()  # materialize
        return self

    # ---------------- query ----------------
    def query_all(self, queries: DataFrame, tau: float, k: int) -> DataFrame:
        """Exact (q_id, x_id, jn, rank) top-k for every query column."""
        assert self.vec_df is not None, "call fit() first"
        qrows = queries.select("col_id", "cells").collect()
        all_cells, owners = [], []
        sizes = {}
        for r in qrows:
            uniq = list(dict.fromkeys(r.cells))
            sizes[r.col_id] = len(uniq)
            all_cells.extend(uniq)
            owners.extend([r.col_id] * len(uniq))
        qm = self.ft.cell_matrix(all_cells)
        qpd = pivot_distances(qm, self.pivots)
        owners = np.array(owners, dtype=np.int64)
        q_index = np.arange(len(all_cells), dtype=np.int64)

        def _mapper(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
            for pdf in batches:
                if not len(pdf):
                    continue
                xv = np.array([np.asarray(v, np.float32) for v in pdf["vec"]])
                xp = np.array([np.asarray(p, np.float32) for p in pdf["pdist"]])
                xid = pdf["x_id"].to_numpy()
                gk = pdf["gkey"].to_numpy()
                out_q, out_qi, out_x = [], [], []
                for key in np.unique(gk):
                    rows = np.nonzero(gk == key)[0]
                    box_min = xp[rows].min(axis=0)
                    box_max = xp[rows].max(axis=0)
                    # group-level triangle bound per query vector
                    lb_box = np.maximum(qpd - box_max[None, :], box_min[None, :] - qpd).max(axis=1)
                    q_surv = np.nonzero(lb_box <= tau)[0]
                    if not len(q_surv):
                        continue
                    # pairwise pivot lower bound
                    diff = np.abs(qpd[q_surv][:, None, :] - xp[rows][None, :, :]).max(axis=2)
                    qi, xi = np.nonzero(diff <= tau)
                    if not len(qi):
                        continue
                    # exact verification
                    dq = qm[q_surv[qi]] - xv[rows[xi]]
                    dist = np.sqrt(np.einsum("ij,ij->i", dq, dq))
                    ok = dist <= tau
                    out_q.extend(owners[q_surv[qi[ok]]].tolist())
                    out_qi.extend(q_index[q_surv[qi[ok]]].tolist())
                    out_x.extend(xid[rows[xi[ok]]].tolist())
                if out_q:
                    yield (
                        pd.DataFrame({"q_id": out_q, "q_idx": out_qi, "x_id": out_x})
                        .drop_duplicates()
                    )

        matches = self.vec_df.mapInPandas(_mapper, schema=_MATCH_SCHEMA)
        counts = matches.groupBy("q_id", "x_id").agg(
            F.countDistinct("q_idx").alias("matched")
        )
        spark = queries.sparkSession
        size_df = spark.createDataFrame(
            pd.DataFrame({"q_id": list(sizes), "q_size": list(sizes.values())})
        )
        scored = counts.join(size_df, "q_id").select(
            "q_id", "x_id", (F.col("matched") / F.col("q_size")).alias("jn")
        )
        w = Window.partitionBy("q_id").orderBy(F.desc("jn"), F.asc("x_id"))
        return (
            scored.withColumn("rank", F.row_number().over(w))
            .filter(F.col("rank") <= k)
        )
