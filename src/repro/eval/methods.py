"""Method runners: a uniform interface over every compared system.

Embedding methods expose ``embed_corpus_df`` (distributed, Spark) and
``embed_queries`` (driver-side, what the online query path does);
``topk_ids`` then ranks by Euclidean distance — exact kNN by default
for accuracy experiments (HNSW recall is ≥95%, validated separately),
HNSW for the timing experiments where the index *is* the system.
"""
from __future__ import annotations

from typing import Dict, List, Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from repro.ann.brute import knn_exact_numpy
from repro.ann.hnsw import HNSWIndex
from repro.embed.fasttext import FastTextLite
from repro.embed.plm import PLMConfig, PLMLite
from repro.embed.tabert import TaBERTLite
from repro.model.deepjoin import DeepJoinModel
from repro.model.mlp import MLPBaseline
from repro.text.transform import render


def render_rows(pdf: pd.DataFrame, option: str, freq=None, max_cells: int = 64) -> List[str]:
    return [
        render(option, cells=list(r.cells), col_name=r.col_name,
               table_title=r.table_title, context=r.context,
               max_cells=max_cells, freq=freq)
        for r in pdf.itertuples()
    ]


class FastTextMethod:
    name = "fastText"

    def __init__(self, ft: FastTextLite | None = None):
        self.ft = ft or FastTextLite()

    def embed_corpus_df(self, repo: DataFrame) -> DataFrame:
        return self.ft.encode_columns(repo)

    def embed_queries(self, pdf: pd.DataFrame) -> np.ndarray:
        return np.stack([self.ft.column_vec(list(c)) for c in pdf["cells"]])


class FrozenPLMMethod:
    """BERT / MPNet baselines: frozen mean-pooled PLM-lite embeddings."""

    def __init__(self, cfg: PLMConfig, name: str, option: str):
        self.plm = PLMLite(cfg)
        self.name = name
        self.option = option

    def embed_corpus_df(self, repo_with_text: DataFrame) -> DataFrame:
        return self.plm.encode_columns(repo_with_text)

    def embed_queries(self, pdf: pd.DataFrame, freq=None) -> np.ndarray:
        return self.plm.encode_texts(render_rows(pdf, self.option, freq))


class TaBERTMethod:
    name = "TaBERT"

    def __init__(self):
        self.tb = TaBERTLite()

    def embed_corpus_df(self, repo: DataFrame) -> DataFrame:
        return self.tb.encode_columns(repo)

    def embed_queries(self, pdf: pd.DataFrame) -> np.ndarray:
        return np.stack([
            self.tb.column_vec(cells=list(r.cells), col_name=r.col_name,
                               table_title=r.table_title)
            for r in pdf.itertuples()
        ])


class MLPMethod:
    name = "MLP"

    def __init__(self, mlp: MLPBaseline):
        self.mlp = mlp

    def embed_corpus_df(self, repo: DataFrame) -> DataFrame:
        # fastText column vectors distributed, tower applied per batch
        ft_df = self.mlp.ft.encode_columns(repo)
        mlp = self.mlp

        def _mapper(batches):
            for pdf in batches:
                if not len(pdf):
                    continue
                vecs = np.stack(pdf["emb"].map(np.asarray)).astype(np.float32)
                emb = mlp.embed(vecs)
                yield pd.DataFrame({"col_id": pdf["col_id"], "emb": [v.tolist() for v in emb]})

        from repro.embed.fasttext import EMB_SCHEMA

        return ft_df.mapInPandas(_mapper, schema=EMB_SCHEMA)

    def embed_queries(self, pdf: pd.DataFrame) -> np.ndarray:
        vecs = np.stack([self.mlp.ft.column_vec(list(c)) for c in pdf["cells"]])
        return self.mlp.embed(vecs)


class DeepJoinMethod:
    """The proposed model: fine-tuned head over PLM-lite."""

    def __init__(self, model: DeepJoinModel, name: str, option: str):
        self.model = model
        self.name = name
        self.option = option

    def embed_corpus_df(self, repo_with_text: DataFrame) -> DataFrame:
        return self.model.encode_columns(repo_with_text)

    def embed_queries(self, pdf: pd.DataFrame, freq=None) -> np.ndarray:
        return self.model.encode_batch(render_rows(pdf, self.option, freq))


def collect_embeddings(emb_df: DataFrame) -> tuple[np.ndarray, np.ndarray]:
    """(ids, matrix) from a (col_id, emb) DataFrame, id-sorted."""
    rows = emb_df.collect()
    ids = np.array([r.col_id for r in rows], dtype=np.int64)
    mat = np.array([r.emb for r in rows], dtype=np.float32)
    order = np.argsort(ids)
    return ids[order], mat[order]


def topk_ids(
    ids: np.ndarray, mat: np.ndarray, qmat: np.ndarray, k: int,
    use_hnsw: bool = False, ef: int = 96, hnsw: HNSWIndex | None = None,
) -> List[List[int]]:
    """Ranked candidate ids per query (Euclidean), exact or via HNSW."""
    if use_hnsw:
        index = hnsw
        if index is None:
            index = HNSWIndex(dim=mat.shape[1], seed=0)
            index.add_batch(mat)
        out = []
        for q in qmat:
            nn, _ = index.search(q, k, ef=ef)
            out.append([int(ids[i]) for i in nn])
        return out
    nn, _ = knn_exact_numpy(qmat.astype(np.float32), mat, k)
    return [[int(ids[i]) for i in row] for row in nn]
