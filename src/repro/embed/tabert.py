"""TaBERT-lite baseline column embedding.

TaBERT is pre-trained for question answering: its column embeddings
emphasize header/utterance alignment rather than cell-content overlap,
which is why it underperforms on joinable-table discovery (paper § 5.2).
The lite stand-in reproduces that bias: it pools token states over the
*metadata prefix* (title + column name) and only a few leading cells,
then applies a fixed random rotation (a proxy for a head trained on an
unrelated objective — information-preserving but metric-distorting).
"""
from __future__ import annotations

from typing import Iterator, List

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from repro.embed.fasttext import EMB_SCHEMA
from repro.embed.plm import PLMConfig, PLMLite

TABERT_CFG = PLMConfig("tabert-lite", dim=96, seed=303, window=3)


def _rotation(dim: int, seed: int) -> np.ndarray:
    """Random *non-orthogonal* projection: an orthogonal rotation would
    preserve the metric exactly (no distortion); a plain Gaussian matrix
    has spread singular values, distorting neighborhoods the way a head
    trained on an unrelated objective (QA) does."""
    g = np.random.default_rng(seed)
    return (g.standard_normal((dim, dim)) / np.sqrt(dim)).astype(np.float32)


class TaBERTLite:
    def __init__(self, cfg: PLMConfig = TABERT_CFG, n_lead_cells: int = 4):
        self.plm = PLMLite(cfg)
        self.rot = _rotation(cfg.dim, cfg.seed + 1)
        self.n_lead_cells = n_lead_cells
        self.dim = cfg.dim

    def column_vec(self, *, cells: List[str], col_name: str, table_title: str) -> np.ndarray:
        text = f"{table_title}. {col_name}: " + ", ".join(cells[: self.n_lead_cells])
        v = self.plm.sentence_vec(text) @ self.rot
        n = float(np.linalg.norm(v))
        return (v / n).astype(np.float32) if n > 0 else v.astype(np.float32)

    def encode_columns(self, df: DataFrame) -> DataFrame:
        cfg, n_lead = self.plm.cfg, self.n_lead_cells

        def _mapper(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
            enc = TaBERTLite(cfg, n_lead)
            for pdf in batches:
                embs = [
                    enc.column_vec(
                        cells=list(r.cells), col_name=r.col_name, table_title=r.table_title
                    ).tolist()
                    for r in pdf.itertuples()
                ]
                yield pd.DataFrame({"col_id": pdf["col_id"], "emb": embs})

        return df.select("col_id", "cells", "col_name", "table_title").mapInPandas(
            _mapper, schema=EMB_SCHEMA
        )
