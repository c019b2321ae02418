"""Experiment context: datasets, ground truth, trained models, caches.

One context = (dataset preset, scale). Everything expensive — exact
joinability scores, self-join positives, fine-tuned model parameters,
corpus embeddings — is memoized in-process and on disk under
``.cache/<dataset>-<scale>/`` so per-table jobs can run independently
without repeating work.

Paper scale: train 30K / test 1M columns. Ours (DESIGN.md § 2):
``SMALL`` = train 2.5K / repository 20K, 40 queries — the shape-
preserving scaled-down default for jobs and benchmarks; ``TINY`` backs
unit tests.
"""
from __future__ import annotations

import hashlib
import os
import pickle
from dataclasses import dataclass
from functools import cached_property
from typing import Dict, List, Tuple

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.embed.fasttext import FastTextLite
from repro.embed.plm import DISTILBERT_LITE, MPNET_LITE, PLMConfig
from repro.joinability.exact import equi_joinability, semantic_joinability
from repro.lake.corpus import corpus_df
from repro.lake.generator import (
    WEBTABLE_LITE,
    WIKITABLE_LITE,
    generate_lake,
)
from repro.model.deepjoin import DeepJoinModel
from repro.model.mlp import MLPBaseline, MLPConfig
from repro.model.train import TrainConfig, prepare_pairs, train
from repro.text.transform import DEFAULT_OPTION, cell_frequencies, contextualize

PLMS: Dict[str, PLMConfig] = {
    "distilbert-lite": DISTILBERT_LITE,
    "mpnet-lite": MPNET_LITE,
}


@dataclass(frozen=True)
class Scale:
    name: str
    corpus: int  # searchable repository size |X|
    train: int  # training subset size (separate columns)
    queries: int


TINY = Scale("tiny", 400, 200, 6)
SMALL = Scale("small", 20_000, 2_500, 40)

# Domains per 1000 generated columns: keeps the *density* of joinable
# candidates per query constant across scales (~65 columns/domain for
# webtable, ~40 for wikitable). Without this, small corpora degenerate
# into many near-duplicate columns per domain, which inverts the method
# ordering (sketches trivially find near-duplicates; embeddings can't
# rank hundreds of look-alikes).
DOMAIN_DENSITY = {"webtable": 15, "wikitable": 25}


class ExperimentContext:
    def __init__(self, spark: SparkSession, dataset: str = "webtable",
                 scale: Scale = SMALL, cache_dir: str = ".cache"):
        from dataclasses import replace

        self.spark = spark
        self.dataset = dataset
        base = {"webtable": WEBTABLE_LITE, "wikitable": WIKITABLE_LITE}[dataset]
        n_domains = max(
            12, int((scale.corpus + scale.train) * DOMAIN_DENSITY[dataset] / 1000)
        )
        self.cfg = replace(base, n_domains=n_domains)
        self.scale = scale
        self.cache_dir = os.path.join(cache_dir, f"{dataset}-{scale.name}")
        os.makedirs(self.cache_dir, exist_ok=True)
        self.ft = FastTextLite()
        self._ctx_dfs: Dict[str, DataFrame] = {}
        self._models: Dict[str, DeepJoinModel] = {}

    # ---------------- disk cache ----------------
    def _cpath(self, key: str) -> str:
        h = hashlib.sha1(key.encode()).hexdigest()[:16]
        return os.path.join(self.cache_dir, f"{h}.pkl")

    def cached(self, key: str, fn):
        path = self._cpath(key)
        if os.path.exists(path):
            with open(path, "rb") as f:
                return pickle.load(f)
        val = fn()
        with open(path, "wb") as f:
            pickle.dump(val, f)
        return val

    # ---------------- data ----------------
    @cached_property
    def lake(self):
        return generate_lake(
            self.cfg,
            n_columns=self.scale.corpus + self.scale.train,
            n_queries=self.scale.queries,
        )

    @cached_property
    def columns_pdf(self) -> pd.DataFrame:
        return self.lake.columns

    @cached_property
    def train_pdf(self) -> pd.DataFrame:
        corpus = self.columns_pdf[self.columns_pdf.role == "corpus"]
        return corpus.iloc[: self.scale.train]

    @cached_property
    def repo_pdf(self) -> pd.DataFrame:
        corpus = self.columns_pdf[self.columns_pdf.role == "corpus"]
        return corpus.iloc[self.scale.train :]

    @cached_property
    def queries_pdf(self) -> pd.DataFrame:
        return self.columns_pdf[self.columns_pdf.role == "query"]

    @cached_property
    def all_df(self) -> DataFrame:
        return corpus_df(self.spark, self.lake)

    @cached_property
    def repo_df(self) -> DataFrame:
        ids = set(self.repo_pdf.col_id)
        df = self.all_df.filter(self.all_df.col_id.isin(ids)).cache()
        df.count()
        return df

    @cached_property
    def train_df(self) -> DataFrame:
        ids = set(self.train_pdf.col_id)
        df = self.all_df.filter(self.all_df.col_id.isin(ids)).cache()
        df.count()
        return df

    @cached_property
    def queries_df(self) -> DataFrame:
        df = self.all_df.filter(self.all_df.role == "query").cache()
        df.count()
        return df

    @cached_property
    def freq(self) -> Dict[str, int]:
        return {r.cell: r.freq for r in cell_frequencies(self.repo_df).collect()}

    def contextualized(self, option: str = DEFAULT_OPTION) -> DataFrame:
        key = f"ctx:{option}"
        if key not in self._ctx_dfs:
            df = contextualize(self.repo_df, option, freq=self.freq).cache()
            df.count()
            self._ctx_dfs[key] = df
        return self._ctx_dfs[key]

    # ---------------- ground truth ----------------
    def equi_scores(self) -> pd.DataFrame:
        """(q_id, x_id, jn) exact equi-joinability, queries vs repo."""
        return self.cached(
            "equi_scores",
            lambda: equi_joinability(self.queries_df, self.repo_df).toPandas(),
        )

    def semantic_scores(self, tau: float) -> pd.DataFrame:
        return self.cached(
            f"semantic_scores:{tau}",
            lambda: semantic_joinability(
                self.spark, self.queries_df, self.repo_df, self.ft, tau
            ).toPandas(),
        )

    def positives(self, join_type: str = "equi", tau: float = 0.9,
                  t: float = 0.7) -> pd.DataFrame:
        """Self-join positives on the training slice (§ 4.1)."""
        def _compute():
            if join_type == "equi":
                jn = equi_joinability(self.train_df, self.train_df)
            else:
                jn = semantic_joinability(
                    self.spark, self.train_df, self.train_df, self.ft, tau
                )
            from pyspark.sql import functions as F

            pos = jn.filter((F.col("jn") >= t) & (F.col("q_id") != F.col("x_id")))
            return pos.select(
                F.col("q_id").alias("x_id"), F.col("x_id").alias("y_id"), "jn"
            ).toPandas()

        key = f"positives:{join_type}:{tau if join_type == 'semantic' else ''}:{t}"
        return self.cached(key, _compute)

    # ---------------- models ----------------
    def deepjoin(self, plm: str = "mpnet-lite", join_type: str = "equi",
                 tau: float = 0.9, option: str = DEFAULT_OPTION,
                 shuffle_rate: float = 0.2,
                 train_cfg: TrainConfig | None = None) -> DeepJoinModel:
        cfg = train_cfg or TrainConfig(shuffle_rate=shuffle_rate)
        key = (f"dj:{plm}:{join_type}:{tau if join_type == 'semantic' else ''}:"
               f"{option}:{shuffle_rate}:{cfg.epochs}:{cfg.lr}:{cfg.max_pairs}")
        if key in self._models:
            return self._models[key]
        model = DeepJoinModel(PLMS[plm], seed=0)

        def _train_params():
            pos = self.positives(join_type, tau)
            pairs = prepare_pairs(
                self.columns_pdf, pos, option=option,
                shuffle_rate=shuffle_rate, max_pairs=cfg.max_pairs,
                freq=self.freq, seed=cfg.seed,
            )
            train(model, pairs, cfg)
            return {k: v.copy() for k, v in model.params.items()}

        model.params = self.cached(key, _train_params)
        self._models[key] = model
        return model

    def mlp(self, join_type: str = "equi", tau: float = 0.9) -> MLPBaseline:
        mlp = MLPBaseline(self.ft, MLPConfig())

        def _fit_params():
            pos = self.positives(join_type, tau)
            mlp.fit(self.columns_pdf, pos)
            return {k: v.copy() for k, v in mlp.params.items()}

        mlp.params = self.cached(f"mlp:{join_type}:{tau}", _fit_params)
        return mlp

    # ---------------- truth ranking helpers ----------------
    @staticmethod
    def truth_maps(scores: pd.DataFrame) -> Dict[int, Tuple[List[int], Dict[int, float]]]:
        """q_id → (exact ranked ids desc-jn asc-id, jn lookup)."""
        out: Dict[int, Tuple[List[int], Dict[int, float]]] = {}
        for q_id, grp in scores.groupby("q_id"):
            grp = grp.sort_values(["jn", "x_id"], ascending=[False, True])
            out[int(q_id)] = (
                [int(x) for x in grp.x_id],
                {int(r.x_id): float(r.jn) for r in grp.itertuples()},
            )
        return out

    def expert_joinable(self, q_row, min_containment: float = 0.15) -> set:
        """Ground-truth 'expert' labels: repo columns of the same domain
        with non-trivial canonical-entity containment from Q.

        A human judge sees topical relatedness plus some overlapping
        entities and calls the pair joinable — they do not compute a
        precise containment ratio. The low containment floor (vs the
        τ-threshold counting PEXESO does) is exactly the judgment gap
        the paper's Table 7 exposes: a fixed matching threshold "may not
        fit" what experts consider joinable."""
        q_canon = set(q_row.canon)
        out = set()
        sub = self.repo_pdf[self.repo_pdf.domain == q_row.domain]
        for r in sub.itertuples():
            if len(q_canon & set(r.canon)) / len(q_canon) >= min_containment:
                out.add(int(r.col_id))
        return out
