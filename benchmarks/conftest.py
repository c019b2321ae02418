"""Shared fixtures for the benchmark suite.

One moderate-scale context (4K repository) is built once per session;
individual benchmarks time the per-query operations that make up the
paper's Tables 13-15 plus the offline stages (corpus generation,
embedding, training, index build).
"""
import numpy as np
import pytest

from repro.ann.hnsw import HNSWIndex
from repro.eval.context import ExperimentContext, Scale
from repro.eval.methods import (
    DeepJoinMethod,
    FastTextMethod,
    collect_embeddings,
)
from repro.josie.index import build_inverted_index
from repro.lshensemble.ensemble import LSHEnsemble
from repro.pexeso.search import PexesoIndex
from repro.text.transform import DEFAULT_OPTION

BENCH_SCALE = Scale("bench", 4_000, 1_200, 10)


@pytest.fixture(scope="session")
def ctx(spark):
    return ExperimentContext(spark, "webtable", BENCH_SCALE)


@pytest.fixture(scope="session")
def dj_method(ctx):
    model = ctx.deepjoin("mpnet-lite", "equi", 0.9)
    return DeepJoinMethod(model, "DeepJoin_MPNet", DEFAULT_OPTION)


@pytest.fixture(scope="session")
def dj_index(ctx, dj_method):
    ids, mat = collect_embeddings(
        dj_method.embed_corpus_df(ctx.contextualized(DEFAULT_OPTION))
    )
    index = HNSWIndex(dim=mat.shape[1], ef_construction=60, seed=0)
    index.add_batch(mat)
    return ids, mat, index


@pytest.fixture(scope="session")
def ft_method(ctx):
    return FastTextMethod(ctx.ft)


@pytest.fixture(scope="session")
def josie_index(ctx):
    idx = build_inverted_index(ctx.repo_df).cache()
    idx.postings.count()
    return idx


@pytest.fixture(scope="session")
def lsh_index(ctx):
    return LSHEnsemble().fit(ctx.repo_df)


@pytest.fixture(scope="session")
def pexeso_index(ctx):
    return PexesoIndex(ft=ctx.ft).fit(ctx.spark, ctx.repo_df)


@pytest.fixture(scope="session")
def query_texts(ctx):
    from repro.eval.methods import render_rows

    return render_rows(ctx.queries_pdf, DEFAULT_OPTION, ctx.freq)
