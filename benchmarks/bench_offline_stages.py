"""Offline-stage benchmarks: corpus embedding, fine-tuning, HNSW and
index builds — the amortized costs behind every accuracy/timing table."""
import numpy as np
import pytest

from repro.ann.hnsw import HNSWIndex
from repro.eval.methods import collect_embeddings
from repro.model.deepjoin import DeepJoinModel
from repro.model.train import TrainConfig, prepare_pairs, train
from repro.embed.plm import MPNET_LITE
from repro.text.transform import DEFAULT_OPTION


@pytest.mark.benchmark(group="offline")
def bench_corpus_embedding_distributed(benchmark, ctx, dj_method):
    df = ctx.contextualized(DEFAULT_OPTION)
    benchmark.pedantic(
        lambda: dj_method.embed_corpus_df(df).count(), rounds=2, iterations=1
    )


@pytest.mark.benchmark(group="offline")
def bench_fine_tuning_epoch(benchmark, ctx):
    pos = ctx.positives("equi")
    pairs = prepare_pairs(ctx.columns_pdf, pos, option=DEFAULT_OPTION,
                          shuffle_rate=0.2, max_pairs=500, freq=ctx.freq, seed=0)

    def one_epoch():
        model = DeepJoinModel(MPNET_LITE, seed=0)
        train(model, pairs, TrainConfig(epochs=1))

    benchmark.pedantic(one_epoch, rounds=2, iterations=1)


@pytest.mark.benchmark(group="offline")
def bench_hnsw_build_4k(benchmark, dj_index):
    _, mat, _ = dj_index

    def build():
        idx = HNSWIndex(dim=mat.shape[1], ef_construction=60, seed=0)
        idx.add_batch(mat)

    benchmark.pedantic(build, rounds=1, iterations=1)


@pytest.mark.benchmark(group="offline")
def bench_josie_index_build(benchmark, ctx):
    from repro.josie.index import build_inverted_index

    benchmark.pedantic(
        lambda: build_inverted_index(ctx.repo_df).token_df.count(),
        rounds=2, iterations=1,
    )


@pytest.mark.benchmark(group="offline")
def bench_minhash_signatures(benchmark, ctx):
    from repro.lshensemble.minhash import minhash_signatures

    benchmark.pedantic(
        lambda: minhash_signatures(ctx.repo_df).count(), rounds=2, iterations=1
    )
