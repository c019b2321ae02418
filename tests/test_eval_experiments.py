"""Integration tests of the experiment drivers at TINY scale.

These exercise the full pipelines (ground truth → methods → metrics)
end-to-end; shape/sanity assertions only — the real numbers come from
jobs/ at SMALL scale and land in EXPERIMENTS.md.
"""
import shutil

import numpy as np
import pandas as pd
import pytest

from repro.eval.context import ExperimentContext, Scale
from repro.eval.experiments import (
    K_GRID,
    accuracy_table,
    hnsw_recall_check,
    table2_stats,
    table3_equi_accuracy,
    table4_6_semantic_accuracy,
    table7_expert,
    table11_12_shuffle_ablation,
    table13_time_vs_size,
    table9_10_transform_ablation,
)

TEST_SCALE = Scale("unittest", 400, 200, 6)


@pytest.fixture(scope="module")
def ctx(spark, tmp_path_factory):
    cache = tmp_path_factory.mktemp("evalcache")
    c = ExperimentContext(spark, "webtable", TEST_SCALE, cache_dir=str(cache))
    yield c
    shutil.rmtree(str(cache), ignore_errors=True)


def test_context_splits(ctx):
    assert len(ctx.train_pdf) == TEST_SCALE.train
    assert len(ctx.repo_pdf) == TEST_SCALE.corpus
    assert len(ctx.queries_pdf) == TEST_SCALE.queries
    assert set(ctx.train_pdf.col_id).isdisjoint(set(ctx.repo_pdf.col_id))


def test_context_disk_cache_roundtrip(ctx):
    a = ctx.equi_scores()
    b = ctx.equi_scores()  # second call hits the cache
    pd.testing.assert_frame_equal(a, b)


def test_positives_nonempty(ctx):
    pos = ctx.positives("equi")
    assert len(pos) > 0
    assert (pos.jn >= 0.7).all()


def test_truth_maps_ranked_desc(ctx):
    truth = ctx.truth_maps(ctx.equi_scores())
    for q, (ranked, jn_map) in truth.items():
        jns = [jn_map[x] for x in ranked]
        assert all(a >= b - 1e-9 for a, b in zip(jns, jns[1:]))


def test_table2_stats_shape(ctx):
    df = table2_stats(ctx)
    assert len(df) == 2
    assert df.iloc[0]["pos_equi"] > 0
    assert df.iloc[0]["pos_semantic"] >= df.iloc[0]["pos_equi"]


def test_table3_shapes_and_ranges(ctx):
    df = table3_equi_accuracy(ctx, ks=(5, 10))
    assert set(df.method) == {
        "LSH Ensemble", "fastText", "BERT", "MPNet", "TaBERT", "MLP",
        "DeepJoin_DistilBERT", "DeepJoin_MPNet",
    }
    for col in ("P@5", "P@10", "NDCG@5", "NDCG@10"):
        assert df[col].between(0, 1).all()


def test_table3_deepjoin_beats_frozen(ctx):
    """The core claim at tiny scale: fine-tuned DeepJoin-MPNet >= frozen
    MPNet on equi precision."""
    df = table3_equi_accuracy(ctx, ks=(10,)).set_index("method")
    assert df.loc["DeepJoin_MPNet", "P@10"] >= df.loc["MPNet", "P@10"]


def test_table4_semantic_shapes(ctx):
    df = table4_6_semantic_accuracy(ctx, 0.9, ks=(5,))
    assert set(df.method) == {
        "LSH Ensemble", "fastText", "DeepJoin_DistilBERT", "DeepJoin_MPNet"
    }
    assert df["P@5"].between(0, 1).all()


def test_table7_expert_shapes(ctx):
    df = table7_expert(ctx, k=5)
    assert set(df.method) == {"LSH Ensemble", "fastText", "PEXESO", "DeepJoin_MPNet"}
    for col in ("Precision", "Recall", "F1"):
        assert df[col].between(0, 1).all()
    # PEXESO retrieves by the same definition that generated the pool
    # labels' semantic component, so it must score reasonably
    assert df.set_index("method").loc["PEXESO", "F1"] > 0


def test_table9_transform_ablation_shapes(ctx):
    df = table9_10_transform_ablation(ctx, "equi", ks=(5,))
    assert len(df) == 7
    assert df["P@5"].between(0, 1).all()


def test_table11_shuffle_ablation_shapes(ctx):
    df = table11_12_shuffle_ablation(ctx, "equi", ks=(5,))
    assert len(df) == 6
    assert "no-shuffle" in set(df.method)


def test_table13_timing_shapes(ctx):
    df = table13_time_vs_size(ctx, "equi", sizes=(200, 400), k=5)
    methods = set(df.method)
    assert {"JOSIE", "LSH Ensemble", "fastText",
            "DeepJoin (CPU)", "DeepJoin (GPU)"} <= methods
    assert (df.total_ms > 0).all()
    # GPU (batched) encoding must beat CPU (per-query loop) encoding
    gpu = df[(df.method == "DeepJoin (GPU)")].encode_ms.mean()
    cpu = df[(df.method == "DeepJoin (CPU)")].encode_ms.mean()
    assert gpu < cpu


def test_hnsw_recall_high(ctx):
    assert hnsw_recall_check(ctx, k=5) >= 0.9


def test_accuracy_table_helper():
    truth = {1: ([10, 11, 12], {10: 0.9, 11: 0.5, 12: 0.1})}
    res = {"m": {1: [10, 11, 12]}}
    df = accuracy_table(truth, res, ks=(3,))
    assert df.iloc[0]["P@3"] == 1.0
    assert df.iloc[0]["NDCG@3"] == 1.0
