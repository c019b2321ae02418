"""Baseline search systems: JOSIE-lite (exact), LSH Ensemble-lite
(approximate), PEXESO-lite (exact semantic)."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.embed.fasttext import FastTextLite
from repro.joinability.exact import equi_topk, semantic_topk
from repro.josie.index import build_inverted_index
from repro.josie.search import josie_topk
from repro.lake.corpus import corpus_df, split_queries
from repro.lake.generator import LakeConfig, generate_lake
from repro.lshensemble.ensemble import LSHEnsemble, _optimal_bands
from repro.lshensemble.minhash import _perm_params, signature_of
from repro.pexeso.search import PexesoIndex

CFG = LakeConfig(
    name="tiny", seed=33, n_domains=6, pool_size_min=40, pool_size_max=80,
    n_columns=150, n_queries=8, big_domains=1, big_pool_max=160,
    variant_rate=0.2,
)


@pytest.fixture(scope="module")
def lake():
    return generate_lake(CFG)


@pytest.fixture(scope="module")
def frames(spark, lake):
    repo, queries = split_queries(corpus_df(spark, lake))
    return repo.cache(), queries.cache()


@pytest.fixture(scope="module")
def ft():
    return FastTextLite()


# ---------------- JOSIE ----------------

def test_josie_index_df_counts(spark, frames):
    from repro.oracle import assert_equivalent

    repo, _ = frames
    idx = build_inverted_index(repo)
    flat = repo.select(F.col("col_id").alias("x_id"), F.explode("cells").alias("cell"))
    assert_equivalent(
        idx.token_df,
        "SELECT cell, count(*) AS df FROM flat GROUP BY cell",
        flat=flat,
    )


def test_josie_equals_exact_equi_topk(frames):
    """JOSIE-lite is exact: identical top-k (same tie-break) as the
    ground-truth equi machinery."""
    repo, queries = frames
    idx = build_inverted_index(repo).cache()
    a = josie_topk(idx, queries, 5).toPandas().sort_values(["q_id", "rank"])
    b = equi_topk(queries, repo, 5).toPandas().sort_values(["q_id", "rank"])
    assert list(a.x_id) == list(b.x_id)
    np.testing.assert_allclose(a.jn.to_numpy(), b.jn.to_numpy())


def test_josie_jn_normalized(frames):
    repo, queries = frames
    idx = build_inverted_index(repo)
    out = josie_topk(idx, queries, 3).toPandas()
    assert (out.jn > 0).all() and (out.jn <= 1.0 + 1e-9).all()


# ---------------- LSH Ensemble ----------------

def test_minhash_jaccard_estimate():
    a, b = _perm_params(256, 1)
    s1 = set(f"v{i}" for i in range(100))
    s2 = set(f"v{i}" for i in range(50, 150))  # true J = 50/150 = 1/3
    sig1 = signature_of(list(s1), a, b)
    sig2 = signature_of(list(s2), a, b)
    est = (sig1 == sig2).mean()
    assert abs(est - 1 / 3) < 0.12


def test_minhash_identical_sets_match():
    a, b = _perm_params(64, 2)
    cells = ["x", "y", "z"]
    np.testing.assert_array_equal(signature_of(cells, a, b), signature_of(cells[::-1], a, b))


def test_optimal_bands_monotone():
    b_hi, r_hi = _optimal_bands(128, 0.9)
    b_lo, r_lo = _optimal_bands(128, 0.2)
    assert r_hi > r_lo  # high threshold -> longer bands (stricter)
    assert b_hi * r_hi <= 128 and b_lo * r_lo <= 128


def test_lshensemble_partitions_by_size(frames):
    repo, _ = frames
    ens = LSHEnsemble(num_perm=64, n_partitions=4).fit(repo)
    uppers = [p.upper for p in ens.partitions]
    assert uppers == sorted(uppers)
    total = sum(len(p.ids) for p in ens.partitions)
    assert total == repo.count()


def test_lshensemble_finds_near_duplicates(frames, lake):
    """A query identical to a corpus column must retrieve it first."""
    repo, _ = frames
    ens = LSHEnsemble(num_perm=128, n_partitions=4).fit(repo)
    row = lake.columns[lake.columns.role == "corpus"].iloc[0]
    res = ens.query(list(row.cells), 5)
    assert res[0][0] == row.col_id
    assert res[0][1] > 0.9


def test_lshensemble_reasonable_precision_vs_exact(frames):
    """Approximate: precision vs exact top-k should be well above random
    but is expected to be imperfect (the paper's point)."""
    repo, queries = frames
    ens = LSHEnsemble(num_perm=128, n_partitions=4).fit(repo)
    exact = equi_topk(queries, repo, 5).toPandas()
    precs = []
    for r in queries.select("col_id", "cells").collect():
        got = {x for x, _ in ens.query(list(r.cells), 5)}
        want = set(exact[exact.q_id == r.col_id].x_id)
        if want:
            precs.append(len(got & want) / len(want))
    assert np.mean(precs) > 0.25


# ---------------- PEXESO ----------------

def test_pexeso_exact_vs_semantic_oracle(spark, frames, ft):
    repo, queries = frames
    idx = PexesoIndex(ft=ft, n_pivots=6).fit(spark, repo)
    for tau in (0.9, 0.7):
        got = idx.query_all(queries, tau, 5).toPandas().sort_values(["q_id", "rank"])
        want = (
            semantic_topk(spark, queries, repo, ft, tau, 5)
            .toPandas().sort_values(["q_id", "rank"])
        )
        assert list(got.x_id) == list(want.x_id), f"tau={tau}"
        np.testing.assert_allclose(got.jn.to_numpy(), want.jn.to_numpy())


def test_pexeso_self_query_perfect(spark, frames, ft, lake):
    repo, _ = frames
    idx = PexesoIndex(ft=ft, n_pivots=6).fit(spark, repo)
    sub = repo.limit(3)
    out = idx.query_all(sub, 0.9, 1).toPandas()
    for r in out.itertuples():
        assert r.q_id == r.x_id
        assert abs(r.jn - 1.0) < 1e-9


def test_pexeso_requires_fit(ft, frames):
    _, queries = frames
    with pytest.raises(AssertionError):
        PexesoIndex(ft=ft).query_all(queries, 0.9, 3)
