"""Exact joinability tests — equi against DuckDB, semantic against a
brute-force python oracle."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.embed.fasttext import FastTextLite
from repro.joinability.exact import (
    equi_joinability,
    equi_topk,
    semantic_joinability,
    semantic_topk,
    topk_from_scores,
)
from repro.joinability.labeling import positive_pairs
from repro.joinability.matcher import cos_threshold, semantic_match_pairs
from repro.lake.corpus import corpus_df, split_queries
from repro.lake.generator import LakeConfig, generate_lake

CFG = LakeConfig(
    name="tiny", seed=21, n_domains=5, pool_size_min=30, pool_size_max=60,
    n_columns=80, n_queries=6, big_domains=1, big_pool_max=120,
    variant_rate=0.25,
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


# ---------------- equi ----------------

def test_equi_joinability_matches_duckdb(spark, frames):
    from repro.oracle import assert_equivalent

    repo, queries = frames
    got = equi_joinability(queries, repo)
    qf = queries.select(F.col("col_id").alias("q_id"), F.explode("cells").alias("cell"))
    xf = repo.select(F.col("col_id").alias("x_id"), F.explode("cells").alias("cell"))
    qs = queries.select(F.col("col_id").alias("q_id"), F.col("n_cells").alias("q_size"))
    assert_equivalent(
        got,
        """
        SELECT q.q_id AS q_id, x.x_id AS x_id,
               count(*)::DOUBLE / any_value(s.q_size) AS jn
        FROM qf q JOIN xf x ON q.cell = x.cell
        JOIN qs s ON s.q_id = q.q_id
        GROUP BY q.q_id, x.x_id
        """,
        qf=qf, xf=xf, qs=qs,
    )


def test_equi_self_join_identity(spark, frames):
    repo, _ = frames
    sub = repo.limit(10)
    jn = equi_joinability(sub, sub)
    diag = jn.filter(F.col("q_id") == F.col("x_id")).select("jn").collect()
    assert len(diag) == 10
    assert all(abs(r.jn - 1.0) < 1e-9 for r in diag)


def test_equi_jn_in_unit_interval(frames):
    repo, queries = frames
    jn = equi_joinability(queries, repo)
    bad = jn.filter((F.col("jn") <= 0) | (F.col("jn") > 1.0 + 1e-9)).count()
    assert bad == 0


def test_equi_topk_ranked_and_bounded(frames):
    repo, queries = frames
    top = equi_topk(queries, repo, 5).toPandas()
    for _, grp in top.groupby("q_id"):
        assert len(grp) <= 5
        assert (grp.sort_values("rank").jn.diff().dropna() <= 1e-9).all()


def test_topk_tie_break_deterministic(spark):
    scores = spark.createDataFrame(
        pd.DataFrame({"q_id": [1, 1, 1], "x_id": [30, 10, 20], "jn": [0.5, 0.5, 0.5]})
    )
    top = topk_from_scores(scores, 2).toPandas().sort_values("rank")
    assert list(top.x_id) == [10, 20]


# ---------------- semantic ----------------

def brute_semantic_jn(q_cells, x_cells, ft, tau):
    thr = cos_threshold(tau)
    qs = list(dict.fromkeys(q_cells))
    xs = list(dict.fromkeys(x_cells))
    qm = ft.cell_matrix(qs)
    xm = ft.cell_matrix(xs)
    matched = sum(1 for i in range(len(qs)) if (qm[i] @ xm.T >= thr).any())
    return matched / len(qs)


def test_match_pairs_include_identity(ft):
    pairs = semantic_match_pairs(["abc def"], ["abc def", "zzz"], ft, 0.9)
    assert ("abc def", "abc def") in set(zip(pairs.l_cell, pairs.r_cell))


def test_match_pairs_monotone_in_tau(ft, lake):
    cells = [c for col in lake.columns.cells.head(30) for c in col]
    n = {
        tau: len(semantic_match_pairs(cells[:200], cells[200:400], ft, tau))
        for tau in (0.7, 0.8, 0.9)
    }
    assert n[0.7] <= n[0.8] <= n[0.9]


def test_semantic_joinability_matches_bruteforce(spark, frames, ft, lake):
    repo, queries = frames
    got = semantic_joinability(spark, queries, repo, ft, 0.9).toPandas()
    got = {(r.q_id, r.x_id): r.jn for r in got.itertuples()}
    pdf = lake.columns.set_index("col_id")
    q_ids = pdf[pdf.role == "query"].index[:3]
    x_ids = pdf[pdf.role == "corpus"].index[:15]
    for q in q_ids:
        for x in x_ids:
            expect = brute_semantic_jn(pdf.loc[q].cells, pdf.loc[x].cells, ft, 0.9)
            assert abs(got.get((q, x), 0.0) - expect) < 1e-9, (q, x)


def test_semantic_superset_of_equi(spark, frames, ft):
    """Exact string equality implies vector distance 0 <= τ, so semantic
    jn >= equi jn pairwise."""
    repo, queries = frames
    eq = equi_joinability(queries, repo).toPandas()
    se = semantic_joinability(spark, queries, repo, ft, 0.9).toPandas()
    sem = {(r.q_id, r.x_id): r.jn for r in se.itertuples()}
    for r in eq.itertuples():
        assert sem.get((r.q_id, r.x_id), 0.0) >= r.jn - 1e-9


def test_semantic_topk_shape(spark, frames, ft):
    repo, queries = frames
    top = semantic_topk(spark, queries, repo, ft, 0.9, 5).toPandas()
    assert set(top.columns) == {"q_id", "x_id", "jn", "rank"}
    assert top["rank"].max() <= 5


# ---------------- labeling ----------------

def test_positive_pairs_equi(spark, frames):
    repo, _ = frames
    pos = positive_pairs(spark, repo, join_type="equi", t=0.7).toPandas()
    assert len(pos) > 0
    assert (pos.jn >= 0.7).all()
    assert (pos.x_id != pos.y_id).all()


def test_positive_pairs_semantic_at_least_equi(spark, frames, ft):
    repo, _ = frames
    n_eq = positive_pairs(spark, repo, join_type="equi", t=0.7).count()
    n_se = positive_pairs(
        spark, repo, join_type="semantic", t=0.7, ft=ft, tau=0.9
    ).count()
    assert n_se >= n_eq


def test_positive_pairs_unknown_type(spark, frames):
    repo, _ = frames
    with pytest.raises(ValueError):
        positive_pairs(spark, repo, join_type="nope")
