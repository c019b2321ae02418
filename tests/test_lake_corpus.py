"""Spark-side corpus DataFrame tests."""
import pytest
from pyspark.sql import functions as F

from repro.lake.corpus import corpus_df, corpus_stats, split_queries
from repro.lake.generator import LakeConfig, generate_lake

CFG = LakeConfig(
    name="tiny", seed=5, n_domains=6, pool_size_min=40, pool_size_max=80,
    n_columns=120, n_queries=8, big_domains=1, big_pool_max=150,
)


@pytest.fixture(scope="module")
def lake_df(spark):
    return corpus_df(spark, generate_lake(CFG)).cache()


def test_schema_fields(lake_df):
    names = set(lake_df.columns)
    assert {"col_id", "role", "table_title", "col_name", "context",
            "cells", "canon", "n_cells"} <= names


def test_split_queries_partitions_rows(lake_df):
    repo, queries = split_queries(lake_df)
    assert repo.count() == CFG.n_columns
    assert queries.count() == CFG.n_queries
    # disjoint col_ids
    assert repo.join(queries, "col_id").count() == 0


def test_n_cells_matches_array_size(lake_df):
    bad = lake_df.filter(F.size("cells") != F.col("n_cells")).count()
    assert bad == 0


def test_corpus_stats_shape(lake_df):
    repo, _ = split_queries(lake_df)
    stats = corpus_stats(repo)
    assert stats["n_columns"] == CFG.n_columns
    assert stats["min_cells"] >= 5
    assert stats["max_cells"] >= stats["avg_cells"] >= stats["min_cells"]


def test_stats_agree_with_duckdb(lake_df, spark):
    """Oracle check: the Spark aggregation equals DuckDB over the same rows."""
    from repro.oracle import assert_equivalent

    repo, _ = split_queries(lake_df)
    got = repo.agg(
        F.count("*").alias("n"),
        F.max("n_cells").alias("mx"),
        F.min("n_cells").alias("mn"),
    )
    flat = repo.select("col_id", "n_cells")
    assert_equivalent(
        got,
        "SELECT count(*) AS n, max(n_cells) AS mx, min(n_cells) AS mn FROM t",
        t=flat,
    )
