"""Exact joinability computation as distributed Spark dataflow.

Equi-joinability (Definition 2.1): explode both sides on cell value,
equi-join, count per pair, normalize by |Q|. Semantic joinability
(Definition 2.3): route the join through the τ-match pair table of
``repro.joinability.matcher``, counting *distinct query cells* with at
least one match.

Both return a sparse (q_id, x_id, jn) DataFrame — pairs with jn = 0 are
absent, which is fine for top-k (k ≪ corpus size and ties at zero are
meaningless for the paper's metrics).
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F

from repro.embed.fasttext import FastTextLite
from repro.joinability.matcher import semantic_match_pairs


def _exploded(df: DataFrame, id_alias: str, cell_alias: str) -> DataFrame:
    return df.select(
        F.col("col_id").alias(id_alias),
        F.explode(F.array_distinct("cells")).alias(cell_alias),
    )


def equi_joinability(queries: DataFrame, repo: DataFrame) -> DataFrame:
    """(q_id, x_id, jn) for every pair with |Q ∩ X| >= 1."""
    q = _exploded(queries, "q_id", "cell")
    qsize = queries.select(
        F.col("col_id").alias("q_id"), F.size(F.array_distinct("cells")).alias("q_size")
    )
    x = _exploded(repo, "x_id", "cell")
    return (
        q.join(x, "cell")
        .groupBy("q_id", "x_id")
        .agg(F.count("*").alias("overlap"))
        .join(qsize, "q_id")
        .select("q_id", "x_id", (F.col("overlap") / F.col("q_size")).alias("jn"))
    )


def semantic_joinability(
    spark: SparkSession,
    queries: DataFrame,
    repo: DataFrame,
    ft: FastTextLite,
    tau: float,
) -> DataFrame:
    """(q_id, x_id, jn) under Definition 2.3 (exact, via τ-match pairs).

    The distinct-cell universes of both sides are collected once (they
    are far smaller than the exploded corpus), matched exactly in numpy,
    and the resulting sparse pair table is joined back in Spark.
    """
    q_cells = [r.cell for r in _exploded(queries, "q", "cell").select("cell").distinct().collect()]
    x_cells = [r.cell for r in _exploded(repo, "x", "cell").select("cell").distinct().collect()]
    pairs = semantic_match_pairs(q_cells, x_cells, ft, tau)
    pairs_df = spark.createDataFrame(pairs, schema="l_cell string, r_cell string")

    q = _exploded(queries, "q_id", "q_cell")
    qsize = queries.select(
        F.col("col_id").alias("q_id"), F.size(F.array_distinct("cells")).alias("q_size")
    )
    x = _exploded(repo, "x_id", "x_cell")
    matched = (
        q.join(pairs_df, q.q_cell == pairs_df.l_cell)
        .join(x, pairs_df.r_cell == x.x_cell)
        .groupBy("q_id", "x_id")
        .agg(F.countDistinct("q_cell").alias("matched"))
    )
    return matched.join(qsize, "q_id").select(
        "q_id", "x_id", (F.col("matched") / F.col("q_size")).alias("jn")
    )


def topk_from_scores(scores: DataFrame, k: int) -> DataFrame:
    """Top-k per query from a (q_id, x_id, jn) frame; deterministic
    tie-break on x_id (any tie-broken subset satisfies Problem 1)."""
    w = Window.partitionBy("q_id").orderBy(F.desc("jn"), F.asc("x_id"))
    return (
        scores.withColumn("rank", F.row_number().over(w))
        .filter(F.col("rank") <= k)
        .select("q_id", "x_id", "jn", "rank")
    )


def equi_topk(queries: DataFrame, repo: DataFrame, k: int) -> DataFrame:
    return topk_from_scores(equi_joinability(queries, repo), k)


def semantic_topk(
    spark: SparkSession, queries: DataFrame, repo: DataFrame,
    ft: FastTextLite, tau: float, k: int,
) -> DataFrame:
    return topk_from_scores(semantic_joinability(spark, queries, repo, ft, tau), k)
