"""Training-data preparation (§ 4.1 of the paper).

Positive examples are column pairs (X, Y) from a repository self-join
with jn(X, Y) >= t — computed by the exact equi machinery (the paper
invokes a set-similarity join) or the exact semantic machinery (the
paper invokes PEXESO; ours is verified equivalent to PEXESO-lite).
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.embed.fasttext import FastTextLite
from repro.joinability.exact import equi_joinability, semantic_joinability


def positive_pairs(
    spark: SparkSession,
    repo: DataFrame,
    *,
    join_type: str = "equi",
    t: float = 0.7,
    ft: FastTextLite | None = None,
    tau: float = 0.9,
) -> DataFrame:
    """(x_id, y_id, jn) with jn(X, Y) >= t, X != Y, from a self-join."""
    if join_type == "equi":
        jn = equi_joinability(repo, repo)
    elif join_type == "semantic":
        jn = semantic_joinability(spark, repo, repo, ft or FastTextLite(), tau)
    else:
        raise ValueError(f"unknown join_type: {join_type!r}")
    return (
        jn.filter((F.col("jn") >= t) & (F.col("q_id") != F.col("x_id")))
        .select(F.col("q_id").alias("x_id"), F.col("x_id").alias("y_id"), "jn")
    )
