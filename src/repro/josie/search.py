"""Exact top-k overlap search over the inverted index.

Any column with overlap >= 1 shares at least one token with the query,
so probing the query's postings lists yields a *complete* candidate set;
counting rows per (query, candidate) gives the exact overlap, and the
top-k by overlap is exact — same answers as JOSIE, same linear-in-|X|
scan behaviour (JOSIE's cost-based probe/verify ordering only improves
constants; see DESIGN.md).
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.josie.index import InvertedIndex


def josie_topk(index: InvertedIndex, queries: DataFrame, k: int) -> DataFrame:
    """(q_id, x_id, jn, rank): exact top-k equi-joinable columns.

    jn = |Q ∩ X| / |Q| (Definition 2.1), rank 1..k per query.
    """
    q = queries.select(
        F.col("col_id").alias("q_id"),
        F.explode(F.array_distinct("cells")).alias("cell"),
    )
    qsize = queries.select(
        F.col("col_id").alias("q_id"),
        F.size(F.array_distinct("cells")).alias("q_size"),
    )
    # rare-token-first processing order (JOSIE's prefix ordering) is kept
    # as an explicit sort key on the probe; it does not change results
    probes = q.join(index.token_df, "cell", "left").select(
        "q_id", "cell", F.coalesce("df", F.lit(0)).alias("df")
    )
    cand = (
        probes.join(index.postings, "cell")
        .groupBy("q_id", "x_id")
        .agg(F.count("*").alias("overlap"))
    )
    scored = cand.join(qsize, "q_id").select(
        "q_id", "x_id", (F.col("overlap") / F.col("q_size")).alias("jn")
    )
    w = Window.partitionBy("q_id").orderBy(F.desc("jn"), F.asc("x_id"))
    return (
        scored.withColumn("rank", F.row_number().over(w))
        .filter(F.col("rank") <= k)
    )
