"""Inverted index over a column repository (Spark DataFrames).

``postings``: (cell, x_id) — one row per (token, column) incidence.
``token_df``: (cell, df) — global document frequency, used for the
prefix-filter token ordering JOSIE processes rare tokens first with.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


@dataclass
class InvertedIndex:
    postings: DataFrame  # (cell, x_id)
    token_df: DataFrame  # (cell, df)
    sizes: DataFrame  # (x_id, x_size)

    def cache(self) -> "InvertedIndex":
        self.postings.cache()
        self.token_df.cache()
        self.sizes.cache()
        return self


def build_inverted_index(repo: DataFrame) -> InvertedIndex:
    postings = repo.select(
        F.col("col_id").alias("x_id"),
        F.explode(F.array_distinct("cells")).alias("cell"),
    )
    token_df = postings.groupBy("cell").agg(F.count("*").alias("df"))
    sizes = repo.select(
        F.col("col_id").alias("x_id"),
        F.size(F.array_distinct("cells")).alias("x_size"),
    )
    return InvertedIndex(postings, token_df, sizes)
