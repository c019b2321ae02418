"""Spark-side view of a generated lake: schema, stats, query split.

The repository X of the paper is a DataFrame with one row per column
extracted from the lake's tables; metadata travels with each row so the
column-to-text transformations (Table 1 of the paper) are plain Spark
expressions over this DataFrame.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import (
    ArrayType,
    LongType,
    StringType,
    StructField,
    StructType,
)

from repro.lake.generator import LakeData

CORPUS_SCHEMA = StructType(
    [
        StructField("col_id", LongType(), False),
        StructField("role", StringType(), False),
        StructField("domain", LongType(), False),
        StructField("table_title", StringType(), False),
        StructField("col_name", StringType(), False),
        StructField("context", StringType(), False),
        StructField("cells", ArrayType(StringType(), False), False),
        StructField("canon", ArrayType(LongType(), False), False),
        StructField("n_cells", LongType(), False),
    ]
)


def corpus_df(spark: SparkSession, lake: LakeData) -> DataFrame:
    """Materialize the lake as a Spark DataFrame (corpus + query rows)."""
    pdf = lake.columns[
        ["col_id", "role", "domain", "table_title", "col_name", "context",
         "cells", "canon", "n_cells"]
    ]
    return spark.createDataFrame(pdf, schema=CORPUS_SCHEMA)


def split_queries(df: DataFrame) -> tuple[DataFrame, DataFrame]:
    """(repository X, query columns) — queries are never in the repository,
    mirroring the paper's leak-avoidance sampling."""
    return df.filter(F.col("role") == "corpus"), df.filter(F.col("role") == "query")


def corpus_stats(df: DataFrame) -> dict:
    """Table-2-style statistics of a repository DataFrame."""
    row = (
        df.agg(
            F.count("*").alias("n_columns"),
            F.max("n_cells").alias("max_cells"),
            F.min("n_cells").alias("min_cells"),
            F.avg("n_cells").alias("avg_cells"),
        )
        .collect()[0]
        .asDict()
    )
    row["avg_cells"] = round(row["avg_cells"], 2)
    return row
