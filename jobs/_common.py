"""Shared bootstrap for spark-submit / plain-python job entrypoints.

Jobs reuse the same Spark setup as conftest (driver memory from cgroup,
broadcast joins disabled) but build their own session since they run
outside pytest. Results are printed and appended to results/<name>.md.
"""
from __future__ import annotations

import os
import sys

ROOT = os.path.dirname(os.path.dirname(os.path.abspath(__file__)))
sys.path.insert(0, ROOT)  # conftest importable when run as a script

import conftest  # noqa: F401,E402  (sets PYSPARK_SUBMIT_ARGS pre-JVM)
from pyspark.sql import SparkSession  # noqa: E402


def get_spark() -> SparkSession:
    return (
        SparkSession.builder.appName("repro-job")
        .config("spark.sql.shuffle.partitions",
                os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def write_result(name: str, markdown: str) -> str:
    out_dir = os.path.join(ROOT, "results")
    os.makedirs(out_dir, exist_ok=True)
    path = os.path.join(out_dir, f"{name}.md")
    with open(path, "w") as f:
        f.write(markdown)
    print(markdown)
    print(f"[written] {path}")
    return path
