"""Run every table's experiment at SMALL scale and write results/*.md.

Usage: python jobs/run_all.py [--dataset webtable|wikitable|both]
                              [--tables 2,3,4,...]  (default: all)

Individual per-table entrypoints (table03_equi_accuracy.py, ...) call
into the same drivers; this runner shares one Spark session and the
on-disk context cache, so a full pass avoids repeated training.
"""
from __future__ import annotations

import argparse
import sys
import time

from _common import get_spark, write_result

from repro.eval.context import ExperimentContext, SMALL, Scale
from repro.eval.experiments import (
    hnsw_recall_check,
    table2_stats,
    table3_equi_accuracy,
    table4_6_semantic_accuracy,
    table7_expert,
    table8_accuracy_by_size,
    table9_10_transform_ablation,
    table11_12_shuffle_ablation,
    table13_time_vs_size,
    table14_time_vs_k,
    table15_time_vs_colsize,
)
from repro.eval.report import to_markdown

SIZE_SCALE = Scale("size", 12_000, 2_000, 150)
TIME_SIZES = {"webtable": (4000, 8000, 12000, 16000, 20000),
              "wikitable": (2000, 4000, 6000, 8000, 10000)}


def run(dataset: str, tables: set[int]):
    spark = get_spark()
    ctx = ExperimentContext(spark, dataset, SMALL)
    t0 = time.time()

    def log(msg):
        print(f"[{dataset} +{time.time()-t0:7.0f}s] {msg}", flush=True)

    if 2 in tables:
        log("table 2")
        write_result(f"table02_{dataset}", to_markdown(
            table2_stats(ctx), f"Table 2 — dataset statistics ({dataset})"))
    if 3 in tables:
        log("table 3")
        write_result(f"table03_{dataset}", to_markdown(
            table3_equi_accuracy(ctx), f"Table 3 — equi-join accuracy ({dataset})"))
    if 4 in tables:
        for tau, tid in ((0.9, 4), (0.8, 5), (0.7, 6)):
            log(f"table {tid} (tau={tau})")
            write_result(f"table{tid:02d}_{dataset}", to_markdown(
                table4_6_semantic_accuracy(ctx, tau),
                f"Table {tid} — semantic-join accuracy, tau={tau} ({dataset})"))
    if 7 in tables:
        log("table 7")
        write_result(f"table07_{dataset}", to_markdown(
            table7_expert(ctx), f"Table 7 — expert-labeled semantic joins ({dataset})"))
    if 8 in tables and dataset == "webtable":
        log("table 8 (size ctx)")
        size_ctx = ExperimentContext(spark, dataset, SIZE_SCALE)
        write_result(f"table08_{dataset}", to_markdown(
            table8_accuracy_by_size(size_ctx),
            f"Table 8 — accuracy by column size, k=10 ({dataset})"))
    if 9 in tables:
        log("table 9 (equi transform ablation)")
        write_result(f"table09_{dataset}", to_markdown(
            table9_10_transform_ablation(ctx, "equi"),
            f"Table 9 — column-to-text options, equi ({dataset})"))
        log("table 10 (semantic transform ablation)")
        write_result(f"table10_{dataset}", to_markdown(
            table9_10_transform_ablation(ctx, "semantic"),
            f"Table 10 — column-to-text options, semantic ({dataset})"))
    if 11 in tables:
        log("table 11 (equi shuffle ablation)")
        write_result(f"table11_{dataset}", to_markdown(
            table11_12_shuffle_ablation(ctx, "equi"),
            f"Table 11 — cell shuffle, equi ({dataset})"))
        log("table 12 (semantic shuffle ablation)")
        write_result(f"table12_{dataset}", to_markdown(
            table11_12_shuffle_ablation(ctx, "semantic"),
            f"Table 12 — cell shuffle, semantic ({dataset})"))
    if 13 in tables:
        for join_type in ("equi", "semantic"):
            log(f"table 13 ({join_type})")
            write_result(f"table13_{dataset}_{join_type}", to_markdown(
                table13_time_vs_size(ctx, join_type, TIME_SIZES[dataset]),
                f"Table 13 — time vs |X|, {join_type} ({dataset})"))
    if 14 in tables:
        for join_type in ("equi", "semantic"):
            log(f"table 14 ({join_type})")
            write_result(f"table14_{dataset}_{join_type}", to_markdown(
                table14_time_vs_k(ctx, join_type),
                f"Table 14 — time vs k, {join_type} ({dataset})"))
    if 15 in tables and dataset == "webtable":
        size_ctx = ExperimentContext(spark, dataset, SIZE_SCALE)
        for join_type in ("equi", "semantic"):
            log(f"table 15 ({join_type})")
            write_result(f"table15_{dataset}_{join_type}", to_markdown(
                table15_time_vs_colsize(size_ctx, join_type),
                f"Table 15 — time vs column size, {join_type} ({dataset})"))
    if 99 in tables:
        log("hnsw recall appendix")
        r = hnsw_recall_check(ctx)
        write_result(f"hnsw_recall_{dataset}",
                     f"HNSW recall@10 vs exact kNN on DeepJoin embeddings "
                     f"({dataset}): {r:.3f}\n")
    log("done")


if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--dataset", default="both",
                    choices=["webtable", "wikitable", "both"])
    ap.add_argument("--tables", default="2,3,4,7,8,9,11,13,14,15,99")
    args = ap.parse_args()
    tables = {int(t) for t in args.tables.split(",")}
    datasets = ["webtable", "wikitable"] if args.dataset == "both" else [args.dataset]
    for ds in datasets:
        run(ds, tables)
