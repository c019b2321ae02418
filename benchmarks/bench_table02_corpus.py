"""Offline stage benchmarks backing Table 2: lake generation and
corpus statistics."""
import pytest

from repro.lake.corpus import corpus_df, corpus_stats
from repro.lake.generator import WEBTABLE_LITE, generate_lake


@pytest.mark.benchmark(group="table02")
def bench_lake_generation(benchmark):
    benchmark.pedantic(
        lambda: generate_lake(WEBTABLE_LITE, n_columns=2000, n_queries=10),
        rounds=3, iterations=1,
    )


@pytest.mark.benchmark(group="table02")
def bench_corpus_stats(benchmark, spark):
    lake = generate_lake(WEBTABLE_LITE, n_columns=2000, n_queries=10)
    df = corpus_df(spark, lake).cache()
    df.count()
    benchmark.pedantic(lambda: corpus_stats(df), rounds=3, iterations=1)
