"""Per-query online pipeline behind the Table 3 accuracy runs:
query contextualization + embedding + retrieval, per method."""
import numpy as np
import pytest


@pytest.mark.benchmark(group="table03")
def bench_deepjoin_query_pipeline(benchmark, ctx, dj_method, dj_index, query_texts):
    _, _, index = dj_index

    def one_query():
        q = dj_method.model.encode_batch([query_texts[0]])[0]
        index.search(q, 10)

    benchmark(one_query)


@pytest.mark.benchmark(group="table03")
def bench_fasttext_query_pipeline(benchmark, ctx, ft_method):
    cells = list(ctx.queries_pdf.iloc[0].cells)

    def one_query():
        ctx.ft.column_vec(cells)

    benchmark(one_query)


@pytest.mark.benchmark(group="table03")
def bench_exact_knn_over_embeddings(benchmark, dj_index):
    from repro.ann.brute import knn_exact_numpy

    ids, mat, _ = dj_index
    q = mat[:5] + 0.01
    benchmark(lambda: knn_exact_numpy(q, mat, 10))
