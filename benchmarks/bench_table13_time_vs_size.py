"""Table 13 components: per-query time of every search system at the
bench repository size (the jobs sweep sizes; here we pin one size and
measure each system's query path precisely)."""
import pytest


@pytest.mark.benchmark(group="table13")
def bench_josie_query_batch(benchmark, ctx, josie_index):
    from repro.josie.search import josie_topk

    benchmark.pedantic(
        lambda: josie_topk(josie_index, ctx.queries_df, 10).collect(),
        rounds=3, iterations=1,
    )


@pytest.mark.benchmark(group="table13")
def bench_lsh_query(benchmark, ctx, lsh_index):
    cells = list(ctx.queries_pdf.iloc[0].cells)
    benchmark(lambda: lsh_index.query(cells, 10))


@pytest.mark.benchmark(group="table13")
def bench_pexeso_query_batch(benchmark, ctx, pexeso_index):
    benchmark.pedantic(
        lambda: pexeso_index.query_all(ctx.queries_df, 0.9, 10).collect(),
        rounds=3, iterations=1,
    )


@pytest.mark.benchmark(group="table13")
def bench_deepjoin_encode_cpu(benchmark, dj_method, query_texts):
    benchmark(lambda: dj_method.model.encode_loop([query_texts[0]]))


@pytest.mark.benchmark(group="table13")
def bench_deepjoin_encode_gpu_batched(benchmark, dj_method, query_texts):
    # batched pass over all queries — the accelerator analogue
    benchmark(lambda: dj_method.model.encode_batch(query_texts))


@pytest.mark.benchmark(group="table13")
def bench_hnsw_search(benchmark, dj_index, dj_method, query_texts):
    _, _, index = dj_index
    q = dj_method.model.encode_batch([query_texts[0]])[0]
    benchmark(lambda: index.search(q, 10))
