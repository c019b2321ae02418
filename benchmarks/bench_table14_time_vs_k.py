"""Table 14 components: HNSW search time as k grows (query encoding is
k-independent — the reason DeepJoin's total barely moves with k)."""
import pytest


@pytest.mark.benchmark(group="table14")
@pytest.mark.parametrize("k", [10, 20, 30, 40, 50])
def bench_hnsw_search_vs_k(benchmark, dj_index, dj_method, query_texts, k):
    _, _, index = dj_index
    q = dj_method.model.encode_batch([query_texts[0]])[0]
    benchmark(lambda: index.search(q, k))


@pytest.mark.benchmark(group="table14")
@pytest.mark.parametrize("k", [10, 50])
def bench_josie_vs_k(benchmark, ctx, josie_index, k):
    from repro.josie.search import josie_topk

    benchmark.pedantic(
        lambda: josie_topk(josie_index, ctx.queries_df, k).collect(),
        rounds=2, iterations=1,
    )
