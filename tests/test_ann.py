"""ANN substrate tests: HNSW and IVFPQ recall vs exact kNN; Spark
brute-force correctness."""
import numpy as np
import pandas as pd
import pytest

from repro.ann.brute import brute_force_knn, knn_exact_numpy
from repro.ann.hnsw import HNSWIndex
from repro.ann.ivfpq import IVFPQIndex


@pytest.fixture(scope="module")
def data():
    g = np.random.default_rng(42)
    base = g.standard_normal((2000, 32)).astype(np.float32)
    queries = g.standard_normal((20, 32)).astype(np.float32)
    return base, queries


def recall_at_k(got_ids, exact_ids):
    return np.mean([
        len(set(g.tolist()) & set(e.tolist())) / len(e)
        for g, e in zip(got_ids, exact_ids)
    ])


def test_knn_exact_numpy_matches_argsort(data):
    base, queries = data
    ids, dists = knn_exact_numpy(queries[:3], base, 5)
    for i in range(3):
        d = np.linalg.norm(base - queries[i], axis=1)
        np.testing.assert_array_equal(ids[i], np.argsort(d)[:5])
        np.testing.assert_allclose(dists[i], np.sort(d)[:5], rtol=1e-4)


def test_knn_exact_k_larger_than_n():
    g = np.random.default_rng(0)
    base = g.standard_normal((3, 8)).astype(np.float32)
    ids, _ = knn_exact_numpy(g.standard_normal((2, 8)).astype(np.float32), base, 10)
    assert ids.shape == (2, 3)


def test_hnsw_high_recall(data):
    base, queries = data
    idx = HNSWIndex(dim=32, m=16, ef_construction=100, ef_search=128, seed=1)
    idx.add_batch(base)
    exact_ids, _ = knn_exact_numpy(queries, base, 10)
    got = [idx.search(q, 10)[0] for q in queries]
    assert recall_at_k(got, exact_ids) >= 0.95


def test_hnsw_exact_on_tiny():
    g = np.random.default_rng(3)
    base = g.standard_normal((30, 8)).astype(np.float32)
    idx = HNSWIndex(dim=8, m=8, ef_construction=40, ef_search=30, seed=2)
    idx.add_batch(base)
    exact_ids, _ = knn_exact_numpy(base[:5], base, 1)
    for i in range(5):
        ids, dists = idx.search(base[i], 1)
        assert ids[0] == exact_ids[i][0]
        assert dists[0] < 1e-5


def test_hnsw_incremental_add(data):
    base, queries = data
    idx = HNSWIndex(dim=32, seed=4)
    idx.add_batch(base[:500])
    idx.add_batch(base[500:1000])
    assert len(idx) == 1000
    exact_ids, _ = knn_exact_numpy(queries, base[:1000], 10)
    got = [idx.search(q, 10, ef=128)[0] for q in queries]
    assert recall_at_k(got, exact_ids) >= 0.9


def test_hnsw_empty_search():
    idx = HNSWIndex(dim=8)
    ids, dists = idx.search(np.zeros(8, dtype=np.float32), 5)
    assert len(ids) == 0 and len(dists) == 0


def test_hnsw_deterministic(data):
    base, queries = data
    a = HNSWIndex(dim=32, seed=7); a.add_batch(base[:300])
    b = HNSWIndex(dim=32, seed=7); b.add_batch(base[:300])
    np.testing.assert_array_equal(a.search(queries[0], 5)[0], b.search(queries[0], 5)[0])


def test_ivfpq_reasonable_recall(data):
    base, queries = data
    idx = IVFPQIndex(dim=32, nlist=32, m_sub=8, nprobe=8, seed=5).fit(base)
    exact_ids, _ = knn_exact_numpy(queries, base, 10)
    got = [idx.search(q, 10)[0] for q in queries]
    # PQ is lossy; nprobe=8/32 — moderate recall is the expected regime
    assert recall_at_k(got, exact_ids) >= 0.4


def test_ivfpq_more_probes_more_recall(data):
    base, queries = data
    lo = IVFPQIndex(dim=32, nlist=32, m_sub=8, nprobe=1, seed=5).fit(base)
    hi = IVFPQIndex(dim=32, nlist=32, m_sub=8, nprobe=16, seed=5).fit(base)
    exact_ids, _ = knn_exact_numpy(queries, base, 10)
    r_lo = recall_at_k([lo.search(q, 10)[0] for q in queries], exact_ids)
    r_hi = recall_at_k([hi.search(q, 10)[0] for q in queries], exact_ids)
    assert r_hi >= r_lo


def test_ivfpq_requires_divisible_dim():
    with pytest.raises(AssertionError):
        IVFPQIndex(dim=30, m_sub=8)


def test_brute_force_knn_spark_matches_numpy(spark, data):
    base, queries = data
    emb = spark.createDataFrame(
        pd.DataFrame({"col_id": np.arange(500), "emb": [v.tolist() for v in base[:500]]}),
        schema="col_id long, emb array<float>",
    ).repartition(8)
    got = brute_force_knn(emb, queries[:5], 7).toPandas()
    exact_ids, _ = knn_exact_numpy(queries[:5], base[:500], 7)
    for qi in range(5):
        grp = got[got.q_idx == qi].sort_values("rank")
        np.testing.assert_array_equal(grp.col_id.to_numpy(), exact_ids[qi])
