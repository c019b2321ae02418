"""Approximate nearest neighbor search substrate (the Faiss stand-in).

HNSW (Malkov & Yashunin) is the paper's search index; IVFPQ is the
billion-scale option it mentions; the Spark brute-force kNN is the
exactness oracle both are tested against.
"""
from repro.ann.hnsw import HNSWIndex  # noqa: F401
from repro.ann.ivfpq import IVFPQIndex  # noqa: F401
from repro.ann.brute import brute_force_knn, knn_exact_numpy  # noqa: F401
