"""Metric unit tests."""
import numpy as np
from hypothesis import given, strategies as st

from repro.eval.metrics import dcg, ndcg_at_k, pooled_prf, precision_at_k


def test_precision_perfect():
    assert precision_at_k([1, 2, 3], [3, 2, 1], 3) == 1.0


def test_precision_disjoint():
    assert precision_at_k([1, 2], [3, 4], 2) == 0.0


def test_precision_partial():
    assert precision_at_k([1, 2, 3, 4], [3, 9, 8, 1], 4) == 0.5


def test_precision_k_zero():
    assert precision_at_k([1], [1], 0) == 0.0


def test_dcg_ordering_matters():
    assert dcg([1.0, 0.5], 2) > dcg([0.5, 1.0], 2)


def test_dcg_first_position_weight_one():
    assert abs(dcg([0.8], 1) - 0.8) < 1e-9


def test_ndcg_perfect_is_one():
    jn = {1: 0.9, 2: 0.5, 3: 0.2}
    assert abs(ndcg_at_k([1, 2, 3], [1, 2, 3], jn, 3) - 1.0) < 1e-9


def test_ndcg_worse_ranking_below_one():
    jn = {1: 0.9, 2: 0.5, 3: 0.2}
    v = ndcg_at_k([3, 2, 1], [1, 2, 3], jn, 3)
    assert 0 < v < 1


def test_ndcg_missing_pairs_score_zero():
    jn = {1: 0.9}
    assert ndcg_at_k([7, 8], [1], jn, 2) == 0.0


def test_ndcg_zero_exact_dcg():
    assert ndcg_at_k([1], [2], {}, 1) == 0.0


def test_pooled_prf_basic():
    p, r, f1 = pooled_prf({1, 2, 3, 4}, {2, 3, 9})
    assert abs(p - 0.5) < 1e-9
    assert abs(r - 2 / 3) < 1e-9
    assert f1 > 0


def test_pooled_prf_empty():
    assert pooled_prf(set(), {1}) == (0.0, 0.0, 0.0)
    assert pooled_prf({1}, set()) == (0.0, 0.0, 0.0)


@given(st.lists(st.integers(0, 30), min_size=1, max_size=10, unique=True),
       st.lists(st.integers(0, 30), min_size=1, max_size=10, unique=True))
def test_precision_bounds(a, b):
    k = max(len(a), len(b))
    v = precision_at_k(a, b, k)
    assert 0.0 <= v <= 1.0


def test_report_markdown():
    import pandas as pd
    from repro.eval.report import to_markdown

    df = pd.DataFrame({"method": ["a"], "P@10": [0.5]})
    md = to_markdown(df, title="T")
    assert "### T" in md and "| a | 0.500 |" in md
