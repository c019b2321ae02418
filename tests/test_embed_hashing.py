"""Hashed bucket vector tests."""
import numpy as np
from hypothesis import given, strategies as st

from repro.embed.hashing import HashedVectors, normalize_rows


def test_deterministic_across_instances():
    a = HashedVectors(dim=32, seed=5)
    b = HashedVectors(dim=32, seed=5)
    np.testing.assert_array_equal(a.vectors(["x", "y"]), b.vectors(["x", "y"]))


def test_different_seeds_differ():
    a = HashedVectors(dim=32, seed=5)
    b = HashedVectors(dim=32, seed=6)
    assert not np.allclose(a.vectors(["x"]), b.vectors(["x"]))


def test_vectors_shape_and_dtype():
    hv = HashedVectors(dim=16)
    m = hv.vectors(["a", "b", "c"])
    assert m.shape == (3, 16)
    assert m.dtype == np.float32


def test_empty_tokens():
    hv = HashedVectors(dim=16)
    assert hv.vectors([]).shape == (0, 16)


def test_sum_vector_normalized():
    hv = HashedVectors(dim=16)
    v = hv.sum_vector(["tok", "other"])
    assert abs(np.linalg.norm(v) - 1.0) < 1e-5


def test_same_token_same_vector():
    hv = HashedVectors(dim=16)
    m = hv.vectors(["dup", "dup"])
    np.testing.assert_array_equal(m[0], m[1])


def test_normalize_rows_zero_safe():
    m = np.array([[0.0, 0.0], [3.0, 4.0]], dtype=np.float32)
    out = normalize_rows(m)
    np.testing.assert_array_equal(out[0], [0, 0])
    np.testing.assert_allclose(np.linalg.norm(out[1]), 1.0, rtol=1e-6)


@given(st.lists(st.text(alphabet="abcxyz", min_size=1, max_size=6), min_size=1, max_size=8))
def test_bucket_stability(tokens):
    hv = HashedVectors(dim=8)
    assert [hv.bucket(t) for t in tokens] == [hv.bucket(t) for t in tokens]
