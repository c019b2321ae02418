"""fastText-lite tests, including the τ-calibration the semantic-join
experiments depend on."""
import numpy as np
import pytest

from repro.embed.fasttext import FastTextLite, unique_cell_vectors
from repro.lake.generator import LakeConfig, _variant, generate_lake


@pytest.fixture(scope="module")
def ft():
    return FastTextLite()


def test_cell_vec_unit_norm(ft):
    v = ft.cell_vec("hello world")
    assert abs(np.linalg.norm(v) - 1.0) < 1e-5


def test_cell_vec_empty_string(ft):
    assert np.allclose(ft.cell_vec("!!!"), 0)


def test_case_insensitive(ft):
    np.testing.assert_allclose(ft.cell_vec("Tokyo"), ft.cell_vec("tokyo"))


def test_misspelling_close_unrelated_far(ft):
    canon = ft.cell_vec("katemalo")
    missp = ft.cell_vec("katemaol")  # adjacent swap
    other = ft.cell_vec("vuzophi")
    assert float(canon @ missp) > 0.45
    assert float(canon @ other) < 0.4


def test_column_vec_order_insensitive(ft):
    a = ft.column_vec(["x1", "y2", "z3"])
    b = ft.column_vec(["z3", "x1", "y2"])
    np.testing.assert_allclose(a, b, rtol=1e-5)


def test_cell_matrix_shape(ft):
    m = ft.cell_matrix(["a1", "b2"])
    assert m.shape == (2, ft.dim)


def test_unique_cell_vectors_dedups(ft):
    uniq, m = unique_cell_vectors(["aa", "bb", "aa"], ft)
    assert uniq == ["aa", "bb"]
    assert m.shape == (2, ft.dim)


def test_tau_calibration_on_lake_variants():
    """At τ=0.9 most generator variants match their canonical value and
    unrelated entities almost never do; match rate decreases with τ —
    the mechanism behind the Table 4→6 accuracy ordering."""
    ft = FastTextLite()
    g = np.random.default_rng(0)
    cfg = LakeConfig(name="t", seed=2, n_domains=6, pool_size_min=50,
                     pool_size_max=100, n_columns=10, n_queries=2, big_domains=0)
    lake = generate_lake(cfg)
    ents = [e for d in lake.domains for e in d.entities][:200]
    cos_var = np.array(
        [float(ft.cell_vec(e) @ ft.cell_vec(_variant(g, e))) for e in ents]
    )
    cos_un = np.array(
        [float(ft.cell_vec(a) @ ft.cell_vec(b)) for a, b in zip(ents, ents[1:])]
    )
    rates = []
    for tau in (0.9, 0.8, 0.7):
        thr = 1 - tau * tau / 2  # unit vectors: d<=tau  <=>  cos>=thr
        rates.append((cos_var >= thr).mean())
        assert (cos_un >= thr).mean() < 0.02
    assert rates[0] > 0.6
    assert rates[0] >= rates[1] >= rates[2]


def test_encode_columns_matches_driver_side(spark, ft):
    from repro.lake.corpus import corpus_df

    cfg = LakeConfig(name="t", seed=4, n_domains=3, pool_size_min=20,
                     pool_size_max=40, n_columns=12, n_queries=2, big_domains=0)
    df = corpus_df(spark, generate_lake(cfg))
    out = {r.col_id: np.array(r.emb) for r in ft.encode_columns(df).collect()}
    pdf = generate_lake(cfg).columns
    for _, row in pdf.head(5).iterrows():
        np.testing.assert_allclose(
            out[row.col_id], ft.column_vec(list(row.cells)), rtol=1e-5
        )
