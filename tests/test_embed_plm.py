"""PLM-lite and TaBERT-lite tests."""
import numpy as np
import pytest

from repro.embed.plm import DISTILBERT_LITE, MPNET_LITE, PLMLite, _posenc
from repro.embed.tabert import TaBERTLite


@pytest.fixture(scope="module")
def bert():
    return PLMLite(DISTILBERT_LITE)


@pytest.fixture(scope="module")
def mpnet():
    return PLMLite(MPNET_LITE)


def test_posenc_shape_and_range():
    pe = _posenc(16, 8)
    assert pe.shape == (16, 8)
    assert np.abs(pe).max() <= 1.0 + 1e-6


def test_token_states_shape(bert):
    h = bert.token_states("alpha beta gamma")
    assert h.shape == (3, DISTILBERT_LITE.dim)
    np.testing.assert_allclose(np.linalg.norm(h, axis=1), 1.0, rtol=1e-5)


def test_empty_text_yields_single_zero_row(bert):
    h = bert.token_states("")
    assert h.shape == (1, DISTILBERT_LITE.dim)
    assert np.allclose(h, 0)


def test_sentence_vec_unit_norm(bert):
    v = bert.sentence_vec("some words here")
    assert abs(np.linalg.norm(v) - 1.0) < 1e-5


def test_order_sensitivity(bert):
    """Positional + contextual mixing makes the frozen encoder order-
    sensitive — the property behind both the frozen-PLM weakness and the
    cell-shuffle ablation."""
    a = bert.sentence_vec("alpha beta gamma delta epsilon zeta")
    b = bert.sentence_vec("zeta epsilon delta gamma beta alpha")
    assert float(a @ b) < 0.999
    assert float(a @ b) > 0.3  # but content still dominates


def test_content_dominates_order(bert):
    same = bert.sentence_vec("alpha beta gamma")
    perm = bert.sentence_vec("gamma alpha beta")
    diff = bert.sentence_vec("one two three")
    assert float(same @ perm) > float(same @ diff) + 0.2


def test_max_tokens_truncation():
    cfg = DISTILBERT_LITE
    plm = PLMLite(cfg)
    toks = plm.tokenize(" ".join(f"w{i}" for i in range(500)))
    assert len(toks) == cfg.max_tokens


def test_mpnet_global_vs_bert_local_context(mpnet, bert):
    # different configs produce different spaces/dimensions
    assert mpnet.cfg.dim != bert.cfg.dim
    assert mpnet.cfg.window is None and bert.cfg.window is not None


def test_deterministic(bert):
    a = PLMLite(DISTILBERT_LITE).sentence_vec("stable output")
    np.testing.assert_array_equal(a, bert.sentence_vec("stable output"))


def test_encode_texts_stack(mpnet):
    m = mpnet.encode_texts(["a b", "c d e"])
    assert m.shape == (2, MPNET_LITE.dim)


def test_tabert_unit_norm():
    tb = TaBERTLite()
    v = tb.column_vec(cells=["a", "b", "c"], col_name="n", table_title="t")
    assert abs(np.linalg.norm(v) - 1.0) < 1e-5


def test_tabert_ignores_deep_cells():
    """TaBERT-lite only reads leading cells (QA bias) — cells beyond the
    lead window don't change the embedding."""
    tb = TaBERTLite(n_lead_cells=4)
    base = ["c1", "c2", "c3", "c4"]
    a = tb.column_vec(cells=base + ["x1"], col_name="n", table_title="t")
    b = tb.column_vec(cells=base + ["y2"], col_name="n", table_title="t")
    np.testing.assert_allclose(a, b)


def test_plm_spark_encoding_matches_driver(spark, mpnet):
    from repro.lake.corpus import corpus_df
    from repro.lake.generator import LakeConfig, generate_lake
    from repro.text.transform import contextualize

    cfg = LakeConfig(name="t", seed=6, n_domains=3, pool_size_min=20,
                     pool_size_max=40, n_columns=10, n_queries=2, big_domains=0)
    df = contextualize(corpus_df(spark, generate_lake(cfg)), "colname-col")
    got = {r.col_id: np.array(r.emb) for r in mpnet.encode_columns(df).collect()}
    for r in df.select("col_id", "text").limit(4).collect():
        np.testing.assert_allclose(got[r.col_id], mpnet.sentence_vec(r.text), rtol=1e-5)
