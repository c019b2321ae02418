"""Adam optimizer and assorted substrate unit tests."""
import numpy as np
import pytest

from repro.model.optim import Adam


def test_adam_minimizes_quadratic():
    x = {"x": np.array([5.0, -3.0], dtype=np.float32)}
    opt = Adam(x, lr=0.1)
    for _ in range(200):
        opt.step({"x": 2 * x["x"]})  # d/dx of ||x||²
    assert np.abs(x["x"]).max() < 0.1


def test_adam_weight_decay_shrinks_params():
    a = {"x": np.array([1.0], dtype=np.float32)}
    b = {"x": np.array([1.0], dtype=np.float32)}
    Adam(a, lr=0.01, weight_decay=0.0).step({"x": np.zeros(1, np.float32)})
    Adam(b, lr=0.01, weight_decay=0.5).step({"x": np.zeros(1, np.float32)})
    assert b["x"][0] < a["x"][0]


def test_adam_steps_only_given_grads():
    p = {"a": np.ones(2, np.float32), "b": np.ones(2, np.float32)}
    opt = Adam(p, lr=0.1)
    opt.step({"a": np.ones(2, np.float32)})
    assert not np.allclose(p["a"], 1.0)
    np.testing.assert_array_equal(p["b"], np.ones(2, np.float32))


def test_adam_bias_correction_first_step():
    p = {"x": np.zeros(1, np.float32)}
    opt = Adam(p, lr=0.1)
    opt.step({"x": np.array([1.0], np.float32)})
    # first Adam step ≈ -lr * sign(grad)
    assert abs(p["x"][0] + 0.1) < 1e-3


def test_josie_index_cache_returns_self(spark):
    from repro.josie.index import build_inverted_index
    from repro.lake.corpus import corpus_df
    from repro.lake.generator import LakeConfig, generate_lake

    cfg = LakeConfig(name="t", seed=50, n_domains=3, pool_size_min=20,
                     pool_size_max=40, n_columns=15, n_queries=2, big_domains=0)
    repo = corpus_df(spark, generate_lake(cfg))
    idx = build_inverted_index(repo)
    assert idx.cache() is idx


def test_scale_dataclass_frozen():
    from repro.eval.context import Scale

    s = Scale("x", 10, 5, 2)
    with pytest.raises(Exception):
        s.corpus = 99


def test_domain_density_scaling(spark, tmp_path):
    from repro.eval.context import ExperimentContext, Scale

    small = ExperimentContext(spark, "webtable", Scale("a", 1000, 500, 2),
                              cache_dir=str(tmp_path / "a"))
    big = ExperimentContext(spark, "webtable", Scale("b", 8000, 2000, 2),
                            cache_dir=str(tmp_path / "b"))
    assert big.cfg.n_domains > small.cfg.n_domains


def test_mlp_identity_at_init():
    """Residual tower with zero-init output layer embeds exactly like
    fastText before training."""
    from repro.embed.fasttext import FastTextLite
    from repro.model.mlp import MLPBaseline

    mlp = MLPBaseline(FastTextLite())
    x = np.random.default_rng(0).standard_normal((4, 64)).astype(np.float32)
    np.testing.assert_allclose(mlp.embed(x), x, atol=1e-6)


def test_deepjoin_head_identity_at_init():
    """Residual head with zero-init W2/Wa embeds as a fixed rotation of
    the mean-pooled token states."""
    from repro.embed.plm import PLMConfig
    from repro.model.deepjoin import DeepJoinModel

    cfg = PLMConfig("t", dim=16, seed=1, window=2, max_tokens=8)
    m = DeepJoinModel(cfg, hidden=8, out_dim=16, seed=0)
    text = "alpha beta gamma"
    h = m.plm.token_states(text)
    want = h.mean(axis=0) @ m.params["R"]
    got = m.encode_batch([text])[0]
    np.testing.assert_allclose(got, want, atol=1e-5)


def test_lshensemble_relaxed_tables_built(spark):
    from repro.lake.corpus import corpus_df
    from repro.lake.generator import LakeConfig, generate_lake
    from repro.lshensemble.ensemble import LSHEnsemble

    cfg = LakeConfig(name="t", seed=51, n_domains=3, pool_size_min=20,
                     pool_size_max=40, n_columns=40, n_queries=2, big_domains=0)
    repo = corpus_df(spark, generate_lake(cfg))
    ens = LSHEnsemble(num_perm=64, n_partitions=2).fit(repo)
    for p in ens.partitions:
        if p.r > 1:
            assert len(p.relaxed) == 1  # exactly one relaxation level


def test_pivot_selection_spreads():
    from repro.pexeso.pivots import select_pivots

    g = np.random.default_rng(0)
    vecs = g.standard_normal((200, 8)).astype(np.float32)
    piv = select_pivots(vecs, 4, seed=1)
    assert piv.shape == (4, 8)
    d = ((piv[:, None, :] - piv[None, :, :]) ** 2).sum(-1)
    off = d[~np.eye(4, dtype=bool)]
    assert off.min() > 1.0  # farthest-point pivots are well separated


def test_pivot_distances_shapes():
    from repro.pexeso.pivots import pivot_distances

    v = np.zeros((0, 8), np.float32)
    p = np.ones((3, 8), np.float32)
    assert pivot_distances(v, p).shape == (0, 3)
