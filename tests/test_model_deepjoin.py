"""DeepJoin model tests: analytic gradients vs finite differences,
encode-path equivalence, and training behaviour."""
import numpy as np
import pytest

from repro.embed.plm import DISTILBERT_LITE, MPNET_LITE, PLMConfig
from repro.model.deepjoin import (
    DeepJoinModel,
    head_backward,
    head_forward,
    init_head,
    pad_states,
)
from repro.model.train import TrainConfig, mnr_loss_and_grads, prepare_pairs, train

TINY_PLM = PLMConfig("tiny-plm", dim=16, seed=9, window=2, max_tokens=16)


def _rand_states(g, b=4, d=16):
    return [g.standard_normal((int(g.integers(2, 6)), d)).astype(np.float32) for _ in range(b)]


def _loss_of(params, hx, mx, hy, my, scale=10.0):
    ex = head_forward(params, hx, mx)
    ey = head_forward(params, hy, my)
    loss, _, _ = mnr_loss_and_grads(ex, ey, scale)
    return loss


def test_head_gradients_match_finite_differences():
    g = np.random.default_rng(0)
    params = init_head(16, 8, 8, seed=1)
    params["Wa"] = (g.standard_normal((16, 16)) * 0.1).astype(np.float32)
    hx, mx = pad_states(_rand_states(g))
    hy, my = pad_states(_rand_states(g))
    ex, cx = head_forward(params, hx, mx, want_cache=True)
    ey, cy = head_forward(params, hy, my, want_cache=True)
    _, dex, dey = mnr_loss_and_grads(ex, ey, 10.0)
    gx = head_backward(params, cx, dex)
    gy = head_backward(params, cy, dey)
    grads = {k: gx[k] + gy[k] for k in gx}
    eps = 1e-3
    for name in ("Wa", "W1", "b1", "W2", "b2"):
        p = params[name]
        flat = p.reshape(-1)
        for j in np.random.default_rng(2).choice(flat.size, size=min(6, flat.size), replace=False):
            orig = flat[j]
            flat[j] = orig + eps
            lp = _loss_of(params, hx, mx, hy, my)
            flat[j] = orig - eps
            lm = _loss_of(params, hx, mx, hy, my)
            flat[j] = orig
            num = (lp - lm) / (2 * eps)
            ana = grads[name].reshape(-1)[j]
            assert abs(num - ana) < 5e-3 * max(1.0, abs(num)), (name, j, num, ana)


def test_mnr_loss_perfect_alignment_is_low():
    g = np.random.default_rng(1)
    e = g.standard_normal((8, 16)).astype(np.float32)
    loss_same, _, _ = mnr_loss_and_grads(e, e.copy(), 20.0)
    loss_rand, _, _ = mnr_loss_and_grads(e, g.standard_normal((8, 16)).astype(np.float32), 20.0)
    assert loss_same < 0.1
    assert loss_rand > loss_same


def test_encode_batch_equals_encode_loop():
    m = DeepJoinModel(TINY_PLM, hidden=8, out_dim=8, seed=3)
    texts = ["alpha beta", "gamma delta epsilon", "zeta"]
    np.testing.assert_allclose(m.encode_batch(texts), m.encode_loop(texts), atol=1e-5)


def test_encode_deterministic():
    a = DeepJoinModel(TINY_PLM, hidden=8, out_dim=8, seed=3)
    b = DeepJoinModel(TINY_PLM, hidden=8, out_dim=8, seed=3)
    t = ["same text here"]
    np.testing.assert_array_equal(a.encode_batch(t), b.encode_batch(t))


def test_training_decreases_loss():
    g = np.random.default_rng(5)
    # synthetic task: pairs share a keyword; negatives don't
    vocab = [f"tok{i}" for i in range(40)]
    pairs = []
    for i in range(120):
        key = vocab[i % 40]
        fill = [vocab[int(g.integers(40))] for _ in range(4)]
        pairs.append((f"{key} " + " ".join(fill[:2]), f"{key} " + " ".join(fill[2:])))
    m = DeepJoinModel(TINY_PLM, hidden=16, out_dim=16, seed=1)
    losses = train(m, pairs, TrainConfig(epochs=10, batch_size=16, lr=1e-2, seed=0))
    assert losses[-1] < losses[0] * 0.8


def test_training_improves_retrieval_over_frozen():
    """End-to-end mini check: after fine-tuning, paired texts are ranked
    closer than under the frozen mean-pool embedding."""
    g = np.random.default_rng(7)
    vocab = [f"w{i}" for i in range(30)]
    def make(key):
        fill = [vocab[int(g.integers(30))] for _ in range(3)]
        return f"{key} " + " ".join(fill)
    keys = [f"key{i}" for i in range(40)]
    train_pairs = [(make(k), make(k)) for k in keys for _ in range(3)]
    test_pairs = [(make(k), make(k)) for k in keys]
    m = DeepJoinModel(TINY_PLM, hidden=16, out_dim=16, seed=2)
    train(m, train_pairs, TrainConfig(epochs=10, batch_size=16, lr=2e-2, seed=1))

    def top1_acc(embed_fn):
        qs = embed_fn([a for a, _ in test_pairs])
        xs = embed_fn([b for _, b in test_pairs])
        d = ((qs[:, None, :] - xs[None, :, :]) ** 2).sum(-1)
        return float(np.mean(d.argmin(1) == np.arange(len(test_pairs))))

    from repro.embed.plm import PLMLite
    frozen = PLMLite(TINY_PLM)
    acc_tuned = top1_acc(lambda ts: m.encode_batch(ts))
    acc_frozen = top1_acc(lambda ts: frozen.encode_texts(ts))
    assert acc_tuned >= acc_frozen


def test_prepare_pairs_shuffle_rate():
    import pandas as pd
    from repro.lake.generator import LakeConfig, generate_lake

    cfg = LakeConfig(name="t", seed=8, n_domains=3, pool_size_min=30,
                     pool_size_max=50, n_columns=40, n_queries=2, big_domains=0)
    cols = generate_lake(cfg).columns
    ids = cols.col_id.to_numpy()[:20]
    pos = pd.DataFrame({"x_id": ids[:10], "y_id": ids[10:20], "jn": 0.8})
    no_shuf = prepare_pairs(cols, pos, option="col", shuffle_rate=0.0, seed=0)
    with_shuf = prepare_pairs(cols, pos, option="col", shuffle_rate=1.0, seed=0)
    assert len(no_shuf) == 10
    assert len(with_shuf) == 20  # rate 1.0 -> every pair duplicated shuffled
    # shuffled twin has the same cells as the original, different order
    orig, shuf = with_shuf[0][0], with_shuf[1][0]
    assert sorted(orig.split(", ")) == sorted(shuf.split(", "))


def test_prepare_pairs_max_pairs_cap():
    import pandas as pd
    from repro.lake.generator import LakeConfig, generate_lake

    cfg = LakeConfig(name="t", seed=8, n_domains=3, pool_size_min=30,
                     pool_size_max=50, n_columns=40, n_queries=2, big_domains=0)
    cols = generate_lake(cfg).columns
    ids = cols.col_id.to_numpy()[:30]
    pos = pd.DataFrame({"x_id": ids[:15], "y_id": ids[15:30], "jn": 0.9})
    out = prepare_pairs(cols, pos, option="col", shuffle_rate=0.0, max_pairs=5, seed=0)
    assert len(out) == 5


def test_spark_encode_matches_driver(spark):
    from repro.lake.corpus import corpus_df
    from repro.lake.generator import LakeConfig, generate_lake
    from repro.text.transform import contextualize

    cfg = LakeConfig(name="t", seed=10, n_domains=3, pool_size_min=20,
                     pool_size_max=40, n_columns=10, n_queries=2, big_domains=0)
    df = contextualize(corpus_df(spark, generate_lake(cfg)), "colname-col")
    m = DeepJoinModel(DISTILBERT_LITE, seed=4)
    got = {r.col_id: np.array(r.emb) for r in m.encode_columns(df).collect()}
    rows = df.select("col_id", "text").limit(5).collect()
    want = m.encode_batch([r.text for r in rows])
    for i, r in enumerate(rows):
        np.testing.assert_allclose(got[r.col_id], want[i], atol=1e-5)


def test_mlp_baseline_trains_and_embeds():
    import pandas as pd
    from repro.embed.fasttext import FastTextLite
    from repro.lake.generator import LakeConfig, generate_lake
    from repro.model.mlp import MLPBaseline, MLPConfig

    cfg = LakeConfig(name="t", seed=12, n_domains=4, pool_size_min=30,
                     pool_size_max=60, n_columns=60, n_queries=2, big_domains=0)
    cols = generate_lake(cfg).columns
    # positives: same-domain column pairs
    by_dom = cols[cols.role == "corpus"].groupby("domain").col_id.apply(list)
    xs, ys = [], []
    for ids in by_dom:
        for a, b in zip(ids, ids[1:]):
            xs.append(a); ys.append(b)
    pos = pd.DataFrame({"x_id": xs, "y_id": ys, "jn": 0.8})
    ft = FastTextLite()
    mlp = MLPBaseline(ft, MLPConfig(epochs=4, seed=0))
    losses = mlp.fit(cols, pos)
    assert losses[-1] <= losses[0]
    emb = mlp.embed(np.random.default_rng(0).standard_normal((3, 64)).astype(np.float32))
    assert emb.shape == (3, ft.dim)
