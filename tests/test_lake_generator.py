"""Unit tests for the synthetic data-lake generator."""
import itertools

import numpy as np
import pytest

from repro.lake.generator import (
    LakeConfig,
    WEBTABLE_LITE,
    WIKITABLE_LITE,
    _variant,
    generate_lake,
)

TINY = LakeConfig(
    name="tiny", seed=3, n_domains=8, pool_size_min=40, pool_size_max=80,
    n_columns=200, n_queries=10, big_domains=2, big_pool_max=200,
)


@pytest.fixture(scope="module")
def tiny_lake():
    return generate_lake(TINY)


def test_deterministic():
    a = generate_lake(TINY)
    b = generate_lake(TINY)
    assert a.columns[["cells", "table_title"]].astype(str).equals(
        b.columns[["cells", "table_title"]].astype(str)
    )


def test_row_counts(tiny_lake):
    df = tiny_lake.columns
    assert len(df) == TINY.n_columns + TINY.n_queries
    assert (df.role == "corpus").sum() == TINY.n_columns
    assert (df.role == "query").sum() == TINY.n_queries


def test_min_column_size(tiny_lake):
    assert tiny_lake.columns.n_cells.min() >= 5


def test_cells_are_distinct_within_column(tiny_lake):
    for cells in tiny_lake.columns.cells:
        assert len(cells) == len(set(cells))


def test_canon_aligned_with_cells(tiny_lake):
    df = tiny_lake.columns
    assert (df.cells.map(len) == df.canon.map(len)).all()
    assert (df.cells.map(len) == df.n_cells).all()


def test_canon_ids_land_in_column_domain(tiny_lake):
    doms = tiny_lake.domains
    for _, row in tiny_lake.columns.head(50).iterrows():
        if row.domain == -1:  # mixed-dump tail column spans domains
            continue
        valid = set(doms[row.domain].ids)
        assert set(row.canon) <= valid


def test_same_domain_columns_overlap_cross_domain_dont(tiny_lake):
    df = tiny_lake.columns[tiny_lake.columns.role == "corpus"]
    dom, grp = max(df.groupby("domain"), key=lambda kv: len(kv[1]))
    same = [set(c) for c in grp.cells.head(15)]
    other = [set(c) for c in df[df.domain != dom].cells.head(15)]
    jn_same = np.mean([len(a & b) / len(a) for a, b in itertools.permutations(same, 2)])
    jn_cross = np.mean([len(a & b) / len(a) for a in same for b in other])
    assert jn_same > 0.1
    assert jn_cross < 0.01


def test_positive_pairs_exist_at_07(tiny_lake):
    """The training-data recipe (jn >= 0.7 self-join) must be non-empty."""
    df = tiny_lake.columns[tiny_lake.columns.role == "corpus"]
    n_pos = 0
    for _, grp in df.groupby("domain"):
        cols = [set(c) for c in grp.cells]
        for a, b in itertools.permutations(cols, 2):
            if len(a & b) / len(a) >= 0.7:
                n_pos += 1
    assert n_pos >= 20


def test_variant_rate_roughly_respected():
    """With variants on, some cells are not canonical surface forms."""
    lake = generate_lake(TINY)
    doms = {d.domain_id: set(d.entities) for d in lake.domains}
    n_var = n_tot = 0
    for _, row in lake.columns.iterrows():
        if row.domain == -1:
            continue
        canon_set = doms[row.domain]
        n_tot += len(row.cells)
        n_var += sum(1 for c in row.cells if c not in canon_set)
    rate = n_var / n_tot
    assert 0.03 < rate < 0.35  # dedup of colliding variants shifts it a bit


def test_variants_share_most_characters():
    g = np.random.default_rng(0)
    for val in ["katema", "holuse foru", "bigword here"]:
        for _ in range(20):
            v = _variant(g, val)
            # same first char, similar length — char-local edit
            assert abs(len(v) - len(val)) <= 2


def test_metadata_correlates_with_domain(tiny_lake):
    """Columns of the same domain share title words; different domains
    rarely do — the precondition for the Table 9/10 ablation."""
    df = tiny_lake.columns[tiny_lake.columns.domain >= 0]
    by_dom = df.groupby("domain").table_title.apply(list)
    same = cross = 0
    doms = list(by_dom.index)
    for d in doms:
        ts = by_dom[d]
        if len(ts) >= 2:
            w0 = set(ts[0].split())
            w1 = set(ts[1].split())
            same += bool(w0 & w1)
    for d1, d2 in itertools.combinations(doms[:6], 2):
        w0 = set(by_dom[d1][0].split())
        w1 = set(by_dom[d2][0].split())
        cross += bool(w0 & w1)
    assert same >= len(doms) * 0.9
    assert cross <= 3


def test_presets_have_distinct_seeds_and_shapes():
    assert WEBTABLE_LITE.seed != WIKITABLE_LITE.seed
    assert WIKITABLE_LITE.n_domains > WEBTABLE_LITE.n_domains


def test_override_counts():
    lake = generate_lake(TINY, n_columns=50, n_queries=3)
    assert (lake.columns.role == "corpus").sum() == 50
    assert (lake.columns.role == "query").sum() == 3


def test_cells_in_consistent_order_across_columns(tiny_lake):
    """Columns of one domain emit shared cells in a consistent relative
    order (popularity rank with local jitter) — the order signal the
    shuffle-ablation experiment relies on."""
    df = tiny_lake.columns[tiny_lake.columns.domain >= 0]
    dom, grp = max(df.groupby("domain"), key=lambda kv: len(kv[1]))
    cols = [list(c) for c in grp.cells.head(10)]
    agreements = []
    for a in cols:
        pos_a = {c: i for i, c in enumerate(a)}
        for b in cols:
            if a is b:
                continue
            common = [c for c in b if c in pos_a]
            if len(common) < 4:
                continue
            ranks = [pos_a[c] for c in common]
            agree = np.mean([
                ranks[i] < ranks[j]
                for i in range(len(ranks)) for j in range(i + 1, len(ranks))
            ])
            agreements.append(agree)
    assert np.mean(agreements) > 0.7
