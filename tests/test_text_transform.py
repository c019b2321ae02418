"""Column-to-text transformation tests (Table 1 options)."""
import pytest
from pyspark.sql import functions as F

from repro.lake.corpus import corpus_df
from repro.lake.generator import LakeConfig, generate_lake
from repro.text.transform import (
    OPTIONS,
    cell_frequencies,
    contextualize,
    render,
)

ROW = dict(
    cells=["alpha", "beta", "gamma delta"],
    col_name="names",
    table_title="greek letters",
    context="greek letters used in math",
)


def test_option_col():
    assert render("col", **ROW) == "alpha, beta, gamma delta"


def test_option_colname_col():
    assert render("colname-col", **ROW) == "names: alpha, beta, gamma delta."


def test_option_colname_col_context():
    out = render("colname-col-context", **ROW)
    assert out.startswith("names: alpha")
    assert out.endswith("greek letters used in math")


def test_option_colname_stat_col():
    out = render("colname-stat-col", **ROW)
    assert "contains 3 values" in out
    assert "(2, 1, 1.3)" in out  # max/min/avg words per cell


def test_option_title_prefix():
    out = render("title-colname-col", **ROW)
    assert out.startswith("greek letters. names:")


def test_option_title_colname_stat_col_is_default_best():
    out = render("title-colname-stat-col", **ROW)
    assert out.startswith("greek letters. names contains 3 values")


def test_all_seven_options_render_distinct():
    outs = {render(o, **ROW) for o in OPTIONS}
    assert len(outs) == len(OPTIONS) == 7


def test_unknown_option_raises():
    with pytest.raises(ValueError):
        render("nope", **ROW)


def test_truncation_keeps_most_frequent_in_order():
    cells = ["a", "b", "c", "d"]
    freq = {"a": 1, "b": 9, "c": 5, "d": 8}
    out = render("col", cells=cells, max_cells=2, freq=freq)
    assert out == "b, d"  # top-2 by freq, original order preserved


def test_truncation_without_freq_keeps_prefix():
    out = render("col", cells=["a", "b", "c"], max_cells=2)
    assert out == "a, b"


def test_stat_uses_kept_cells_but_n_is_total():
    cells = [f"w{i}" for i in range(10)]
    out = render("colname-stat-col", cells=cells, col_name="c", max_cells=3)
    assert "contains 10 values" in out


CFG = LakeConfig(
    name="tiny", seed=9, n_domains=5, pool_size_min=30, pool_size_max=60,
    n_columns=60, n_queries=4, big_domains=1, big_pool_max=100,
)


@pytest.fixture(scope="module")
def df(spark):
    return corpus_df(spark, generate_lake(CFG)).cache()


def test_contextualize_adds_text_column(df):
    out = contextualize(df, "col")
    assert "text" in out.columns
    rows = out.select("cells", "text").limit(5).collect()
    for r in rows:
        assert r.text == ", ".join(r.cells)


@pytest.mark.parametrize("option", OPTIONS)
def test_contextualize_all_options_nonempty(df, option):
    n_empty = contextualize(df, option).filter(F.length("text") == 0).count()
    assert n_empty == 0


def test_cell_frequencies_counts_columns(df, spark):
    from repro.oracle import assert_equivalent

    freq = cell_frequencies(df)
    flat = df.select("col_id", F.explode("cells").alias("cell"))
    assert_equivalent(
        freq,
        "SELECT cell, count(*) AS freq FROM flat GROUP BY cell",
        flat=flat,
    )


def test_contextualize_uses_freq_for_truncation(df):
    freq_map = {r.cell: r.freq for r in cell_frequencies(df).collect()}
    out = contextualize(df, "col", max_cells=3, freq=freq_map)
    row = out.filter(F.size("cells") > 3).select("cells", "text").first()
    assert row is not None
    kept = row.text.split(", ")
    assert len(kept) == 3
    # kept = top-3 cells by (freq desc, position) in original column order
    cells = list(row.cells)
    ranked = sorted(range(len(cells)), key=lambda i: (-freq_map.get(cells[i], 0), i))
    expected = [cells[i] for i in sorted(ranked[:3])]
    assert kept == expected
