"""Table 15 components: query encoding time by query column size
(exact methods grow with column size; encoding grows mildly)."""
import pytest

from repro.text.transform import render


def _query_of_size(ctx, lo, hi):
    pdf = ctx.queries_pdf
    sel = pdf[(pdf.n_cells >= lo) & (pdf.n_cells <= hi)]
    row = (sel.iloc[0] if len(sel) else pdf.iloc[0])
    return render("title-colname-stat-col", cells=list(row.cells),
                  col_name=row.col_name, table_title=row.table_title,
                  context=row.context)


@pytest.mark.benchmark(group="table15")
@pytest.mark.parametrize("group", [(5, 10), (11, 50), (51, 10**9)],
                         ids=["short", "medium", "long"])
def bench_deepjoin_encode_by_colsize(benchmark, ctx, dj_method, group):
    text = _query_of_size(ctx, *group)
    benchmark(lambda: dj_method.model.encode_loop([text]))


@pytest.mark.benchmark(group="table15")
@pytest.mark.parametrize("group", [(5, 10), (51, 10**9)], ids=["short", "long"])
def bench_fasttext_encode_by_colsize(benchmark, ctx, group):
    lo, hi = group
    pdf = ctx.queries_pdf
    sel = pdf[(pdf.n_cells >= lo) & (pdf.n_cells <= hi)]
    cells = list((sel.iloc[0] if len(sel) else pdf.iloc[0]).cells)
    benchmark(lambda: ctx.ft.column_vec(cells))
