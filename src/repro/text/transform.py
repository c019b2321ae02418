"""Column-to-text transformation — Table 1 of the paper.

Seven contextualization options turn a column row (cells + metadata)
into the text sequence fed to the PLM. ``render`` is the pure-python
core; ``contextualize`` applies it over a Spark corpus DataFrame via
mapInPandas with a broadcast cell-frequency map for the paper's
frequency-based cell truncation ("in case of a limit of the input
sequence's length, we choose the cell values with the highest
frequency").
"""
from __future__ import annotations

from typing import Dict, Iterator, List, Optional

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.types import StringType, StructField

OPTIONS = (
    "col",
    "colname-col",
    "colname-col-context",
    "colname-stat-col",
    "title-colname-col",
    "title-colname-col-context",
    "title-colname-stat-col",
)

DEFAULT_OPTION = "title-colname-stat-col"  # the paper's best (Tables 9/10)


def _truncate(cells: List[str], max_cells: int, freq: Optional[Dict[str, int]]) -> List[str]:
    if len(cells) <= max_cells:
        return list(cells)
    if not freq:
        return list(cells[:max_cells])
    # keep the max_cells most frequent cells, preserving column order
    ranked = sorted(range(len(cells)), key=lambda i: (-freq.get(cells[i], 0), i))
    keep = sorted(ranked[:max_cells])
    return [cells[i] for i in keep]


def _stat(cells: List[str]) -> str:
    lens = [len(c.split()) for c in cells]
    return f"({max(lens)}, {min(lens)}, {sum(lens) / len(lens):.1f})"


def render(
    option: str,
    *,
    cells: List[str],
    col_name: str = "",
    table_title: str = "",
    context: str = "",
    max_cells: int = 64,
    freq: Optional[Dict[str, int]] = None,
) -> str:
    """Render one column to its text sequence under ``option``."""
    if option not in OPTIONS:
        raise ValueError(f"unknown transformation option: {option!r}")
    kept = _truncate(cells, max_cells, freq)
    col = ", ".join(kept)
    n = len(cells)
    if option == "col":
        return col
    if option == "colname-col":
        return f"{col_name}: {col}."
    if option == "colname-col-context":
        return f"{col_name}: {col}. {context}"
    if option == "colname-stat-col":
        return f"{col_name} contains {n} values {_stat(kept)}: {col}"
    if option == "title-colname-col":
        return f"{table_title}. {col_name}: {col}."
    if option == "title-colname-col-context":
        return f"{table_title}. {col_name}: {col}. {context}"
    # title-colname-stat-col
    return f"{table_title}. {col_name} contains {n} values {_stat(kept)}: {col}."


def cell_frequencies(repo: DataFrame) -> DataFrame:
    """(cell, freq) where freq = number of repository columns containing
    the cell value — the paper's truncation ranking. Cells within a
    column are already distinct, so no per-column dedup is needed."""
    return (
        repo.select(F.explode("cells").alias("cell"))
        .groupBy("cell")
        .agg(F.count("*").alias("freq"))
    )


def contextualize(
    df: DataFrame,
    option: str = DEFAULT_OPTION,
    *,
    max_cells: int = 64,
    freq: Optional[Dict[str, int]] = None,
) -> DataFrame:
    """Append a ``text`` column rendering every row under ``option``.

    ``freq`` (broadcast to executors via closure capture) enables the
    frequency-based truncation; pass the collected result of
    ``cell_frequencies`` for repositories with long columns.
    """
    if option not in OPTIONS:
        raise ValueError(f"unknown transformation option: {option!r}")
    # fresh StructType — StructType.add would mutate df's own schema
    from pyspark.sql.types import StructType

    schema = StructType(list(df.schema.fields) + [StructField("text", StringType(), False)])
    fields = [f.name for f in df.schema.fields]

    def _mapper(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            pdf = pdf.copy()
            pdf["text"] = [
                render(
                    option,
                    cells=list(row.cells),
                    col_name=row.col_name,
                    table_title=row.table_title,
                    context=row.context,
                    max_cells=max_cells,
                    freq=freq,
                )
                for row in pdf.itertuples()
            ]
            yield pdf[fields + ["text"]]

    return df.mapInPandas(_mapper, schema=schema)
