"""Markdown rendering of experiment tables (no external deps)."""
from __future__ import annotations

import pandas as pd


def to_markdown(df: pd.DataFrame, title: str = "") -> str:
    """Plain GitHub-style markdown table."""
    cols = list(df.columns)
    lines = []
    if title:
        lines.append(f"### {title}\n")
    lines.append("| " + " | ".join(str(c) for c in cols) + " |")
    lines.append("|" + "|".join("---" for _ in cols) + "|")
    for _, row in df.iterrows():
        cells = []
        for c in cols:
            v = row[c]
            cells.append(f"{v:.3f}" if isinstance(v, float) else str(v))
        lines.append("| " + " | ".join(cells) + " |")
    return "\n".join(lines) + "\n"
