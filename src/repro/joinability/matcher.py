"""τ-matching of cell vectors (Definition 2.2), computed exactly.

``semantic_match_pairs`` embeds the distinct cell strings of both sides
with fastText-lite and computes the exact set of matching pairs
(Euclidean distance <= τ on unit vectors, i.e. cosine >= 1 - τ²/2) via
blocked matrix products. The resulting (l_cell, r_cell) pair table is
small and sparse (identity + variant links), and feeds the distributed
semantic-joinability aggregation in ``repro.joinability.exact``.
"""
from __future__ import annotations

from typing import List, Sequence

import numpy as np
import pandas as pd

from repro.embed.fasttext import FastTextLite
from repro.embed.hashing import normalize_rows


def cos_threshold(tau: float) -> float:
    """d(u,v) <= tau on unit vectors  <=>  cos(u,v) >= 1 - tau²/2."""
    return 1.0 - tau * tau / 2.0


def semantic_match_pairs(
    left_cells: Sequence[str],
    right_cells: Sequence[str],
    ft: FastTextLite,
    tau: float,
    block: int = 4096,
) -> pd.DataFrame:
    """Exact (l_cell, r_cell) pairs with d <= τ, via blocked matmul."""
    left: List[str] = list(dict.fromkeys(left_cells))
    right: List[str] = list(dict.fromkeys(right_cells))
    if not left or not right:
        return pd.DataFrame({"l_cell": [], "r_cell": []}, dtype=str)
    lm = normalize_rows(ft.cell_matrix(left))
    rm = normalize_rows(ft.cell_matrix(right))
    thr = cos_threshold(tau)
    ls, rs = [], []
    for i in range(0, len(left), block):
        sims = lm[i : i + block] @ rm.T
        li, ri = np.nonzero(sims >= thr)
        ls.append(li + i)
        rs.append(ri)
    li = np.concatenate(ls) if ls else np.array([], dtype=int)
    ri = np.concatenate(rs) if rs else np.array([], dtype=int)
    return pd.DataFrame(
        {"l_cell": [left[i] for i in li], "r_cell": [right[j] for j in ri]}
    )
