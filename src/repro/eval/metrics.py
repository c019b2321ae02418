"""Accuracy metrics as defined in § 5.1 of the paper.

* precision@k — overlap between the model's top-k and the exact top-k.
* NDCG@k — DCG_model / DCG_exact where DCG = Σ jn(Q, X_i) / log2(i+1)
  over the ranked list, with the *true* joinability of each retrieved
  column (0 if the pair has no overlap at all).
* pooled precision/recall/F1 — for the expert-label experiment
  (Table 7): the truth pool is the union of results across the compared
  methods (Clarke & Willett estimation), labels come from ground truth.
"""
from __future__ import annotations

from typing import Dict, List, Sequence, Set, Tuple

import numpy as np


def precision_at_k(got: Sequence[int], exact: Sequence[int], k: int) -> float:
    """|top-k(model) ∩ top-k(exact)| / k."""
    if k <= 0:
        return 0.0
    return len(set(list(got)[:k]) & set(list(exact)[:k])) / k


def dcg(jns: Sequence[float], k: int) -> float:
    """Σ_{i=1..k} jn_i / log2(i+1) over a ranked list of joinabilities."""
    jns = list(jns)[:k]
    return float(sum(j / np.log2(i + 2) for i, j in enumerate(jns)))


def ndcg_at_k(
    got: Sequence[int],
    exact: Sequence[int],
    jn_lookup: Dict[int, float],
    k: int,
) -> float:
    """DCG of the model ranking over DCG of the exact ranking, both
    scored with true joinability (missing pairs score 0)."""
    d_model = dcg([jn_lookup.get(x, 0.0) for x in list(got)[:k]], k)
    d_exact = dcg([jn_lookup.get(x, 0.0) for x in list(exact)[:k]], k)
    if d_exact == 0:
        return 0.0
    return d_model / d_exact


def pooled_prf(
    retrieved: Set[int], pool_joinable: Set[int]
) -> Tuple[float, float, float]:
    """(precision, recall, F1) against a pooled ground-truth label set.

    precision = |retrieved ∩ joinable| / |retrieved|;
    recall = |retrieved ∩ joinable| / |joinable in pool|.
    """
    tp = len(retrieved & pool_joinable)
    p = tp / len(retrieved) if retrieved else 0.0
    r = tp / len(pool_joinable) if pool_joinable else 0.0
    f1 = 2 * p * r / (p + r) if p + r > 0 else 0.0
    return p, r, f1


def mean_over_queries(values: List[float]) -> float:
    return float(np.mean(values)) if values else 0.0
