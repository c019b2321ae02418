"""Exact joinability: Definitions 2.1 (equi) and 2.3 (semantic).

These are the repo's ground-truth oracles: they label training data
(self-join at jn >= t, § 4.1 of the paper), define the exact top-k every
approximate method is scored against (precision@k / NDCG@k), and verify
JOSIE-lite and PEXESO-lite.
"""
from repro.joinability.exact import (  # noqa: F401
    equi_joinability,
    equi_topk,
    semantic_joinability,
    semantic_topk,
    topk_from_scores,
)
from repro.joinability.matcher import semantic_match_pairs  # noqa: F401
from repro.joinability.labeling import positive_pairs  # noqa: F401
