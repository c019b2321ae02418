"""Evaluation layer: metrics, method runners, per-table experiment
drivers, and paper-style reporting. See DESIGN.md § 4 for the table
index."""
from repro.eval.metrics import (  # noqa: F401
    dcg,
    ndcg_at_k,
    pooled_prf,
    precision_at_k,
)
