"""Synthetic data-lake substrate (Webtable-lite / Wikitable-lite).

The paper evaluates on the WDC Web Table Corpus and Wikipedia tables,
which are unavailable offline. This package synthesizes a data lake with
the same *joinability structure*: entity domains, Zipf-weighted cell
sampling, dirty "semantic variants" (misspellings / format changes), and
metadata (table title, column name, context) correlated with content.
See DESIGN.md section 2 for the substitution rationale.
"""
from repro.lake.generator import (  # noqa: F401
    LakeConfig,
    WEBTABLE_LITE,
    WIKITABLE_LITE,
    generate_lake,
)
from repro.lake.corpus import corpus_df, corpus_stats, split_queries  # noqa: F401
