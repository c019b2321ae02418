"""Text pipeline: tokenization and column-to-text transformation.

Implements Table 1 of the paper (the seven contextualization options)
plus the shared tokenizer used by every embedder in this repo.
"""
from repro.text.tokenizer import char_ngrams, words  # noqa: F401
from repro.text.transform import (  # noqa: F401
    OPTIONS,
    cell_frequencies,
    contextualize,
    render,
)
