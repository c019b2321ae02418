"""Shared tokenizer: word split + fastText-style character n-grams."""
from __future__ import annotations

import re
from typing import List

_WORD_RE = re.compile(r"[a-z0-9]+")


def words(text: str) -> List[str]:
    """Lowercased alphanumeric word tokens."""
    return _WORD_RE.findall(text.lower())


def char_ngrams(word: str, n_min: int = 2, n_max: int = 4) -> List[str]:
    """Character n-grams of ``word`` with boundary markers, fastText-style.

    The word itself (with markers) is always included, so exact-match
    signal is preserved alongside subword similarity.
    """
    w = f"<{word}>"
    grams = [w]
    for n in range(n_min, n_max + 1):
        grams.extend(w[i : i + n] for i in range(len(w) - n + 1))
    return grams
