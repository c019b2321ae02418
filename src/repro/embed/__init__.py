"""Embedding substrates.

* ``hashing``  — deterministic hashed bucket vectors (shared trick).
* ``fasttext`` — fastText-lite: char-n-gram cell/word embeddings (the
  vector space V of Definition 2.2, and the frozen fastText baseline).
* ``plm``      — PLM-lite: frozen contextual token encoders standing in
  for DistilBERT / MPNet (see DESIGN.md for the substitution argument).
* ``tabert``   — TaBERT-lite baseline column embedding.
"""
from repro.embed.hashing import HashedVectors  # noqa: F401
from repro.embed.fasttext import FastTextLite  # noqa: F401
from repro.embed.plm import DISTILBERT_LITE, MPNET_LITE, PLMLite  # noqa: F401
from repro.embed.tabert import TaBERTLite  # noqa: F401
