"""JOSIE-lite: exact top-k overlap set-similarity search (Zhu et al.).

JOSIE regards equi-joinable table discovery as top-k set similarity
search with overlap |Q ∩ X| and answers it exactly from an inverted
index. The lite version keeps the data structures (token → postings
inverted index, global token-frequency ordering) and exactness, but
replaces JOSIE's cost-based alternation between index probes and
candidate verification with a full distributed postings join — an
efficiency simplification that preserves both the answers and the
linear-in-|X| scaling shape (DESIGN.md § 2).
"""
from repro.josie.index import build_inverted_index  # noqa: F401
from repro.josie.search import josie_topk  # noqa: F401
