"""PEXESO-lite (Dong et al., ICDE 2021): exact semantic-joinable table
search via pivot-based filtering.

Cell values are embedded into the metric space V (fastText-lite); a
repo vector x can only match a query vector q (d(q,x) <= τ) if for
every pivot p, |d(q,p) - d(x,p)| <= τ (triangle inequality). Pivot
distances are precomputed for all repository vectors and organized in a
coarse grid (cluster) index whose per-cell bounding boxes prune whole
groups. Surviving pairs are verified exactly, matched query cells are
counted per column, and the top-k by Definition 2.3 joinability is
exact — verified against the all-pairs oracle in tests.
"""
from repro.pexeso.pivots import pivot_distances, select_pivots  # noqa: F401
from repro.pexeso.search import PexesoIndex  # noqa: F401
