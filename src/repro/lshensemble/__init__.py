"""LSH Ensemble-lite (Zhu et al., PVLDB 2016): approximate containment
search via MinHash sketches + size-based partitioning.

The repository is partitioned into equi-depth size ranges; each
partition gets an LSH banding tuned from the containment→Jaccard
threshold conversion using the partition's upper size bound — the
conversion that introduces the false positives responsible for LSH
Ensemble's mediocre precision in the paper's Table 3. Top-k adaptation
ranks bucket candidates by minhash-estimated containment and falls back
to a partition scan when probes return fewer than k candidates (the
fallback is why it is "sometimes even slower than JOSIE").
"""
from repro.lshensemble.minhash import minhash_signatures  # noqa: F401
from repro.lshensemble.ensemble import LSHEnsemble  # noqa: F401
