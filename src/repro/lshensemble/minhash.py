"""MinHash sketches (Broder 1997) computed distributed via mapInPandas."""
from __future__ import annotations

import zlib
from typing import Iterator, List

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql.types import ArrayType, LongType, StructField, StructType

# Mersenne prime 2^31-1: products a*v stay under 2^62, so plain int64
# arithmetic suffices (no object-dtype bignum fallback)
_PRIME = (1 << 31) - 1

SIG_SCHEMA = StructType(
    [
        StructField("x_id", LongType(), False),
        StructField("x_size", LongType(), False),
        StructField("sig", ArrayType(LongType(), False), False),
    ]
)


def _perm_params(num_perm: int, seed: int) -> tuple[np.ndarray, np.ndarray]:
    g = np.random.default_rng(seed)
    a = g.integers(1, _PRIME, num_perm, dtype=np.int64)
    b = g.integers(0, _PRIME, num_perm, dtype=np.int64)
    return a, b


def signature_of(cells: List[str], a: np.ndarray, b: np.ndarray) -> np.ndarray:
    """MinHash signature (num_perm,) of a cell-value set."""
    if not cells:
        return np.full(len(a), _PRIME, dtype=np.int64)
    vals = np.fromiter(
        (zlib.crc32(c.encode("utf-8")) % _PRIME for c in set(cells)),
        dtype=np.int64,
    )
    h = (a[:, None] * vals[None, :] + b[:, None]) % _PRIME  # (num_perm, n)
    return np.min(h, axis=1)


def minhash_signatures(repo: DataFrame, num_perm: int = 128, seed: int = 7) -> DataFrame:
    """(x_id, x_size, sig) for every repository column."""

    def _mapper(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        a, b = _perm_params(num_perm, seed)
        for pdf in batches:
            sigs, sizes = [], []
            for cells in pdf["cells"]:
                cl = list(cells)
                sigs.append(signature_of(cl, a, b).tolist())
                sizes.append(len(set(cl)))
            yield pd.DataFrame(
                {"x_id": pdf["col_id"], "x_size": sizes, "sig": sigs}
            )

    return repo.select("col_id", "cells").mapInPandas(_mapper, schema=SIG_SCHEMA)
