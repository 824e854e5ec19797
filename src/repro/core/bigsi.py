"""BIGSI baseline — one Bloom filter column per file (Bradley et al. 2019).

The index is an ``m x N`` bit matrix; column ``j`` is the Bloom filter of
file ``j``, all sharing the same ``eta`` hash functions. A query hashes the
k-mer to ``eta`` rows, ANDs those bitslices (each N bits wide) and reports
the set columns. Query cost is therefore linear in N — the limitation RAMBO
removes.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from repro.sketch.bitmatrix import BitMatrix
from repro.sketch.bloom import BLOOM_SEED_BASE, query_rows
from repro.sketch.hashing import hash_seeds

from .construct import build_matrix, map_columns


def bigsi_mapping(n_files: int) -> pd.DataFrame:
    """File → column mapping: the identity (one column per file)."""
    ids = np.arange(n_files, dtype=np.int64)
    return pd.DataFrame({"file_id": ids, "col": ids})


@dataclass
class BigsiIndex:
    """Driver-side query engine over the packed bit matrix."""

    matrix: BitMatrix
    n_files: int
    m: int
    eta: int
    seed: int = 0

    def __post_init__(self):
        self.seeds = hash_seeds(self.eta, base_seed=BLOOM_SEED_BASE + self.seed)

    @classmethod
    def build(
        cls, kmers: DataFrame, n_files: int, *, m: int, eta: int, seed: int = 0
    ) -> "BigsiIndex":
        """Distributed construction from a ``(file_id, code)`` DataFrame."""
        colcodes = map_columns(kmers, bigsi_mapping(n_files))
        matrix = build_matrix(colcodes, m, n_files, eta, seed=seed)
        return cls(matrix=matrix, n_files=n_files, m=m, eta=eta, seed=seed)

    def query(self, code: int) -> np.ndarray:
        """File ids whose Bloom column passes the membership test for ``code``.

        Zero false negatives; false positives per column at the Bloom rate.
        """
        rows = query_rows(code, self.seeds, self.m)
        return self.matrix.slice_cols(self.matrix.and_slices(rows))

    def query_many(self, codes: np.ndarray) -> list[np.ndarray]:
        return [self.query(int(c)) for c in np.asarray(codes, dtype=np.int64)]

    @property
    def ncols(self) -> int:
        return self.matrix.ncols

    @property
    def memory_bytes(self) -> int:
        """Bitslice storage only — BIGSI keeps no per-column metadata."""
        return self.matrix.memory_bytes

    def save(self, path: str) -> None:
        """Persist to an ``.npz`` (used by the build/query jobs)."""
        np.savez_compressed(
            path,
            kind=np.array(["bigsi"]),
            rows=self.matrix.rows,
            params=np.array([self.matrix.m, self.n_files, self.m, self.eta, self.seed]),
        )

    @classmethod
    def load(cls, path: str) -> "BigsiIndex":
        with np.load(path, allow_pickle=False) as z:
            if z["kind"][0] != "bigsi":
                raise ValueError(f"{path} is not a BIGSI index")
            m_rows, n_files, m, eta, seed = (int(v) for v in z["params"])
            matrix = BitMatrix(m_rows, n_files)
            matrix.rows = z["rows"]
            return cls(matrix=matrix, n_files=n_files, m=m, eta=eta, seed=seed)
