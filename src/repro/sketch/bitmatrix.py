"""Row-major packed bitslice matrix — the shared storage layer.

Both BIGSI and RAMBO are an ``m x ncols`` bit matrix whose *rows* (called
bitslices in the paper) are the unit of access at query time: a query
fetches the ``eta`` rows its k-mer hashes to and bitwise-ANDs them. Storing
rows contiguously (as BIGSI's BerkeleyDB backend does) makes the dominant
query cost proportional to the bitslice *width* — N columns for BIGSI,
D*W for RAMBO — which is exactly the asymmetry the paper measures. Both
index classes use this one implementation, so their timing difference comes
from geometry, not implementation skew.

Construction is distributed: Spark produces the distinct (row, col) set-bit
pairs (hashing and de-duplication happen on executors), and only those
pairs are collected and scattered into the packed matrix on the driver.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame


class BitMatrix:
    """``m`` bitslices of ``ncols`` bits, packed 8 columns per byte."""

    def __init__(self, m: int, ncols: int):
        if m < 1 or ncols < 1:
            raise ValueError("m and ncols must be positive")
        self.m = int(m)
        self.ncols = int(ncols)
        self.rows = np.zeros((m, (ncols + 7) // 8), dtype=np.uint8)

    @classmethod
    def from_pairs(cls, m: int, ncols: int, rows: np.ndarray, cols: np.ndarray) -> "BitMatrix":
        """Build from parallel (row, col) index arrays (duplicates fine)."""
        out = cls(m, ncols)
        out.set_bits(rows, cols)
        return out

    @classmethod
    def from_bitpairs_df(cls, m: int, ncols: int, pairs: DataFrame) -> "BitMatrix":
        """Build from a Spark DataFrame with int columns ``row`` and ``col``.

        The DataFrame is the output of the distributed hashing pipeline;
        only the (already distinct) set-bit coordinates cross to the driver.
        """
        pdf = pairs.select("row", "col").toPandas()
        return cls.from_pairs(
            m, ncols, pdf["row"].to_numpy(np.int64), pdf["col"].to_numpy(np.int64)
        )

    def set_bits(self, rows: np.ndarray, cols: np.ndarray) -> None:
        rows = np.asarray(rows, dtype=np.int64)
        cols = np.asarray(cols, dtype=np.int64)
        if rows.shape != cols.shape:
            raise ValueError("rows and cols must align")
        if len(rows) == 0:
            return
        if rows.min() < 0 or rows.max() >= self.m:
            raise IndexError("row index out of range")
        if cols.min() < 0 or cols.max() >= self.ncols:
            raise IndexError("col index out of range")
        np.bitwise_or.at(
            self.rows, (rows, cols >> 3), np.uint8(1) << (cols & 7).astype(np.uint8)
        )

    def get_bit(self, row: int, col: int) -> bool:
        return bool((self.rows[row, col >> 3] >> (col & 7)) & 1)

    def and_slices(self, row_ids: np.ndarray) -> np.ndarray:
        """Fetch the bitslices ``row_ids`` and AND them (the query kernel).

        ``self.rows[row_ids]`` is a gather-copy — the analogue of BIGSI
        reading eta bitslices off storage — so per-query work scales with
        ``len(row_ids) * ncols/8`` bytes for both systems.
        """
        return np.bitwise_and.reduce(self.rows[np.asarray(row_ids)], axis=0)

    def slice_cols(self, packed: np.ndarray) -> np.ndarray:
        """Column indices of the 1-bits in one packed bitslice."""
        return np.flatnonzero(np.unpackbits(packed, bitorder="little")[: self.ncols])

    @property
    def memory_bytes(self) -> int:
        """Bytes of bitslice storage — the paper's memory metric."""
        return int(self.rows.nbytes)

    @property
    def bits_set(self) -> int:
        return int(np.unpackbits(self.rows, axis=1).sum())

    def __eq__(self, other: object) -> bool:
        return (
            isinstance(other, BitMatrix)
            and (self.m, self.ncols) == (other.m, other.ncols)
            and bool(np.array_equal(self.rows, other.rows))
        )
