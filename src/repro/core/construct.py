"""Shared distributed construction pipeline for BIGSI and RAMBO.

Both indexes are built by the same dataflow, differing only in how a file
is mapped to bit-matrix columns (identity for BIGSI, D partition hashes for
RAMBO):

    corpus (file_id, seq)
      → k-mers (file_id, code)            [mapInPandas, distinct per file]
      → column-mapped (col, code)          [broadcast join, distinct]
      → hashed set-bits (row, col)         [mapInPandas, eta rows per code,
                                            distinct]
      → packed BitMatrix                   [collect pairs, scatter on driver]

Everything up to the final collect runs on executors through Catalyst; only
the distinct set-bit coordinates (a few bits per inserted k-mer) cross to
the driver. This is the paper's "embarrassingly parallel" construction:
files are processed independently and the per-column merge is a distinct
aggregation.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.sketch.bitmatrix import BitMatrix
from repro.sketch.bloom import BLOOM_SEED_BASE, bloom_rows
from repro.sketch.hashing import hash_seeds

BITPAIR_SCHEMA = T.StructType(
    [
        T.StructField("row", T.LongType(), False),
        T.StructField("col", T.IntegerType(), False),
    ]
)


def map_columns(kmers: DataFrame, mapping: pd.DataFrame) -> DataFrame:
    """Map ``(file_id, code)`` to ``(col, code)`` and merge duplicates.

    ``mapping`` has columns ``file_id``/``col`` with one or more columns per
    file (one for BIGSI, D for RAMBO). The tiny mapping table is broadcast;
    the distinct realises RAMBO's dataset merge (a k-mer shared by two files
    of one partition is inserted once).
    """
    spark = kmers.sparkSession
    mdf = spark.createDataFrame(mapping[["file_id", "col"]])
    return (
        kmers.join(F.broadcast(mdf), "file_id")
        .select(F.col("col").cast("int"), "code")
        .distinct()
    )


def hashed_bitpairs(colcodes: DataFrame, m: int, eta: int, *, seed: int = 0) -> DataFrame:
    """``(col, code)`` → distinct ``(row, col)`` set-bit coordinates."""
    seeds = hash_seeds(eta, base_seed=BLOOM_SEED_BASE + seed)

    def emit(batches):
        for pdf in batches:
            if len(pdf) == 0:
                continue
            rows = bloom_rows(pdf["code"].to_numpy(np.int64), seeds, m)
            yield pd.DataFrame(
                {
                    "row": rows.ravel().astype(np.int64),
                    "col": np.repeat(pdf["col"].to_numpy(np.int32), eta),
                }
            )

    return colcodes.mapInPandas(emit, schema=BITPAIR_SCHEMA).distinct()


def build_matrix(colcodes: DataFrame, m: int, ncols: int, eta: int, *, seed: int = 0) -> BitMatrix:
    """Run the distributed hash stage and pack the result on the driver."""
    return BitMatrix.from_bitpairs_df(m, ncols, hashed_bitpairs(colcodes, m, eta, seed=seed))


def collect_colcodes(colcodes: DataFrame) -> tuple[np.ndarray, np.ndarray]:
    """Collect distinct ``(col, code)`` pairs as numpy arrays.

    Used by the sweep harness (`repro.core.experiment`): the expensive Spark
    stages (k-mer extraction, column mapping, distinct) run once, and each
    (m, eta) grid point re-hashes these pairs on the driver instead of
    re-running the job per grid point.
    """
    pdf = colcodes.toPandas()
    return pdf["col"].to_numpy(np.int64), pdf["code"].to_numpy(np.int64)


def scatter_matrix(
    cols: np.ndarray, codes: np.ndarray, m: int, ncols: int, eta: int, *, seed: int = 0
) -> BitMatrix:
    """Driver-side equivalent of :func:`build_matrix` over collected pairs.

    Bit-identical to the distributed path (same ``bloom_rows``); tests
    assert the equality.
    """
    seeds = hash_seeds(eta, base_seed=BLOOM_SEED_BASE + seed)
    rows = bloom_rows(codes, seeds, m)
    return BitMatrix.from_pairs(m, ncols, rows.ravel(), np.repeat(cols, eta))
