"""k-mer extraction as Spark DataFrame transforms.

The production path (:func:`extract_kmers`) slides a k-wide window over
each sequence inside ``mapInPandas`` and emits 2-bit-encoded int64 codes,
deduplicated per file — each file is "represented by a set of k-mers"
(§ II). A pure-SQL path (:func:`kmer_strings`) produces the same windows as
strings through Catalyst (`transform`/`sequence`/`substring`); tests
cross-check the two and the DuckDB oracle checks the SQL path, so the
vectorised encoder cannot silently drift from the declarative definition.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.sketch.hashing import MAX_K, encode_kmers

KMER_SCHEMA = T.StructType(
    [
        T.StructField("file_id", T.IntegerType(), False),
        T.StructField("code", T.LongType(), False),
    ]
)

DEFAULT_K = 31  # the paper's k ("We set the length of k-mer to 31")


def sequence_codes(seq: str, k: int) -> np.ndarray:
    """All (non-distinct) k-mer codes of one sequence, in order.

    Encodes the whole sequence once, then assembles window codes with a
    sliding view — O(len) work instead of O(len * k).
    """
    if not 1 <= k <= MAX_K:
        raise ValueError(f"k must be in [1, {MAX_K}], got {k}")
    if len(seq) < k:
        return np.empty(0, dtype=np.int64)
    base = encode_kmers(list(seq), 1).astype(np.uint64)
    windows = np.lib.stride_tricks.sliding_window_view(base, k)
    shifts = (np.uint64(2) * np.arange(k, dtype=np.uint64))[None, :]
    return (windows << shifts).sum(axis=1, dtype=np.uint64).astype(np.int64)


def extract_kmers(corpus: DataFrame, k: int = DEFAULT_K, *, distinct: bool = True) -> DataFrame:
    """``(file_id, seq)`` → ``(file_id, code)`` k-mer DataFrame.

    With ``distinct=True`` (the default, matching the paper's set-of-k-mers
    file model) codes are deduplicated within each file on the executors
    before any shuffle.
    """

    def emit(batches):
        for pdf in batches:
            parts = []
            for fid, seq in zip(pdf["file_id"], pdf["seq"]):
                codes = sequence_codes(seq, k)
                if distinct:
                    codes = np.unique(codes)
                parts.append(pd.DataFrame({"file_id": np.int32(fid), "code": codes}))
            yield pd.concat(parts) if parts else pd.DataFrame(
                {"file_id": pd.Series(dtype="int32"), "code": pd.Series(dtype="int64")}
            )

    out = corpus.mapInPandas(emit, schema=KMER_SCHEMA)
    # mapInPandas dedupes within a file's row; files are unique per corpus
    # row so no cross-partition dedup is needed.
    return out


def kmer_strings(corpus: DataFrame, k: int = DEFAULT_K) -> DataFrame:
    """Declarative k-mer windows: ``(file_id, kmer: string)``, not distinct.

    Kept as the Catalyst-native reference implementation; the oracle tests
    run the equivalent SQL in DuckDB against it.
    """
    windows = F.expr(f"transform(sequence(1, length(seq) - {k - 1}), i -> substring(seq, i, {k}))")
    return (
        corpus.where(F.length("seq") >= k)
        .select("file_id", F.explode(windows).alias("kmer"))
    )


def encode_kmer_strings(kmers: DataFrame, k: int = DEFAULT_K) -> DataFrame:
    """Encode a ``(file_id, kmer)`` string DataFrame to ``(file_id, code)``."""

    @F.pandas_udf(T.LongType())
    def enc(s: pd.Series) -> pd.Series:
        return pd.Series(encode_kmers(s.tolist(), k), dtype="int64")

    return kmers.select(F.col("file_id").cast("int"), enc("kmer").alias("code"))
