"""MinHash signatures over per-file k-mer sets, computed in Spark.

The paper de-duplicates the NCBI corpus by dropping files with Jaccard
similarity > 0.9 before sampling its evaluation subsets (§ V "Datasets").
MinHash (Broder 1997) estimates Jaccard similarity: for a random
permutation ``h_p``, ``P[min h_p(A) = min h_p(B)] = J(A, B)``, so the
fraction of agreeing signature slots is an unbiased estimate of J.

Computation is a two-level aggregation: ``mapInPandas`` computes per-batch
minima for every (file, permutation) with vectorised numpy, then a
``groupBy().min()`` combines partials — so executor output is
``files x num_perms`` rows regardless of corpus size.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.sketch.bloom import MINHASH_SEED_BASE
from repro.sketch.hashing import hash64, hash_seeds

SIG_SCHEMA = T.StructType(
    [
        T.StructField("file_id", T.IntegerType(), False),
        T.StructField("perm", T.IntegerType(), False),
        T.StructField("minval", T.LongType(), False),
    ]
)


def minhash_signatures(kmers: DataFrame, num_perms: int, *, seed: int = 0) -> DataFrame:
    """``(file_id, code)`` → ``(file_id, perm, minval)`` signature DataFrame.

    ``minval`` is the int64 view of the minimum uint64 hash under
    permutation ``perm`` (order-preserving comparisons are done in uint64
    space before the view, so signs never reorder values).
    """
    if num_perms < 1:
        raise ValueError("num_perms must be positive")
    seeds = hash_seeds(num_perms, base_seed=MINHASH_SEED_BASE + seed)

    def partial_mins(batches):
        for pdf in batches:
            if len(pdf) == 0:
                continue
            codes = pdf["code"].to_numpy(np.int64)
            files = pdf["file_id"].to_numpy(np.int64)
            order = np.argsort(files, kind="stable")
            codes, files = codes[order], files[order]
            uniq, starts = np.unique(files, return_index=True)
            bounds = np.append(starts, len(files))
            out_file, out_perm, out_min = [], [], []
            for fi, lo, hi in zip(uniq, bounds[:-1], bounds[1:]):
                hs = np.stack([hash64(codes[lo:hi], s) for s in seeds])
                out_file.append(np.full(num_perms, fi, dtype=np.int32))
                out_perm.append(np.arange(num_perms, dtype=np.int32))
                out_min.append(hs.min(axis=1).astype(np.int64))
            yield pd.DataFrame(
                {
                    "file_id": np.concatenate(out_file),
                    "perm": np.concatenate(out_perm),
                    "minval": np.concatenate(out_min),
                }
            )

    partial = kmers.mapInPandas(partial_mins, schema=SIG_SCHEMA)
    # uint64 order == int64 order within each sign class; to make Spark's
    # signed min agree with uint64 min we offset into signed space first.
    offset = F.lit(-(1 << 63)).cast("long")
    return (
        partial.withColumn("shifted", F.col("minval") + offset)
        .groupBy("file_id", "perm")
        .agg(F.min("shifted").alias("shifted"))
        .select("file_id", "perm", (F.col("shifted") - offset).alias("minval"))
    )


def signature_matrix(sigs: DataFrame) -> tuple[np.ndarray, np.ndarray]:
    """Collect signatures as ``(file_ids, sig_matrix)`` with rows aligned."""
    pdf = sigs.toPandas().sort_values(["file_id", "perm"])
    files = pdf["file_id"].unique()
    num_perms = pdf["perm"].nunique()
    mat = pdf["minval"].to_numpy(np.int64).reshape(len(files), num_perms)
    return files.astype(np.int64), mat


def estimate_jaccard(sig_a: np.ndarray, sig_b: np.ndarray) -> float:
    """Fraction of agreeing slots — the MinHash Jaccard estimate."""
    if sig_a.shape != sig_b.shape:
        raise ValueError("signatures must have equal length")
    return float((sig_a == sig_b).mean())


def exact_jaccard_pairs(kmers: DataFrame, pairs: DataFrame) -> DataFrame:
    """Exact Jaccard for candidate ``(a, b)`` pairs via joins.

    ``J = |A ∩ B| / (|A| + |B| - |A ∩ B|)`` with the intersection computed
    by a code-equality join restricted to candidate pairs. Output columns:
    ``a, b, inter, size_a, size_b, jaccard``.
    """
    sizes = kmers.groupBy("file_id").agg(F.count("*").alias("size"))
    ka = kmers.select(F.col("file_id").alias("a"), "code")
    kb = kmers.select(F.col("file_id").alias("b"), "code")
    inter = (
        pairs.join(ka, "a")
        .join(kb, ["b", "code"])
        .groupBy("a", "b")
        .agg(F.count("*").alias("inter"))
    )
    return (
        pairs.join(inter, ["a", "b"], "left")
        .fillna(0, subset=["inter"])
        .join(sizes.select(F.col("file_id").alias("a"), F.col("size").alias("size_a")), "a")
        .join(sizes.select(F.col("file_id").alias("b"), F.col("size").alias("size_b")), "b")
        .withColumn(
            "jaccard",
            F.col("inter") / (F.col("size_a") + F.col("size_b") - F.col("inter")),
        )
    )
