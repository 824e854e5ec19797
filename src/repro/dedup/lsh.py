"""LSH banding over MinHash signatures + the de-duplication pass.

Banding (Indyk & Motwani 1998, as used in § V): split the ``P``-slot
signature into ``b`` bands of ``r`` rows; files agreeing on *all* rows of
any band land in the same bucket and become a candidate pair. A pair with
Jaccard ``s`` collides in some band with probability ``1 - (1 - s^r)^b`` —
an S-curve that passes near-duplicates (s > 0.9) with high probability and
suppresses unrelated pairs. Candidates are then verified with *exact*
Jaccard (a Spark join, oracle-checked in tests), so banding only affects
recall, never precision.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .minhash import exact_jaccard_pairs, minhash_signatures


def collision_probability(s: float, rows_per_band: int, bands: int) -> float:
    """P[candidate] for a pair with true Jaccard ``s`` under (r, b) banding."""
    return 1.0 - (1.0 - s**rows_per_band) ** bands


def band_buckets(sigs: DataFrame, rows_per_band: int) -> DataFrame:
    """``(file_id, band, bucket)``: one LSH bucket per file per band."""
    vals = F.transform(
        F.array_sort(F.collect_list(F.struct("perm", "minval"))), lambda s: s["minval"]
    )
    return (
        sigs.withColumn("band", (F.col("perm") / rows_per_band).cast("int"))
        .groupBy("file_id", "band")
        .agg(vals.alias("vals"))
        .select(
            "file_id",
            "band",
            F.xxhash64("band", F.concat_ws(",", F.transform("vals", lambda v: v.cast("string")))).alias(
                "bucket"
            ),
        )
    )


def candidate_pairs(buckets: DataFrame) -> DataFrame:
    """Distinct ``(a, b)`` with a < b sharing any (band, bucket)."""
    left = buckets.select("band", "bucket", F.col("file_id").alias("a"))
    right = buckets.select("band", "bucket", F.col("file_id").alias("b"))
    return (
        left.join(right, ["band", "bucket"])
        .where(F.col("a") < F.col("b"))
        .select("a", "b")
        .distinct()
    )


@dataclass
class DedupResult:
    """Outcome of the LSH de-duplication pass."""

    n_files: int
    n_candidates: int
    duplicate_pairs: list[tuple[int, int, float]]  # (a, b, jaccard) above threshold
    kept: np.ndarray  # sorted surviving file ids
    dropped: np.ndarray  # sorted removed file ids


def dedup_files(
    kmers: DataFrame,
    *,
    num_perms: int = 48,
    rows_per_band: int = 4,
    threshold: float = 0.9,
    seed: int = 0,
) -> DedupResult:
    """The paper's preprocessing: drop files with Jaccard > ``threshold``.

    Verified duplicate pairs are resolved greedily by file id: a file is
    dropped if it duplicates a *kept* lower-id file (so exactly one
    representative per duplicate cluster survives, matching the paper's
    "unique files" count).
    """
    if num_perms % rows_per_band != 0:
        raise ValueError("num_perms must be a multiple of rows_per_band")
    n_files = kmers.select("file_id").distinct().count()
    sigs = minhash_signatures(kmers, num_perms, seed=seed)
    cands = candidate_pairs(band_buckets(sigs, rows_per_band))
    verified = (
        exact_jaccard_pairs(kmers, cands)
        .select("a", "b", "jaccard")
        .toPandas()
        .sort_values(["a", "b"])
    )
    dup = verified[verified["jaccard"] > threshold]
    neighbours: dict[int, set[int]] = {}
    for a, b in zip(dup["a"].astype(int), dup["b"].astype(int)):
        neighbours.setdefault(b, set()).add(a)
    kept: list[int] = []
    kept_set: set[int] = set()
    all_ids = sorted(
        int(r["file_id"]) for r in kmers.select("file_id").distinct().collect()
    )
    for fid in all_ids:
        if neighbours.get(fid, set()) & kept_set:
            continue
        kept.append(fid)
        kept_set.add(fid)
    dropped = np.array(sorted(set(all_ids) - kept_set), dtype=np.int64)
    return DedupResult(
        n_files=n_files,
        n_candidates=len(verified),
        duplicate_pairs=[
            (int(a), int(b), float(j))
            for a, b, j in zip(dup["a"], dup["b"], dup["jaccard"])
        ],
        kept=np.array(kept, dtype=np.int64),
        dropped=dropped,
    )
