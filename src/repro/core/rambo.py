"""RAMBO — Repeated And Merged BloOm filter (the paper's contribution).

Geometry: ``num_repetitions`` (D) independent random partitions of the N
files into ``num_partitions`` (W) disjoint groups, one merged Bloom filter
per (repetition, partition) → an ``m x (D*W)`` bit matrix with
``D*W ≪ N``. Column layout: repetition ``d`` owns columns
``[d*W, (d+1)*W)``; a file belongs to column ``d*W + ph_d(file)``.

Insertion (Algorithm 1): every k-mer of a file is added to the file's D
columns — realised distributedly by the shared pipeline in
``repro.core.construct`` with a D-rows-per-file column mapping.

Query (Algorithm 2): AND the eta bitslices (width D*W), then decode — in
each repetition take the union of the member files of hit partitions and
intersect the unions across repetitions. Bloom filters have no false
negatives, so a file truly containing the k-mer hits in all D repetitions
and always survives; a non-member survives only if it collides in *every*
repetition, which drives the false-positive rate down exponentially in D
(the count-min-sketch argument of § III).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from repro.sketch.bitmatrix import BitMatrix
from repro.sketch.bloom import BLOOM_SEED_BASE, PARTITION_SEED_BASE, query_rows
from repro.sketch.hashing import bucket, hash_seeds

from .construct import build_matrix, map_columns


def partition_assignments(
    n_files: int, num_partitions: int, num_repetitions: int, *, seed: int = 0
) -> np.ndarray:
    """Partition of each file in each repetition, shape ``(D, n_files)``.

    Row ``d`` is the universal partition hash ``ph_d`` of the paper applied
    to every file id.
    """
    pseeds = hash_seeds(num_repetitions, base_seed=PARTITION_SEED_BASE + seed)
    ids = np.arange(n_files, dtype=np.int64)
    return np.stack([bucket(ids, s, num_partitions) for s in pseeds], axis=0)


def rambo_mapping(assignments: np.ndarray, num_partitions: int) -> pd.DataFrame:
    """File → D columns mapping DataFrame for the construction pipeline."""
    num_repetitions, n_files = assignments.shape
    ids = np.tile(np.arange(n_files, dtype=np.int64), num_repetitions)
    reps = np.repeat(np.arange(num_repetitions, dtype=np.int64), n_files)
    cols = reps * num_partitions + assignments.ravel()
    return pd.DataFrame({"file_id": ids, "col": cols})


@dataclass
class RamboIndex:
    """Driver-side query engine: bit matrix + partition membership lists."""

    matrix: BitMatrix
    n_files: int
    m: int
    eta: int
    num_partitions: int
    num_repetitions: int
    seed: int = 0

    def __post_init__(self):
        self.seeds = hash_seeds(self.eta, base_seed=BLOOM_SEED_BASE + self.seed)
        self.assignments = partition_assignments(
            self.n_files, self.num_partitions, self.num_repetitions, seed=self.seed
        )
        # Sorted member-file arrays per (repetition, partition): the sets
        # Algorithm 2 unions and intersects. Sorted so the decode can use
        # merge-based set ops on small arrays (~N/W elements).
        # int32 members: file ids are < 2**31 and narrower elements halve
        # the decode's concatenate+sort traffic.
        self.members = [
            [
                np.flatnonzero(self.assignments[d] == p).astype(np.int32)
                for p in range(self.num_partitions)
            ]
            for d in range(self.num_repetitions)
        ]
        # Flat col -> member-array view plus col -> repetition-bit, so the
        # query decode is a single pass over the (few) hit columns.
        self._members_flat = [arr for rep in self.members for arr in rep]
        self._rep_bit = [
            1 << d for d in range(self.num_repetitions) for _ in range(self.num_partitions)
        ]
        self._all_reps = (1 << self.num_repetitions) - 1

    @classmethod
    def build(
        cls,
        kmers: DataFrame,
        n_files: int,
        *,
        m: int,
        eta: int,
        num_partitions: int,
        num_repetitions: int,
        seed: int = 0,
    ) -> "RamboIndex":
        """Distributed construction from a ``(file_id, code)`` DataFrame."""
        assignments = partition_assignments(n_files, num_partitions, num_repetitions, seed=seed)
        colcodes = map_columns(kmers, rambo_mapping(assignments, num_partitions))
        matrix = build_matrix(colcodes, m, num_partitions * num_repetitions, eta, seed=seed)
        return cls(
            matrix=matrix,
            n_files=n_files,
            m=m,
            eta=eta,
            num_partitions=num_partitions,
            num_repetitions=num_repetitions,
            seed=seed,
        )

    def query(self, code: int) -> np.ndarray:
        """Sorted file ids reported for ``code`` (Algorithm 2).

        Superset of the true containing set (no false negatives); false
        positives require a collision in every repetition.
        """
        rows = query_rows(code, self.seeds, self.m)
        hit_cols = self.matrix.slice_cols(self.matrix.and_slices(rows))
        if len(hit_cols) == 0:
            return np.empty(0, dtype=np.int64)
        # Decode without per-repetition set objects: partitions within one
        # repetition are disjoint, so that repetition's union is a plain
        # concatenation of member arrays; a file is in the intersection of
        # all D unions iff it occurs exactly D times (= once per
        # repetition) in the concatenation of every repetition's union —
        # detected as a run of length D in the sorted candidate stream.
        D = self.num_repetitions
        mf, rb = self._members_flat, self._rep_bit
        parts = []
        reps_hit = 0
        for col in hit_cols.tolist():
            parts.append(mf[col])
            reps_hit |= rb[col]
        if reps_hit != self._all_reps:
            # The true partition always hits in every repetition, so a
            # repetition with no hit proves the k-mer is in no file at all.
            return np.empty(0, dtype=np.int64)
        if len(parts) == 1:
            return parts[0]
        cand = np.concatenate(parts)
        cand.sort()
        if D == 1:
            return cand
        head = cand[: 1 - D]
        return head[head == cand[D - 1 :]]

    def query_many(self, codes: np.ndarray) -> list[np.ndarray]:
        return [self.query(int(c)) for c in np.asarray(codes, dtype=np.int64)]

    @property
    def ncols(self) -> int:
        return self.matrix.ncols

    @property
    def memory_bytes(self) -> int:
        """Bitslices + partition-membership metadata (RAMBO-only overhead)."""
        return self.matrix.memory_bytes + int(self.assignments.nbytes)

    def save(self, path: str) -> None:
        """Persist to an ``.npz`` (used by the build/query jobs).

        Assignments are recomputed from the seed on load (they are a pure
        function of ``(n_files, W, D, seed)``), so only geometry is stored.
        """
        np.savez_compressed(
            path,
            kind=np.array(["rambo"]),
            rows=self.matrix.rows,
            params=np.array(
                [
                    self.matrix.m,
                    self.n_files,
                    self.m,
                    self.eta,
                    self.num_partitions,
                    self.num_repetitions,
                    self.seed,
                ]
            ),
        )

    @classmethod
    def load(cls, path: str) -> "RamboIndex":
        with np.load(path, allow_pickle=False) as z:
            if z["kind"][0] != "rambo":
                raise ValueError(f"{path} is not a RAMBO index")
            m_rows, n_files, m, eta, w, d, seed = (int(v) for v in z["params"])
            matrix = BitMatrix(m_rows, w * d)
            matrix.rows = z["rows"]
            return cls(
                matrix=matrix,
                n_files=n_files,
                m=m,
                eta=eta,
                num_partitions=w,
                num_repetitions=d,
                seed=seed,
            )
