"""Count-min sketch over int64 keys.

RAMBO is "an extension of the CMS data structure [Cormode & Muthukrishnan
2005]: we replace the counters in the CMS with Bloom filters" (§ III). The
CMS is therefore a first-class substrate here: it pins down the
(depth × width) repetition/partition geometry and the minimum-over-rows
estimate that RAMBO's set-intersection decode generalises. The corpus
report (`repro.genomes.generator.corpus_stats`) uses it to estimate k-mer
multiplicity — the redundancy statistic the paper's memory argument rests
on — and tests verify the classic (epsilon, delta) overestimate guarantee.
"""
from __future__ import annotations

import math

import numpy as np

from .hashing import hash_seeds, bucket

CMS_SEED_BASE = 4 << 32


class CountMinSketch:
    """Depth ``d`` × width ``w`` counter matrix with seeded row hashes."""

    def __init__(self, width: int, depth: int, *, seed: int = 0):
        if width < 1 or depth < 1:
            raise ValueError("width and depth must be positive")
        self.width = int(width)
        self.depth = int(depth)
        self.seed = int(seed)
        self.seeds = hash_seeds(depth, base_seed=CMS_SEED_BASE + seed)
        self.table = np.zeros((depth, width), dtype=np.int64)

    @classmethod
    def from_error(cls, epsilon: float, delta: float, *, seed: int = 0) -> "CountMinSketch":
        """Sized so estimates overshoot by <= epsilon*N w.p. >= 1-delta."""
        if not 0 < epsilon < 1 or not 0 < delta < 1:
            raise ValueError("epsilon and delta must be in (0, 1)")
        return cls(
            width=int(math.ceil(math.e / epsilon)),
            depth=int(math.ceil(math.log(1 / delta))),
            seed=seed,
        )

    def _buckets(self, codes: np.ndarray | int) -> np.ndarray:
        codes = np.atleast_1d(np.asarray(codes, dtype=np.int64))
        return np.stack([bucket(codes, s, self.width) for s in self.seeds], axis=0)

    def add(self, codes: np.ndarray | int, counts: np.ndarray | int = 1) -> None:
        """Add ``counts`` (broadcastable) occurrences of each code."""
        codes = np.atleast_1d(np.asarray(codes, dtype=np.int64))
        counts = np.broadcast_to(np.asarray(counts, dtype=np.int64), codes.shape)
        cols = self._buckets(codes)
        for d in range(self.depth):
            np.add.at(self.table[d], cols[d], counts)

    def estimate(self, codes: np.ndarray | int) -> np.ndarray:
        """Point query: min over rows. Never underestimates the true count."""
        cols = self._buckets(codes)
        return self.table[np.arange(self.depth)[:, None], cols].min(axis=0)

    def merge(self, other: "CountMinSketch") -> "CountMinSketch":
        """Elementwise sum of two sketches built with identical geometry/seed."""
        if (self.width, self.depth, self.seed) != (other.width, other.depth, other.seed):
            raise ValueError("incompatible sketches (width/depth/seed differ)")
        out = CountMinSketch(self.width, self.depth, seed=self.seed)
        out.table = self.table + other.table
        return out

    @property
    def total(self) -> int:
        """Total weight inserted (row sums are all equal to it)."""
        return int(self.table[0].sum())


def cms_from_kmers(kmers, width: int, depth: int, *, seed: int = 0) -> CountMinSketch:
    """Distributed CMS over the ``code`` column of a k-mer DataFrame.

    Each executor partition builds a local sketch (``mapInPandas``), and the
    driver sums them — valid because CMS merge is elementwise addition.
    The result estimates k-mer multiplicity (files-per-k-mer), the
    redundancy statistic behind the paper's memory argument.
    """
    import pandas as pd
    from pyspark.sql import functions as F  # noqa: F401  (DataFrame check)

    def sketch_partition(batches):
        local = CountMinSketch(width, depth, seed=seed)
        for pdf in batches:
            if len(pdf):
                local.add(pdf["code"].to_numpy(np.int64))
        yield pd.DataFrame({"cell": local.table.ravel()})

    cells = kmers.select("code").mapInPandas(
        sketch_partition, schema="cell long"
    ).toPandas()["cell"].to_numpy(np.int64)
    out = CountMinSketch(width, depth, seed=seed)
    n_parts = len(cells) // (width * depth)
    out.table = cells.reshape(n_parts, depth, width).sum(axis=0)
    return out
