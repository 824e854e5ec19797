"""Packed-bit Bloom filter over int64 keys.

This is the unit substrate of both BIGSI and RAMBO: BIGSI keeps one filter
per file, RAMBO one *merged* filter per (repetition, partition). Both
indexes store their filters column-packed inside a shared
:class:`~repro.sketch.bitmatrix.BitMatrix`; this standalone class exists for
unit-level reasoning (sizing, merging, FP estimation) and for tests that pin
down Bloom semantics independent of the index layout.

Keys are int64 (2-bit-encoded k-mers); all operations are vectorised.
"""
from __future__ import annotations

import math

import numpy as np

from .hashing import hash_seeds, bucket

#: Seed-family bases, spaced 2**32 apart so families never collide.
BLOOM_SEED_BASE = 1 << 32
PARTITION_SEED_BASE = 2 << 32
MINHASH_SEED_BASE = 3 << 32


def bloom_rows(codes: np.ndarray | int, seeds: np.ndarray, m: int) -> np.ndarray:
    """Row indices set/probed for each code, shape ``(len(codes), len(seeds))``.

    Shared by the standalone filter, the Spark construction pipeline and the
    driver query engines — the single source of truth for "which rows does
    this k-mer touch".
    """
    codes = np.atleast_1d(np.asarray(codes, dtype=np.int64))
    return np.stack([bucket(codes, s, m) for s in seeds], axis=1)


def query_rows(code: int, seeds: np.ndarray, m: int) -> np.ndarray:
    """Single-code fast path of :func:`bloom_rows` (one vectorised hash call).

    ``hash64(code, s) = splitmix64(code XOR s)`` is elementwise in the seed,
    so hashing one code under all ``eta`` seeds is a single numpy op —
    identical values to ``bloom_rows(code, seeds, m)[0]`` (asserted in
    tests) but without per-seed Python dispatch, which would otherwise
    dominate the per-query latency the paper measures.
    """
    # Inlined splitmix64 over (code XOR seeds): python-int ^ uint64-array
    # promotes directly, avoiding per-query scalar boxing. uint64 result;
    # valid directly as a fancy index into the bit matrix.
    from .hashing import _C1, _C2, _C3, _S27, _S30, _S31

    z = ((code & 0xFFFFFFFFFFFFFFFF) ^ seeds) + _C1
    z = (z ^ (z >> _S30)) * _C2
    z = (z ^ (z >> _S27)) * _C3
    return (z ^ (z >> _S31)) % np.uint64(m)


def optimal_bits(n_keys: int, fp_rate: float) -> int:
    """Classic Bloom sizing: bits for ``n_keys`` at target ``fp_rate``."""
    if not 0 < fp_rate < 1:
        raise ValueError("fp_rate must be in (0, 1)")
    n_keys = max(1, n_keys)
    return max(8, int(math.ceil(-n_keys * math.log(fp_rate) / (math.log(2) ** 2))))


def optimal_eta(m: int, n_keys: int) -> int:
    """Classic optimal hash count ``(m/n) ln 2`` (at least 1)."""
    return max(1, round(m / max(1, n_keys) * math.log(2)))


class BloomFilter:
    """An ``m``-bit filter with ``eta`` seeded hash functions.

    Two filters are *compatible* (mergeable / comparable) when they share
    ``m``, ``eta`` and ``seed`` — the same invariant the paper imposes on
    BIGSI's per-file filters.
    """

    def __init__(self, m: int, eta: int, *, seed: int = 0):
        if m < 1:
            raise ValueError("m must be positive")
        if eta < 1:
            raise ValueError("eta must be positive")
        self.m = int(m)
        self.eta = int(eta)
        self.seed = int(seed)
        self.seeds = hash_seeds(eta, base_seed=BLOOM_SEED_BASE + seed)
        self.bits = np.zeros((m + 7) // 8, dtype=np.uint8)

    def _check_compatible(self, other: "BloomFilter") -> None:
        if (self.m, self.eta, self.seed) != (other.m, other.eta, other.seed):
            raise ValueError("incompatible Bloom filters (m/eta/seed differ)")

    def add(self, codes: np.ndarray | int) -> None:
        """Insert codes (vectorised; duplicates are harmless)."""
        rows = bloom_rows(codes, self.seeds, self.m).ravel()
        np.bitwise_or.at(self.bits, rows >> 3, np.uint8(1) << (rows & 7).astype(np.uint8))

    def contains(self, codes: np.ndarray | int) -> np.ndarray:
        """Membership test, returns bool array aligned with ``codes``.

        No false negatives by construction; false positives at a rate set
        by load factor and ``eta``.
        """
        rows = bloom_rows(codes, self.seeds, self.m)
        probed = (self.bits[rows >> 3] >> (rows & 7).astype(np.uint8)) & 1
        return probed.all(axis=1)

    def merge(self, other: "BloomFilter") -> "BloomFilter":
        """Bitwise-OR union — RAMBO's dataset-merge primitive."""
        self._check_compatible(other)
        out = BloomFilter(self.m, self.eta, seed=self.seed)
        out.bits = self.bits | other.bits
        return out

    @property
    def load(self) -> float:
        """Fraction of set bits (the filter's fill ratio)."""
        return int(np.unpackbits(self.bits)[: self.m].sum()) / self.m

    def fp_estimate(self) -> float:
        """Estimated FP rate from the observed load: ``load ** eta``."""
        return self.load**self.eta

    def __eq__(self, other: object) -> bool:
        return (
            isinstance(other, BloomFilter)
            and (self.m, self.eta, self.seed) == (other.m, other.eta, other.seed)
            and bool(np.array_equal(self.bits, other.bits))
        )
