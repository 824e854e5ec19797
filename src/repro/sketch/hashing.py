"""Seeded 64-bit hashing and 2-bit k-mer encoding.

One numpy implementation is used everywhere — inside Spark executors (via
pandas UDFs / ``mapInPandas``) during index construction, and on the driver
inside the query engines — so insert-time and query-time hash values agree
by construction. This mirrors the paper's requirement that "all N Bloom
filters share the same hash functions for consistency".

The mixer is splitmix64 (Steele et al., "Fast splittable pseudorandom
number generators", OOPSLA 2014): a full-period 64-bit finalizer with good
avalanche behaviour, cheap to vectorise in numpy.
"""
from __future__ import annotations

import numpy as np

_MASK = np.uint64(0xFFFFFFFFFFFFFFFF)
_C1 = np.uint64(0x9E3779B97F4A7C15)
_C2 = np.uint64(0xBF58476D1CE4E5B9)
_C3 = np.uint64(0x94D049BB133111EB)

# k-mer alphabet. 2 bits per base; k <= 31 keeps codes in 62 bits, so they
# are always non-negative when stored in Spark's signed 64-bit LongType.
BASES = "ACGT"
_BASE_LUT = np.full(256, 255, dtype=np.uint8)
for _i, _b in enumerate(BASES):
    _BASE_LUT[ord(_b)] = _i
    _BASE_LUT[ord(_b.lower())] = _i

MAX_K = 31


_S30, _S27, _S31 = np.uint64(30), np.uint64(27), np.uint64(31)


def splitmix64(x: np.ndarray | int) -> np.ndarray:
    """Apply the splitmix64 finalizer elementwise to uint64 input.

    Inputs are promoted to >=1-d before the arithmetic: numpy only warns
    about (intended) uint64 wraparound on 0-d scalars, and an ``errstate``
    context per call would dominate the per-query latency the evaluation
    measures. 0-d inputs get their scalar result back.
    """
    z = np.asarray(x, dtype=np.uint64)
    scalar = z.ndim == 0
    if scalar:
        z = z.reshape(1)
    z = z + _C1
    z = (z ^ (z >> _S30)) * _C2
    z = (z ^ (z >> _S27)) * _C3
    z = z ^ (z >> _S31)
    return z[0] if scalar else z


def hash_seeds(num: int, *, base_seed: int) -> np.ndarray:
    """``num`` independent 64-bit hash-function seeds derived from one seed.

    Seed ``i`` of family ``base_seed`` is ``splitmix64(base_seed + i)``;
    families with different ``base_seed`` values (Bloom rows vs partition
    hashes vs MinHash permutations) never overlap for num < 2**32 because
    base seeds are spaced 2**32 apart by the callers.
    """
    return splitmix64(np.arange(base_seed, base_seed + num, dtype=np.uint64))


def hash64(values: np.ndarray | int, seed: np.uint64 | int) -> np.ndarray:
    """Seeded 64-bit hash of uint64 values: splitmix64(x XOR seed)."""
    v = np.asarray(values, dtype=np.uint64)
    return splitmix64(v ^ np.uint64(seed))


def bucket(values: np.ndarray | int, seed: np.uint64 | int, mod: int) -> np.ndarray:
    """Seeded hash reduced to ``[0, mod)`` — a universal-ish hash family."""
    return (hash64(values, seed) % np.uint64(mod)).astype(np.int64)


def encode_kmers(kmers: "np.ndarray | list[str]", k: int) -> np.ndarray:
    """Vectorised 2-bit encoding of equal-length DNA strings to int64 codes.

    Raises ``ValueError`` on characters outside ``ACGTacgt`` or on strings
    whose length differs from ``k``. Code layout: base ``i`` (0-indexed from
    the left) occupies bits ``[2i, 2i+2)``; for k <= 31 the top two bits are
    zero, so codes round-trip through Spark LongType without sign issues.
    """
    if not 1 <= k <= MAX_K:
        raise ValueError(f"k must be in [1, {MAX_K}], got {k}")
    joined = "".join(kmers)
    if len(joined) != k * len(kmers):
        raise ValueError("all k-mers must have length exactly k")
    raw = np.frombuffer(joined.encode("ascii"), dtype=np.uint8).reshape(-1, k)
    mapped = _BASE_LUT[raw]
    if (mapped == 255).any():
        bad = raw[(mapped == 255).any(axis=1)][0].tobytes().decode()
        raise ValueError(f"non-ACGT character in k-mer {bad!r}")
    shifts = (np.uint64(2) * np.arange(k, dtype=np.uint64))[None, :]
    codes = (mapped.astype(np.uint64) << shifts).sum(axis=1, dtype=np.uint64)
    return codes.astype(np.int64)


def decode_kmer(code: int, k: int) -> str:
    """Inverse of :func:`encode_kmers` for a single code."""
    return "".join(BASES[(int(code) >> (2 * i)) & 3] for i in range(k))


def random_kmer_codes(num: int, k: int, *, seed: int) -> np.ndarray:
    """``num`` uniform random k-mer codes (deterministic in ``seed``).

    Used for the negative half of the query workload: a uniform 31-mer is
    almost surely absent from the corpus, which is how the paper's
    data-dependent false-positive rate is probed.
    """
    g = np.random.default_rng(seed)
    return g.integers(0, 1 << (2 * k), size=num, dtype=np.int64)
