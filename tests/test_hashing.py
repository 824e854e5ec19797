"""Unit tests for the shared hashing / k-mer-encoding substrate."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.sketch.hashing import (
    BASES,
    MAX_K,
    bucket,
    decode_kmer,
    encode_kmers,
    hash64,
    hash_seeds,
    random_kmer_codes,
    splitmix64,
)


class TestSplitmix64:
    def test_reference_vector_zero(self):
        # First output of the splitmix64 reference stream seeded with 0.
        assert int(splitmix64(np.uint64(0))) == 0xE220A8397B1DCDAF

    def test_reference_vector_one(self):
        # First output of the reference stream seeded with 1.
        assert int(splitmix64(np.uint64(1))) == 0x910A2DEC89025CC1

    def test_matches_pure_python_reference(self):
        def ref(x: int) -> int:
            mask = (1 << 64) - 1
            z = (x + 0x9E3779B97F4A7C15) & mask
            z = ((z ^ (z >> 30)) * 0xBF58476D1CE4E5B9) & mask
            z = ((z ^ (z >> 27)) * 0x94D049BB133111EB) & mask
            return z ^ (z >> 31)

        for x in [0, 1, 2, 2**31, 2**63, (1 << 64) - 1]:
            assert int(splitmix64(np.uint64(x))) == ref(x)

    def test_vectorised_matches_scalar(self):
        xs = np.arange(100, dtype=np.uint64)
        vec = splitmix64(xs)
        assert all(int(vec[i]) == int(splitmix64(np.uint64(i))) for i in range(100))

    def test_deterministic(self):
        xs = np.random.default_rng(0).integers(0, 2**63, 1000).astype(np.uint64)
        assert np.array_equal(splitmix64(xs), splitmix64(xs))

    def test_avalanche_bits(self):
        # Flipping one input bit should flip ~half the output bits.
        x = np.uint64(0x123456789ABCDEF)
        base = int(splitmix64(x))
        flips = [bin(base ^ int(splitmix64(x ^ np.uint64(1 << b)))).count("1") for b in range(64)]
        assert 20 < np.mean(flips) < 44

    def test_output_dtype(self):
        assert splitmix64(np.arange(4, dtype=np.uint64)).dtype == np.uint64


class TestSeededHashing:
    def test_hash_seeds_distinct(self):
        s = hash_seeds(64, base_seed=0)
        assert len(np.unique(s)) == 64

    def test_hash_seeds_families_disjoint(self):
        a = hash_seeds(16, base_seed=1 << 32)
        b = hash_seeds(16, base_seed=2 << 32)
        assert len(np.intersect1d(a, b)) == 0

    def test_hash64_seed_changes_output(self):
        xs = np.arange(100, dtype=np.int64)
        assert not np.array_equal(hash64(xs, 1), hash64(xs, 2))

    def test_hash64_negative_int64_ok(self):
        # int64 inputs are reinterpreted as uint64 — no crash, stable result.
        xs = np.array([-1, -2**62], dtype=np.int64)
        assert np.array_equal(hash64(xs, 7), hash64(xs, 7))

    @pytest.mark.parametrize("mod", [2, 7, 10, 100, 1 << 16])
    def test_bucket_range(self, mod):
        xs = np.random.default_rng(1).integers(0, 2**62, 2000)
        b = bucket(xs, 3, mod)
        assert b.min() >= 0 and b.max() < mod
        assert b.dtype == np.int64

    @pytest.mark.parametrize("mod", [8, 64, 101])
    def test_bucket_roughly_uniform(self, mod):
        xs = np.arange(50_000, dtype=np.int64)
        counts = np.bincount(bucket(xs, 5, mod), minlength=mod)
        expected = 50_000 / mod
        assert counts.min() > expected * 0.7 and counts.max() < expected * 1.3


class TestKmerCodec:
    @pytest.mark.parametrize("k", [1, 2, 5, 16, 31])
    def test_roundtrip(self, k):
        g = np.random.default_rng(k)
        kmers = ["".join(g.choice(list(BASES), k)) for _ in range(50)]
        codes = encode_kmers(kmers, k)
        assert [decode_kmer(c, k) for c in codes] == kmers

    def test_codes_nonnegative(self):
        g = np.random.default_rng(0)
        kmers = ["".join(g.choice(list(BASES), MAX_K)) for _ in range(200)]
        assert (encode_kmers(kmers, MAX_K) >= 0).all()

    def test_distinct_kmers_distinct_codes(self):
        kmers = ["AAAA", "AAAT", "TAAA", "ACGT", "TGCA"]
        assert len(set(encode_kmers(kmers, 4).tolist())) == 5

    def test_lowercase_accepted(self):
        assert encode_kmers(["acgt"], 4)[0] == encode_kmers(["ACGT"], 4)[0]

    def test_bad_character_raises(self):
        with pytest.raises(ValueError, match="non-ACGT"):
            encode_kmers(["ACGN"], 4)

    def test_wrong_length_raises(self):
        with pytest.raises(ValueError, match="length"):
            encode_kmers(["ACG"], 4)

    @pytest.mark.parametrize("k", [0, 32, 100])
    def test_bad_k_raises(self, k):
        with pytest.raises(ValueError, match="k must be"):
            encode_kmers(["A" * max(k, 1)], k)

    def test_empty_input(self):
        assert len(encode_kmers([], 4)) == 0

    @settings(max_examples=50, deadline=None)
    @given(st.lists(st.text(alphabet="ACGT", min_size=8, max_size=8), min_size=1, max_size=20))
    def test_roundtrip_hypothesis(self, kmers):
        codes = encode_kmers(kmers, 8)
        assert [decode_kmer(c, 8) for c in codes] == kmers


class TestRandomKmerCodes:
    def test_range_and_determinism(self):
        a = random_kmer_codes(1000, 31, seed=4)
        b = random_kmer_codes(1000, 31, seed=4)
        assert np.array_equal(a, b)
        assert a.min() >= 0 and a.max() < 1 << 62

    def test_seed_changes_sample(self):
        assert not np.array_equal(
            random_kmer_codes(100, 31, seed=1), random_kmer_codes(100, 31, seed=2)
        )

    def test_decodable(self):
        for c in random_kmer_codes(20, 31, seed=0):
            assert len(decode_kmer(int(c), 31)) == 31
