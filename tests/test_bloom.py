"""Unit tests for the Bloom filter substrate."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.sketch.bloom import (
    BloomFilter,
    bloom_rows,
    optimal_bits,
    optimal_eta,
    query_rows,
)
from repro.sketch.hashing import random_kmer_codes


def keys(n, seed=0):
    return random_kmer_codes(n, 31, seed=seed)


class TestBloomRows:
    @pytest.mark.parametrize("eta", [1, 3, 4, 8])
    def test_shape(self, eta):
        bf = BloomFilter(1 << 12, eta)
        rows = bloom_rows(keys(17), bf.seeds, bf.m)
        assert rows.shape == (17, eta)

    def test_rows_in_range(self):
        bf = BloomFilter(1000, 4)
        rows = bloom_rows(keys(500), bf.seeds, bf.m)
        assert rows.min() >= 0 and rows.max() < 1000

    def test_deterministic(self):
        bf = BloomFilter(1 << 10, 3, seed=5)
        assert np.array_equal(bloom_rows(keys(50), bf.seeds, bf.m), bloom_rows(keys(50), bf.seeds, bf.m))

    def test_scalar_input(self):
        bf = BloomFilter(1 << 10, 3)
        assert bloom_rows(12345, bf.seeds, bf.m).shape == (1, 3)

    @pytest.mark.parametrize("m", [97, 1 << 12, 12345])
    def test_query_rows_matches_bloom_rows(self, m):
        """The single-code fast path must agree exactly with the
        construction-time hashing for every code."""
        bf = BloomFilter(m, 4, seed=3)
        for c in keys(200, seed=11):
            assert np.array_equal(
                query_rows(int(c), bf.seeds, m), bloom_rows(int(c), bf.seeds, m)[0]
            )


class TestBloomFilter:
    @pytest.mark.parametrize("m,eta", [(1 << 10, 1), (1 << 12, 3), (1 << 12, 4), (1 << 14, 6)])
    def test_no_false_negatives(self, m, eta):
        bf = BloomFilter(m, eta)
        ks = keys(500)
        bf.add(ks)
        assert bf.contains(ks).all()

    def test_empty_filter_rejects(self):
        bf = BloomFilter(1 << 12, 3)
        assert not bf.contains(keys(100)).any()

    @pytest.mark.parametrize("eta", [3, 4])
    def test_fp_rate_close_to_theory(self, eta):
        n, target = 2000, 0.02
        m = optimal_bits(n, target)
        bf = BloomFilter(m, eta)
        bf.add(keys(n, seed=1))
        fp = bf.contains(keys(20_000, seed=2)).mean()
        # eta != optimal, so allow generous slack around the load**eta model.
        assert fp < 0.15
        assert abs(fp - bf.fp_estimate()) < 0.05

    def test_fp_decreases_with_m(self):
        ks = keys(1000, seed=3)
        probes = keys(20_000, seed=4)
        fps = []
        for m in (1 << 11, 1 << 13, 1 << 15):
            bf = BloomFilter(m, 3)
            bf.add(ks)
            fps.append(bf.contains(probes).mean())
        assert fps[0] > fps[1] > fps[2]

    def test_add_idempotent(self):
        bf1, bf2 = BloomFilter(1 << 10, 3), BloomFilter(1 << 10, 3)
        ks = keys(100)
        bf1.add(ks)
        bf2.add(ks)
        bf2.add(ks)
        assert bf1 == bf2

    def test_scalar_add_and_contains(self):
        bf = BloomFilter(1 << 10, 3)
        bf.add(42)
        assert bf.contains(42).all()

    def test_merge_is_union(self):
        a, b = BloomFilter(1 << 12, 3), BloomFilter(1 << 12, 3)
        ka, kb = keys(200, seed=5), keys(200, seed=6)
        a.add(ka)
        b.add(kb)
        merged = a.merge(b)
        assert merged.contains(ka).all() and merged.contains(kb).all()
        direct = BloomFilter(1 << 12, 3)
        direct.add(np.concatenate([ka, kb]))
        assert merged == direct

    def test_merge_incompatible_raises(self):
        with pytest.raises(ValueError, match="incompatible"):
            BloomFilter(1 << 10, 3).merge(BloomFilter(1 << 11, 3))
        with pytest.raises(ValueError, match="incompatible"):
            BloomFilter(1 << 10, 3).merge(BloomFilter(1 << 10, 4))
        with pytest.raises(ValueError, match="incompatible"):
            BloomFilter(1 << 10, 3, seed=0).merge(BloomFilter(1 << 10, 3, seed=1))

    def test_seed_isolates_filters(self):
        a, b = BloomFilter(1 << 12, 3, seed=1), BloomFilter(1 << 12, 3, seed=2)
        ks = keys(100)
        a.add(ks)
        b.add(ks)
        assert not np.array_equal(a.bits, b.bits)

    def test_load_counts_set_bits(self):
        bf = BloomFilter(64, 1)
        bf.add(np.array([1], dtype=np.int64))
        assert bf.load == 1 / 64

    @pytest.mark.parametrize("m,eta", [(0, 3), (-1, 3), (10, 0)])
    def test_bad_params_raise(self, m, eta):
        with pytest.raises(ValueError):
            BloomFilter(m, eta)

    def test_non_byte_aligned_m(self):
        bf = BloomFilter(1001, 3)
        ks = keys(100)
        bf.add(ks)
        assert bf.contains(ks).all()

    @settings(max_examples=30, deadline=None)
    @given(st.lists(st.integers(min_value=0, max_value=2**61), min_size=1, max_size=50))
    def test_no_false_negatives_hypothesis(self, xs):
        bf = BloomFilter(1 << 12, 3)
        arr = np.array(xs, dtype=np.int64)
        bf.add(arr)
        assert bf.contains(arr).all()


class TestSizing:
    def test_optimal_bits_monotone_in_n(self):
        assert optimal_bits(2000, 0.01) > optimal_bits(1000, 0.01)

    def test_optimal_bits_monotone_in_fp(self):
        assert optimal_bits(1000, 0.001) > optimal_bits(1000, 0.01)

    def test_optimal_bits_known_value(self):
        # ~9.59 bits/key at 1% FP.
        assert abs(optimal_bits(10_000, 0.01) / 10_000 - 9.585) < 0.01

    @pytest.mark.parametrize("fp", [0.0, 1.0, -0.5, 2.0])
    def test_optimal_bits_bad_fp(self, fp):
        with pytest.raises(ValueError):
            optimal_bits(100, fp)

    def test_optimal_eta(self):
        assert optimal_eta(optimal_bits(1000, 0.01), 1000) == 7
        assert optimal_eta(10, 1_000_000) == 1
