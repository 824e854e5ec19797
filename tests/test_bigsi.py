"""Tests for the BIGSI baseline index."""
import numpy as np
import pytest

from repro.core.bigsi import BigsiIndex, bigsi_mapping
from repro.sketch.bloom import BloomFilter
from repro.sketch.hashing import random_kmer_codes
from tests.conftest import K, SMALL, file_kmer_sets


class TestMapping:
    def test_identity(self):
        m = bigsi_mapping(5)
        assert m["file_id"].tolist() == m["col"].tolist() == [0, 1, 2, 3, 4]


class TestBuild:
    def test_geometry(self, bigsi):
        assert bigsi.ncols == SMALL.n_files
        assert bigsi.matrix.m == bigsi.m == 6144
        assert bigsi.eta == 3

    def test_memory_is_matrix_only(self, bigsi):
        assert bigsi.memory_bytes == bigsi.matrix.memory_bytes
        assert bigsi.memory_bytes == 6144 * ((SMALL.n_files + 7) // 8)


class TestQuery:
    def test_no_false_negatives_every_file(self, bigsi, kmers_pdf):
        """Every k-mer of every file must report that file (paper § II-A)."""
        sets = file_kmer_sets(kmers_pdf)
        g = np.random.default_rng(0)
        for fid, codes in sets.items():
            sample = g.choice(np.array(sorted(codes)), size=min(20, len(codes)), replace=False)
            for c in sample:
                assert fid in bigsi.query(int(c)), f"false negative for file {fid}"

    def test_matches_per_file_bloom_reference(self, bigsi, kmers_pdf):
        """BIGSI's column j must behave exactly like a standalone Bloom
        filter of file j built with the same (m, eta, seed)."""
        sets = file_kmer_sets(kmers_pdf)
        filters = {}
        for fid, codes in sets.items():
            bf = BloomFilter(bigsi.m, bigsi.eta, seed=bigsi.seed)
            bf.add(np.array(sorted(codes), dtype=np.int64))
            filters[fid] = bf
        probes = np.concatenate(
            [random_kmer_codes(150, K, seed=1), np.array(sorted(sets[0]))[:50]]
        )
        for c in probes:
            got = set(bigsi.query(int(c)).tolist())
            want = {fid for fid, bf in filters.items() if bf.contains(int(c))[0]}
            assert got == want

    def test_results_sorted_unique(self, bigsi, queries):
        for c in queries[:100]:
            r = bigsi.query(int(c))
            assert np.array_equal(r, np.unique(r))

    def test_query_many_matches_query(self, bigsi, queries):
        many = bigsi.query_many(queries[:50])
        assert all(
            np.array_equal(m, bigsi.query(int(c))) for m, c in zip(many, queries[:50])
        )

    def test_absent_kmer_mostly_empty(self, bigsi):
        """Random 31-mers are absent; reported files are pure FPs and rare."""
        probes = random_kmer_codes(500, K, seed=7)
        fp_cols = sum(len(bigsi.query(int(c))) for c in probes)
        assert fp_cols / (500 * SMALL.n_files) < 0.05


class TestFpBehaviour:
    def test_fp_rate_drops_with_m(self, kmers):
        probes = random_kmer_codes(400, K, seed=8)
        rates = []
        for m in (1024, 4096, 16384):
            idx = BigsiIndex.build(kmers, SMALL.n_files, m=m, eta=3)
            fp = sum(len(idx.query(int(c))) for c in probes)
            rates.append(fp / (len(probes) * SMALL.n_files))
        assert rates[0] > rates[1] > rates[2]

    @pytest.mark.parametrize("eta", [3, 4])
    def test_eta_variants_build(self, kmers, eta):
        idx = BigsiIndex.build(kmers, SMALL.n_files, m=4096, eta=eta)
        assert idx.eta == eta
        assert len(idx.seeds) == eta
