"""Tests for the RAMBO index — geometry, insertion, Algorithm-2 decode."""
import numpy as np
import pytest

from repro.core.rambo import RamboIndex, partition_assignments, rambo_mapping
from repro.sketch.bloom import BloomFilter
from repro.sketch.hashing import random_kmer_codes
from tests.conftest import K, SMALL, file_kmer_sets


class TestPartitionAssignments:
    @pytest.mark.parametrize("w,d", [(2, 1), (8, 3), (16, 5)])
    def test_shape_and_range(self, w, d):
        a = partition_assignments(100, w, d, seed=0)
        assert a.shape == (d, 100)
        assert a.min() >= 0 and a.max() < w

    def test_deterministic(self):
        assert np.array_equal(
            partition_assignments(50, 8, 3, seed=1), partition_assignments(50, 8, 3, seed=1)
        )

    def test_seed_changes_partitions(self):
        assert not np.array_equal(
            partition_assignments(50, 8, 3, seed=1), partition_assignments(50, 8, 3, seed=2)
        )

    def test_repetitions_independent(self):
        a = partition_assignments(200, 8, 3, seed=0)
        assert not np.array_equal(a[0], a[1])
        assert not np.array_equal(a[1], a[2])

    def test_roughly_balanced(self):
        a = partition_assignments(8000, 8, 1, seed=0)
        counts = np.bincount(a[0], minlength=8)
        assert counts.min() > 700 and counts.max() < 1300


class TestMapping:
    def test_one_column_per_repetition(self):
        a = partition_assignments(20, 4, 3, seed=0)
        m = rambo_mapping(a, 4)
        assert len(m) == 60
        per_file = m.groupby("file_id")["col"].apply(list)
        for fid, cols in per_file.items():
            assert len(cols) == 3
            for d, c in enumerate(sorted(cols)):
                assert d * 4 <= c < (d + 1) * 4

    def test_columns_match_assignments(self):
        a = partition_assignments(20, 4, 2, seed=3)
        m = rambo_mapping(a, 4).sort_values(["file_id", "col"])
        for fid in range(20):
            cols = m[m["file_id"] == fid]["col"].to_numpy()
            want = np.sort(np.array([a[0, fid], 4 + a[1, fid]]))
            assert np.array_equal(cols, want)


class TestMembers:
    def test_members_partition_every_file(self, rambo):
        for d in range(rambo.num_repetitions):
            all_members = np.concatenate(rambo.members[d])
            assert np.array_equal(np.sort(all_members), np.arange(SMALL.n_files))

    def test_members_match_assignments(self, rambo):
        for d in range(rambo.num_repetitions):
            for p in range(rambo.num_partitions):
                want = np.flatnonzero(rambo.assignments[d] == p)
                assert np.array_equal(rambo.members[d][p], want)


class TestQuery:
    def test_no_false_negatives_every_file(self, rambo, kmers_pdf):
        """Bloom filters never miss, so the true file survives every
        repetition's union and the final intersection (§ IV-B)."""
        sets = file_kmer_sets(kmers_pdf)
        g = np.random.default_rng(1)
        for fid, codes in sets.items():
            sample = g.choice(np.array(sorted(codes)), size=min(20, len(codes)), replace=False)
            for c in sample:
                assert fid in rambo.query(int(c)), f"false negative for file {fid}"

    def test_matches_merged_bloom_reference(self, rambo, kmers_pdf):
        """The index must agree exactly with a reference built from
        standalone merged Bloom filters + explicit set intersection."""
        sets = file_kmer_sets(kmers_pdf)
        # One BloomFilter per (repetition, partition) holding the union.
        ref = [
            [BloomFilter(rambo.m, rambo.eta, seed=rambo.seed) for _ in range(rambo.num_partitions)]
            for _ in range(rambo.num_repetitions)
        ]
        for fid, codes in sets.items():
            arr = np.array(sorted(codes), dtype=np.int64)
            for d in range(rambo.num_repetitions):
                ref[d][rambo.assignments[d, fid]].add(arr)
        probes = np.concatenate(
            [random_kmer_codes(150, K, seed=5), np.array(sorted(sets[3]))[:40]]
        )
        for c in probes:
            want: set | None = None
            for d in range(rambo.num_repetitions):
                union: set = set()
                for p in range(rambo.num_partitions):
                    if ref[d][p].contains(int(c))[0]:
                        union |= set(rambo.members[d][p].tolist())
                want = union if want is None else (want & union)
            assert set(rambo.query(int(c)).tolist()) == (want or set())

    def test_results_sorted_unique(self, rambo, queries):
        for c in queries[:100]:
            r = rambo.query(int(c))
            assert np.array_equal(r, np.unique(r))

    def test_query_many_matches_query(self, rambo, queries):
        many = rambo.query_many(queries[:50])
        assert all(
            np.array_equal(m, rambo.query(int(c))) for m, c in zip(many, queries[:50])
        )

    def test_intersection_tightens_with_repetitions(self, kmers):
        """More repetitions prune more false positives (the CMS argument)."""
        probes = random_kmer_codes(300, K, seed=9)
        fp_counts = []
        for d in (1, 2, 3):
            idx = RamboIndex.build(
                kmers, SMALL.n_files, m=8192, eta=3, num_partitions=6, num_repetitions=d
            )
            fp_counts.append(sum(len(idx.query(int(c))) for c in probes))
        assert fp_counts[0] > fp_counts[1] > fp_counts[2]

    def test_fp_rate_drops_with_m(self, kmers):
        probes = random_kmer_codes(300, K, seed=10)
        rates = []
        for m in (4096, 16384, 65536):
            idx = RamboIndex.build(
                kmers, SMALL.n_files, m=m, eta=3, num_partitions=8, num_repetitions=3
            )
            rates.append(sum(len(idx.query(int(c))) for c in probes))
        assert rates[0] >= rates[1] >= rates[2]
        assert rates[2] < rates[0]


class TestGeometry:
    def test_ncols_far_below_n_files(self, rambo):
        assert rambo.ncols == 24 < SMALL.n_files

    def test_column_count_independent_of_files(self, kmers):
        """RAMBO's key property: adding datasets never adds columns."""
        a = RamboIndex.build(kmers, SMALL.n_files, m=2048, eta=3, num_partitions=5, num_repetitions=2)
        assert a.ncols == 10

    def test_memory_includes_metadata(self, rambo):
        assert rambo.memory_bytes > rambo.matrix.memory_bytes

    @pytest.mark.parametrize("eta", [3, 4])
    def test_eta_variants(self, kmers, eta):
        idx = RamboIndex.build(
            kmers, SMALL.n_files, m=4096, eta=eta, num_partitions=4, num_repetitions=2
        )
        assert len(idx.seeds) == eta
