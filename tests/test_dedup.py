"""Tests for MinHash signatures, LSH banding, and the dedup pass."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.dedup.lsh import (
    band_buckets,
    candidate_pairs,
    collision_probability,
    dedup_files,
)
from repro.dedup.minhash import (
    estimate_jaccard,
    exact_jaccard_pairs,
    minhash_signatures,
    signature_matrix,
)
from repro.genomes.generator import file_specs
from repro.oracle import assert_equivalent
from repro.sketch.bloom import MINHASH_SEED_BASE
from repro.sketch.hashing import hash64, hash_seeds
from tests.conftest import DUPED, file_kmer_sets

N_PERMS = 48


@pytest.fixture(scope="module")
def sigs(duped_kmers):
    df = minhash_signatures(duped_kmers, N_PERMS, seed=0).cache()
    df.count()
    return df


@pytest.fixture(scope="module")
def sig_mat(sigs):
    return signature_matrix(sigs)


@pytest.fixture(scope="module")
def duped_sets(duped_kmers):
    return file_kmer_sets(duped_kmers.toPandas())


class TestSignatures:
    def test_shape(self, sigs):
        assert sigs.count() == DUPED.n_files * N_PERMS

    def test_matches_driver_reference(self, sigs, duped_sets):
        """Distributed two-level min == direct numpy min per (file, perm)."""
        seeds = hash_seeds(N_PERMS, base_seed=MINHASH_SEED_BASE + 0)
        pdf = sigs.toPandas().set_index(["file_id", "perm"])["minval"]
        for fid in list(duped_sets)[:8]:
            codes = np.array(sorted(duped_sets[fid]), dtype=np.int64)
            for p in (0, 7, N_PERMS - 1):
                want = int(hash64(codes, seeds[p]).min().astype(np.int64))
                assert int(pdf.loc[(fid, p)]) == want

    def test_deterministic(self, spark, duped_kmers, sigs):
        again = minhash_signatures(duped_kmers, N_PERMS, seed=0)
        assert again.exceptAll(sigs).count() == 0

    def test_seed_changes_signatures(self, spark, duped_kmers, sigs):
        other = minhash_signatures(duped_kmers, N_PERMS, seed=1)
        assert other.exceptAll(sigs).count() > 0

    def test_bad_num_perms(self, duped_kmers):
        with pytest.raises(ValueError):
            minhash_signatures(duped_kmers, 0)


class TestJaccardEstimation:
    def test_estimate_tracks_exact(self, sig_mat, duped_sets):
        files, mat = sig_mat
        idx = {int(f): i for i, f in enumerate(files)}
        g = np.random.default_rng(0)
        errs = []
        for a, b in g.integers(0, DUPED.n_files, (40, 2)):
            a, b = int(a), int(b)
            if a == b:
                continue
            exact = len(duped_sets[a] & duped_sets[b]) / len(duped_sets[a] | duped_sets[b])
            est = estimate_jaccard(mat[idx[a]], mat[idx[b]])
            errs.append(abs(est - exact))
        # MinHash std at P=48 is ~sqrt(J(1-J)/48) <= 0.072.
        assert np.mean(errs) < 0.08

    def test_identical_sets_estimate_one(self, sig_mat):
        files, mat = sig_mat
        assert estimate_jaccard(mat[0], mat[0]) == 1.0

    def test_mismatched_length_raises(self, sig_mat):
        _, mat = sig_mat
        with pytest.raises(ValueError):
            estimate_jaccard(mat[0], mat[0][:10])


class TestExactJaccardOracle:
    def test_against_duckdb(self, spark, duped_kmers, duped_sets):
        """Oracle check: join-based exact Jaccard == DuckDB SQL."""
        pairs = spark.createDataFrame(
            [(0, 1), (2, 3), (0, DUPED.n_files - 1)], ["a", "b"]
        )
        got = exact_jaccard_pairs(duped_kmers, pairs).select(
            "a", "b", "inter", "size_a", "size_b", "jaccard"
        )
        assert_equivalent(
            got,
            """
            WITH sizes AS (
              SELECT file_id, count(*) AS size FROM kmers GROUP BY file_id
            ),
            inter AS (
              SELECT p.a AS a, p.b AS b, count(*) AS inter
              FROM pairs p
              JOIN kmers ka ON ka.file_id = p.a
              JOIN kmers kb ON kb.file_id = p.b AND kb.code = ka.code
              GROUP BY p.a, p.b
            )
            SELECT p.a AS a, p.b AS b,
                   coalesce(i.inter, 0) AS inter,
                   sa.size AS size_a, sb.size AS size_b,
                   coalesce(i.inter, 0) * 1.0 / (sa.size + sb.size - coalesce(i.inter, 0)) AS jaccard
            FROM pairs p
            LEFT JOIN inter i ON i.a = p.a AND i.b = p.b
            JOIN sizes sa ON sa.file_id = p.a
            JOIN sizes sb ON sb.file_id = p.b
            """,
            kmers=duped_kmers,
            pairs=pairs.toPandas(),
        )

    def test_matches_set_reference(self, spark, duped_kmers, duped_sets):
        pairs = spark.createDataFrame([(4, 5), (6, 7)], ["a", "b"])
        pdf = exact_jaccard_pairs(duped_kmers, pairs).toPandas()
        for _, row in pdf.iterrows():
            a, b = int(row["a"]), int(row["b"])
            want = len(duped_sets[a] & duped_sets[b]) / len(duped_sets[a] | duped_sets[b])
            assert row["jaccard"] == pytest.approx(want)


class TestBanding:
    def test_collision_probability_scurve(self):
        assert collision_probability(0.95, 4, 12) > 0.999
        assert collision_probability(0.2, 4, 12) < 0.03
        assert collision_probability(0.0, 4, 12) == 0.0
        assert collision_probability(1.0, 4, 12) == 1.0

    def test_bucket_count(self, sigs):
        b = band_buckets(sigs, rows_per_band=4)
        assert b.count() == DUPED.n_files * (N_PERMS // 4)

    def test_identical_files_always_collide(self, spark, duped_kmers, sigs):
        """Files with identical k-mer sets share every band bucket."""
        b = band_buckets(sigs, rows_per_band=4).toPandas()
        # duplicate pairs in DUPED share all but the mutated tail — find an
        # exactly-equal pair via sigs instead: same signature ⇒ same buckets.
        by_file = b.sort_values("band").groupby("file_id")["bucket"].apply(list)
        specs = file_specs(DUPED)
        dup = specs[specs["dup_of"] >= 0].iloc[0]
        a, src = int(dup["file_id"]), int(dup["dup_of"])
        shared = sum(
            x == y for x, y in zip(by_file.loc[a], by_file.loc[src])
        )
        assert shared >= 1  # near-duplicates collide in at least one band

    def test_candidates_include_duplicates(self, sigs):
        cands = candidate_pairs(band_buckets(sigs, rows_per_band=4)).toPandas()
        got = set(zip(cands["a"], cands["b"]))
        specs = file_specs(DUPED)
        for _, row in specs[specs["dup_of"] >= 0].iterrows():
            pair = tuple(sorted((int(row["file_id"]), int(row["dup_of"]))))
            assert pair in got

    def test_candidates_ordered_distinct(self, sigs):
        cands = candidate_pairs(band_buckets(sigs, rows_per_band=4)).toPandas()
        assert (cands["a"] < cands["b"]).all()
        assert not cands.duplicated(["a", "b"]).any()


class TestDedup:
    def test_dedup_drops_exactly_true_duplicates(self, duped_kmers, duped_sets):
        """kept/dropped must match the exact-Jaccard reference computed
        directly from the k-mer sets (LSH recall + verification precision)."""
        res = dedup_files(duped_kmers, num_perms=N_PERMS, rows_per_band=4, threshold=0.9)
        # Greedy reference over *all* pairs with exact Jaccard.
        ids = sorted(duped_sets)
        kept_ref: list[int] = []
        for fid in ids:
            dup_of_kept = any(
                len(duped_sets[fid] & duped_sets[kk]) / len(duped_sets[fid] | duped_sets[kk]) > 0.9
                for kk in kept_ref
            )
            if not dup_of_kept:
                kept_ref.append(fid)
        assert res.kept.tolist() == kept_ref
        assert res.n_files == DUPED.n_files
        assert len(res.kept) + len(res.dropped) == DUPED.n_files

    def test_dedup_reduces_duplicated_corpus(self, duped_kmers):
        res = dedup_files(duped_kmers, num_perms=N_PERMS, rows_per_band=4, threshold=0.9)
        assert 0 < len(res.dropped) <= DUPED.n_duplicates + 5

    def test_threshold_one_keeps_everything(self, duped_kmers):
        res = dedup_files(duped_kmers, num_perms=N_PERMS, rows_per_band=4, threshold=1.0)
        assert len(res.kept) == DUPED.n_files

    def test_bad_band_geometry(self, duped_kmers):
        with pytest.raises(ValueError):
            dedup_files(duped_kmers, num_perms=10, rows_per_band=4)
