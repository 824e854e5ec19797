"""Tests for ground truth, FP measurement, and the distributed query path."""
import numpy as np
import pandas as pd
import pytest

from repro.core.eval import (
    GroundTruth,
    Measurement,
    distributed_query,
    ground_truth_pairs,
    measure,
    query_workload,
    time_queries,
)
from repro.oracle import assert_equivalent
from repro.sketch.hashing import random_kmer_codes
from tests.conftest import K, SMALL, file_kmer_sets


class TestGroundTruth:
    def test_lookup_matches_sets(self, truth, kmers_pdf):
        sets = file_kmer_sets(kmers_pdf)
        g = np.random.default_rng(0)
        for fid in g.integers(0, SMALL.n_files, 10):
            codes = sorted(sets[int(fid)])[:10]
            for c in codes:
                assert int(fid) in truth.lookup(int(c))

    def test_lookup_absent_code_empty(self, truth):
        for c in random_kmer_codes(50, K, seed=1):
            hits = truth.lookup(int(c))
            assert len(hits) == 0 or int(c) in truth.codes

    def test_lookup_sorted_unique(self, truth):
        for c in truth.codes[:200]:
            r = truth.lookup(int(c))
            assert len(r) > 0
            assert np.array_equal(r, np.unique(r))

    def test_from_arrays_equals_from_pairs(self, kmers, kmers_pdf, truth):
        t2 = GroundTruth.from_arrays(
            files=kmers_pdf["file_id"].to_numpy(np.int64),
            codes=kmers_pdf["code"].to_numpy(np.int64),
        )
        assert np.array_equal(t2.codes, truth.codes)
        for c in truth.codes[:100]:
            assert np.array_equal(t2.lookup(int(c)), truth.lookup(int(c)))


class TestGroundTruthPairsOracle:
    def test_spark_join_against_duckdb(self, spark, kmers, truth):
        """Oracle check: the distributed ground-truth join == DuckDB SQL."""
        codes = np.concatenate([truth.codes[:100], random_kmer_codes(100, K, seed=2)])
        got = ground_truth_pairs(spark, kmers, codes)
        assert_equivalent(
            got,
            """
            SELECT k.code AS code, k.file_id AS file_id
            FROM kmers k
            JOIN (SELECT DISTINCT code FROM queries) q USING (code)
            """,
            kmers=kmers,
            queries=pd.DataFrame({"code": codes}),
        )

    def test_spark_join_matches_driver_lookup(self, spark, kmers, truth):
        codes = truth.codes[:50]
        pdf = ground_truth_pairs(spark, kmers, codes).toPandas()
        for c in codes:
            want = set(truth.lookup(int(c)).tolist())
            got = set(pdf.loc[pdf["code"] == c, "file_id"].tolist())
            assert got == want


class TestQueryWorkload:
    def test_size_and_determinism(self, truth):
        a = query_workload(truth, 200, K, seed=5)
        b = query_workload(truth, 200, K, seed=5)
        assert len(a) == 200
        assert np.array_equal(a, b)

    def test_half_present(self, truth):
        q = query_workload(truth, 300, K, seed=6)
        present = np.isin(q, truth.codes).sum()
        assert present >= 150  # 150 sampled positives; negatives ~never collide

    def test_seed_changes_workload(self, truth):
        assert not np.array_equal(
            query_workload(truth, 100, K, seed=1), query_workload(truth, 100, K, seed=2)
        )


class _PerfectIndex:
    """Oracle-backed index: answers exactly — used to pin down accounting."""

    def __init__(self, truth):
        self.truth = truth

    def query(self, code):
        return self.truth.lookup(code)


class _OverreportingIndex(_PerfectIndex):
    """Always adds file 0 — one FP per query where 0 is not a true hit."""

    def query(self, code):
        return np.union1d(self.truth.lookup(code), [0])


class TestMeasure:
    def test_perfect_index_scores_clean(self, truth, queries):
        m = measure(_PerfectIndex(truth), queries[:100], truth, n_files=SMALL.n_files)
        assert m.false_positives == 0
        assert m.false_negatives == 0
        assert m.fp_rate == 0.0
        assert m.n_queries == 100

    def test_overreporting_counted(self, truth, queries):
        qs = queries[:100]
        m = measure(_OverreportingIndex(truth), qs, truth, n_files=SMALL.n_files)
        spurious = sum(1 for c in qs if 0 not in truth.lookup(int(c)))
        assert m.false_positives == spurious
        assert m.false_negatives == 0

    def test_negatives_accounting(self, truth, queries):
        qs = queries[:50]
        m = measure(_PerfectIndex(truth), qs, truth, n_files=SMALL.n_files)
        want_neg = sum(SMALL.n_files - len(truth.lookup(int(c))) for c in qs)
        assert m.negatives == want_neg

    def test_real_indexes_zero_fn(self, bigsi, rambo, truth, queries):
        for idx in (bigsi, rambo):
            m = measure(idx, queries, truth, n_files=SMALL.n_files)
            assert m.false_negatives == 0
            assert 0 <= m.fp_rate < 0.5
            assert m.avg_query_us > 0

    def test_fp_rate_property(self):
        m = Measurement(10, 5, 1, 0, 100, 1.0)
        assert m.fp_rate == 0.05


class TestTiming:
    def test_time_queries_positive(self, bigsi, queries):
        t = time_queries(bigsi, queries[:50], repeats=2)
        assert 0 < t < 1.0


class TestDistributedQuery:
    @pytest.mark.parametrize("which", ["bigsi", "rambo"])
    def test_matches_driver_engine(self, spark, bigsi, rambo, truth, queries, which):
        idx = {"bigsi": bigsi, "rambo": rambo}[which]
        codes = queries[:80]
        pdf = distributed_query(spark, idx, codes).toPandas()
        for c in codes:
            got = np.sort(pdf.loc[pdf["code"] == c, "file_id"].to_numpy())
            assert np.array_equal(got, idx.query(int(c)))

    def test_superset_of_truth_via_oracle(self, spark, kmers, bigsi, truth):
        """Distributed results must contain the exact DuckDB answer set."""
        codes = truth.codes[:60]
        got = distributed_query(spark, bigsi, codes).toPandas()
        exact = ground_truth_pairs(spark, kmers, codes).toPandas()
        got_pairs = set(zip(got["code"], got["file_id"]))
        exact_pairs = set(zip(exact["code"], exact["file_id"]))
        assert exact_pairs <= got_pairs
