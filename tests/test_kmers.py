"""Tests for k-mer extraction — vectorised path vs Catalyst path vs DuckDB."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.genomes.kmers import (
    DEFAULT_K,
    encode_kmer_strings,
    extract_kmers,
    kmer_strings,
    sequence_codes,
)
from repro.oracle import assert_equivalent
from repro.sketch.hashing import decode_kmer, encode_kmers
from tests.conftest import K, SMALL


def naive_kmers(seq: str, k: int) -> list[str]:
    return [seq[i : i + k] for i in range(len(seq) - k + 1)]


class TestSequenceCodes:
    @pytest.mark.parametrize("k", [1, 4, 15, 31])
    def test_matches_naive(self, k):
        g = np.random.default_rng(k)
        seq = "".join(g.choice(list("ACGT"), 200))
        got = [decode_kmer(c, k) for c in sequence_codes(seq, k)]
        assert got == naive_kmers(seq, k)

    def test_matches_encode_kmers(self):
        seq = "ACGTACGTTTGCA"
        assert np.array_equal(sequence_codes(seq, 5), encode_kmers(naive_kmers(seq, 5), 5))

    def test_short_sequence_empty(self):
        assert len(sequence_codes("ACG", 4)) == 0

    def test_exact_length_single(self):
        assert len(sequence_codes("ACGT", 4)) == 1

    def test_bad_k(self):
        with pytest.raises(ValueError):
            sequence_codes("ACGT", 0)
        with pytest.raises(ValueError):
            sequence_codes("A" * 40, 32)


class TestExtractKmers:
    def test_schema(self, kmers):
        assert [f.name for f in kmers.schema.fields] == ["file_id", "code"]

    def test_distinct_within_file(self, kmers_pdf):
        assert not kmers_pdf.duplicated(["file_id", "code"]).any()

    def test_counts_match_driver_reference(self, corpus_pdf, kmers_pdf):
        for fid in (0, 5, SMALL.n_files - 1):
            seq = corpus_pdf.loc[corpus_pdf["file_id"] == fid, "seq"].iloc[0]
            want = set(np.unique(sequence_codes(seq, K)).tolist())
            got = set(kmers_pdf.loc[kmers_pdf["file_id"] == fid, "code"].tolist())
            assert got == want

    def test_non_distinct_mode_counts(self, spark, corpus):
        nd = extract_kmers(corpus, K, distinct=False)
        total_windows = corpus.select(
            F.sum(F.length("seq") - F.lit(K - 1)).alias("w")
        ).first()["w"]
        assert nd.count() == total_windows

    def test_all_files_present(self, kmers_pdf):
        assert set(kmers_pdf["file_id"]) == set(range(SMALL.n_files))


class TestCatalystPathAndOracle:
    def test_sql_windows_match_vectorised(self, spark, corpus):
        """The Catalyst string path and the numpy code path agree exactly."""
        sql_codes = (
            encode_kmer_strings(kmer_strings(corpus, K), K)
            .groupBy("file_id", "code")
            .count()
            .drop("count")
        )
        vec = extract_kmers(corpus, K)
        assert sql_codes.exceptAll(vec).count() == 0
        assert vec.exceptAll(sql_codes).count() == 0

    def test_kmer_strings_against_duckdb(self, spark, corpus):
        """Oracle check: Catalyst window extraction == DuckDB lateral join."""
        small = corpus.where(F.col("file_id") < 6)
        counts = kmer_strings(small, K).groupBy("file_id").agg(
            F.count("*").alias("n_windows"), F.countDistinct("kmer").alias("n_distinct")
        )
        assert_equivalent(
            counts,
            f"""
            SELECT file_id,
                   count(*) AS n_windows,
                   count(DISTINCT kmer) AS n_distinct
            FROM (
              SELECT file_id, substring(seq, i, {K}) AS kmer
              FROM (
                SELECT file_id, seq,
                       unnest(generate_series(1, length(seq) - {K - 1})) AS i
                FROM corpus
              )
            )
            GROUP BY file_id
            """,
            corpus=small,
        )

    def test_kmer_strings_sample_against_duckdb(self, spark, corpus):
        """Oracle check on the actual window strings of one file."""
        one = corpus.where(F.col("file_id") == 3)
        windows = kmer_strings(one, K).groupBy("kmer").count()
        assert_equivalent(
            windows,
            f"""
            SELECT kmer, count(*) AS count
            FROM (
              SELECT substring(seq, i, {K}) AS kmer
              FROM (
                SELECT seq, unnest(generate_series(1, length(seq) - {K - 1})) AS i
                FROM corpus
              )
            )
            GROUP BY kmer
            """,
            corpus=one,
        )

    def test_short_sequences_dropped(self, spark):
        df = spark.createDataFrame(
            pd.DataFrame({"file_id": [0, 1], "seq": ["ACGT", "A" * 50]})
        )
        out = extract_kmers(df, 31).toPandas()
        assert set(out["file_id"]) == {1}
        # "A"*50 has 20 windows but only one distinct 31-mer.
        assert len(out) == 1
        nd = extract_kmers(df, 31, distinct=False).toPandas()
        assert len(nd) == 20
