"""Tests for the shared distributed construction pipeline."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.bigsi import bigsi_mapping
from repro.core.construct import (
    build_matrix,
    collect_colcodes,
    hashed_bitpairs,
    map_columns,
    scatter_matrix,
)
from repro.core.rambo import partition_assignments, rambo_mapping
from repro.oracle import assert_equivalent
from repro.sketch.bloom import BLOOM_SEED_BASE, bloom_rows
from repro.sketch.hashing import hash_seeds
from tests.conftest import SMALL


class TestMapColumns:
    def test_bigsi_identity_mapping(self, spark, kmers, kmers_pdf):
        out = map_columns(kmers, bigsi_mapping(SMALL.n_files)).toPandas()
        got = set(zip(out["col"], out["code"]))
        want = set(zip(kmers_pdf["file_id"], kmers_pdf["code"]))
        assert got == want

    def test_rambo_mapping_merges_duplicates(self, spark, kmers):
        """Merging two files into one column deduplicates shared k-mers."""
        assignments = partition_assignments(SMALL.n_files, 4, 2, seed=0)
        mapping = rambo_mapping(assignments, 4)
        out = map_columns(kmers, mapping)
        assert out.count() == out.distinct().count()

    def test_rambo_colcodes_against_duckdb(self, spark, kmers):
        """Oracle check: the broadcast-join + distinct == SQL join distinct."""
        assignments = partition_assignments(SMALL.n_files, 4, 2, seed=0)
        mapping = rambo_mapping(assignments, 4)
        out = map_columns(kmers, mapping)
        assert_equivalent(
            out.groupBy("col").agg(F.count("*").alias("n_codes")),
            """
            SELECT col, count(*) AS n_codes
            FROM (
              SELECT DISTINCT m.col AS col, k.code AS code
              FROM kmers k JOIN mapping m USING (file_id)
            )
            GROUP BY col
            """,
            kmers=kmers,
            mapping=mapping,
        )

    def test_total_kmers_conserved(self, spark, kmers):
        """Every (file, code) lands in exactly D columns before dedup."""
        assignments = partition_assignments(SMALL.n_files, 6, 3, seed=1)
        mapping = rambo_mapping(assignments, 6)
        joined = kmers.join(
            F.broadcast(spark.createDataFrame(mapping)), "file_id"
        )
        assert joined.count() == kmers.count() * 3


class TestHashedBitpairs:
    def test_rows_in_range_and_distinct(self, spark, kmers):
        colcodes = map_columns(kmers, bigsi_mapping(SMALL.n_files))
        pairs = hashed_bitpairs(colcodes, m=512, eta=3, seed=0)
        pdf = pairs.toPandas()
        assert pdf["row"].between(0, 511).all()
        assert pdf["col"].between(0, SMALL.n_files - 1).all()
        assert not pdf.duplicated(["row", "col"]).any()

    def test_matches_driver_hashing(self, spark):
        pdf = pd.DataFrame({"col": [0, 0, 1], "code": [11, 22, 33]})
        colcodes = spark.createDataFrame(pdf)
        got = hashed_bitpairs(colcodes, m=64, eta=4, seed=2).toPandas()
        seeds = hash_seeds(4, base_seed=BLOOM_SEED_BASE + 2)
        rows = bloom_rows(pdf["code"].to_numpy(np.int64), seeds, 64)
        want = set(zip(rows.ravel().tolist(), np.repeat(pdf["col"].to_numpy(), 4).tolist()))
        assert set(zip(got["row"], got["col"])) == want


class TestMatrixEquivalence:
    @pytest.mark.parametrize("m,eta", [(512, 3), (2048, 4)])
    def test_distributed_equals_driver_scatter(self, spark, kmers, m, eta):
        """The Spark builder and the sweep's driver scatter are bit-identical."""
        colcodes = map_columns(kmers, bigsi_mapping(SMALL.n_files))
        distributed = build_matrix(colcodes, m, SMALL.n_files, eta, seed=0)
        cols, codes = collect_colcodes(colcodes)
        driver = scatter_matrix(cols, codes, m, SMALL.n_files, eta, seed=0)
        assert distributed == driver

    def test_rambo_distributed_equals_driver(self, spark, kmers):
        assignments = partition_assignments(SMALL.n_files, 8, 3, seed=0)
        colcodes = map_columns(kmers, rambo_mapping(assignments, 8))
        distributed = build_matrix(colcodes, 4096, 24, 3, seed=0)
        cols, codes = collect_colcodes(colcodes)
        assert distributed == scatter_matrix(cols, codes, 4096, 24, 3, seed=0)

    def test_seed_changes_matrix(self, spark, kmers):
        colcodes = map_columns(kmers, bigsi_mapping(SMALL.n_files))
        cols, codes = collect_colcodes(colcodes)
        a = scatter_matrix(cols, codes, 1024, SMALL.n_files, 3, seed=0)
        b = scatter_matrix(cols, codes, 1024, SMALL.n_files, 3, seed=9)
        assert a != b

    def test_bits_set_bounded_by_insertions(self, spark, kmers):
        colcodes = map_columns(kmers, bigsi_mapping(SMALL.n_files))
        cols, codes = collect_colcodes(colcodes)
        M = scatter_matrix(cols, codes, 1 << 15, SMALL.n_files, 3, seed=0)
        assert 0 < M.bits_set <= len(codes) * 3
