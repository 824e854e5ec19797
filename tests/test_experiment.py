"""Tests for the sweep harness (the machinery behind Figures 5–8 and E5)."""
import numpy as np
import pytest

from repro.core.bigsi import BigsiIndex
from repro.core.experiment import (
    ExpRow,
    FIG5_SWEEP,
    FIG6_SWEEP,
    SweepConfig,
    build_point,
    format_rows,
    prepare_inputs,
    rows_from_csv,
    rows_to_csv,
    run_scaling,
    run_sweep,
)
from repro.core.rambo import RamboIndex
from repro.genomes.generator import CorpusConfig

TINY = SweepConfig(
    corpus=CorpusConfig(
        n_files=30, gene_pool_size=25, gene_len=90, genes_per_file=3, private_len=70, seed=42
    ),
    etas=(3,),
    bits_factors=(4.0, 12.0),
    num_partitions=5,
    num_repetitions=2,
    n_queries=200,
    seed=1,
)


@pytest.fixture(scope="module")
def inputs(spark):
    return prepare_inputs(spark, TINY)


@pytest.fixture(scope="module")
def rows(spark):
    return run_sweep(spark, TINY)


class TestPrepareInputs:
    def test_shapes(self, inputs):
        assert inputs.n_files == 30
        assert len(inputs.bigsi_cols) == len(inputs.bigsi_codes) > 0
        assert len(inputs.rambo_cols) == len(inputs.rambo_codes) > 0
        assert len(inputs.queries) == 200

    def test_rambo_pairs_fewer_than_bigsi_times_reps(self, inputs):
        """Merging dedupes shared k-mers, so RAMBO stores fewer than D x
        BIGSI's pairs — the redundancy saving the paper's memory story uses."""
        assert len(inputs.rambo_codes) < 2 * len(inputs.bigsi_codes)

    def test_keys_per_col(self, inputs):
        assert inputs.bigsi_keys_per_col == pytest.approx(len(inputs.bigsi_codes) / 30)
        assert inputs.rambo_keys_per_col == pytest.approx(len(inputs.rambo_codes) / 10)

    def test_truth_covers_corpus(self, inputs):
        assert len(inputs.truth.codes) > 1000


class TestBuildPoint:
    def test_bigsi_point(self, inputs):
        idx = build_point(inputs, "bigsi", eta=3, bits_factor=8.0)
        assert isinstance(idx, BigsiIndex)
        assert idx.ncols == 30
        assert idx.m >= 8 * inputs.bigsi_keys_per_col - 1

    def test_rambo_point(self, inputs):
        idx = build_point(inputs, "rambo", eta=3, bits_factor=8.0)
        assert isinstance(idx, RamboIndex)
        assert idx.ncols == 10

    def test_unknown_system(self, inputs):
        with pytest.raises(ValueError):
            build_point(inputs, "sbt", eta=3, bits_factor=8.0)

    def test_equal_factor_similar_load(self, inputs):
        """Equal bits/key ⇒ comparable Bloom fill on both systems."""
        b = build_point(inputs, "bigsi", eta=3, bits_factor=8.0)
        r = build_point(inputs, "rambo", eta=3, bits_factor=8.0)
        load_b = b.matrix.bits_set / (b.matrix.m * b.ncols)
        load_r = r.matrix.bits_set / (r.matrix.m * r.ncols)
        assert 0.5 < load_b / load_r < 2.0


class TestRunSweep:
    def test_row_count(self, rows):
        # etas x factors x systems
        assert len(rows) == 1 * 2 * 2

    def test_zero_false_negatives_everywhere(self, rows):
        assert all(r.false_negatives == 0 for r in rows)

    def test_fp_decreases_with_bits(self, rows):
        for system in ("bigsi", "rambo"):
            sys_rows = sorted(
                (r for r in rows if r.system == system), key=lambda r: r.bits_factor
            )
            assert sys_rows[0].fp_rate >= sys_rows[-1].fp_rate

    def test_rambo_fewer_columns(self, rows):
        for r in rows:
            if r.system == "rambo":
                assert r.ncols == 10 < 30

    def test_timing_positive(self, rows):
        assert all(r.avg_query_us > 0 for r in rows)

    def test_paper_sweep_geometry(self):
        assert FIG5_SWEEP.corpus.n_files == 3480 and FIG5_SWEEP.num_partitions == 100
        assert FIG6_SWEEP.corpus.n_files == 2500 and FIG6_SWEEP.num_partitions == 84
        assert FIG5_SWEEP.num_repetitions == FIG6_SWEEP.num_repetitions == 3
        assert FIG5_SWEEP.n_queries == 30_000


class TestScaling:
    def test_scaling_run(self, spark):
        rows = run_scaling(
            spark,
            n_files_grid=(20, 40),
            eta=3,
            bits_factor=8.0,
            ref=CorpusConfig(
                n_files=40, gene_pool_size=25, gene_len=90, genes_per_file=3,
                private_len=70, seed=9,
            ),
            ref_partitions=8,
            n_queries=100,
            num_repetitions=2,
        )
        assert len(rows) == 4
        ns = sorted({r.n_files for r in rows})
        assert ns == [20, 40]
        # W scales sub-linearly: at N=20 the RAMBO width must be below 8x2.
        small_rambo = next(r for r in rows if r.system == "rambo" and r.n_files == 20)
        big_rambo = next(r for r in rows if r.system == "rambo" and r.n_files == 40)
        assert small_rambo.ncols < big_rambo.ncols <= 16


class TestRowSerde:
    def test_csv_roundtrip(self, rows, tmp_path):
        p = str(tmp_path / "rows.csv")
        rows_to_csv(rows, p)
        back = rows_from_csv(p)
        assert back == rows

    def test_format_rows(self, rows):
        text = format_rows(rows)
        assert "system" in text and "bigsi" in text and "rambo" in text
        assert len(text.splitlines()) == len(rows) + 2

    def test_memory_mb(self):
        r = ExpRow("bigsi", 10, 3, 8.0, 100, 10, 2 << 20, 0.01, 0, 5.0)
        assert r.memory_mb == 2.0
