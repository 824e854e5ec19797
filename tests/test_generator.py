"""Tests for the synthetic genome corpus generator (NCBI substitute)."""
import numpy as np
import pandas as pd
import pytest

from repro.genomes.generator import (
    CorpusConfig,
    PAPER_2500,
    PAPER_3480,
    corpus_stats,
    file_specs,
    gene_pool,
    genome_corpus,
    materialise_spec,
)
from tests.conftest import DUPED, SMALL, file_kmer_sets


class TestConfig:
    def test_defaults_valid(self):
        CorpusConfig()

    @pytest.mark.parametrize(
        "kw",
        [
            {"n_files": 0},
            {"gene_len": 10},
            {"gene_pool_size": 0},
            {"dup_fraction": 1.0},
            {"dup_fraction": -0.1},
        ],
    )
    def test_invalid_configs_raise(self, kw):
        with pytest.raises(ValueError):
            CorpusConfig(**kw)

    def test_duplicate_split(self):
        cfg = CorpusConfig(n_files=40, dup_fraction=0.25)
        assert cfg.n_duplicates == 10 and cfg.n_originals == 30

    def test_paper_configs_match_paper_counts(self):
        assert PAPER_3480.n_files == 3480
        assert PAPER_2500.n_files == 2500


class TestGenePool:
    def test_deterministic(self):
        assert gene_pool(SMALL) == gene_pool(SMALL)

    def test_seed_changes_pool(self):
        other = CorpusConfig(**{**SMALL.__dict__, "seed": SMALL.seed + 1})
        assert gene_pool(other) != gene_pool(SMALL)

    def test_shape_and_alphabet(self):
        pool = gene_pool(SMALL)
        assert len(pool) == SMALL.gene_pool_size
        assert all(len(g) == SMALL.gene_len for g in pool)
        assert all(set(g) <= set("ACGT") for g in pool)


class TestFileSpecs:
    def test_counts_and_ids(self):
        specs = file_specs(DUPED)
        assert len(specs) == DUPED.n_files
        assert sorted(specs["file_id"]) == list(range(DUPED.n_files))

    def test_originals_have_no_source(self):
        specs = file_specs(DUPED)
        originals = specs[specs["file_id"] < DUPED.n_originals]
        assert (originals["dup_of"] == -1).all()

    def test_duplicates_copy_recipe(self):
        specs = file_specs(DUPED).set_index("file_id")
        dups = specs[specs["dup_of"] >= 0]
        assert len(dups) == DUPED.n_duplicates
        for fid, row in dups.iterrows():
            src = specs.loc[int(row["dup_of"])]
            assert row["gene_ids"] == src["gene_ids"]
            assert row["private_seed"] == src["private_seed"]

    def test_gene_ids_within_pool(self):
        specs = file_specs(SMALL)
        for gids in specs["gene_ids"]:
            assert all(0 <= int(g) < SMALL.gene_pool_size for g in gids.split(","))

    def test_deterministic(self):
        pd.testing.assert_frame_equal(file_specs(SMALL), file_specs(SMALL))


class TestMaterialise:
    def test_sequence_is_genes_plus_private(self):
        pool = gene_pool(SMALL)
        spec = file_specs(SMALL).iloc[0]
        seq = materialise_spec(spec, pool, SMALL)
        genes = "".join(pool[int(i)] for i in spec["gene_ids"].split(","))
        assert seq.startswith(genes)
        assert len(seq) == len(genes) + SMALL.private_len

    def test_duplicate_differs_only_in_tail(self):
        pool = gene_pool(DUPED)
        specs = file_specs(DUPED).set_index("file_id", drop=False)
        dup = specs[specs["dup_of"] >= 0].iloc[0]
        src = specs.loc[int(dup["dup_of"])]
        s_dup, s_src = (materialise_spec(s, pool, DUPED) for s in (dup, src))
        assert len(s_dup) == len(s_src)
        assert s_dup != s_src
        assert s_dup[: -DUPED.dup_mutation_len] == s_src[: -DUPED.dup_mutation_len]


class TestCorpusDataFrame:
    def test_row_count_and_schema(self, corpus):
        assert corpus.count() == SMALL.n_files
        assert [f.name for f in corpus.schema.fields] == ["file_id", "seq"]

    def test_file_ids_unique_and_dense(self, corpus_pdf):
        assert sorted(corpus_pdf["file_id"]) == list(range(SMALL.n_files))

    def test_deterministic_across_builds(self, spark, corpus_pdf):
        again = (
            genome_corpus(spark, SMALL).toPandas().sort_values("file_id").reset_index(drop=True)
        )
        pd.testing.assert_frame_equal(corpus_pdf, again)

    def test_matches_driver_materialisation(self, corpus_pdf):
        pool = gene_pool(SMALL)
        specs = file_specs(SMALL).set_index("file_id", drop=False)
        for fid in (0, 7, SMALL.n_files - 1):
            assert corpus_pdf.loc[fid, "seq"] == materialise_spec(specs.loc[fid], pool, SMALL)

    def test_alphabet(self, corpus_pdf):
        assert all(set(s) <= set("ACGT") for s in corpus_pdf["seq"])


class TestRedundancyAndDuplicates:
    def test_corpus_stats(self, kmers):
        stats = corpus_stats(kmers)
        assert stats.n_files == SMALL.n_files
        # Zipfian gene sharing must produce real cross-file redundancy …
        assert stats.mean_multiplicity > 1.5
        # … while private segments keep files distinguishable.
        assert stats.universe_size > SMALL.n_files * 50

    def test_private_kmers_exist_per_file(self, kmers_pdf):
        sets = file_kmer_sets(kmers_pdf)
        for fid, s in sets.items():
            others = set().union(*(v for f, v in sets.items() if f != fid))
            assert s - others, f"file {fid} has no unique k-mers"

    def test_injected_duplicates_have_high_jaccard(self, spark, duped_kmers):
        sets = file_kmer_sets(duped_kmers.toPandas())
        specs = file_specs(DUPED)
        dups = specs[specs["dup_of"] >= 0]
        assert len(dups) > 0
        for _, row in dups.iterrows():
            a, b = sets[int(row["file_id"])], sets[int(row["dup_of"])]
            j = len(a & b) / len(a | b)
            assert j > 0.9, f"near-duplicate pair has Jaccard {j:.3f}"

    def test_unrelated_files_low_jaccard(self, kmers_pdf):
        sets = file_kmer_sets(kmers_pdf)
        g = np.random.default_rng(0)
        pairs = [(int(a), int(b)) for a, b in g.integers(0, SMALL.n_files, (30, 2)) if a != b]
        js = [len(sets[a] & sets[b]) / len(sets[a] | sets[b]) for a, b in pairs]
        assert np.mean(js) < 0.6
