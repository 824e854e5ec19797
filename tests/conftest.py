"""Shared fixtures: one small corpus + k-mer table + built indexes.

Everything is session-scoped on top of the session ``spark`` fixture so the
distributed stages (corpus generation, k-mer extraction) run once for the
whole suite; tests treat these as immutable inputs.
"""
import numpy as np
import pytest

from repro.core.bigsi import BigsiIndex
from repro.core.eval import GroundTruth, query_workload
from repro.core.rambo import RamboIndex
from repro.genomes.generator import CorpusConfig, genome_corpus
from repro.genomes.kmers import extract_kmers

K = 31
SMALL = CorpusConfig(
    n_files=48,
    gene_pool_size=36,
    gene_len=110,
    genes_per_file=3,
    private_len=90,
    zipf_alpha=1.2,
    seed=11,
)
DUPED = CorpusConfig(
    n_files=40,
    gene_pool_size=30,
    gene_len=300,
    genes_per_file=5,
    private_len=80,
    dup_fraction=0.25,
    dup_mutation_len=5,
    seed=21,
)


@pytest.fixture(scope="session")
def corpus(spark):
    df = genome_corpus(spark, SMALL).cache()
    df.count()
    return df


@pytest.fixture(scope="session")
def corpus_pdf(corpus):
    return corpus.toPandas().sort_values("file_id").reset_index(drop=True)


@pytest.fixture(scope="session")
def kmers(spark, corpus):
    df = extract_kmers(corpus, K).cache()
    df.count()
    return df


@pytest.fixture(scope="session")
def kmers_pdf(kmers):
    return kmers.toPandas().sort_values(["file_id", "code"]).reset_index(drop=True)


@pytest.fixture(scope="session")
def truth(kmers):
    return GroundTruth.from_pairs_df(kmers)


@pytest.fixture(scope="session")
def queries(truth):
    return query_workload(truth, 400, K, seed=3)


@pytest.fixture(scope="session")
def bigsi(kmers):
    return BigsiIndex.build(kmers, SMALL.n_files, m=6144, eta=3, seed=0)


@pytest.fixture(scope="session")
def rambo(kmers):
    return RamboIndex.build(
        kmers, SMALL.n_files, m=24576, eta=3, num_partitions=8, num_repetitions=3, seed=0
    )


@pytest.fixture(scope="session")
def duped_corpus(spark):
    df = genome_corpus(spark, DUPED).cache()
    df.count()
    return df


@pytest.fixture(scope="session")
def duped_kmers(spark, duped_corpus):
    df = extract_kmers(duped_corpus, K).cache()
    df.count()
    return df


def file_kmer_sets(kmers_pdf) -> dict[int, set[int]]:
    """Exact per-file k-mer sets from the collected pair table."""
    return {
        int(fid): set(grp["code"].tolist())
        for fid, grp in kmers_pdf.groupby("file_id")
    }
