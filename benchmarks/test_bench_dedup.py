"""De-duplication benchmark: MinHash + LSH + exact verification (E6)."""
import pytest

from repro.dedup.lsh import dedup_files
from repro.genomes.generator import CorpusConfig, genome_corpus
from repro.genomes.kmers import extract_kmers

CFG = CorpusConfig(
    n_files=120, gene_pool_size=80, gene_len=300, genes_per_file=5,
    private_len=80, dup_fraction=0.15, dup_mutation_len=5, seed=55,
)


@pytest.fixture(scope="module")
def kmers(spark):
    df = extract_kmers(genome_corpus(spark, CFG), 31).cache()
    df.count()
    return df


def test_dedup_pipeline(benchmark, kmers):
    result = benchmark.pedantic(
        lambda: dedup_files(kmers, num_perms=48, rows_per_band=4, threshold=0.9),
        rounds=2,
        iterations=1,
    )
    assert len(result.dropped) > 0
