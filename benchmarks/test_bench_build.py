"""Construction benchmarks: the distributed build path (§ VI parallelism).

Times the full Spark dataflow (k-mer extraction → mapping → hashed-bit
dedup → collect+pack) for both systems, plus the driver-side re-hash used
by the sweep harness.
"""
import pytest

from repro.core.bigsi import BigsiIndex
from repro.core.construct import scatter_matrix
from repro.core.rambo import RamboIndex
from repro.genomes.generator import CorpusConfig, genome_corpus
from repro.genomes.kmers import extract_kmers

CFG = CorpusConfig(
    n_files=150, gene_pool_size=100, gene_len=300, genes_per_file=4,
    private_len=120, seed=77,
)


@pytest.fixture(scope="module")
def kmers(spark):
    df = extract_kmers(genome_corpus(spark, CFG), 31).cache()
    df.count()
    return df


def test_build_bigsi_distributed(benchmark, kmers):
    benchmark.pedantic(
        lambda: BigsiIndex.build(kmers, CFG.n_files, m=16384, eta=3),
        rounds=3,
        iterations=1,
    )


def test_build_rambo_distributed(benchmark, kmers):
    benchmark.pedantic(
        lambda: RamboIndex.build(
            kmers, CFG.n_files, m=65536, eta=3, num_partitions=20, num_repetitions=3
        ),
        rounds=3,
        iterations=1,
    )


def test_kmer_extraction(benchmark, spark):
    corpus = genome_corpus(spark, CFG).cache()
    corpus.count()
    benchmark.pedantic(
        lambda: extract_kmers(corpus, 31).count(), rounds=3, iterations=1
    )
    corpus.unpersist()


def test_driver_scatter(benchmark, kmers):
    pdf = kmers.toPandas()
    cols = pdf["file_id"].to_numpy("int64")
    codes = pdf["code"].to_numpy("int64")
    benchmark(lambda: scatter_matrix(cols, codes, 16384, CFG.n_files, 3))
