"""Benchmark fixtures: two corpus sizes so the scaling shape is visible.

``BENCH_LARGE`` vs ``BENCH_SMALL`` differ ~3.5x in file count with RAMBO
width scaled by sqrt (the paper's W-vs-N ratio), mirroring the 3480-vs-2500
comparison at a size that builds in seconds.
"""
import numpy as np
import pytest

from repro.core.experiment import SweepConfig, build_point, prepare_inputs
from repro.genomes.generator import CorpusConfig

ETA = 3
BITS_FACTOR = 10.0

BENCH_SMALL = SweepConfig(
    corpus=CorpusConfig(
        n_files=300, gene_pool_size=200, gene_len=300, genes_per_file=4,
        private_len=120, seed=300,
    ),
    etas=(ETA,),
    bits_factors=(BITS_FACTOR,),
    num_partitions=29,  # 100 * sqrt(300/3480)
    num_repetitions=3,
    n_queries=2000,
    seed=0,
)
BENCH_LARGE = SweepConfig(
    corpus=CorpusConfig(
        n_files=1000, gene_pool_size=600, gene_len=300, genes_per_file=4,
        private_len=120, seed=1000,
    ),
    etas=(ETA,),
    bits_factors=(BITS_FACTOR,),
    num_partitions=54,  # 100 * sqrt(1000/3480)
    num_repetitions=3,
    n_queries=2000,
    seed=0,
)


@pytest.fixture(scope="session")
def inputs_small(spark):
    return prepare_inputs(spark, BENCH_SMALL)


@pytest.fixture(scope="session")
def inputs_large(spark):
    return prepare_inputs(spark, BENCH_LARGE)


@pytest.fixture(scope="session")
def indexes_small(inputs_small):
    return {
        s: build_point(inputs_small, s, eta=ETA, bits_factor=BITS_FACTOR)
        for s in ("bigsi", "rambo")
    }


@pytest.fixture(scope="session")
def indexes_large(inputs_large):
    return {
        s: build_point(inputs_large, s, eta=ETA, bits_factor=BITS_FACTOR)
        for s in ("bigsi", "rambo")
    }
