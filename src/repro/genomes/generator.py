"""Synthetic genome corpus — the NCBI-assembly substitute.

The paper evaluates on 161 023 NCBI genome assemblies, de-duplicated to
136 602 files, then uniformly subsampled to 3480 and 2500 files. We have no
network and no genomic archives, so this module generates a corpus with the
two properties the paper's results rest on:

* **Cross-file redundancy** — files draw their sequence from a shared pool
  of "genes" with Zipfian popularity, so k-mers have heavy multiplicity
  across files. This is the redundancy that keeps RAMBO's merged Bloom
  filters from saturating (§ VII: "we take advantage of the redundancy of
  genome sequences among datasets").
* **Per-file unique content** — every file also carries a private random
  segment, so ground-truth query answers are non-trivial and the exact
  inverted index discriminates files.

A configurable fraction of files are *near-duplicates* of earlier files
(same genes, lightly mutated private segment → Jaccard > 0.9), exercising
the paper's LSH de-duplication preprocessing step.

Generation is a distributed map: the driver fabricates per-file *specs*
(gene ids + a private-segment seed), and executors materialise sequences
via ``mapInPandas`` with the gene pool broadcast — the same
"embarrassingly parallel over partitioned genomic files" dataflow the
reproduction targets.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

from repro.sketch.hashing import BASES, splitmix64

CORPUS_SCHEMA = T.StructType(
    [
        T.StructField("file_id", T.IntegerType(), False),
        T.StructField("seq", T.StringType(), False),
    ]
)


@dataclass(frozen=True)
class CorpusConfig:
    """Knobs for the synthetic corpus (defaults sized for unit tests)."""

    n_files: int = 60
    gene_pool_size: int = 40
    gene_len: int = 120
    genes_per_file: int = 4
    private_len: int = 100
    zipf_alpha: float = 1.2
    dup_fraction: float = 0.0
    #: characters of the private segment rewritten in a near-duplicate file
    dup_mutation_len: int = 20
    seed: int = 0

    def __post_init__(self):
        if self.n_files < 1:
            raise ValueError("n_files must be positive")
        if self.gene_pool_size < 1 or self.gene_len < 32:
            raise ValueError("gene pool must exist and genes must exceed k=31")
        if not 0 <= self.dup_fraction < 1:
            raise ValueError("dup_fraction must be in [0, 1)")

    @property
    def n_duplicates(self) -> int:
        return int(self.n_files * self.dup_fraction)

    @property
    def n_originals(self) -> int:
        return self.n_files - self.n_duplicates


#: Benchmark-scale configs matching the paper's two corpus sizes. File
#: *content* is scaled down (~2k distinct k-mers/file vs millions) so the
#: full Bloom-size x eta grid runs in minutes; file *count* matches the paper.
PAPER_3480 = CorpusConfig(
    n_files=3480, gene_pool_size=2000, gene_len=400, genes_per_file=4,
    private_len=220, zipf_alpha=1.2, seed=3480,
)
PAPER_2500 = CorpusConfig(
    n_files=2500, gene_pool_size=1500, gene_len=400, genes_per_file=4,
    private_len=220, zipf_alpha=1.2, seed=2500,
)


def _random_dna(g: np.random.Generator, length: int) -> str:
    return "".join(np.array(list(BASES))[g.integers(0, 4, length)])


def gene_pool(cfg: CorpusConfig) -> list[str]:
    """The shared gene sequences (deterministic in ``cfg.seed``)."""
    g = np.random.default_rng(int(splitmix64(cfg.seed)))
    return [_random_dna(g, cfg.gene_len) for _ in range(cfg.gene_pool_size)]


def _zipf_weights(n: int, alpha: float) -> np.ndarray:
    w = 1.0 / np.arange(1, n + 1, dtype=np.float64) ** alpha
    return w / w.sum()


def file_specs(cfg: CorpusConfig) -> pd.DataFrame:
    """Per-file recipe: which genes, which private seed, which dup source.

    Columns: ``file_id``, ``gene_ids`` (comma-joined), ``private_seed``,
    ``dup_of`` (-1 for originals). Duplicates copy the gene list and
    private seed of their source; only ``dup_mutation_len`` trailing private
    characters will differ after materialisation.
    """
    g = np.random.default_rng(int(splitmix64(cfg.seed + 1)))
    weights = _zipf_weights(cfg.gene_pool_size, cfg.zipf_alpha)
    rows = []
    for fid in range(cfg.n_originals):
        # Floor of 3 distinct genes keeps every file long enough that a
        # near-duplicate's mutated tail stays a small fraction of its
        # k-mer set (so injected duplicates reliably exceed Jaccard 0.9).
        n_genes = min(cfg.gene_pool_size, max(3, int(g.poisson(cfg.genes_per_file))))
        genes = np.sort(g.choice(cfg.gene_pool_size, size=n_genes, replace=False, p=weights))
        rows.append(
            {
                "file_id": fid,
                "gene_ids": ",".join(map(str, genes)),
                # mask to 63 bits so the seed survives Spark's signed LongType
                "private_seed": int(splitmix64(cfg.seed ^ (fid + 17))) >> 1,
                "dup_of": -1,
            }
        )
    for j in range(cfg.n_duplicates):
        src = rows[int(g.integers(0, cfg.n_originals))]
        rows.append(
            {
                "file_id": cfg.n_originals + j,
                "gene_ids": src["gene_ids"],
                "private_seed": src["private_seed"],
                "dup_of": src["file_id"],
            }
        )
    return pd.DataFrame(rows)


def materialise_spec(spec: pd.Series, pool: list[str], cfg: CorpusConfig) -> str:
    """Sequence for one file spec (pure function; shared driver/executor)."""
    genes = [pool[int(i)] for i in str(spec["gene_ids"]).split(",")]
    g = np.random.default_rng(int(spec["private_seed"]))
    private = _random_dna(g, cfg.private_len)
    if int(spec["dup_of"]) >= 0 and cfg.dup_mutation_len > 0:
        gm = np.random.default_rng(int(splitmix64(int(spec["file_id"]) + 23)))
        tail = _random_dna(gm, min(cfg.dup_mutation_len, cfg.private_len))
        private = private[: len(private) - len(tail)] + tail
    return "".join(genes) + private


def genome_corpus(spark: SparkSession, cfg: CorpusConfig = CorpusConfig()) -> DataFrame:
    """Corpus DataFrame ``(file_id, seq)`` materialised on executors."""
    pool_bc = spark.sparkContext.broadcast(gene_pool(cfg))
    specs = spark.createDataFrame(file_specs(cfg)).repartition(
        max(1, min(cfg.n_files, spark.sparkContext.defaultParallelism * 2))
    )

    def build(batches):
        pool = pool_bc.value
        for pdf in batches:
            yield pd.DataFrame(
                {
                    "file_id": pdf["file_id"].astype("int32"),
                    "seq": [materialise_spec(r, pool, cfg) for _, r in pdf.iterrows()],
                }
            )

    return specs.mapInPandas(build, schema=CORPUS_SCHEMA)


@dataclass
class CorpusStats:
    """Redundancy profile of a corpus (drives Bloom sizing decisions)."""

    n_files: int
    distinct_kmers_per_file: float
    universe_size: int
    mean_multiplicity: float
    extras: dict = field(default_factory=dict)


def corpus_stats(kmers: DataFrame) -> CorpusStats:
    """Exact redundancy stats from a ``(file_id, code)`` k-mer DataFrame.

    ``mean_multiplicity`` is the average number of files containing a
    distinct k-mer — the redundancy factor the paper's memory argument
    depends on (RAMBO's merged filters hold the *union*, which is a factor
    ``mean_multiplicity`` smaller than the sum BIGSI pays for).
    """
    from pyspark.sql import functions as F

    agg = kmers.agg(
        F.countDistinct("file_id").alias("nf"),
        F.count("*").alias("pairs"),
        F.countDistinct("code").alias("universe"),
    ).first()
    return CorpusStats(
        n_files=agg["nf"],
        distinct_kmers_per_file=agg["pairs"] / max(1, agg["nf"]),
        universe_size=agg["universe"],
        mean_multiplicity=agg["pairs"] / max(1, agg["universe"]),
    )


def cms_multiplicity_estimate(
    kmers: DataFrame, *, width: int = 1 << 16, depth: int = 4, sample: int = 2000, seed: int = 0
) -> float:
    """Sketch-based mean multiplicity: CMS point queries over sampled k-mers.

    The streaming counterpart of ``corpus_stats``: a distributed count-min
    sketch (RAMBO's ancestor structure) estimates how many files contain a
    typical k-mer without an exact group-by. Overestimates slightly (CMS
    never undercounts); tests bound it against the exact statistic.
    """
    import numpy as np

    from repro.sketch.cms import cms_from_kmers

    cms = cms_from_kmers(kmers, width, depth, seed=seed)
    # Sort so the sample is deterministic in `seed` regardless of the
    # (nondeterministic) row order Spark's distinct() returns.
    codes = np.sort(
        kmers.select("code").distinct().toPandas()["code"].to_numpy(np.int64)
    )
    g = np.random.default_rng(seed)
    probe = g.choice(codes, size=min(sample, len(codes)), replace=False)
    return float(cms.estimate(probe).mean())
