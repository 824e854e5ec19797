"""Parameter-sweep driver for the paper's evaluation (Figures 5–8, scaling).

One sweep covers a corpus at the paper's geometry: for each
``eta ∈ {3, 4}`` and each Bloom-size point (expressed as *bits per stored
key per column*, the knob the paper turns by "changing the size of the
Bloom filters"), build BIGSI and RAMBO and record false-positive rate,
per-query time, and memory. Query-time-vs-FP slices of the result are
Figures 5/6; memory-vs-FP slices are Figures 7/8.

The expensive distributed stages — corpus generation, k-mer extraction,
column mapping, per-column dedup — run once per corpus through Spark; each
grid point then re-hashes the collected (col, code) pairs on the driver
with :func:`repro.core.construct.scatter_matrix`, which is bit-identical to
the distributed builder (asserted in tests). This is what lets "hundreds of
experiments finish in a reasonable time" (§ V) at our scale.
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field

import numpy as np
from pyspark.sql import SparkSession
from pyspark.storagelevel import StorageLevel

from repro.core.bigsi import BigsiIndex, bigsi_mapping
from repro.core.construct import collect_colcodes, map_columns, scatter_matrix
from repro.core.eval import GroundTruth, Measurement, measure, query_workload
from repro.core.rambo import RamboIndex, partition_assignments, rambo_mapping
from repro.genomes.generator import PAPER_2500, PAPER_3480, CorpusConfig, genome_corpus
from repro.genomes.kmers import DEFAULT_K, extract_kmers

#: Default Bloom-size sweep, in bits per stored key per column. Spans the
#: same FP-rate range the paper plots (~tens of % down to well under 1%).
DEFAULT_BITS_FACTORS = (2.0, 3.0, 4.0, 6.0, 8.0, 12.0, 16.0)


@dataclass(frozen=True)
class SweepConfig:
    """One evaluation sweep (one corpus, full eta x Bloom-size grid)."""

    corpus: CorpusConfig = field(default_factory=CorpusConfig)
    k: int = DEFAULT_K
    etas: tuple[int, ...] = (3, 4)
    bits_factors: tuple[float, ...] = DEFAULT_BITS_FACTORS
    num_partitions: int = 10  # W — the paper uses 100 (N=3480) / 84 (N=2500)
    num_repetitions: int = 3  # D — the paper uses 3
    n_queries: int = 2000  # the paper uses 30 000; jobs override
    seed: int = 0


#: Paper-parameter sweeps behind Figures 5+7 and 6+8.
FIG5_SWEEP = SweepConfig(corpus=PAPER_3480, num_partitions=100, n_queries=30_000)
FIG6_SWEEP = SweepConfig(corpus=PAPER_2500, num_partitions=84, n_queries=30_000)


@dataclass
class ExpRow:
    """One grid point of the sweep — one plotted point in Figs 5–8."""

    system: str
    n_files: int
    eta: int
    bits_factor: float
    m: int
    ncols: int
    memory_bytes: int
    fp_rate: float
    false_negatives: int
    avg_query_us: float

    @property
    def memory_mb(self) -> float:
        return self.memory_bytes / 2**20


@dataclass
class SweepInputs:
    """Collected per-corpus state shared by every grid point."""

    n_files: int
    bigsi_cols: np.ndarray
    bigsi_codes: np.ndarray
    rambo_cols: np.ndarray
    rambo_codes: np.ndarray
    truth: GroundTruth
    queries: np.ndarray
    num_partitions: int
    num_repetitions: int
    seed: int

    @property
    def bigsi_keys_per_col(self) -> float:
        return len(self.bigsi_codes) / max(1, self.n_files)

    @property
    def rambo_keys_per_col(self) -> float:
        return len(self.rambo_codes) / max(1, self.num_partitions * self.num_repetitions)


def prepare_inputs(spark: SparkSession, cfg: SweepConfig) -> SweepInputs:
    """Run the distributed stages once and collect grid-point inputs."""
    n = cfg.corpus.n_files
    kmers = extract_kmers(genome_corpus(spark, cfg.corpus), cfg.k).persist(
        StorageLevel.MEMORY_AND_DISK
    )
    try:
        b_cols, b_codes = collect_colcodes(map_columns(kmers, bigsi_mapping(n)))
        assignments = partition_assignments(
            n, cfg.num_partitions, cfg.num_repetitions, seed=cfg.seed
        )
        r_cols, r_codes = collect_colcodes(
            map_columns(kmers, rambo_mapping(assignments, cfg.num_partitions))
        )
    finally:
        kmers.unpersist()
    truth = GroundTruth.from_arrays(files=b_cols, codes=b_codes)
    queries = query_workload(truth, cfg.n_queries, cfg.k, seed=cfg.seed + 7)
    return SweepInputs(
        n_files=n,
        bigsi_cols=b_cols,
        bigsi_codes=b_codes,
        rambo_cols=r_cols,
        rambo_codes=r_codes,
        truth=truth,
        queries=queries,
        num_partitions=cfg.num_partitions,
        num_repetitions=cfg.num_repetitions,
        seed=cfg.seed,
    )


def build_point(
    inputs: SweepInputs, system: str, *, eta: int, bits_factor: float
) -> "BigsiIndex | RamboIndex":
    """Build one index at one grid point from the collected pairs.

    ``m`` scales with the per-column key load, so equal ``bits_factor``
    means equal Bloom load factor — the apples-to-apples axis on which the
    two systems trade memory for FP rate.
    """
    if system == "bigsi":
        m = max(8, math.ceil(bits_factor * inputs.bigsi_keys_per_col))
        matrix = scatter_matrix(
            inputs.bigsi_cols, inputs.bigsi_codes, m, inputs.n_files, eta, seed=inputs.seed
        )
        return BigsiIndex(matrix=matrix, n_files=inputs.n_files, m=m, eta=eta, seed=inputs.seed)
    if system == "rambo":
        ncols = inputs.num_partitions * inputs.num_repetitions
        m = max(8, math.ceil(bits_factor * inputs.rambo_keys_per_col))
        matrix = scatter_matrix(
            inputs.rambo_cols, inputs.rambo_codes, m, ncols, eta, seed=inputs.seed
        )
        return RamboIndex(
            matrix=matrix,
            n_files=inputs.n_files,
            m=m,
            eta=eta,
            num_partitions=inputs.num_partitions,
            num_repetitions=inputs.num_repetitions,
            seed=inputs.seed,
        )
    raise ValueError(f"unknown system {system!r}")


def run_sweep(spark: SparkSession, cfg: SweepConfig) -> list[ExpRow]:
    """The full grid: every (system, eta, Bloom size) point, measured."""
    inputs = prepare_inputs(spark, cfg)
    rows: list[ExpRow] = []
    for eta in cfg.etas:
        for factor in cfg.bits_factors:
            for system in ("bigsi", "rambo"):
                index = build_point(inputs, system, eta=eta, bits_factor=factor)
                meas: Measurement = measure(
                    index, inputs.queries, inputs.truth, n_files=inputs.n_files
                )
                rows.append(
                    ExpRow(
                        system=system,
                        n_files=inputs.n_files,
                        eta=eta,
                        bits_factor=factor,
                        m=index.m,
                        ncols=index.ncols,
                        memory_bytes=index.memory_bytes,
                        fp_rate=meas.fp_rate,
                        false_negatives=meas.false_negatives,
                        avg_query_us=meas.avg_query_us,
                    )
                )
    return rows


def run_scaling(
    spark: SparkSession,
    *,
    n_files_grid: tuple[int, ...] = (500, 1000, 2000, 3480),
    eta: int = 3,
    bits_factor: float = 10.0,
    ref: CorpusConfig = PAPER_3480,
    ref_partitions: int = 100,
    n_queries: int = 5000,
    num_repetitions: int = 3,
    seed: int = 0,
) -> list[ExpRow]:
    """Query time vs number of files at fixed Bloom load (experiment E5).

    ``W`` scales as ``W_ref * sqrt(N / N_ref)`` — the ratio implied by the
    paper's two settings (100 @ 3480 vs 84 @ 2500 ≈ sqrt scaling) — so
    RAMBO's bitslice width grows as sqrt(N) while BIGSI's grows as N.
    """
    rows: list[ExpRow] = []
    for n in n_files_grid:
        w = max(2, round(ref_partitions * math.sqrt(n / ref.n_files)))
        cfg = SweepConfig(
            corpus=CorpusConfig(
                n_files=n,
                # Pool scales with N so k-mer multiplicity (a property of
                # the data, not of N) stays constant across grid points.
                gene_pool_size=max(10, round(ref.gene_pool_size * n / ref.n_files)),
                gene_len=ref.gene_len,
                genes_per_file=ref.genes_per_file,
                private_len=ref.private_len,
                zipf_alpha=ref.zipf_alpha,
                seed=ref.seed + n,
            ),
            etas=(eta,),
            bits_factors=(bits_factor,),
            num_partitions=w,
            num_repetitions=num_repetitions,
            n_queries=n_queries,
            seed=seed,
        )
        rows.extend(run_sweep(spark, cfg))
    return rows


def rows_to_csv(rows: list[ExpRow], path: str) -> None:
    """Persist sweep rows so the memory-view jobs can reuse a prior sweep."""
    import csv
    from dataclasses import asdict, fields

    with open(path, "w", newline="") as f:
        w = csv.DictWriter(f, fieldnames=[fld.name for fld in fields(ExpRow)])
        w.writeheader()
        for r in rows:
            w.writerow(asdict(r))


def rows_from_csv(path: str) -> list[ExpRow]:
    import csv

    out = []
    with open(path, newline="") as f:
        for rec in csv.DictReader(f):
            out.append(
                ExpRow(
                    system=rec["system"],
                    n_files=int(rec["n_files"]),
                    eta=int(rec["eta"]),
                    bits_factor=float(rec["bits_factor"]),
                    m=int(rec["m"]),
                    ncols=int(rec["ncols"]),
                    memory_bytes=int(rec["memory_bytes"]),
                    fp_rate=float(rec["fp_rate"]),
                    false_negatives=int(rec["false_negatives"]),
                    avg_query_us=float(rec["avg_query_us"]),
                )
            )
    return out


def format_rows(rows: list[ExpRow]) -> str:
    """Fixed-width table of sweep rows (what the jobs print)."""
    hdr = (
        f"{'system':>6} {'N':>5} {'eta':>3} {'bits/key':>8} {'m':>9} "
        f"{'cols':>5} {'mem_MB':>8} {'FP_%':>8} {'FN':>3} {'us/query':>9}"
    )
    lines = [hdr, "-" * len(hdr)]
    for r in rows:
        lines.append(
            f"{r.system:>6} {r.n_files:>5} {r.eta:>3} {r.bits_factor:>8.1f} "
            f"{r.m:>9} {r.ncols:>5} {r.memory_mb:>8.2f} {100 * r.fp_rate:>8.4f} "
            f"{r.false_negatives:>3} {r.avg_query_us:>9.1f}"
        )
    return "\n".join(lines)
