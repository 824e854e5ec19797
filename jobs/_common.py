"""Shared plumbing for spark-submit job entrypoints.

Each job exposes ``run(spark, args) -> str`` (the printed table) so tests
can drive it with the session fixture, and a ``main()`` that creates its
own local session when launched via ``spark-submit jobs/<name>.py`` or
``python jobs/<name>.py``.
"""
from __future__ import annotations

import argparse
import os

# spark.driver.memory is read at JVM launch, not from SparkConf, so it must
# be in PYSPARK_SUBMIT_ARGS before pyspark is imported anywhere. Jobs import
# this module first; under pytest the session fixture's conftest has already
# set the variable, so setdefault is a no-op there.
os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
    f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '24g')} "
    "--conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false "
    "pyspark-shell",
)

from pyspark.sql import SparkSession  # noqa: E402

from repro.core.experiment import SweepConfig
from repro.genomes.generator import CorpusConfig


def make_spark(app: str) -> SparkSession:
    """Local session mirroring the test fixture's query-relevant config."""
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .getOrCreate()
    )


def sweep_argparser(desc: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=desc)
    p.add_argument(
        "--scale",
        type=float,
        default=1.0,
        help="corpus scale: fraction of the paper's file count (1.0 = full)",
    )
    p.add_argument("--n-queries", type=int, default=None, help="override query count")
    p.add_argument("--save-rows", default=None, help="write raw sweep rows to this CSV")
    p.add_argument("--rows-csv", default=None, help="reuse rows from a prior sweep CSV")
    return p


def paired_view(rows, *, metric: str) -> str:
    """Side-by-side BIGSI-vs-RAMBO table per grid point.

    ``metric`` is ``"avg_query_us"`` (Figs 5/6) or ``"memory_bytes"``
    (Figs 7/8). The ratio column is BIGSI/RAMBO — >1 means RAMBO wins.
    """
    key = {(r.system, r.eta, r.bits_factor): r for r in rows}
    pts = sorted({(r.eta, r.bits_factor) for r in rows})
    unit = "us/query" if metric == "avg_query_us" else "mem_MB"
    hdr = (
        f"{'eta':>3} {'bits/key':>8} | {'BIGSI_FP%':>9} {'BIGSI_' + unit:>15} | "
        f"{'RAMBO_FP%':>9} {'RAMBO_' + unit:>15} | {'ratio_B/R':>9}"
    )
    lines = [hdr, "-" * len(hdr)]
    for eta, f in pts:
        b, r = key.get(("bigsi", eta, f)), key.get(("rambo", eta, f))
        if b is None or r is None:
            continue
        bv, rv = getattr(b, metric), getattr(r, metric)
        if metric == "memory_bytes":
            bs, rs = f"{bv / 2**20:.2f}", f"{rv / 2**20:.2f}"
        else:
            bs, rs = f"{bv:.1f}", f"{rv:.1f}"
        lines.append(
            f"{eta:>3} {f:>8.1f} | {100 * b.fp_rate:>9.4f} {bs:>15} | "
            f"{100 * r.fp_rate:>9.4f} {rs:>15} | {bv / rv:>9.2f}"
        )
    return "\n".join(lines)


def scaled_sweep(base: SweepConfig, scale: float, n_queries: int | None) -> SweepConfig:
    """Shrink a paper sweep for quick runs: file count, gene pool and RAMBO
    width scale together (W by sqrt, matching the paper's W-vs-N ratio)."""
    if scale == 1.0 and n_queries is None:
        return base
    c = base.corpus
    corpus = CorpusConfig(
        n_files=max(10, int(c.n_files * scale)),
        gene_pool_size=max(10, int(c.gene_pool_size * scale)),
        gene_len=c.gene_len,
        genes_per_file=c.genes_per_file,
        private_len=c.private_len,
        zipf_alpha=c.zipf_alpha,
        seed=c.seed,
    )
    return SweepConfig(
        corpus=corpus,
        k=base.k,
        etas=base.etas,
        bits_factors=base.bits_factors,
        num_partitions=max(2, round(base.num_partitions * scale**0.5)),
        num_repetitions=base.num_repetitions,
        n_queries=n_queries or max(200, int(base.n_queries * scale)),
        seed=base.seed,
    )
