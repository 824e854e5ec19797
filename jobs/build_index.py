"""Build a BIGSI or RAMBO index over a synthetic corpus and save it as .npz.

The construction is the fully distributed Spark path (k-mer extraction →
column mapping → hashed set-bit dedup → packed matrix). Pair with
``jobs/query_index.py`` to serve queries against the saved index.
"""
import argparse
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))

from _common import make_spark

from repro.core.bigsi import BigsiIndex
from repro.core.rambo import RamboIndex
from repro.genomes.generator import CorpusConfig, genome_corpus
from repro.genomes.kmers import extract_kmers


def run(spark, args) -> str:
    cfg = CorpusConfig(
        n_files=args.n_files,
        gene_pool_size=max(10, args.n_files // 2),
        gene_len=300,
        genes_per_file=4,
        private_len=120,
        seed=args.seed,
    )
    kmers = extract_kmers(genome_corpus(spark, cfg), 31).cache()
    n_pairs = kmers.count()
    if args.system == "bigsi":
        idx = BigsiIndex.build(kmers, cfg.n_files, m=args.m, eta=args.eta, seed=args.seed)
    else:
        idx = RamboIndex.build(
            kmers,
            cfg.n_files,
            m=args.m,
            eta=args.eta,
            num_partitions=args.num_partitions,
            num_repetitions=args.num_repetitions,
            seed=args.seed,
        )
    kmers.unpersist()
    idx.save(args.out)
    return (
        f"built {args.system} index: N={cfg.n_files} files, {n_pairs} (file,k-mer) pairs, "
        f"m={idx.m}, eta={idx.eta}, columns={idx.ncols}, "
        f"memory={idx.memory_bytes / 2**20:.2f} MB -> {args.out}"
    )


def main() -> None:
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument("system", choices=["bigsi", "rambo"])
    p.add_argument("--out", required=True, help="output .npz path")
    p.add_argument("--n-files", type=int, default=500)
    p.add_argument("--m", type=int, default=1 << 15)
    p.add_argument("--eta", type=int, default=3)
    p.add_argument("--num-partitions", type=int, default=20)
    p.add_argument("--num-repetitions", type=int, default=3)
    p.add_argument("--seed", type=int, default=0)
    args = p.parse_args()
    spark = make_spark("build_index")
    try:
        print(run(spark, args))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
