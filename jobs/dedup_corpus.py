"""Experiment E6: LSH de-duplication of a corpus with injected duplicates.

Mirrors the paper's preprocessing (§ V Datasets): MinHash + LSH banding
finds candidate pairs, exact Jaccard verifies them, and files with
J > 0.9 against a kept file are dropped (161 023 → 136 602 in the paper).
"""
import argparse
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))

from _common import make_spark

from repro.dedup.lsh import dedup_files
from repro.genomes.generator import CorpusConfig, genome_corpus
from repro.genomes.kmers import extract_kmers


def run(spark, args) -> str:
    cfg = CorpusConfig(
        n_files=args.n_files,
        gene_pool_size=max(10, args.n_files // 2),
        gene_len=300,
        genes_per_file=5,
        private_len=80,
        dup_fraction=args.dup_fraction,
        dup_mutation_len=5,
        seed=args.seed,
    )
    kmers = extract_kmers(genome_corpus(spark, cfg), 31).cache()
    kmers.count()
    res = dedup_files(
        kmers,
        num_perms=args.num_perms,
        rows_per_band=args.rows_per_band,
        threshold=args.threshold,
    )
    kmers.unpersist()
    return "\n".join(
        [
            __doc__.strip(),
            "",
            f"files before dedup:        {res.n_files}",
            f"injected near-duplicates:  {cfg.n_duplicates}",
            f"LSH candidate pairs:       {res.n_candidates}",
            f"verified duplicate pairs:  {len(res.duplicate_pairs)} (Jaccard > {args.threshold})",
            f"files dropped:             {len(res.dropped)}",
            f"files after dedup:         {len(res.kept)}",
        ]
    )


def main() -> None:
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument("--n-files", type=int, default=400)
    p.add_argument("--dup-fraction", type=float, default=0.15)
    p.add_argument("--num-perms", type=int, default=48)
    p.add_argument("--rows-per-band", type=int, default=4)
    p.add_argument("--threshold", type=float, default=0.9)
    p.add_argument("--seed", type=int, default=7)
    args = p.parse_args()
    spark = make_spark("dedup_corpus")
    try:
        print(run(spark, args))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
