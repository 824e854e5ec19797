"""Query a saved index (.npz from jobs/build_index.py) with k-mer strings.

Queries run through the distributed batch path (broadcast sketch +
mapInPandas over the query DataFrame) — the "query via DataFrame lookup
against sketches" dataflow — and hits are printed per query.
"""
import argparse
import os
import sys

import numpy as np

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))

from _common import make_spark

from repro.core.bigsi import BigsiIndex
from repro.core.eval import distributed_query
from repro.core.rambo import RamboIndex
from repro.sketch.hashing import encode_kmers, random_kmer_codes


def load_any(path: str):
    try:
        return BigsiIndex.load(path)
    except ValueError:
        return RamboIndex.load(path)


def run(spark, args) -> str:
    idx = load_any(args.index)
    if args.kmers:
        codes = encode_kmers(args.kmers, 31)
        labels = args.kmers
    else:
        codes = random_kmer_codes(args.n_random, 31, seed=args.seed)
        labels = [f"random#{i}" for i in range(len(codes))]
    hits = distributed_query(spark, idx, codes).toPandas()
    lines = [
        f"index: {type(idx).__name__} N={idx.n_files} m={idx.m} eta={idx.eta} "
        f"columns={idx.ncols}",
    ]
    by_code = hits.groupby("code")["file_id"].apply(list)
    for label, c in zip(labels, codes):
        files = sorted(by_code.get(int(c), []))
        lines.append(f"{label}: {len(files)} file(s) {files[:20]}")
    return "\n".join(lines)


def main() -> None:
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument("--index", required=True, help=".npz index path")
    p.add_argument("--kmers", nargs="*", default=None, help="31-mer query strings")
    p.add_argument("--n-random", type=int, default=10)
    p.add_argument("--seed", type=int, default=0)
    args = p.parse_args()
    spark = make_spark("query_index")
    try:
        print(run(spark, args))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
