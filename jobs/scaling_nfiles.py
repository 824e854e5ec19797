"""Experiment E5: query time vs number of files (the paper's scaling claim).

BIGSI's per-query cost grows linearly in N while RAMBO's grows with its
bitslice width D*W (W ∝ sqrt(N)), so the BIGSI/RAMBO query-time ratio must
widen as N grows — "the larger the number of datasets, the bigger the
gains" (§ V Results).
"""
import argparse
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))

from _common import make_spark

from repro.core.experiment import format_rows, run_scaling


def run(spark, args) -> str:
    rows = run_scaling(
        spark,
        n_files_grid=tuple(args.n_files),
        eta=args.eta,
        bits_factor=args.bits_factor,
        n_queries=args.n_queries,
    )
    lines = [__doc__.strip(), "", format_rows(rows), "", "speedup (BIGSI us / RAMBO us) by N:"]
    for n in sorted({r.n_files for r in rows}):
        b = next(r for r in rows if r.system == "bigsi" and r.n_files == n)
        r_ = next(r for r in rows if r.system == "rambo" and r.n_files == n)
        lines.append(
            f"  N={n:>5}: BIGSI {b.avg_query_us:8.1f} us  RAMBO {r_.avg_query_us:8.1f} us"
            f"  speedup {b.avg_query_us / r_.avg_query_us:5.2f}x  (widths {b.ncols} vs {r_.ncols})"
        )
    return "\n".join(lines)


def main() -> None:
    p = argparse.ArgumentParser(description=__doc__)
    p.add_argument("--n-files", type=int, nargs="+", default=[500, 1000, 2000, 3480])
    p.add_argument("--eta", type=int, default=3)
    p.add_argument("--bits-factor", type=float, default=10.0)
    p.add_argument("--n-queries", type=int, default=5000)
    args = p.parse_args()
    spark = make_spark("scaling_nfiles")
    try:
        print(run(spark, args))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
