"""Figure 6: query time vs FP rate, N=2500 (RAMBO 3x84 vs BIGSI).

Runs the Bloom-size x eta sweep of the paper's evaluation on the synthetic
corpus and prints one row per plotted point, plus a paired
BIGSI-vs-RAMBO view. Use --scale for a quick reduced run, --rows-csv to
re-print from a previous sweep without recomputing.
"""
import os
import sys

sys.path.insert(0, os.path.dirname(os.path.abspath(__file__)))

from _common import make_spark, paired_view, scaled_sweep, sweep_argparser

from repro.core.experiment import FIG6_SWEEP, format_rows, rows_from_csv, rows_to_csv, run_sweep


def run(spark, args) -> str:
    """Run (or reload) the sweep and return the printed report."""
    if args.rows_csv:
        rows = rows_from_csv(args.rows_csv)
    else:
        rows = run_sweep(spark, scaled_sweep(FIG6_SWEEP, args.scale, args.n_queries))
        if args.save_rows:
            rows_to_csv(rows, args.save_rows)
    return (
        "Figure 6: query time vs FP rate, N=2500 (RAMBO 3x84 vs BIGSI)\n\n"
        + format_rows(rows)
        + "\n\n"
        + paired_view(rows, metric="avg_query_us")
    )


def main() -> None:
    args = sweep_argparser(__doc__).parse_args()
    spark = make_spark("fig6_query_tradeoff_2500")
    try:
        print(run(spark, args))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
