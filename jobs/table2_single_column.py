"""Table 2: single-column fuzzy-join quality, all methods, 10 datasets.

Columns mirror the paper: Size, UBR, PEPCC, RERCC, AutoFJ P/R, BSJ AR,
unsupervised ARs (Excel, FW, ZeroER, ECM, PP), supervised ARs
(Magellan, DM, AL at 50 % labels), and the ablations AutoFJ-UC /
AutoFJ-NR. Reports are cached under results/ for reuse by Table 5.

Usage: python jobs/table2_single_column.py [--scale 0.5] [--no-cache]
"""
import argparse

import _common

from repro.eval.tables import format_table2, run_single_column_suite


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0, help="dataset size multiplier")
    ap.add_argument("--no-cache", action="store_true")
    ap.add_argument("--tau", type=float, default=0.9)
    args = ap.parse_args()
    spark = _common.get_spark("table2")
    print("Running single-column suite (AutoFJ + 8 baselines + ablations)…")
    reports = run_single_column_suite(
        spark, tau=args.tau, scale=args.scale, use_cache=not args.no_cache
    )
    print("\nTable 2: Performance evaluation on single-column fuzzy join datasets\n")
    print(format_table2(reports))
    spark.stop()


if __name__ == "__main__":
    main()
