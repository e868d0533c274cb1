"""Table 6: AutoFJ with the reduced 24-function configuration space.

Re-runs the single-column suite restricted to 24 join functions; the
expectation (paper §5.1.4 / Table 6) is near-identical precision with a
modest recall drop vs. the full 140-function space.
"""
import argparse

import _common

from repro.eval.tables import format_table2, run_single_column_suite


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--no-cache", action="store_true")
    args = ap.parse_args()
    spark = _common.get_spark("table6")
    print("Running single-column suite with 24 configurations…")
    reports = run_single_column_suite(
        spark, reduced=True, use_cache=not args.no_cache
    )
    print("\nTable 6: Precision and Recall with 24 configurations\n")
    print(format_table2(reports))
    spark.stop()


if __name__ == "__main__":
    main()
