"""Table 5: PR-AUC scores on the single-column datasets, all methods.

Reuses the cached Table-2 suite reports when present.
"""
import argparse

import _common

from repro.eval.tables import format_prauc_table, run_single_column_suite


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--no-cache", action="store_true")
    args = ap.parse_args()
    spark = _common.get_spark("table5")
    reports = run_single_column_suite(spark, use_cache=not args.no_cache)
    print("\nTable 5: PR-AUC Scores on single-column fuzzy join datasets\n")
    print(format_prauc_table(reports))
    spark.stop()


if __name__ == "__main__":
    main()
