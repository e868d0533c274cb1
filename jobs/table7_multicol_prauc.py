"""Table 7: PR-AUC scores on the multi-column datasets.

Reuses the cached Table-4 suite reports when present.
"""
import argparse

import _common

from repro.eval.tables import format_multi_prauc, run_multi_column_suite


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--no-cache", action="store_true")
    ap.add_argument("--g", type=int, default=10)
    args = ap.parse_args()
    spark = _common.get_spark("table7")
    reports = run_multi_column_suite(spark, g=args.g, use_cache=not args.no_cache)
    print("\nTable 7: PR-AUC Scores on multi-column fuzzy join datasets\n")
    print(format_multi_prauc(reports))
    spark.stop()


if __name__ == "__main__":
    main()
