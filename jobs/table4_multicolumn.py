"""Table 4: multi-column fuzzy-join evaluation.

4(a): AutoFJ (Algorithm 3) P/R + selected columns/weights vs. all
baselines (AR at AutoFJ's precision).
4(b) (``--robustness``): add 2 random-string columns to each dataset and
report ΔR for AutoFJ and ΔAR for Excel and AL.

Usage: python jobs/table4_multicolumn.py [--robustness] [--g 10] [--no-cache]
"""
import argparse

import _common

from repro.benchgen.multi_column import add_random_columns, make_multi_dataset, spec_names
from repro.eval.multi_harness import evaluate_multi_dataset
from repro.eval.tables import format_table4a, run_multi_column_suite


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--robustness", action="store_true", help="also run Table 4(b)")
    ap.add_argument("--g", type=int, default=10, help="column-weight grid steps")
    ap.add_argument("--no-cache", action="store_true")
    args = ap.parse_args()
    spark = _common.get_spark("table4")

    print("Running multi-column suite (Algorithm 3 + baselines)…")
    reports = run_multi_column_suite(spark, g=args.g, use_cache=not args.no_cache)
    print("\nTable 4(a): Overall Multi-Column Join Quality Comparison\n")
    print(format_table4a(reports))

    if args.robustness:
        print("\nTable 4(b): Multi-Column Robustness (adding 2 random columns)\n")
        print(f"{'Dataset':<8} {'AutoFJ ΔR':>10} {'Excel ΔAR':>10} {'AL ΔAR':>8}")
        print("-" * 40)
        base = {r.name: r for r in reports}
        d_r, d_ex, d_al = [], [], []
        for name in spec_names():
            ds = add_random_columns(make_multi_dataset(name), 2, seed=1)
            noisy = evaluate_multi_dataset(spark, ds, g=args.g)
            b = base[name]
            dr = noisy.autofj_recall - b.autofj_recall
            dex = noisy.ar("Excel") - b.ar("Excel")
            dal = noisy.ar("AL") - b.ar("AL")
            d_r.append(dr)
            d_ex.append(dex)
            d_al.append(dal)
            print(f"{name:<8} {dr:>10.3f} {dex:>10.3f} {dal:>8.3f}")
        print("-" * 40)
        print(
            f"{'Average':<8} {sum(d_r)/len(d_r):>10.3f} "
            f"{sum(d_ex)/len(d_ex):>10.3f} {sum(d_al)/len(d_al):>8.3f}"
        )
    spark.stop()


if __name__ == "__main__":
    main()
