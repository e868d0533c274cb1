"""Table 3: multi-column fuzzy-join dataset statistics.

Prints domain, #attributes, L–R sizes, and #matches for the 8 synthetic
datasets that substitute for the Magellan/Leipzig benchmarks.
"""
import _common  # noqa: F401

from repro.benchgen.multi_column import get_spec, make_multi_dataset, spec_names


def main() -> None:
    print("Table 3: Multi-column fuzzy join datasets\n")
    print(f"{'Dataset':<8} {'Domain':<14} {'#Attr':>6} {'Size (L-R)':>14} {'#Matches':>9}")
    print("-" * 56)
    for name in spec_names():
        spec = get_spec(name)
        ds = make_multi_dataset(name)
        assert len(ds.left) == spec.n_l and len(ds.right) == spec.n_r
        print(
            f"{name:<8} {spec.domain:<14} {len(spec.columns):>6} "
            f"{f'{len(ds.left)} - {len(ds.right)}':>14} {ds.n_gt:>9}"
        )


if __name__ == "__main__":
    main()
