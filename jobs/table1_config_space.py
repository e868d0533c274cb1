"""Table 1: parameter options considered in the experiments.

Prints the (P, T, W, D) grid and verifies the 140-function count
(4×2 char + 4×2×2×8 set + 4×1 embedding), plus the reduced 24 space.
"""
import _common  # noqa: F401  (sys.path setup)

from repro.core import distance as D
from repro.core import preprocess as P
from repro.core import tokenize as T
from repro.core import weights as W
from repro.core.config_space import full_space, reduced_space


def main() -> None:
    print("Table 1: Parameter Options Considered in the Experiments")
    print(f"  Preprocessing : {', '.join(P.VARIANTS)}")
    print(f"  Tokenization  : {', '.join(T.VARIANTS)}")
    print(f"  Token weights : {', '.join(W.VARIANTS)}")
    print(f"  Char distances: {', '.join(D.CHAR_DISTANCES)}")
    print(f"  Set distances : {', '.join(D.SET_DISTANCES)} (CJD/CCD/CDD hybrid containment)")
    print(f"  Embedding     : {', '.join(D.EMBEDDING_DISTANCES)} (hashed-trigram substitute)")
    fns = full_space()
    fams = [f.family for f in fns]
    print(
        f"\nJoin functions: {len(fns)} total "
        f"(char={fams.count('char')}, set={fams.count('set')}, "
        f"embedding={fams.count('embedding')}) — paper: 140"
    )
    print(f"Reduced space (Table 6): {len(reduced_space(24))} functions")


if __name__ == "__main__":
    main()
