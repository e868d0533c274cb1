"""FuzzyWuzzy-style scorer (FW baseline, §5.1.3).

Reimplements the package's three classic ratios on our Levenshtein
kernel — ``ratio`` (plain normalized edit similarity), ``token_sort_ratio``
(ratio over alphabetically-sorted tokens), ``token_set_ratio`` (ratio
over intersection/remainder constructions) — and scores a pair as the
max of the three, like ``fuzz.WRatio``'s core. Scores in [0, 100].
"""
from __future__ import annotations

import numpy as np

from repro.core.distance import lev_batch


def _prep(s: str) -> str:
    return " ".join("".join(c if c.isalnum() else " " for c in (s or "").lower()).split())


def ratio_batch(a: list[str], b: list[str]) -> np.ndarray:
    """Plain ratio: 100 · (1 − normalized edit distance)."""
    return 100.0 * (1.0 - lev_batch(a, b))


def score_pairs(l_values: list[str], r_values: list[str]) -> np.ndarray:
    """FW score per pair: max(ratio, token_sort, token_set), in [0, 100]."""
    a = [_prep(v) for v in l_values]
    b = [_prep(v) for v in r_values]
    plain = ratio_batch(a, b)
    a_sorted = [" ".join(sorted(s.split())) for s in a]
    b_sorted = [" ".join(sorted(s.split())) for s in b]
    tsort = ratio_batch(a_sorted, b_sorted)
    # token_set: sorted-intersection vs intersection+remainder strings.
    t0a, t0b = [], []
    t1a, t1b = [], []
    for x, y in zip(a, b):
        sx, sy = set(x.split()), set(y.split())
        inter = " ".join(sorted(sx & sy))
        ia = (inter + " " + " ".join(sorted(sx - sy))).strip()
        ib = (inter + " " + " ".join(sorted(sy - sx))).strip()
        t0a.append(inter)
        t0b.append(ia)
        t1a.append(inter)
        t1b.append(ib)
    tset = np.maximum(ratio_batch(t0a, t0b), ratio_batch(t1a, t1b))
    # Empty-intersection pairs degenerate to 100 in tset; guard like fuzzywuzzy
    # by zeroing when the intersection is empty.
    empty_inter = np.array([t == "" for t in t0a])
    tset = np.where(empty_inter, 0.0, tset)
    return np.maximum(plain, np.maximum(tsort, tset))
