"""Token-weight options (the W axis): equal weights and IDF weights.

IDF weights are computed over the **reference table L** (the curated side),
matching the paper's blocking description ("TF-IDF weighting schema") and
the convention that the reference corpus defines token informativeness.
Unseen tokens get the maximum IDF (they appeared in zero L records).
"""
from __future__ import annotations

import math
from typing import Iterable, Mapping

#: Weight variants used in experiments.
VARIANTS: tuple[str, ...] = ("EW", "IDFW")


def idf_weights(token_sets: Iterable[Iterable[str]]) -> dict[str, float]:
    """IDF weight per token from a corpus of per-record token collections.

    ``idf(t) = log(1 + N / df(t))`` — smooth, strictly positive, monotone
    decreasing in document frequency.
    """
    df: dict[str, int] = {}
    n = 0
    for toks in token_sets:
        n += 1
        for t in set(toks):
            df[t] = df.get(t, 0) + 1
    return {t: math.log(1.0 + n / c) for t, c in df.items()}


class TokenWeigher:
    """Maps a token to its weight under a variant (``EW`` or ``IDFW``)."""

    def __init__(self, variant: str, idf: Mapping[str, float] | None = None):
        if variant not in VARIANTS:
            raise ValueError(f"unknown weight variant {variant!r}")
        if variant == "IDFW" and idf is None:
            raise ValueError("IDFW requires an idf mapping")
        self.variant = variant
        self._idf = dict(idf) if idf else {}
        # Unseen tokens are maximally informative.
        self._default = max(self._idf.values(), default=1.0)

    def weight(self, token: str) -> float:
        if self.variant == "EW":
            return 1.0
        return self._idf.get(token, self._default)

    def weight_map(self, tokens: Iterable[str]) -> dict[str, float]:
        """De-duplicated token -> weight map for one record.

        The paper's set-based distances operate on weighted token *sets*
        (Figure 2 lists one weight per distinct token), so duplicates
        collapse to a single weighted element.
        """
        return {t: self.weight(t) for t in set(tokens)}
