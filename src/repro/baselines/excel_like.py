"""Excel Fuzzy-Lookup-style scorer (Excel baseline, §5.1.3).

The paper describes Excel's default as a "carefully engineered weighted
combination of multiple distance functions" (a variant of the
generalized fuzzy similarity of Chaudhuri et al. [17], tuned on English
data). We reproduce that recipe: a fixed convex combination of
IDF-weighted token Jaccard, Jaro-Winkler, normalized edit similarity,
and weighted containment, over lowercased punctuation-stripped text.
The weights are static — this baseline is deliberately *not* tuned per
dataset (that is AutoFJ's job).
"""
from __future__ import annotations

import numpy as np

from repro.core.config_space import JoinFunction

# (join-function name, weight) — engineered defaults.
_COMPONENTS: tuple[tuple[str, float], ...] = (
    ("L+RP|SP|IDFW|JD", 0.40),  # IDF token overlap carries most signal
    ("L+RP|3G|IDFW|CD", 0.20),  # 3-gram cosine for typo robustness
    ("L|-|-|JW", 0.15),
    ("L|-|-|ED", 0.15),
    ("L+RP|SP|IDFW|MD", 0.10),  # containment for sub-string records
)


def component_indices(fns: list[JoinFunction]) -> list[tuple[int, float]]:
    by_name = {f.name: i for i, f in enumerate(fns)}
    out = [(by_name[n], w) for n, w in _COMPONENTS if n in by_name]
    if not out:
        raise ValueError("none of the Excel component functions are in the space")
    return out


def score_pairs(dist: np.ndarray, fns: list[JoinFunction]) -> np.ndarray:
    """Similarity score in [0, 1] per candidate pair (higher = better)."""
    comps = component_indices(fns)
    total_w = sum(w for _, w in comps)
    score = np.zeros(dist.shape[0], dtype=np.float64)
    for idx, w in comps:
        score += w * (1.0 - dist[:, idx].astype(np.float64))
    return score / total_w
