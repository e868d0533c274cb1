"""Similarity features for the learned baselines.

ZeroER / ECM / Magellan / DeepMatcher / Active-Learning all consume
Magellan-style similarity features. We derive them from the already-
computed join-function distance tensor (similarity = 1 − distance) plus
two cheap length features — the same feature family the Magellan
generator produces (jaccard / cosine / dice on word and 3-gram tokens,
edit-based sims, containment).
"""
from __future__ import annotations

import numpy as np

from repro.core.config_space import JoinFunction

#: Join functions whose similarities serve as features (by name).
FEATURE_FNS: tuple[str, ...] = (
    "L|SP|EW|JD",
    "L|SP|IDFW|JD",
    "L|3G|EW|JD",
    "L|3G|IDFW|JD",
    "L|SP|EW|CD",
    "L|3G|IDFW|CD",
    "L|SP|EW|DD",
    "L|SP|EW|MD",
    "L|SP|EW|ID",
    "L|-|-|ED",
    "L|-|-|JW",
    "L|-|-|GED",
    "L+S+RP|SP|EW|JD",
    "L+S+RP|3G|IDFW|CD",
)


def feature_indices(fns: list[JoinFunction]) -> list[int]:
    """Tensor column indices of the feature functions present in ``fns``."""
    by_name = {f.name: i for i, f in enumerate(fns)}
    return [by_name[n] for n in FEATURE_FNS if n in by_name]


def feature_matrix(
    dist: np.ndarray,
    fns: list[JoinFunction],
    l_values: list[str],
    r_values: list[str],
) -> np.ndarray:
    """[n_pairs, d] similarity feature matrix (float64)."""
    idx = feature_indices(fns)
    sims = 1.0 - dist[:, idx].astype(np.float64)
    la = np.array([len(v or "") for v in l_values], dtype=np.float64)
    lb = np.array([len(v or "") for v in r_values], dtype=np.float64)
    denom = np.maximum(np.maximum(la, lb), 1.0)
    len_sim = 1.0 - np.abs(la - lb) / denom
    ta = np.array([len((v or "").split()) for v in l_values], dtype=np.float64)
    tb = np.array([len((v or "").split()) for v in r_values], dtype=np.float64)
    tok_sim = 1.0 - np.abs(ta - tb) / np.maximum(np.maximum(ta, tb), 1.0)
    return np.column_stack([sims, len_sim, tok_sim])


def embedding_features(l_values: list[str], r_values: list[str]) -> np.ndarray:
    """Raw representation features for the DeepMatcher substitute.

    DeepMatcher learns from *record embeddings*, not engineered
    similarity features — which is exactly why it is label-hungry and
    underperforms at a 50 % label budget (paper §5.1.4). We mirror that:
    [emb(l), emb(r), |emb(l) − emb(r)|] of the hashed-trigram embedding
    (192 dims), forcing the MLP to learn similarity from scratch.
    """
    from repro.core.distance import embed

    el = np.array([embed((v or "").lower()) for v in l_values])
    er = np.array([embed((v or "").lower()) for v in r_values])
    return np.concatenate([el, er, np.abs(el - er)], axis=1)
