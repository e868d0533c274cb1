"""Unsupervised precision estimation (§3.1, Eq. 8–13).

Geometric idea: for a join pair (l, r) at distance d, draw the 2d-ball
around l; every additional L record inside it is a plausible competing
counterpart, so ``precision(l, r) = 1 / |{l′ : f(l, l′) ≤ 2d}|`` (the
count includes l itself, so a clean ball gives precision 1).

Config-level (Eq. 9): for ``C = ⟨f, θ⟩``, r joins its closest l iff
``f(l, r) ≤ θ`` and its precision is ``1 / |{l′ : f(l, l′) ≤ 2θ}|``.

This module precomputes, per join function and per threshold-grid cell:
  - ``closest``: per right record, the nearest left candidate and distance;
  - ``ball_counts[l, k]``: number of *other* L records within distance
    ``2·θ_k`` of l (from the blocked L–L pairs — the blocking cap is the
    paper's own approximation);
  - the precision tensor ``P[fn, k, r]`` (0 where r does not join).

All arrays are driver-side numpy; sizes are post-blocking and small.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass
class Precomputed:
    """Per-dataset precomputation feeding the greedy search.

    Attributes
    ----------
    thresholds : [n_th] ascending grid over (0, 1].
    closest_l : [n_fn, n_R] index into L of the closest candidate (-1: none).
    closest_d : [n_fn, n_R] distance to it (inf if none).
    precision : [n_fn, n_th, n_R] float32 estimated precision; 0 = not joined.
    """

    thresholds: np.ndarray
    closest_l: np.ndarray
    closest_d: np.ndarray
    precision: np.ndarray

    @property
    def n_fn(self) -> int:
        return self.precision.shape[0]

    @property
    def n_th(self) -> int:
        return self.precision.shape[1]

    @property
    def n_r(self) -> int:
        return self.precision.shape[2]

    def flat(self) -> tuple[np.ndarray, np.ndarray]:
        """Flatten to config-major form: P[(fn, th) → cfg, r] and l-assign."""
        p = self.precision.reshape(self.n_fn * self.n_th, self.n_r)
        l_assign = np.repeat(self.closest_l, self.n_th, axis=0)
        return p, l_assign


def closest_per_right(
    l_idx: np.ndarray, r_idx: np.ndarray, dists: np.ndarray, n_r: int
) -> tuple[np.ndarray, np.ndarray]:
    """Per right record, the argmin-distance left candidate for each fn.

    ``dists``: [n_pairs, n_fn]. Returns (closest_l [n_fn, n_r] int32 with
    -1 for no candidate, closest_d [n_fn, n_r] with inf).
    Ties break toward the smaller left index (deterministic).
    """
    n_pairs, n_fn = dists.shape
    closest_l = np.full((n_fn, n_r), -1, dtype=np.int64)
    closest_d = np.full((n_fn, n_r), np.inf, dtype=np.float64)
    if n_pairs == 0:
        return closest_l, closest_d
    # Stable sort by l_idx once so equal distances resolve to smaller lid.
    base = np.argsort(l_idx, kind="stable")
    lb, rb = l_idx[base], r_idx[base]
    for j in range(n_fn):
        d = dists[base, j].astype(np.float64)
        # lexsort: primary r, secondary distance (last key is primary).
        order = np.lexsort((d, rb))
        rs = rb[order]
        first = np.ones(len(rs), dtype=bool)
        first[1:] = rs[1:] != rs[:-1]
        sel = order[first]
        closest_l[j, rb[sel]] = lb[sel]
        closest_d[j, rb[sel]] = d[sel]
    return closest_l, closest_d


def ball_counts(
    l1_idx: np.ndarray,
    ll_dists: np.ndarray,
    n_l: int,
    thresholds: np.ndarray,
) -> np.ndarray:
    """``counts[fn, l, k]`` = #{l′ ≠ l : f(l, l′) ≤ 2·θ_k} from L–L pairs.

    Histogram trick: bin each L–L distance at the smallest k with
    ``2·θ_k ≥ d`` and take a cumulative sum over k.
    """
    n_pairs, n_fn = ll_dists.shape
    n_th = len(thresholds)
    counts = np.zeros((n_fn, n_l, n_th + 1), dtype=np.int32)
    if n_pairs:
        for j in range(n_fn):
            # Smallest grid index whose 2θ covers d; n_th = never covered.
            bins = np.searchsorted(2.0 * thresholds, ll_dists[:, j], side="left")
            np.add.at(counts[j], (l1_idx, np.minimum(bins, n_th)), 1)
    return np.cumsum(counts, axis=2)[:, :, :n_th]


def precompute(
    l_idx: np.ndarray,
    r_idx: np.ndarray,
    lr_dists: np.ndarray,
    l1_idx: np.ndarray,
    ll_dists: np.ndarray,
    *,
    n_l: int,
    n_r: int,
    thresholds: np.ndarray,
) -> Precomputed:
    """Full Eq. 9 precomputation for all ⟨fn, θ⟩ configurations."""
    closest_l, closest_d = closest_per_right(l_idx, r_idx, lr_dists, n_r)
    counts = ball_counts(l1_idx, ll_dists, n_l, thresholds)
    n_fn, n_th = lr_dists.shape[1], len(thresholds)
    precision = np.zeros((n_fn, n_th, n_r), dtype=np.float32)
    for j in range(n_fn):
        has = closest_l[j] >= 0
        if not has.any():
            continue
        lr = closest_l[j, has]
        # joined[k, r] ⇔ closest_d ≤ θ_k.
        joined = closest_d[j, has][None, :] <= thresholds[:, None]
        # 1 + others-in-ball (the 1 is l itself, Eq. 8/9 counts it).
        denom = 1.0 + counts[j][lr, :].T.astype(np.float64)  # [n_th, n_sel]
        precision[j][:, has] = np.where(joined, 1.0 / denom, 0.0)
    return Precomputed(
        thresholds=thresholds,
        closest_l=closest_l,
        closest_d=closest_d,
        precision=precision,
    )
