"""Fellegi–Sunter ECM baseline (§5.1.3).

The recordlinkage-toolkit approach the paper uses: binarize each
similarity feature at its mean, then fit the Fellegi–Sunter latent-match
model with Expectation-(Conditional-)Maximization: per feature j,
``m_j = P(feature=1 | match)`` and ``u_j = P(feature=1 | non-match)``;
the score is the posterior match probability under conditional
independence. Losing information through binarization is the point —
the paper attributes ECM's weak results to exactly that.
"""
from __future__ import annotations

import numpy as np

_CLIP = 1e-4


def binarize(features: np.ndarray) -> np.ndarray:
    """Threshold every column at its mean (the paper's setup)."""
    x = np.asarray(features, dtype=np.float64)
    return (x > x.mean(axis=0, keepdims=True)).astype(np.float64)


def fit_predict(features: np.ndarray, *, n_iter: int = 100) -> np.ndarray:
    """Posterior match probability per pair via ECM on binary features."""
    if len(features) == 0:
        return np.zeros(0)
    g = binarize(features)
    n, d = g.shape
    p = 0.1  # prior match proportion
    m = np.full(d, 0.9)
    u = np.full(d, 0.1)
    for _ in range(n_iter):
        # E step: P(match | gamma) under conditional independence.
        log_m = g @ np.log(m) + (1 - g) @ np.log(1 - m)
        log_u = g @ np.log(u) + (1 - g) @ np.log(1 - u)
        a = p * np.exp(log_m)
        b = (1 - p) * np.exp(log_u)
        w = a / np.maximum(a + b, 1e-300)
        # CM steps.
        new_p = float(np.clip(w.mean(), _CLIP, 1 - _CLIP))
        sw = max(w.sum(), 1e-12)
        snw = max((1 - w).sum(), 1e-12)
        new_m = np.clip((w[:, None] * g).sum(axis=0) / sw, _CLIP, 1 - _CLIP)
        new_u = np.clip(((1 - w)[:, None] * g).sum(axis=0) / snw, _CLIP, 1 - _CLIP)
        if (
            abs(new_p - p) < 1e-8
            and np.abs(new_m - m).max() < 1e-8
            and np.abs(new_u - u).max() < 1e-8
        ):
            p, m, u = new_p, new_m, new_u
            break
        p, m, u = new_p, new_m, new_u
    log_m = g @ np.log(m) + (1 - g) @ np.log(1 - m)
    log_u = g @ np.log(u) + (1 - g) @ np.log(1 - u)
    a = p * np.exp(log_m)
    b = (1 - p) * np.exp(log_u)
    return a / np.maximum(a + b, 1e-300)
