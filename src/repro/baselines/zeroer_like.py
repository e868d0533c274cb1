"""ZeroER-style unsupervised matcher (§5.1.3).

ZeroER fits a two-component generative model (a Gaussian-Mixture
variant) over Magellan similarity features; the match probability is the
posterior of the high-similarity component. We implement a diagonal-
covariance 2-component GMM with EM in numpy over the same feature
family, identifying the "match" component as the one with the larger
mean feature sum (matches are more similar on every feature).
"""
from __future__ import annotations

import numpy as np

_MIN_VAR = 1e-4


def fit_predict(
    features: np.ndarray, *, n_iter: int = 60, seed: int = 0
) -> np.ndarray:
    """Posterior match probability per row of ``features``.

    EM for a 2-component diagonal GMM, initialized by splitting on the
    mean feature sum (a deterministic, scale-free initialization).
    """
    x = np.asarray(features, dtype=np.float64)
    n, d = x.shape
    if n == 0:
        return np.zeros(0)
    if n == 1:
        return np.ones(1) * 0.5
    sums = x.sum(axis=1)
    hi = sums >= np.median(sums)
    resp = np.column_stack([hi.astype(float), 1.0 - hi]).clip(1e-6, 1 - 1e-6)

    def m_step(r):
        w = r.sum(axis=0) + 1e-9
        mu = (r.T @ x) / w[:, None]
        var = np.empty_like(mu)
        for k in range(2):
            var[k] = (r[:, k][:, None] * (x - mu[k]) ** 2).sum(axis=0) / w[k]
        return w / n, mu, np.maximum(var, _MIN_VAR)

    pi, mu, var = m_step(resp)
    for _ in range(n_iter):
        # E step: diagonal Gaussian log-densities.
        log_p = np.empty((n, 2))
        for k in range(2):
            log_p[:, k] = (
                np.log(pi[k] + 1e-12)
                - 0.5 * np.sum(np.log(2 * np.pi * var[k]))
                - 0.5 * np.sum((x - mu[k]) ** 2 / var[k], axis=1)
            )
        log_p -= log_p.max(axis=1, keepdims=True)
        p = np.exp(log_p)
        new_resp = p / p.sum(axis=1, keepdims=True)
        if np.abs(new_resp - resp).max() < 1e-6:
            resp = new_resp
            break
        resp = new_resp
        pi, mu, var = m_step(resp)
    match_k = int(np.argmax(mu.sum(axis=1)))
    return resp[:, match_k]
