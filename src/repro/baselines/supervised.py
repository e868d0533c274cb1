"""Supervised baselines (§5.1.3): Magellan-like RF, DeepMatcher-like MLP,
and uncertainty-sampling Active Learning.

Protocol, as in the paper: split the *right* records 50/50; candidate
pairs of training records are labeled from ground truth; models score
the test-half pairs; adjusted recall / PR-AUC are computed on the test
half only. 50 % of ground-truth labels is a deliberately generous budget.

Magellan → ``pyspark.ml`` RandomForestClassifier over similarity
features (same model family; sklearn is not installed — DESIGN.md §3).
DeepMatcher → ``pyspark.ml`` MultilayerPerceptronClassifier (a deep
model over the same features; keeps the "higher capacity, label-hungry"
role). Active Learning → numpy logistic regression with uncertainty
sampling until 50 % of the joined pairs are labeled (modAL's default
query strategy).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.ml.classification import (
    MultilayerPerceptronClassifier,
    RandomForestClassifier,
)
from pyspark.ml.functions import array_to_vector
from pyspark.sql import SparkSession
from pyspark.sql import functions as F


def split_by_right(
    r_idx: np.ndarray, n_r: int, *, seed: int = 0, train_frac: float = 0.5
) -> tuple[np.ndarray, np.ndarray]:
    """Pair-level train/test masks from a 50/50 split of right records."""
    rng = np.random.default_rng(seed)
    perm = rng.permutation(n_r)
    train_r = np.zeros(n_r, dtype=bool)
    train_r[perm[: int(round(n_r * train_frac))]] = True
    train_mask = train_r[r_idx]
    return train_mask, ~train_mask


def _fit_predict_sparkml(
    spark: SparkSession,
    features: np.ndarray,
    labels: np.ndarray,
    train_mask: np.ndarray,
    estimator,
) -> np.ndarray:
    """Train on the masked rows, return P(match) for every row."""
    pdf = pd.DataFrame(
        {
            "row": np.arange(len(features)),
            "farr": [row.astype(float).tolist() for row in features],
            "label": labels.astype(float),
            "is_train": train_mask,
        }
    )
    df = spark.createDataFrame(pdf).withColumn("features", array_to_vector(F.col("farr")))
    train = df.where("is_train")
    if train.where("label = 1").count() == 0 or train.where("label = 0").count() == 0:
        # Degenerate single-class training set: constant score.
        return np.full(len(features), float(labels[train_mask].mean() if train_mask.any() else 0.0))
    model = estimator.fit(train)
    pred = model.transform(df).select("row", "probability").toPandas()
    probs = np.zeros(len(features))
    probs[pred["row"].to_numpy()] = np.array([float(v[1]) for v in pred["probability"]])
    return probs


def magellan_rf(
    spark: SparkSession,
    features: np.ndarray,
    labels: np.ndarray,
    train_mask: np.ndarray,
    *,
    seed: int = 0,
) -> np.ndarray:
    """Magellan-like: random forest over similarity features."""
    est = RandomForestClassifier(
        numTrees=50, maxDepth=8, seed=seed, labelCol="label", featuresCol="features"
    )
    return _fit_predict_sparkml(spark, features, labels, train_mask, est)


def deepmatcher_mlp(
    spark: SparkSession,
    features: np.ndarray,
    labels: np.ndarray,
    train_mask: np.ndarray,
    *,
    seed: int = 0,
) -> np.ndarray:
    """DeepMatcher-like: multilayer perceptron over the same features."""
    d = features.shape[1]
    est = MultilayerPerceptronClassifier(
        layers=[d, 32, 16, 2], maxIter=120, seed=seed,
        labelCol="label", featuresCol="features",
    )
    return _fit_predict_sparkml(spark, features, labels, train_mask, est)


# ---------------------------------------------------------------------------
# Active learning: numpy logistic regression + uncertainty sampling
# ---------------------------------------------------------------------------

def _fit_logreg(
    x: np.ndarray, y: np.ndarray, *, epochs: int = 200, lr: float = 0.5, l2: float = 1e-3
) -> tuple[np.ndarray, float]:
    n, d = x.shape
    w = np.zeros(d)
    b = 0.0
    for _ in range(epochs):
        z = x @ w + b
        p = 1.0 / (1.0 + np.exp(-np.clip(z, -30, 30)))
        g = p - y
        w -= lr * (x.T @ g / n + l2 * w)
        b -= lr * g.mean()
    return w, b


def _predict_logreg(x: np.ndarray, w: np.ndarray, b: float) -> np.ndarray:
    return 1.0 / (1.0 + np.exp(-np.clip(x @ w + b, -30, 30)))


def active_learning(
    features: np.ndarray,
    labels: np.ndarray,
    *,
    seed: int = 0,
    batch: int = 10,
    budget: int | None = None,
) -> np.ndarray:
    """Uncertainty-sampling AL: label up to ``budget`` pairs, score all.

    Default budget = 50 % of the positive pairs (paper: "until 50 % of
    joined pairs in the data are labeled"), floor 20 labels.
    """
    n = len(features)
    if n == 0:
        return np.zeros(0)
    rng = np.random.default_rng(seed)
    if budget is None:
        budget = max(20, int(round(0.5 * labels.sum())) * 2)
    budget = min(budget, n)
    labeled = np.zeros(n, dtype=bool)
    # Seed: a few random pairs plus the most similar ones (likely positives).
    seed_idx = rng.choice(n, size=min(10, n), replace=False)
    labeled[seed_idx] = True
    labeled[np.argsort(-features.sum(axis=1))[:5]] = True
    w, b = np.zeros(features.shape[1]), 0.0
    while labeled.sum() < budget:
        x_l, y_l = features[labeled], labels[labeled]
        if y_l.min() == y_l.max():
            # Single class so far: query the most dissimilar-from-mean rows.
            probs = features.sum(axis=1)
        else:
            w, b = _fit_logreg(x_l, y_l)
            probs = _predict_logreg(features, w, b)
        uncertainty = -np.abs(probs - 0.5)
        uncertainty[labeled] = -np.inf
        take = np.argsort(uncertainty)[-min(batch, budget - int(labeled.sum())):]
        labeled[take] = True
    x_l, y_l = features[labeled], labels[labeled]
    if y_l.min() == y_l.max():
        return np.full(n, float(y_l.mean()))
    w, b = _fit_logreg(x_l, y_l)
    return _predict_logreg(features, w, b)


def active_learning_scores(
    features: np.ndarray,
    labels: np.ndarray,
    train_mask: np.ndarray,
    *,
    seed: int = 0,
) -> np.ndarray:
    """Run the AL loop on the training half; score ALL pairs.

    The query pool is restricted to training-half pairs (test labels are
    never seen); the final logistic model scores everything.
    """
    tr = np.where(train_mask)[0]
    if len(tr) == 0:
        return np.zeros(len(features))
    x, y = features[tr], labels[tr]
    rng = np.random.default_rng(seed)
    n = len(tr)
    budget = min(n, max(20, int(round(y.sum()))))
    labeled = np.zeros(n, dtype=bool)
    labeled[rng.choice(n, size=min(10, n), replace=False)] = True
    labeled[np.argsort(-x.sum(axis=1))[:5]] = True
    while labeled.sum() < budget:
        xl, yl = x[labeled], y[labeled]
        if yl.min() == yl.max():
            probs = x.sum(axis=1)
        else:
            w, b = _fit_logreg(xl, yl)
            probs = _predict_logreg(x, w, b)
        unc = -np.abs(probs - 0.5)
        unc[labeled] = -np.inf
        take = np.argsort(unc)[-min(10, budget - int(labeled.sum())):]
        labeled[take] = True
    xl, yl = x[labeled], y[labeled]
    if yl.min() == yl.max():
        return np.zeros(len(features))
    w, b = _fit_logreg(xl, yl)
    return _predict_logreg(features, w, b)
