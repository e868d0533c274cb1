"""Tests for the supervised baselines (Magellan-RF, DM-MLP, AL)."""
import numpy as np
import pytest

from repro.baselines.supervised import (
    active_learning_scores,
    deepmatcher_mlp,
    magellan_rf,
    split_by_right,
)


def _data(n=300, d=6, seed=0):
    rng = np.random.default_rng(seed)
    n_pos = n // 5
    pos = np.clip(rng.normal(0.85, 0.08, (n_pos, d)), 0, 1)
    neg = np.clip(rng.normal(0.3, 0.12, (n - n_pos, d)), 0, 1)
    x = np.vstack([pos, neg])
    y = np.concatenate([np.ones(n_pos), np.zeros(n - n_pos)])
    perm = rng.permutation(n)
    return x[perm], y[perm]


class TestSplitByRight:
    def test_pair_masks_partition(self):
        r_idx = np.array([0, 0, 1, 2, 3, 3, 3])
        tr, te = split_by_right(r_idx, 4, seed=0)
        assert (tr ^ te).all()

    def test_split_at_record_level(self):
        r_idx = np.array([0, 0, 1, 1, 2, 2])
        tr, _ = split_by_right(r_idx, 3, seed=1)
        # Pairs of the same right record land on the same side.
        for r in range(3):
            vals = set(tr[r_idx == r])
            assert len(vals) == 1

    def test_roughly_half(self):
        r_idx = np.arange(100)
        tr, _ = split_by_right(r_idx, 100, seed=0)
        assert 40 <= tr.sum() <= 60


class TestMagellanRF:
    def test_learns_separable_data(self, spark):
        x, y = _data()
        tr, te = split_by_right(np.arange(len(x)), len(x), seed=0)
        p = magellan_rf(spark, x, y, tr, seed=0)
        assert p[(y == 1) & te].mean() > 0.7
        assert p[(y == 0) & te].mean() < 0.3

    def test_degenerate_single_class(self, spark):
        x = np.random.default_rng(0).random((40, 3))
        y = np.zeros(40)
        tr = np.ones(40, dtype=bool)
        p = magellan_rf(spark, x, y, tr)
        assert np.allclose(p, 0.0)


class TestDeepMatcherMLP:
    def test_learns_separable_data(self, spark):
        x, y = _data(seed=2)
        tr, te = split_by_right(np.arange(len(x)), len(x), seed=0)
        p = deepmatcher_mlp(spark, x, y, tr, seed=0)
        assert p[(y == 1) & te].mean() > p[(y == 0) & te].mean() + 0.2


class TestActiveLearning:
    def test_learns_separable_data(self):
        x, y = _data(seed=4)
        tr, te = split_by_right(np.arange(len(x)), len(x), seed=0)
        p = active_learning_scores(x, y, tr, seed=0)
        assert p[(y == 1) & te].mean() > 0.6
        assert p[(y == 0) & te].mean() < 0.4

    def test_empty_train(self):
        x, y = _data(n=10)
        p = active_learning_scores(x, y, np.zeros(10, dtype=bool))
        assert np.allclose(p, 0.0)

    def test_label_budget_respected(self):
        # Budget path: runs without consuming every label.
        x, y = _data(n=500, seed=5)
        tr = np.ones(500, dtype=bool)
        p = active_learning_scores(x, y, tr, seed=0)
        assert p.shape == (500,)
