"""Tests for evaluation metrics (§5.1.2)."""
import math

import pytest

from repro.eval.metrics import (
    PRPoint,
    adjusted_recall,
    pearson,
    pr_auc,
    pr_curve,
    precision_recall,
)

GT = {0: 10, 1: 11, 2: 12, 3: None}


class TestPrecisionRecall:
    def test_perfect(self):
        p, r = precision_recall({0: 10, 1: 11, 2: 12}, GT)
        assert p == 1.0 and r == 1.0

    def test_wrong_join_counts_against_precision(self):
        p, r = precision_recall({0: 10, 1: 99}, GT)
        assert p == 0.5 and r == pytest.approx(1 / 3)

    def test_joining_bottom_r_is_false_positive(self):
        p, r = precision_recall({3: 10}, GT)
        assert p == 0.0 and r == 0.0

    def test_empty_assignment(self):
        p, r = precision_recall({}, GT)
        assert p == 1.0 and r == 0.0

    def test_missed_join_hurts_recall_not_precision(self):
        p, r = precision_recall({0: 10}, GT)
        assert p == 1.0 and r == pytest.approx(1 / 3)


class TestPRCurve:
    def test_monotone_recall(self):
        scored = [(0, 10, 0.9), (1, 11, 0.8), (2, 99, 0.7)]
        pts = pr_curve(scored, GT)
        rec = [p.recall for p in pts]
        assert rec == sorted(rec)
        assert pts[0].precision == 1.0
        assert pts[-1].precision == pytest.approx(2 / 3)

    def test_ties_consumed_together(self):
        scored = [(0, 10, 0.5), (1, 99, 0.5)]
        pts = pr_curve(scored, GT)
        assert len(pts) == 1
        assert pts[0].precision == 0.5

    def test_empty(self):
        assert pr_curve([], GT) == []


class TestPRAUC:
    def test_perfect_curve(self):
        pts = [PRPoint(1.0, 0.5, 0.9), PRPoint(1.0, 1.0, 0.5)]
        assert pr_auc(pts) == pytest.approx(1.0)

    def test_half_precision(self):
        pts = [PRPoint(0.5, 1.0, 0.5)]
        assert pr_auc(pts) == pytest.approx(0.5)

    def test_empty(self):
        assert pr_auc([]) == 0.0

    def test_non_increasing_recall_ignored(self):
        pts = [PRPoint(1.0, 0.5, 0.9), PRPoint(0.9, 0.5, 0.8)]
        assert pr_auc(pts) == pytest.approx(0.5)


class TestAdjustedRecall:
    def test_paper_worked_example(self):
        # §5.1.2: baseline curve {(0.8,0.8),(0.9,0.7),(0.92,0.6),(0.95,0.5)},
        # AutoFJ precision 0.91 → AR = 0.7 (at precision 0.9).
        pts = [
            PRPoint(0.95, 0.5, 0.9),
            PRPoint(0.92, 0.6, 0.8),
            PRPoint(0.9, 0.7, 0.7),
            PRPoint(0.8, 0.8, 0.6),
        ]
        assert adjusted_recall(pts, 0.91) == pytest.approx(0.7)

    def test_all_points_above_target_uses_max_recall(self):
        pts = [PRPoint(0.99, 0.3, 0.9), PRPoint(0.95, 0.6, 0.5)]
        assert adjusted_recall(pts, 0.9) == pytest.approx(0.6)

    def test_empty(self):
        assert adjusted_recall([], 0.9) == 0.0


class TestPearson:
    def test_perfect_correlation(self):
        assert pearson([1, 2, 3], [2, 4, 6]) == pytest.approx(1.0)

    def test_anti_correlation(self):
        assert pearson([1, 2, 3], [3, 2, 1]) == pytest.approx(-1.0)

    def test_degenerate_nan(self):
        assert math.isnan(pearson([1], [1]))
        assert math.isnan(pearson([1, 1], [1, 2]))
