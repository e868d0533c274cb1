"""Tests for the greedy union search (Algorithm 1)."""
import numpy as np
import pytest

from repro.core.autofj import apply_program, greedy_search, single_best_config
from repro.core.precision_est import Precomputed


def _pre(precision, closest_l, thresholds=None):
    """Build a Precomputed from explicit tensors."""
    precision = np.asarray(precision, dtype=np.float32)
    n_fn, n_th, n_r = precision.shape
    closest_l = np.asarray(closest_l, dtype=np.int64)
    th = np.asarray(thresholds if thresholds is not None else np.linspace(0.1, 1, n_th))
    closest_d = np.where(closest_l >= 0, 0.0, np.inf)
    return Precomputed(
        thresholds=th, closest_l=closest_l, closest_d=closest_d, precision=precision
    )


class TestGreedySearch:
    def test_picks_high_precision_config(self):
        # fn0 joins r0 with precision 1; fn1 joins r0,r1 with precision 0.4.
        pre = _pre(
            [[[1.0, 0.0]], [[0.4, 0.4]]],
            closest_l=[[0, -1], [0, 1]],
        )
        res = greedy_search(pre, tau=0.9)
        assert res.program == [(0, 0)]
        assert res.assignment.tolist() == [0, -1]

    def test_union_of_two_configs(self):
        # fn0 joins r0 (p=1), fn1 joins r1 (p=0.95): union keeps precision
        # above 0.9 and adds recall.
        pre = _pre(
            [[[1.0, 0.0]], [[0.0, 0.95]]],
            closest_l=[[0, -1], [-1, 1]],
        )
        res = greedy_search(pre, tau=0.9)
        assert len(res.program) == 2
        assert res.assignment.tolist() == [0, 1]
        assert res.est_precision[-1] == pytest.approx((1.0 + 0.95) / 2)

    def test_stops_at_precision_target(self):
        # Second config would drag estimated precision below τ.
        pre = _pre(
            [[[1.0, 0.0]], [[0.0, 0.3]]],
            closest_l=[[0, -1], [-1, 1]],
        )
        res = greedy_search(pre, tau=0.9)
        assert res.program == [(0, 0)]
        assert res.assignment.tolist() == [0, -1]

    def test_conflict_resolved_by_confidence(self):
        # Both configs join r0 but to different l; the higher-precision
        # assignment wins (§3.1 conflict rule).
        pre = _pre(
            [[[0.95, 0.96]], [[0.97, 0.0]]],
            closest_l=[[1, 2], [0, -1]],
        )
        res = greedy_search(pre, tau=0.5)
        assert res.assignment[0] == 0  # from the p=0.97 config
        assert res.assignment[1] == 2

    def test_profit_prefers_more_tp_per_fp(self):
        # fn0: 2 joins at p=0.95 (TP=1.9, FP=0.1, profit=19)
        # fn1: 1 join at p=0.96 (TP=0.96, FP=0.04, profit=24) → fn1 first.
        pre = _pre(
            [[[0.95, 0.95, 0.0]], [[0.0, 0.0, 0.96]]],
            closest_l=[[0, 1, -1], [-1, -1, 2]],
        )
        res = greedy_search(pre, tau=0.5)
        assert res.program[0] == (1, 0)

    def test_empty_space(self):
        pre = _pre(np.zeros((1, 1, 2)), closest_l=[[-1, -1]])
        res = greedy_search(pre, tau=0.9)
        assert res.program == []
        assert (res.assignment == -1).all()

    def test_no_duplicate_configs(self):
        pre = _pre(
            [[[1.0, 1.0]]],
            closest_l=[[0, 1]],
        )
        res = greedy_search(pre, tau=0.5)
        assert len(res.program) == 1  # adding the same config again has no gain

    def test_est_recall_monotone(self):
        pre = _pre(
            [[[1.0, 0.0, 0.0]], [[0.0, 0.98, 0.0]], [[0.0, 0.0, 0.97]]],
            closest_l=[[0, -1, -1], [-1, 1, -1], [-1, -1, 2]],
        )
        res = greedy_search(pre, tau=0.9)
        assert res.est_recall == sorted(res.est_recall)
        assert len(res.snapshots) == len(res.program)


class TestApplyProgram:
    def test_matches_search_assignment(self):
        rng = np.random.default_rng(0)
        precision = rng.random((4, 3, 10)).astype(np.float32)
        precision[precision < 0.5] = 0.0
        closest_l = rng.integers(0, 5, (4, 10))
        pre = _pre(precision, closest_l)
        res = greedy_search(pre, tau=0.2)
        l_cur, p_cur = apply_program(pre, res.program)
        assert (l_cur == res.assignment).all()
        assert np.allclose(p_cur, res.confidence)


class TestSingleBestConfig:
    def test_maximizes_recall_subject_to_tau(self):
        # fn0: 1 join p=1.0; fn1: 2 joins p=0.95 → UC picks fn1.
        pre = _pre(
            [[[1.0, 0.0]], [[0.95, 0.95]]],
            closest_l=[[0, -1], [0, 1]],
        )
        res = single_best_config(pre, tau=0.9)
        assert res.program[0][0] == 1
        assert (res.assignment >= 0).sum() == 2

    def test_fallback_when_none_meets_tau(self):
        pre = _pre(
            [[[0.4, 0.4]], [[0.6, 0.0]]],
            closest_l=[[0, 1], [0, -1]],
        )
        res = single_best_config(pre, tau=0.9)
        assert res.program[0][0] == 1  # highest-precision config
