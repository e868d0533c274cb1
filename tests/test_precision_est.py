"""Tests for the 2d-ball precision estimate (Eq. 8–13), on hand-built
geometries mirroring Figure 4 of the paper."""
import numpy as np
import pytest

from repro.core.precision_est import ball_counts, closest_per_right, precompute


def _grid(vals):
    return np.array(vals, dtype=np.float64)


class TestClosestPerRight:
    def test_basic_argmin(self):
        # pairs: (l, r, d) for one function.
        l_idx = np.array([0, 1, 2])
        r_idx = np.array([0, 0, 1])
        d = np.array([[0.3], [0.1], [0.2]])
        cl, cd = closest_per_right(l_idx, r_idx, d, n_r=3)
        assert cl[0, 0] == 1 and cd[0, 0] == pytest.approx(0.1)
        assert cl[0, 1] == 2 and cd[0, 1] == pytest.approx(0.2)
        assert cl[0, 2] == -1 and np.isinf(cd[0, 2])  # no candidates

    def test_tie_breaks_to_smaller_lid(self):
        l_idx = np.array([5, 2])
        r_idx = np.array([0, 0])
        d = np.array([[0.1], [0.1]])
        cl, _ = closest_per_right(l_idx, r_idx, d, n_r=1)
        assert cl[0, 0] == 2

    def test_per_function_independence(self):
        l_idx = np.array([0, 1])
        r_idx = np.array([0, 0])
        d = np.array([[0.1, 0.9], [0.5, 0.2]])
        cl, _ = closest_per_right(l_idx, r_idx, d, n_r=1)
        assert cl[0, 0] == 0  # fn 0 prefers l0
        assert cl[1, 0] == 1  # fn 1 prefers l1

    def test_empty_pairs(self):
        cl, cd = closest_per_right(
            np.zeros(0, dtype=int), np.zeros(0, dtype=int), np.zeros((0, 2)), n_r=3
        )
        assert (cl == -1).all() and np.isinf(cd).all()


class TestBallCounts:
    def test_counts_cumulative_in_theta(self):
        # l0 has neighbors at distances 0.2 and 0.6.
        l1 = np.array([0, 0])
        d = np.array([[0.2], [0.6]])
        th = _grid([0.1, 0.2, 0.3, 0.5])
        c = ball_counts(l1, d, n_l=2, thresholds=th)
        # 2θ = 0.2, 0.4, 0.6, 1.0 → counts 1, 1, 2, 2.
        assert c[0, 0].tolist() == [1, 1, 2, 2]

    def test_boundary_inclusive(self):
        # d = 2θ exactly counts as inside the ball (f ≤ 2θ).
        c = ball_counts(np.array([0]), np.array([[0.4]]), 1, _grid([0.2]))
        assert c[0, 0, 0] == 1

    def test_no_neighbors(self):
        c = ball_counts(np.zeros(0, dtype=int), np.zeros((0, 1)), 2, _grid([0.5]))
        assert (c == 0).all()


class TestPrecompute:
    def test_figure4a_clean_ball_precision_one(self):
        """r's closest l has no other L records within 2θ → precision 1."""
        # L = {0, 1} far apart (d_LL = 0.9); r at distance 0.1 from l0.
        pre = precompute(
            l_idx=np.array([0]),
            r_idx=np.array([0]),
            lr_dists=np.array([[0.1]]),
            l1_idx=np.array([0, 1]),
            ll_dists=np.array([[0.9], [0.9]]),
            n_l=2,
            n_r=1,
            thresholds=_grid([0.2, 0.5]),
        )
        # θ=0.2: 2θ=0.4 < 0.9 → clean ball → precision 1.
        assert pre.precision[0, 0, 0] == pytest.approx(1.0)
        # θ=0.5: 2θ=1.0 ≥ 0.9 → one extra L record → precision 1/2.
        assert pre.precision[0, 1, 0] == pytest.approx(0.5)

    def test_figure4b_crowded_ball_low_precision(self):
        """Many L records in the 2d-ball → precision 1/(1+count)."""
        # l0 has 4 close L neighbors at d=0.3 each; r at d=0.25 from l0.
        pre = precompute(
            l_idx=np.array([0]),
            r_idx=np.array([0]),
            lr_dists=np.array([[0.25]]),
            l1_idx=np.array([0, 0, 0, 0]),
            ll_dists=np.array([[0.3]] * 4),
            n_l=5,
            n_r=1,
            thresholds=_grid([0.25]),
        )
        # 2θ = 0.5 ≥ 0.3 → 4 neighbors in ball → precision 1/5 (paper Ex. 3.2).
        assert pre.precision[0, 0, 0] == pytest.approx(1 / 5)

    def test_not_joined_below_threshold(self):
        pre = precompute(
            l_idx=np.array([0]),
            r_idx=np.array([0]),
            lr_dists=np.array([[0.8]]),
            l1_idx=np.zeros(0, dtype=int),
            ll_dists=np.zeros((0, 1)),
            n_l=1,
            n_r=1,
            thresholds=_grid([0.5]),
        )
        assert pre.precision[0, 0, 0] == 0.0

    def test_join_at_exact_threshold(self):
        pre = precompute(
            l_idx=np.array([0]),
            r_idx=np.array([0]),
            lr_dists=np.array([[0.5]]),
            l1_idx=np.zeros(0, dtype=int),
            ll_dists=np.zeros((0, 1)),
            n_l=1,
            n_r=1,
            thresholds=_grid([0.5]),
        )
        assert pre.precision[0, 0, 0] == pytest.approx(1.0)

    def test_flat_shape(self):
        pre = precompute(
            l_idx=np.array([0]),
            r_idx=np.array([0]),
            lr_dists=np.array([[0.1, 0.2]]),
            l1_idx=np.zeros(0, dtype=int),
            ll_dists=np.zeros((0, 2)),
            n_l=1,
            n_r=2,
            thresholds=_grid([0.3, 0.6, 0.9]),
        )
        p, l_assign = pre.flat()
        assert p.shape == (6, 2)
        assert l_assign.shape == (6, 2)
        # Config order: fn0 θ0..θ2 then fn1 θ0..θ2.
        assert pre.precision[1, 2, 0] == p[5, 0]
