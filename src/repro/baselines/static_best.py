"""Best Static Join function (BSJ, §5.1.3) and recall Upper Bound (UBR).

BSJ: evaluate every individual join function as a score-based joiner
(score = 1 − distance; each r joins its closest l). The *static* winner
is the function with the best average adjusted recall over all datasets
— chosen once, globally, by the Table-2 job.

UBR: a ground-truth pair (l, r) is *feasible* if some join function in
the space ranks l as r's closest left record; UBR is the recall over
feasible pairs — the ceiling any fuzzy-join program over this space can
reach (§5.1.3).
"""
from __future__ import annotations

import numpy as np

from repro.core.precision_est import closest_per_right
from repro.eval.metrics import PRPoint, pr_curve


def per_function_curves(
    l_idx: np.ndarray,
    r_idx: np.ndarray,
    dists: np.ndarray,
    *,
    n_r: int,
    rids: list,
    lids: list,
    gt: dict,
) -> list[list[PRPoint]]:
    """PR curve of each join function used as a standalone joiner."""
    closest_l, closest_d = closest_per_right(l_idx, r_idx, dists, n_r)
    curves = []
    for j in range(dists.shape[1]):
        scored = [
            (rids[r], lids[int(closest_l[j, r])], 1.0 - float(closest_d[j, r]))
            for r in range(n_r)
            if closest_l[j, r] >= 0
        ]
        curves.append(pr_curve(scored, gt))
    return curves


def upper_bound_recall(
    l_idx: np.ndarray,
    r_idx: np.ndarray,
    dists: np.ndarray,
    *,
    n_r: int,
    rids: list,
    lids: list,
    gt: dict,
) -> float:
    """UBR: fraction of ground-truth pairs reachable by some function."""
    closest_l, _ = closest_per_right(l_idx, r_idx, dists, n_r)
    lid_pos = {v: i for i, v in enumerate(lids)}
    n_gt = sum(1 for v in gt.values() if v is not None)
    if n_gt == 0:
        return 0.0
    feasible = 0
    for r in range(n_r):
        gt_lid = gt.get(rids[r])
        if gt_lid is None:
            continue
        want = lid_pos.get(gt_lid, -2)
        if (closest_l[:, r] == want).any():
            feasible += 1
    return feasible / n_gt
