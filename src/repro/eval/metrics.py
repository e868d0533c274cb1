"""Evaluation metrics (§5.1.2): precision, relative recall, adjusted
recall, and PR-AUC.

- ``precision`` (Eq. 3): among joined R records, the fraction whose
  assignment equals ground truth (joining an r whose truth is ⊥ counts
  as a false positive).
- ``recall`` (Eq. 4 variant): we report the *relative* recall —
  correct joins / total ground-truth joins — which the paper notes is
  the absolute count up to a per-dataset constant.
- ``adjusted recall`` (AR): for a score-based method, the recall at the
  threshold whose precision is closest-to-but-not-greater-than a target
  precision (the AutoFJ operating point). Favors the baseline, as in
  the paper.
- ``PR-AUC``: step-wise area under the PR curve (sum of ΔR · P).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass
class PRPoint:
    precision: float
    recall: float
    threshold: float


def precision_recall(
    assignment: dict[int, int], gt: dict[int, int | None], n_gt: int | None = None
) -> tuple[float, float]:
    """Precision (Eq. 3) and relative recall of a many-to-one assignment.

    ``assignment`` maps rid → lid for joined records only.
    """
    if n_gt is None:
        n_gt = sum(1 for v in gt.values() if v is not None)
    joined = len(assignment)
    if joined == 0:
        return 1.0, 0.0
    correct = sum(1 for r, l in assignment.items() if gt.get(r) == l)
    return correct / joined, (correct / n_gt if n_gt else 0.0)


def pr_curve(
    scored: list[tuple[int, int, float]], gt: dict[int, int | None], n_gt: int | None = None
) -> list[PRPoint]:
    """PR curve for a score-based joiner.

    ``scored``: per right record, its single best candidate as
    (rid, lid, score), higher score = more similar. Sweeping the score
    threshold from high to low traces the curve (each r joins its best
    candidate iff score ≥ t — the many-to-one discipline the paper's AR
    procedure implies).
    """
    if n_gt is None:
        n_gt = sum(1 for v in gt.values() if v is not None)
    pts: list[PRPoint] = []
    if not scored or n_gt == 0:
        return pts
    order = sorted(scored, key=lambda x: -x[2])
    correct = 0
    joined = 0
    i = 0
    n = len(order)
    while i < n:
        # Consume all pairs tied at this score before emitting a point.
        s = order[i][2]
        while i < n and order[i][2] == s:
            rid, lid, _ = order[i]
            joined += 1
            if gt.get(rid) == lid:
                correct += 1
            i += 1
        pts.append(PRPoint(correct / joined, correct / n_gt, s))
    return pts


def pr_auc(points: list[PRPoint]) -> float:
    """Step-wise AUC: Σ (R_i − R_{i−1}) · P_i over increasing recall."""
    if not points:
        return 0.0
    auc = 0.0
    prev_r = 0.0
    for p in points:  # already in decreasing-threshold = increasing-recall order
        if p.recall > prev_r:
            auc += (p.recall - prev_r) * p.precision
            prev_r = p.recall
    return auc


def adjusted_recall(points: list[PRPoint], target_precision: float) -> float:
    """Recall at precision closest-to-but-not-greater-than the target.

    If every point exceeds the target precision, the max-recall point is
    used (both conventions favor the baseline, per §5.1.2).
    """
    if not points:
        return 0.0
    at_or_below = [p for p in points if p.precision <= target_precision]
    if at_or_below:
        best_p = max(p.precision for p in at_or_below)
        return max(p.recall for p in at_or_below if p.precision == best_p)
    return max(p.recall for p in points)


def pearson(a: list[float], b: list[float]) -> float:
    """Pearson correlation; NaN for degenerate (constant/short) series,
    matching the paper's NA entries for one-iteration runs."""
    if len(a) != len(b) or len(a) < 2:
        return float("nan")
    x, y = np.asarray(a, dtype=float), np.asarray(b, dtype=float)
    if x.std() == 0 or y.std() == 0:
        return float("nan")
    return float(np.corrcoef(x, y)[0, 1])
