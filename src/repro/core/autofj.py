"""AutoFJ greedy union search (Algorithm 1) and program application.

Given the precomputed precision tensor, the greedy loop maintains the
union state per right record: its current assignment and estimated
precision (0 = unassigned). Adding a configuration C updates each r it
joins to ``max(p_cur, p_C)`` — this single rule covers all three cases of
§3.1 (new join; same-l agreement keeps the more confident estimate;
conflicting l keeps the more confident assignment). Then

    TP(U) = Σ_r p_r,   FP(U) = |joined| − TP(U),
    precision(U) = TP/(TP+FP) = mean p over joined,
    profit(U) = TP/FP                              (Eq. 13–14)

Each iteration evaluates profit(U ∪ {C}) for every remaining C with one
vectorized max over the [n_cfg, n_R] matrix, picks the argmax, and stops
when its estimated precision would drop to ≤ τ (Alg. 1 line 11–14) or no
remaining configuration adds true positives.

`apply_program` re-applies a learned program U to candidate pairs with a
distance tensor — the Spark-side path broadcasts U and evaluates the
union predicate over the pair DataFrame, producing the final
many-to-one join.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.core.precision_est import Precomputed

_EPS = 1e-9


@dataclass
class AutoFJResult:
    """Output of the greedy search.

    ``assignment[r]`` is the joined left index or -1; ``confidence[r]``
    the estimated precision of that join (0 if unassigned).
    ``program`` lists selected (fn_index, threshold_index) pairs in
    selection order. Per-iteration estimated precision/recall and
    assignment snapshots support PEPCC/RERCC and PR curves.
    """

    assignment: np.ndarray
    confidence: np.ndarray
    program: list[tuple[int, int]] = field(default_factory=list)
    est_precision: list[float] = field(default_factory=list)
    est_recall: list[float] = field(default_factory=list)
    snapshots: list[np.ndarray] = field(default_factory=list)


def greedy_search(
    pre: Precomputed,
    tau: float,
    *,
    max_iters: int | None = None,
) -> AutoFJResult:
    """Algorithm 1 over the flattened config space."""
    p_cfg, l_cfg = pre.flat()  # [n_cfg, n_R] each
    n_cfg, n_r = p_cfg.shape
    p_cur = np.zeros(n_r, dtype=np.float64)
    l_cur = np.full(n_r, -1, dtype=np.int64)
    used = np.zeros(n_cfg, dtype=bool)
    res = AutoFJResult(assignment=l_cur, confidence=p_cur)
    tp_cur = 0.0
    limit = max_iters if max_iters is not None else n_cfg
    p_cfg64 = p_cfg.astype(np.float64)
    for _ in range(limit):
        p_new = np.maximum(p_cur[None, :], p_cfg64)  # [n_cfg, n_R]
        tp = p_new.sum(axis=1)
        joined = (p_new > 0).sum(axis=1)
        fp = joined - tp
        profit = tp / np.maximum(fp, _EPS)
        gain = tp - tp_cur
        candidate = (~used) & (gain > _EPS)
        if not candidate.any():
            break
        profit = np.where(candidate, profit, -np.inf)
        c = int(np.argmax(profit))
        prec = tp[c] / max(joined[c], _EPS)
        if prec <= tau:
            break
        # Accept C: update union state.
        better = p_cfg64[c] > p_cur
        l_cur = np.where(better, l_cfg[c], l_cur)
        p_cur = np.maximum(p_cur, p_cfg64[c])
        tp_cur = float(p_cur.sum())
        used[c] = True
        res.program.append((c // pre.n_th, c % pre.n_th))
        res.est_precision.append(float(prec))
        res.est_recall.append(tp_cur)
        res.snapshots.append(l_cur.copy())
    res.assignment = l_cur
    res.confidence = p_cur
    return res


def apply_program(
    pre: Precomputed, program: list[tuple[int, int]]
) -> tuple[np.ndarray, np.ndarray]:
    """Re-derive the union assignment for a given program.

    Used both to apply a learned program to fresh data and to verify the
    Spark-side application path against the search-state assignment.
    """
    n_r = pre.n_r
    p_cur = np.zeros(n_r)
    l_cur = np.full(n_r, -1, dtype=np.int64)
    for fn_i, th_i in program:
        p_c = pre.precision[fn_i, th_i].astype(np.float64)
        l_c = pre.closest_l[fn_i]
        better = p_c > p_cur
        l_cur = np.where(better, l_c, l_cur)
        p_cur = np.maximum(p_cur, p_c)
    return l_cur, p_cur


def single_best_config(pre: Precomputed, tau: float) -> AutoFJResult:
    """AutoFJ-UC ablation: the single configuration maximizing estimated
    recall (TP) subject to estimated precision > τ; falls back to the
    max-precision config if none meets τ."""
    p, _ = pre.flat()
    p64 = p.astype(np.float64)
    tp = p64.sum(axis=1)
    joined = (p64 > 0).sum(axis=1)
    prec = tp / np.maximum(joined, _EPS)
    ok = prec > tau
    if ok.any():
        idx = int(np.argmax(np.where(ok, tp, -np.inf)))
    else:
        idx = int(np.argmax(prec))
    pre_like = AutoFJResult(
        assignment=np.where(p64[idx] > 0, np.repeat(pre.closest_l, pre.n_th, axis=0)[idx], -1),
        confidence=p64[idx],
        program=[(idx // pre.n_th, idx % pre.n_th)],
        est_precision=[float(prec[idx])],
        est_recall=[float(tp[idx])],
    )
    pre_like.snapshots.append(pre_like.assignment.copy())
    return pre_like
