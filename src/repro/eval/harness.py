"""Per-dataset evaluation harness: AutoFJ, ablations, and all baselines.

Produces the numbers behind Tables 2, 5, and 6 for one dataset: AutoFJ's
(P, R) at the precision target plus PEPCC/RERCC, the recall upper bound
(UBR), per-join-function PR curves (for the globally-chosen BSJ), and PR
curves for every baseline from which adjusted recall (at AutoFJ's
precision) and PR-AUC are derived.

Baselines reuse the blocked candidate-pair space and distance tensor
(their comparison space; the paper's baselines block internally too),
except PPJoin, which runs its own Spark prefix-filter join.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
from pyspark.sql import SparkSession

from repro.baselines import ecm as ecm_mod
from repro.baselines import excel_like, fuzzywuzzy_like, zeroer_like
from repro.baselines.features import embedding_features, feature_matrix
from repro.baselines.ppjoin import ppjoin
from repro.baselines.static_best import per_function_curves, upper_bound_recall
from repro.baselines.supervised import (
    active_learning_scores,
    deepmatcher_mlp,
    magellan_rf,
    split_by_right,
)
from repro.core.pipeline import Prepared, prepare, run_autofj
from repro.eval.metrics import (
    PRPoint,
    adjusted_recall,
    pearson,
    pr_auc,
    pr_curve,
    precision_recall,
)

UNSUPERVISED = ("Excel", "FW", "ZeroER", "ECM", "PP")
SUPERVISED = ("Magellan", "DM", "AL")


@dataclass
class DatasetReport:
    """All Table-2/5/6 numbers for one dataset."""

    name: str
    n_l: int
    n_r: int
    ubr: float
    autofj_precision: float
    autofj_recall: float
    pepcc: float
    rercc: float
    autofj_curve: list[PRPoint]
    uc_recall: float  # AutoFJ-UC ablation
    nr_recall: float  # AutoFJ-NR ablation (no negative rules)
    bsj_curves: list[list[PRPoint]] = field(default_factory=list)
    curves: dict[str, list[PRPoint]] = field(default_factory=dict)

    def ar(self, method: str) -> float:
        return adjusted_recall(self.curves[method], self.autofj_precision)

    def auc(self, method: str) -> float:
        return pr_auc(self.curves[method])

    @property
    def autofj_auc(self) -> float:
        return pr_auc(self.autofj_curve)


def _best_candidate_scores(
    prep: Prepared, scores: np.ndarray, mask: np.ndarray | None = None
) -> list[tuple[int, int, float]]:
    """Per right record, its best-scoring candidate (rid, lid, score)."""
    df = prep.lr_pairs[["rid", "lid"]].copy()
    df["score"] = scores
    if mask is not None:
        df = df[mask]
    if df.empty:
        return []
    idx = df.groupby("rid")["score"].idxmax()
    best = df.loc[idx]
    return list(best.itertuples(index=False, name=None))


def evaluate_dataset(
    spark: SparkSession,
    ds,
    *,
    tau: float = 0.9,
    s: int = 50,
    seed: int = 0,
    fns=None,
    prep: Prepared | None = None,
    curve_tau: float = 0.05,
    with_baselines: bool = True,
) -> DatasetReport:
    """Run AutoFJ (+ ablations, UBR, baselines) on one dataset."""
    if prep is None:
        prep = prepare(spark, ds, fns=fns)
    gt = ds.gt

    # --- AutoFJ at the precision target -----------------------------------
    from repro.core.pipeline import precompute_for

    pre_nr = precompute_for(prep, use_negative_rules=True, s=s)
    run = run_autofj(spark, ds, prep=prep, pre=pre_nr, tau=tau, s=s)
    p_afj, r_afj = precision_recall(run.assignment, gt)
    actual_p, actual_r = [], []
    for snap in run.iteration_assignments():
        pp, rr = precision_recall(snap, gt)
        actual_p.append(pp)
        actual_r.append(rr)
    pepcc = pearson(run.result.est_precision, actual_p)
    rercc = pearson(run.result.est_recall, actual_r)

    # --- AutoFJ PR curve (confidence sweep over the deep greedy run) -------
    # Run the greedy to near-exhaustion (τ = curve_tau), then sweep the
    # per-record estimated precision (the confidence each join carries)
    # exactly like a baseline's score threshold — this is AutoFJ's full
    # operating curve for PR-AUC.
    deep = run_autofj(spark, ds, prep=prep, pre=pre_nr, tau=curve_tau, s=s)
    conf_scored = [
        (prep.rids[r], prep.lids[int(l)], float(deep.result.confidence[r]))
        for r, l in enumerate(deep.result.assignment)
        if l >= 0
    ]
    autofj_curve = pr_curve(conf_scored, gt)

    # --- Ablations ---------------------------------------------------------
    uc = run_autofj(spark, ds, prep=prep, pre=pre_nr, tau=tau, s=s, single_config=True)
    _, r_uc = precision_recall(uc.assignment, gt)
    nr = run_autofj(spark, ds, prep=prep, tau=tau, s=s, use_negative_rules=False)
    _, r_nr = precision_recall(nr.assignment, gt)

    # --- UBR + BSJ ---------------------------------------------------------
    l_idx = prep.lr_pairs["l_idx"].to_numpy()
    r_idx = prep.lr_pairs["r_idx"].to_numpy()
    ubr = upper_bound_recall(
        l_idx, r_idx, prep.lr_dist, n_r=prep.n_r, rids=prep.rids, lids=prep.lids, gt=gt
    )
    report = DatasetReport(
        name=ds.name, n_l=prep.n_l, n_r=prep.n_r, ubr=ubr,
        autofj_precision=p_afj, autofj_recall=r_afj,
        pepcc=pepcc, rercc=rercc, autofj_curve=autofj_curve,
        uc_recall=r_uc, nr_recall=r_nr,
    )
    if not with_baselines:
        return report
    report.bsj_curves = per_function_curves(
        l_idx, r_idx, prep.lr_dist, n_r=prep.n_r, rids=prep.rids, lids=prep.lids, gt=gt
    )

    # --- Unsupervised baselines -------------------------------------------
    l_vals = prep.lr_pairs["l_value"].tolist()
    r_vals = prep.lr_pairs["r_value"].tolist()
    report.curves["Excel"] = pr_curve(
        _best_candidate_scores(prep, excel_like.score_pairs(prep.lr_dist, prep.fns)), gt
    )
    report.curves["FW"] = pr_curve(
        _best_candidate_scores(prep, fuzzywuzzy_like.score_pairs(l_vals, r_vals)), gt
    )
    feats = feature_matrix(prep.lr_dist, prep.fns, l_vals, r_vals)
    report.curves["ZeroER"] = pr_curve(
        _best_candidate_scores(prep, zeroer_like.fit_predict(feats, seed=seed)), gt
    )
    report.curves["ECM"] = pr_curve(
        _best_candidate_scores(prep, ecm_mod.fit_predict(feats)), gt
    )

    # PPJoin: its own Spark join at a permissive threshold, swept after.
    left = spark.createDataFrame(ds.left[["lid", "value"]])
    right = spark.createDataFrame(ds.right[["rid", "value"]])
    pp = ppjoin(spark, left, right, key_col="value", threshold=0.1).toPandas()
    if len(pp):
        best = pp.loc[pp.groupby("rid")["jaccard"].idxmax()]
        pp_scored = list(best[["rid", "lid", "jaccard"]].itertuples(index=False, name=None))
    else:
        pp_scored = []
    report.curves["PP"] = pr_curve(pp_scored, gt)

    # --- Supervised baselines (50/50 split by right record) ----------------
    labels = np.array(
        [gt.get(r) == l for r, l in zip(prep.lr_pairs["rid"], prep.lr_pairs["lid"])],
        dtype=np.float64,
    )
    train_mask, test_mask = split_by_right(r_idx, prep.n_r, seed=seed)
    test_rids = {prep.rids[i] for i in np.unique(r_idx[test_mask])}
    gt_test = {r: v for r, v in gt.items() if r in test_rids}
    n_gt_test = sum(1 for v in gt_test.values() if v is not None)

    def _sup_curve(probs: np.ndarray) -> list[PRPoint]:
        scored = _best_candidate_scores(prep, probs, mask=test_mask)
        return pr_curve(scored, gt_test, n_gt=n_gt_test)

    report.curves["Magellan"] = _sup_curve(
        magellan_rf(spark, feats, labels, train_mask, seed=seed)
    )
    emb_feats = embedding_features(l_vals, r_vals)
    report.curves["DM"] = _sup_curve(
        deepmatcher_mlp(spark, emb_feats, labels, train_mask, seed=seed)
    )
    # AL queries labels from the training half, then scores every pair with
    # a model fit on the actively-labeled subset.
    report.curves["AL"] = _sup_curve(
        active_learning_scores(feats, labels, train_mask, seed=seed)
    )
    return report
