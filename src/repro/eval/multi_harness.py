"""Multi-column evaluation harness (Tables 4a, 4b, 7).

AutoFJ = Algorithm 3 over per-column distance tensors. Baselines follow
§5.2.2: Excel / FW / PPJoin see all columns concatenated (they are
single-attribute methods); ZeroER / ECM / Magellan / DM / AL consume
per-column similarity features (Magellan-style feature generation).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.baselines import ecm as ecm_mod
from repro.baselines import excel_like, fuzzywuzzy_like, zeroer_like
from repro.baselines.ppjoin import ppjoin
from repro.baselines.supervised import (
    active_learning_scores,
    deepmatcher_mlp,
    magellan_rf,
    split_by_right,
)
from repro.core.autofj import greedy_search
from repro.core.config_space import full_space
from repro.core.multi_column import (
    MultiPrepared,
    multi_column_autofj,
    prepare_multi,
)
from repro.core.pairs import build_idf_maps, compute_distance_matrix
from repro.eval.metrics import (
    PRPoint,
    adjusted_recall,
    pr_auc,
    pr_curve,
    precision_recall,
)

_CONCAT_FNS = [
    f
    for f in full_space()
    if f.name
    in {
        "L+RP|SP|IDFW|JD", "L+RP|3G|IDFW|CD", "L|-|-|JW", "L|-|-|ED",
        "L+RP|SP|IDFW|MD",
    }
]


@dataclass
class MultiReport:
    """Table-4a/7 numbers for one multi-column dataset."""

    name: str
    selected: list[str]
    weights: dict[str, float]
    autofj_precision: float
    autofj_recall: float
    autofj_curve: list[PRPoint]
    curves: dict[str, list[PRPoint]] = field(default_factory=dict)

    def ar(self, method: str) -> float:
        return adjusted_recall(self.curves[method], self.autofj_precision)

    def auc(self, method: str) -> float:
        return pr_auc(self.curves[method])

    @property
    def autofj_auc(self) -> float:
        return pr_auc(self.autofj_curve)


def _best_scores(mp: MultiPrepared, scores, mask=None):
    df = mp.lr_pairs[["rid", "lid"]].copy()
    df["score"] = scores
    if mask is not None:
        df = df[mask]
    if df.empty:
        return []
    return list(
        df.loc[df.groupby("rid")["score"].idxmax()].itertuples(index=False, name=None)
    )


def _column_features(mp: MultiPrepared, max_fns_per_col: int = 6) -> np.ndarray:
    """Per-column similarity features: 1 − distance for a few functions."""
    n_cols, n_pairs, n_fn = mp.lr_dist.shape
    take = list(range(min(max_fns_per_col, n_fn)))
    feats = [1.0 - mp.lr_dist[c][:, take].astype(np.float64) for c in range(n_cols)]
    return np.concatenate(feats, axis=1)


def evaluate_multi_dataset(
    spark: SparkSession,
    ds,
    *,
    tau: float = 0.9,
    s: int = 50,
    g: int = 10,
    seed: int = 0,
    prep: MultiPrepared | None = None,
    curve_tau: float = 0.05,
    with_baselines: bool = True,
) -> MultiReport:
    if prep is None:
        prep = prepare_multi(spark, ds)
    gt = ds.gt

    res = multi_column_autofj(prep, tau=tau, s=s, g=g)
    assignment = prep.assignment_to_dict(res.result.assignment)
    p_afj, r_afj = precision_recall(assignment, gt)

    # AutoFJ PR curve: confidence sweep over a near-exhaustive greedy run
    # at the selected weights (same methodology as the single-column
    # harness — per-join estimated precision is the score).
    deep = greedy_search(res.pre, curve_tau)
    conf_scored = [
        (prep.rids[r], prep.lids[int(l)], float(deep.confidence[r]))
        for r, l in enumerate(deep.assignment)
        if l >= 0
    ]
    curve = pr_curve(conf_scored, gt)

    sel_w = {c: float(w) for c, w in zip(prep.cols, res.weights) if w > 1e-9}
    report = MultiReport(
        name=ds.name, selected=res.selected, weights=sel_w,
        autofj_precision=p_afj, autofj_recall=r_afj, autofj_curve=curve,
    )
    if not with_baselines:
        return report

    # --- Concatenated-column baselines ------------------------------------
    l_vals = prep.lr_pairs["l_value"].tolist()
    r_vals = prep.lr_pairs["r_value"].tolist()
    idf_cat = build_idf_maps(
        ds.left[prep.cols].astype(str).agg(" ".join, axis=1).tolist()
    )
    cat_dist = compute_distance_matrix(l_vals, r_vals, _CONCAT_FNS, idf_cat)
    report.curves["Excel"] = pr_curve(
        _best_scores(prep, excel_like.score_pairs(cat_dist, _CONCAT_FNS)), gt
    )
    report.curves["FW"] = pr_curve(
        _best_scores(prep, fuzzywuzzy_like.score_pairs(l_vals, r_vals)), gt
    )
    cat = F.trim(
        F.concat_ws(" ", *[F.coalesce(F.col(c).cast("string"), F.lit("")) for c in prep.cols])
    )
    left = spark.createDataFrame(ds.left).withColumn("__cat", cat)
    right = spark.createDataFrame(ds.right).withColumn("__cat", cat)
    pp = ppjoin(spark, left, right, key_col="__cat", threshold=0.1).toPandas()
    if len(pp):
        best = pp.loc[pp.groupby("rid")["jaccard"].idxmax()]
        scored = list(best[["rid", "lid", "jaccard"]].itertuples(index=False, name=None))
    else:
        scored = []
    report.curves["PP"] = pr_curve(scored, gt)

    # --- Feature-based baselines ------------------------------------------
    feats = _column_features(prep)
    report.curves["ZeroER"] = pr_curve(
        _best_scores(prep, zeroer_like.fit_predict(feats, seed=seed)), gt
    )
    report.curves["ECM"] = pr_curve(
        _best_scores(prep, ecm_mod.fit_predict(feats)), gt
    )

    labels = np.array(
        [gt.get(r) == l for r, l in zip(prep.lr_pairs["rid"], prep.lr_pairs["lid"])],
        dtype=np.float64,
    )
    r_idx = prep.lr_pairs["r_idx"].to_numpy()
    train_mask, test_mask = split_by_right(r_idx, prep.n_r, seed=seed)
    test_rids = {prep.rids[i] for i in np.unique(r_idx[test_mask])}
    gt_test = {r: v for r, v in gt.items() if r in test_rids}
    n_gt_test = sum(1 for v in gt_test.values() if v is not None)

    def _sup_curve(probs):
        return pr_curve(_best_scores(prep, probs, mask=test_mask), gt_test, n_gt=n_gt_test)

    report.curves["Magellan"] = _sup_curve(magellan_rf(spark, feats, labels, train_mask, seed=seed))
    from repro.baselines.features import embedding_features

    emb_feats = embedding_features(l_vals, r_vals)
    report.curves["DM"] = _sup_curve(deepmatcher_mlp(spark, emb_feats, labels, train_mask, seed=seed))
    report.curves["AL"] = _sup_curve(active_learning_scores(feats, labels, train_mask, seed=seed))
    return report
