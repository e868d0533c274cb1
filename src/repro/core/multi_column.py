"""Multi-column AutoFJ (§4, Algorithm 3).

Forward selection over columns: starting from the zero weight vector,
each outer iteration tries every remaining column j and every mixing
step α ∈ {1/g, …, (g−1)/g}, forming ``w′ = (1−α)·w + α·e_j``, runs
single-column AutoFJ (Algorithm 1) on the weighted column distances
``F_w(l, r) = Σ_j w_j · f_j(l[j], r[j])``, and keeps the candidate with
the best *estimated* recall. A column is added only if it improves on
the incumbent; otherwise the search stops.

Implementation notes:
- Distances per column are precomputed once (the expensive Spark stage);
  each (j, α) trial is a cheap driver-side weighted sum + Eq. 9
  precompute + greedy.
- Weight vectors are normalized to sum 1 before use, so the [0, 1]
  threshold grid keeps constant resolution; this makes first-iteration α
  values equivalent (pure rescale), which we deduplicate.
- The paper's efficiency constraint is kept: one distance function
  shared across columns per configuration (the join-function axis of the
  tensor is shared).
- Missing-value semantics (§5.2.2): missing = empty string; two missing
  values get the maximum distance (enforced in the tensor, not here).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.benchgen.single_column import FuzzyJoinDataset
from repro.core import blocking
from repro.core import negative_rules as NR
from repro.core.autofj import AutoFJResult, greedy_search
from repro.core.config_space import JoinFunction, reduced_space, threshold_grid
from repro.core.pairs import build_idf_maps, pair_distances
from repro.core.precision_est import Precomputed, precompute


@dataclass
class MultiPrepared:
    """Blocked pairs + per-column distance tensors for one dataset."""

    ds: FuzzyJoinDataset
    fns: list[JoinFunction]
    cols: list[str]
    lr_pairs: pd.DataFrame  # lid, rid, l_idx, r_idx, l_concat, r_concat
    lr_dist: np.ndarray  # [n_cols, n_lr, n_fn]
    nr_keep: np.ndarray
    ll_pairs: pd.DataFrame  # lid, lid2, l1_idx
    ll_dist: np.ndarray  # [n_cols, n_ll, n_fn]
    lids: list
    rids: list
    rules: set

    @property
    def n_l(self) -> int:
        return len(self.lids)

    @property
    def n_r(self) -> int:
        return len(self.rids)

    def assignment_to_dict(self, assignment: np.ndarray) -> dict:
        return {
            self.rids[r]: self.lids[int(l)]
            for r, l in enumerate(assignment)
            if l >= 0
        }


def _concat_col(df, cols):
    return F.trim(F.concat_ws(" ", *[F.coalesce(F.col(c).cast("string"), F.lit("")) for c in cols]))


def prepare_multi(
    spark: SparkSession,
    ds: FuzzyJoinDataset,
    *,
    fns: list[JoinFunction] | None = None,
    beta: float = 1.0,
    num_partitions: int | None = 16,
) -> MultiPrepared:
    """Spark stages for a multi-column dataset.

    Blocking and negative rules operate on the concatenation of all
    columns (records as documents); distances are computed per column
    with missing-max semantics. Default function space is the reduced
    24-function space (the multi-column runtime is
    O(m²·g·|S|·pairs) — §4.2; DESIGN.md documents the reduction).
    """
    fns = fns if fns is not None else reduced_space(24)
    cols = ds.key_cols
    left = spark.createDataFrame(ds.left).withColumn("__cat", _concat_col(ds.left, cols))
    right = spark.createDataFrame(ds.right).withColumn("__cat", _concat_col(ds.right, cols))

    lr = blocking.block_lr(spark, left, right, key_col="__cat", beta=beta)
    lr_ids = lr.select("lid", "rid").toPandas()
    # L–L candidates: union of the concatenated-text blocking and one
    # blocking per column. Concatenation alone under-samples neighbors
    # that are close under a *skewed* column weighting (e.g. same-year
    # records), which would inflate the 2d-ball precision estimate and
    # let Algorithm 3 pick degenerate weights; per-column blocking
    # restores those neighbors.
    ll = blocking.block_ll(spark, left, key_col="__cat", beta=beta)
    ll_union = ll.select("lid", "lid2")
    for c in cols:
        col_nonempty = left.where(F.length(F.coalesce(F.col(c).cast("string"), F.lit(""))) > 0)
        ll_c = blocking.block_ll(
            spark, col_nonempty.withColumn("__ckey", F.col(c).cast("string")),
            key_col="__ckey", beta=beta,
        )
        ll_union = ll_union.unionAll(ll_c.select("lid", "lid2"))
    ll_ids = ll_union.distinct().toPandas()

    lids = ds.left["lid"].tolist()
    rids = ds.right["rid"].tolist()
    lid_to_idx = {v: i for i, v in enumerate(lids)}
    rid_to_idx = {v: i for i, v in enumerate(rids)}

    # Per-column distance tensors over the same candidate pairs. The pair
    # order from pair_distances follows its own collection order, so
    # align every column's tensor to (lid, rid) of the first call.
    lr_dist_cols = []
    ll_dist_cols = []
    lr_key = None
    ll_key = None
    for c in cols:
        idf_maps = build_idf_maps(ds.left[c].astype(str).tolist())
        ids_c, mat_c = pair_distances(
            spark, spark.createDataFrame(lr_ids), left, right,
            key_col=c, fns=fns, idf_maps=idf_maps,
            missing_max=True, num_partitions=num_partitions,
        )
        order = ids_c.sort_values(["lid", "rid"]).index.to_numpy()
        if lr_key is None:
            lr_key = ids_c.loc[order, ["lid", "rid"]].reset_index(drop=True)
        lr_dist_cols.append(mat_c[order])
        ids_ll, mat_ll = pair_distances(
            spark,
            spark.createDataFrame(ll_ids).select("lid", F.col("lid2").alias("rid")),
            left,
            left.select(F.col("lid").alias("rid"), *[F.col(x) for x in cols]),
            key_col=c, fns=fns, idf_maps=idf_maps,
            missing_max=True, num_partitions=num_partitions,
        )
        order_ll = ids_ll.sort_values(["lid", "rid"]).index.to_numpy()
        if ll_key is None:
            ll_key = ids_ll.loc[order_ll, ["lid", "rid"]].reset_index(drop=True)
        ll_dist_cols.append(mat_ll[order_ll])

    l_cat = dict(
        zip(ds.left["lid"], ds.left[cols].astype(str).agg(" ".join, axis=1))
    )
    r_cat = dict(
        zip(ds.right["rid"], ds.right[cols].astype(str).agg(" ".join, axis=1))
    )
    lr_pairs = lr_key.copy()
    lr_pairs["l_idx"] = lr_pairs["lid"].map(lid_to_idx)
    lr_pairs["r_idx"] = lr_pairs["rid"].map(rid_to_idx)
    lr_pairs["l_value"] = lr_pairs["lid"].map(l_cat)
    lr_pairs["r_value"] = lr_pairs["rid"].map(r_cat)

    ll_pairs = ll_key.rename(columns={"rid": "lid2"}).copy()
    ll_pairs["l1_idx"] = ll_pairs["lid"].map(lid_to_idx)

    rules = NR.learn_rules(
        (l_cat[a], l_cat[b]) for a, b in zip(ll_pairs["lid"], ll_pairs["lid2"])
    )
    nr_keep = NR.apply_rules_pandas(
        lr_pairs, rules, l_value_col="l_value", r_value_col="r_value"
    ).to_numpy()

    return MultiPrepared(
        ds=ds, fns=fns, cols=list(cols),
        lr_pairs=lr_pairs, lr_dist=np.stack(lr_dist_cols),
        nr_keep=nr_keep,
        ll_pairs=ll_pairs, ll_dist=np.stack(ll_dist_cols),
        lids=lids, rids=rids, rules=rules,
    )


@dataclass
class MultiAutoFJResult:
    """Output of Algorithm 3."""

    weights: np.ndarray  # final column weights (sum 1 over selected cols)
    selected: list[str]  # selected column names, in selection order
    result: AutoFJResult
    pre: Precomputed
    trials: int = 0
    history: list[tuple[str, float]] = field(default_factory=list)


def _weighted_pre(
    mp: MultiPrepared, w: np.ndarray, *, use_negative_rules: bool, s: int
) -> Precomputed:
    mask = mp.nr_keep if use_negative_rules else np.ones(len(mp.lr_pairs), dtype=bool)
    lr = np.tensordot(w, mp.lr_dist, axes=(0, 0))  # [n_lr, n_fn]
    ll = np.tensordot(w, mp.ll_dist, axes=(0, 0))
    return precompute(
        l_idx=mp.lr_pairs["l_idx"].to_numpy()[mask],
        r_idx=mp.lr_pairs["r_idx"].to_numpy()[mask],
        lr_dists=lr[mask],
        l1_idx=mp.ll_pairs["l1_idx"].to_numpy(),
        ll_dists=ll,
        n_l=mp.n_l,
        n_r=mp.n_r,
        thresholds=np.array(threshold_grid(s)),
    )


def multi_column_autofj(
    mp: MultiPrepared,
    *,
    tau: float = 0.9,
    s: int = 50,
    g: int = 10,
    use_negative_rules: bool = True,
) -> MultiAutoFJResult:
    """Algorithm 3: forward selection of columns with weight mixing."""
    m = len(mp.cols)
    w = np.zeros(m)
    remaining = set(range(m))
    best_run: AutoFJResult | None = None
    best_pre: Precomputed | None = None
    best_recall = -1.0
    history: list[tuple[str, float]] = []
    trials = 0
    alphas = [k / g for k in range(1, g)]
    while remaining:
        iter_best = None  # (recall, j, w', run, pre)
        tried: set[tuple] = set()
        for j in sorted(remaining):
            for alpha in alphas:
                w_try = (1 - alpha) * w + alpha * np.eye(m)[j]
                tot = w_try.sum()
                if tot <= 0:
                    continue
                w_try = w_try / tot
                key = tuple(np.round(w_try, 6))
                if key in tried:
                    continue  # e.g. first iteration: all α collapse to e_j
                tried.add(key)
                pre = _weighted_pre(mp, w_try, use_negative_rules=use_negative_rules, s=s)
                run = greedy_search(pre, tau)
                trials += 1
                rec = run.est_recall[-1] if run.est_recall else 0.0
                if iter_best is None or rec > iter_best[0]:
                    iter_best = (rec, j, w_try, run, pre)
        if iter_best is None:
            break
        rec, j, w_new, run, pre = iter_best
        if rec > best_recall + 1e-9:
            best_recall = rec
            best_run, best_pre = run, pre
            w = w_new
            remaining.discard(j)
            history.append((mp.cols[j], rec))
        else:
            break
    if best_run is None:
        # Nothing improved on empty: run on uniform weights as fallback.
        w = np.ones(m) / m
        best_pre = _weighted_pre(mp, w, use_negative_rules=use_negative_rules, s=s)
        best_run = greedy_search(best_pre, tau)
    selected = [c for c, _ in history]
    return MultiAutoFJResult(
        weights=w, selected=selected, result=best_run, pre=best_pre,
        trials=trials, history=history,
    )
