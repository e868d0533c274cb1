"""End-to-end AutoFJ pipeline for one dataset (Alg. 1 lines 1–4 + search).

Wires the Spark stages (blocking, negative-rule filtering, distance
tensor) to the driver-side precomputation and greedy search, and exposes
everything the evaluation harness needs: the raw candidate pairs with
values (baselines reuse them as their comparison space), the full
distance tensor (baselines reuse distances as features), and index maps.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.benchgen.single_column import FuzzyJoinDataset
from repro.core import blocking
from repro.core import negative_rules as NR
from repro.core.autofj import AutoFJResult, greedy_search, single_best_config
from repro.core.config_space import JoinFunction, full_space, threshold_grid
from repro.core.pairs import IdfMaps, build_idf_maps, pair_distances
from repro.core.precision_est import Precomputed, precompute


@dataclass
class Prepared:
    """Blocked pairs + distance tensors + index maps for one dataset."""

    ds: FuzzyJoinDataset
    fns: list[JoinFunction]
    # L–R candidate pairs (all blocked pairs, pre-negative-rules) with
    # contiguous indices and raw values for baseline feature reuse.
    lr_pairs: pd.DataFrame  # columns: lid, rid, l_idx, r_idx, l_value, r_value
    lr_dist: np.ndarray  # [n_lr, n_fn]
    nr_keep: np.ndarray  # [n_lr] bool — False where a negative rule fires
    # L–L candidate pairs.
    ll_pairs: pd.DataFrame  # columns: lid, lid2, l1_idx
    ll_dist: np.ndarray  # [n_ll, n_fn]
    # Index maps.
    lids: list  # position = l_idx
    rids: list  # position = r_idx
    rules: set

    @property
    def n_l(self) -> int:
        return len(self.lids)

    @property
    def n_r(self) -> int:
        return len(self.rids)

    def assignment_to_dict(self, assignment: np.ndarray) -> dict:
        """Translate an l-index assignment vector to {rid: lid}."""
        return {
            self.rids[r]: self.lids[int(l)]
            for r, l in enumerate(assignment)
            if l >= 0
        }


def prepare(
    spark: SparkSession,
    ds: FuzzyJoinDataset,
    *,
    fns: list[JoinFunction] | None = None,
    beta: float = 1.0,
    key_col: str = "value",
    num_partitions: int | None = 16,
) -> Prepared:
    """Run the Spark stages for one single-column dataset."""
    fns = fns if fns is not None else full_space()
    left = spark.createDataFrame(ds.left[["lid", key_col]])
    right = spark.createDataFrame(ds.right[["rid", key_col]])

    lr = blocking.block_lr(spark, left, right, key_col=key_col, beta=beta)
    ll = blocking.block_ll(spark, left, key_col=key_col, beta=beta)

    idf_maps = build_idf_maps(ds.left[key_col].tolist())

    lr_ids, lr_dist = pair_distances(
        spark, lr.select("lid", "rid"), left, right,
        key_col=key_col, fns=fns, idf_maps=idf_maps,
        num_partitions=num_partitions,
    )
    ll_ids, ll_dist = pair_distances(
        spark,
        ll.select("lid", ll["lid2"].alias("rid")),
        left,
        left.select(left["lid"].alias("rid"), key_col),
        key_col=key_col, fns=fns, idf_maps=idf_maps,
        num_partitions=num_partitions,
    )

    lids = ds.left["lid"].tolist()
    rids = ds.right["rid"].tolist()
    lid_to_idx = {v: i for i, v in enumerate(lids)}
    rid_to_idx = {v: i for i, v in enumerate(rids)}
    l_values = dict(zip(ds.left["lid"], ds.left[key_col]))
    r_values = dict(zip(ds.right["rid"], ds.right[key_col]))

    lr_pairs = lr_ids.copy()
    lr_pairs["l_idx"] = lr_pairs["lid"].map(lid_to_idx)
    lr_pairs["r_idx"] = lr_pairs["rid"].map(rid_to_idx)
    lr_pairs["l_value"] = lr_pairs["lid"].map(l_values)
    lr_pairs["r_value"] = lr_pairs["rid"].map(r_values)

    ll_pairs = ll_ids.rename(columns={"rid": "lid2"}).copy()
    ll_pairs["l1_idx"] = ll_pairs["lid"].map(lid_to_idx)

    # Negative rules: learn on L–L values, mark violating L–R pairs.
    rules = NR.learn_rules(
        (l_values[a], l_values[b])
        for a, b in zip(ll_pairs["lid"], ll_pairs["lid2"])
    )
    nr_keep = NR.apply_rules_pandas(
        lr_pairs, rules, l_value_col="l_value", r_value_col="r_value"
    ).to_numpy()

    return Prepared(
        ds=ds, fns=fns,
        lr_pairs=lr_pairs, lr_dist=lr_dist, nr_keep=nr_keep,
        ll_pairs=ll_pairs, ll_dist=ll_dist,
        lids=lids, rids=rids, rules=rules,
    )


def precompute_for(
    prep: Prepared,
    *,
    use_negative_rules: bool = True,
    fn_subset: list[int] | None = None,
    s: int = 50,
) -> Precomputed:
    """Eq. 9 precomputation over (optionally NR-filtered, sub-spaced) pairs."""
    mask = prep.nr_keep if use_negative_rules else np.ones(len(prep.lr_pairs), dtype=bool)
    cols = fn_subset if fn_subset is not None else list(range(len(prep.fns)))
    thresholds = np.array(threshold_grid(s))
    return precompute(
        l_idx=prep.lr_pairs["l_idx"].to_numpy()[mask],
        r_idx=prep.lr_pairs["r_idx"].to_numpy()[mask],
        lr_dists=prep.lr_dist[mask][:, cols],
        l1_idx=prep.ll_pairs["l1_idx"].to_numpy(),
        ll_dists=prep.ll_dist[:, cols],
        n_l=prep.n_l,
        n_r=prep.n_r,
        thresholds=thresholds,
    )


@dataclass
class AutoFJRun:
    """A completed AutoFJ run on one dataset."""

    prep: Prepared
    pre: Precomputed
    result: AutoFJResult

    @property
    def assignment(self) -> dict:
        return self.prep.assignment_to_dict(self.result.assignment)

    def iteration_assignments(self) -> list[dict]:
        return [self.prep.assignment_to_dict(s) for s in self.result.snapshots]


def run_autofj(
    spark: SparkSession,
    ds: FuzzyJoinDataset,
    *,
    tau: float = 0.9,
    s: int = 50,
    beta: float = 1.0,
    use_negative_rules: bool = True,
    fns: list[JoinFunction] | None = None,
    prep: Prepared | None = None,
    pre: Precomputed | None = None,
    single_config: bool = False,
) -> AutoFJRun:
    """Full single-column AutoFJ (Algorithm 1) on one dataset.

    Pass ``prep`` to reuse blocking/distances across variants (ablations,
    τ sweeps) — the expensive Spark stages run once per dataset. Pass
    ``pre`` as well to skip the Eq. 9 precomputation (τ-only variants).
    """
    if prep is None:
        prep = prepare(spark, ds, fns=fns, beta=beta)
    if pre is None:
        pre = precompute_for(prep, use_negative_rules=use_negative_rules, s=s)
    if single_config:
        res = single_best_config(pre, tau)
    else:
        res = greedy_search(pre, tau)
    return AutoFJRun(prep=prep, pre=pre, result=res)
