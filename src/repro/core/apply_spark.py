"""Distributed application of a learned AutoFJ program (broadcast join).

Once Algorithm 1/3 has selected the program ``U = {⟨f_k, θ_k⟩}``, the
final many-to-one join is a Spark dataflow over the candidate-pair
DataFrame: the program and the per-(config, l) precision table (derived
from the L–L ball counts, Eq. 9) are **broadcast**; each configuration
joins each r to its closest l within θ_k; conflicting assignments are
resolved by the higher broadcast precision (earlier-selected config wins
ties, matching the greedy's strict-improvement update).

This mirrors :func:`repro.core.autofj.apply_program` exactly (tested),
but as a Catalyst plan — the production path for large R tables.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F

from repro.core.precision_est import Precomputed, ball_counts


def program_precision_table(
    pre: Precomputed,
    program: list[tuple[int, int]],
    ll_dist: np.ndarray,
    l1_idx: np.ndarray,
    n_l: int,
) -> pd.DataFrame:
    """(cfg, l_idx, p) rows: Eq. 9 precision per config and left record.

    Recomputed from the L–L distances (the broadcastable artifact), in
    float32 to match the search's precision tensor bit-for-bit.
    """
    counts = ball_counts(l1_idx, ll_dist, n_l, pre.thresholds)
    rows = []
    for cfg, (fn_i, th_i) in enumerate(program):
        p = (1.0 / (1.0 + counts[fn_i, :, th_i].astype(np.float64))).astype(np.float32)
        for l in range(n_l):
            rows.append((cfg, l, float(p[l])))
    return pd.DataFrame(rows, columns=["cfg", "l_idx", "p"])


def apply_program_spark(
    spark: SparkSession,
    pairs_with_dists: DataFrame,
    pre: Precomputed,
    program: list[tuple[int, int]],
    precision_table: pd.DataFrame,
) -> DataFrame:
    """Evaluate the union-of-configs join over a candidate-pair DataFrame.

    ``pairs_with_dists`` needs columns (l_idx, r_idx, d0..d{K-1}) where
    ``dk`` is the distance under program entry k's join function.
    Returns (r_idx, l_idx, p): the final many-to-one assignment.
    """
    if not program:
        return spark.createDataFrame(
            pd.DataFrame(columns=["r_idx", "l_idx", "p"]),
            schema="r_idx long, l_idx long, p double",
        )
    per_cfg = []
    for k, (fn_i, th_i) in enumerate(program):
        theta = float(pre.thresholds[th_i])
        per_cfg.append(
            pairs_with_dists.select(
                "l_idx", "r_idx", F.col(f"d{k}").alias("d"), F.lit(k).alias("cfg")
            ).where(F.col("d") <= theta)  # exact, matching the driver's Eq. 1 test
        )
    melted = per_cfg[0]
    for df in per_cfg[1:]:
        melted = melted.unionAll(df)
    # J_C(r): per (r, cfg), the closest l (ties → smaller l_idx).
    w_min = Window.partitionBy("r_idx", "cfg").orderBy(F.asc("d"), F.asc("l_idx"))
    closest = (
        melted.withColumn("__rk", F.row_number().over(w_min))
        .where(F.col("__rk") == 1)
        .drop("__rk", "d")
    )
    prec = spark.createDataFrame(precision_table)
    joined = closest.join(F.broadcast(prec), ["cfg", "l_idx"])
    # Union conflict resolution: max p, earliest config on ties.
    w_best = Window.partitionBy("r_idx").orderBy(F.desc("p"), F.asc("cfg"))
    return (
        joined.withColumn("__rk", F.row_number().over(w_best))
        .where(F.col("__rk") == 1)
        .select("r_idx", "l_idx", "p")
    )
