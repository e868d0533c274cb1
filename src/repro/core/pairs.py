"""Distance tensor over blocked candidate pairs.

Given a candidate-pair DataFrame and the two input tables, computes the
distance under **every join function in the space** for every pair, as a
Spark ``mapInPandas`` dataflow: each partition batch runs the vectorized
numpy kernels from :mod:`repro.core.distance` (batched Levenshtein DP,
weighted-set algebra, hashed embeddings). IDF maps (learned on L, one per
(preprocessing, tokenization) variant) ride along via Spark broadcast.

The resulting tensor (`n_pairs × n_functions`, float32) is collected to
the driver where the greedy search runs — post-blocking it is
``O((|L|+|R|)·√|L|·|F|)`` which is small by construction (§3.2).
"""
from __future__ import annotations

from typing import Mapping, Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import ArrayType, DoubleType, StructField, StructType

from repro.core import distance as D
from repro.core.config_space import JoinFunction
from repro.core.preprocess import VARIANTS as P_VARIANTS
from repro.core.preprocess import preprocess
from repro.core.tokenize import tokenize
from repro.core.weights import TokenWeigher, idf_weights

IdfMaps = dict[tuple[str, str], dict[str, float]]


def build_idf_maps(l_values: Sequence[str]) -> IdfMaps:
    """IDF maps over L for every (preprocessing, tokenization) variant."""
    maps: IdfMaps = {}
    for p in P_VARIANTS:
        pre = [preprocess(v or "", p) for v in l_values]
        for t in ("3G", "SP"):
            maps[(p, t)] = idf_weights(tokenize(s, t) for s in pre)
    return maps


def compute_distance_matrix(
    a_values: Sequence[str],
    b_values: Sequence[str],
    fns: Sequence[JoinFunction],
    idf_maps: IdfMaps,
    *,
    missing_max: bool = False,
) -> np.ndarray:
    """Distance matrix [len(pairs), len(fns)] for aligned string batches.

    ``missing_max=True`` (multi-column semantics, §5.2.2) forces distance
    1.0 whenever **both** sides are missing/empty.
    """
    n = len(a_values)
    out = np.empty((n, len(fns)), dtype=np.float32)
    if n == 0:
        return out
    a_raw = ["" if v is None else str(v) for v in a_values]
    b_raw = ["" if v is None else str(v) for v in b_values]

    # Preprocessed strings per variant.
    pre_a = {p: [preprocess(s, p) for s in a_raw] for p in P_VARIANTS}
    pre_b = {p: [preprocess(s, p) for s in b_raw] for p in P_VARIANTS}

    # Lazily-computed primitive caches.
    char_cache: dict[tuple[str, str], np.ndarray] = {}
    set_cache: dict[tuple[str, str, str], dict[str, np.ndarray]] = {}
    emb_cache: dict[str, np.ndarray] = {}
    weigher_cache: dict[tuple[str, str, str], TokenWeigher] = {}
    wmap_cache: dict[tuple[str, str, str], dict[str, dict[str, float]]] = {}

    def char_dists(p: str, d: str) -> np.ndarray:
        key = (p, d)
        if key not in char_cache:
            if d == "ED":
                char_cache[key] = D.lev_batch(pre_a[p], pre_b[p])
            else:
                char_cache[key] = D.jw_batch(pre_a[p], pre_b[p])
        return char_cache[key]

    def weight_maps(p: str, t: str, w: str, texts: Sequence[str]) -> list[dict[str, float]]:
        wk = (p, t, w)
        if wk not in weigher_cache:
            weigher_cache[wk] = TokenWeigher(w, idf_maps.get((p, t)) if w == "IDFW" else None)
            wmap_cache[wk] = {}
        weigher, memo = weigher_cache[wk], wmap_cache[wk]
        result = []
        for s in texts:
            m = memo.get(s)
            if m is None:
                m = weigher.weight_map(tokenize(s, t))
                memo[s] = m
            result.append(m)
        return result

    def set_dists(p: str, t: str, w: str) -> dict[str, np.ndarray]:
        key = (p, t, w)
        if key not in set_cache:
            wa = weight_maps(p, t, w, pre_a[p])
            wb = weight_maps(p, t, w, pre_b[p])
            cols = {d: np.empty(n) for d in D.SET_DISTANCES}
            for i in range(n):
                row = D.set_distances(wa[i], wb[i])
                for d in D.SET_DISTANCES:
                    cols[d][i] = row[d]
            set_cache[key] = cols
        return set_cache[key]

    def emb_dists(p: str) -> np.ndarray:
        if p not in emb_cache:
            emb_cache[p] = np.array(
                [D.embedding_distance(x, y) for x, y in zip(pre_a[p], pre_b[p])]
            )
        return emb_cache[p]

    for j, fn in enumerate(fns):
        if fn.family == "char":
            out[:, j] = char_dists(fn.preprocessing, fn.dist)
        elif fn.family == "set":
            out[:, j] = set_dists(fn.preprocessing, fn.tokenization, fn.weighting)[fn.dist]
        else:
            out[:, j] = emb_dists(fn.preprocessing)

    if missing_max:
        both_empty = np.array([(not x.strip()) and (not y.strip()) for x, y in zip(a_raw, b_raw)])
        if both_empty.any():
            out[both_empty, :] = 1.0
    return out


def pair_distances(
    spark: SparkSession,
    pairs: DataFrame,
    left: DataFrame,
    right: DataFrame,
    *,
    key_col: str,
    fns: Sequence[JoinFunction],
    idf_maps: IdfMaps,
    left_id: str = "lid",
    right_id: str = "rid",
    missing_max: bool = False,
    num_partitions: int | None = None,
) -> tuple[pd.DataFrame, np.ndarray]:
    """Distance tensor for ``pairs`` over all ``fns`` via ``mapInPandas``.

    ``pairs`` has (left_id, right_id); ``left``/``right`` carry the key
    column. ``right`` may be the L table again (L–L pairs) with its id
    aliased to ``right_id``. Returns the collected pair id frame (driver
    order) and the float32 tensor aligned with it.
    """
    lv = left.select(F.col(left_id), F.col(key_col).alias("__lval"))
    rv = right.select(F.col(right_id), F.col(key_col).alias("__rval"))
    with_vals = pairs.join(F.broadcast(lv), left_id).join(F.broadcast(rv), right_id)
    if num_partitions:
        with_vals = with_vals.repartition(num_partitions)

    bc = spark.sparkContext.broadcast((list(fns), idf_maps))
    schema = StructType(
        [
            StructField(left_id, pairs.schema[left_id].dataType),
            StructField(right_id, pairs.schema[right_id].dataType),
            StructField("dists", ArrayType(DoubleType())),
        ]
    )

    def _compute(iterator):
        fns_local, idf_local = bc.value
        for pdf in iterator:
            mat = compute_distance_matrix(
                pdf["__lval"].tolist(),
                pdf["__rval"].tolist(),
                fns_local,
                idf_local,
                missing_max=missing_max,
            )
            yield pd.DataFrame(
                {
                    left_id: pdf[left_id].values,
                    right_id: pdf[right_id].values,
                    "dists": list(mat.astype(float)),
                }
            )

    result = with_vals.mapInPandas(_compute, schema=schema).toPandas()
    tensor = (
        np.vstack(result["dists"].to_numpy()).astype(np.float32)
        if len(result)
        else np.zeros((0, len(fns)), dtype=np.float32)
    )
    return result[[left_id, right_id]].reset_index(drop=True), tensor
