"""Default blocking (§3.2), as a Spark DataFrame dataflow.

The paper's untuned default: 3-gram tokenization, TF-IDF token weights
learned on the reference table L, candidate score = sum of weights of
common distinct tokens, keep the top ``⌊β·√|L|⌋`` left records per right
record (β = 1 default). The same dataflow produces L–L candidate pairs
(per left record, its top-k nearest other left records), which feed both
negative-rule learning and the 2d-ball precision estimate.

Everything here is Catalyst-planned: pandas-UDF tokenizer → explode →
aggregate IDF → inverted-index equi-join on token → group-by sum →
window top-k. The IDF table is small and joined onto exploded tokens;
Spark broadcasts it when beneficial (we re-enable broadcast for these
dimension-sized joins explicitly, since the session fixture disables
auto-broadcast globally).
"""
from __future__ import annotations

import math

import pandas as pd
from pyspark.sql import DataFrame, SparkSession, Window
from pyspark.sql import functions as F
from pyspark.sql.functions import pandas_udf
from pyspark.sql.types import ArrayType, StringType

from repro.core.tokenize import qgrams


@pandas_udf(ArrayType(StringType()))
def _qgram_tokens(col: pd.Series) -> pd.Series:
    """Distinct padded 3-grams of the lowercased value (blocking tokens)."""
    return col.map(lambda s: sorted(set(qgrams((s or "").lower(), 3))))


def _exploded_tokens(df: DataFrame, id_col: str, key_col: str) -> DataFrame:
    return (
        df.select(id_col, _qgram_tokens(F.col(key_col)).alias("__toks"))
        .select(id_col, F.explode("__toks").alias("token"))
    )


def idf_table(l_tokens: DataFrame, n_left: int, id_col: str = "lid") -> DataFrame:
    """Per-token IDF over L: ``log(1 + |L| / df)``. Input: exploded (lid, token)."""
    return (
        l_tokens.groupBy("token")
        .agg(F.countDistinct(id_col).alias("df"))
        .select("token", (F.log(F.lit(1.0) + F.lit(float(n_left)) / F.col("df"))).alias("weight"))
    )


def top_k(pair_scores: DataFrame, per_col: str, other_col: str, k: int) -> DataFrame:
    """Keep the k best-scoring partners per ``per_col`` record.

    Ties broken by partner id for determinism.
    """
    w = Window.partitionBy(per_col).orderBy(F.desc("score"), F.asc(other_col))
    return (
        pair_scores.withColumn("__rank", F.row_number().over(w))
        .where(F.col("__rank") <= k)
        .drop("__rank")
    )


def block_lr(
    spark: SparkSession,
    left: DataFrame,
    right: DataFrame,
    *,
    key_col: str,
    beta: float = 1.0,
) -> DataFrame:
    """L–R candidate pairs ``(lid, rid, score)``, top ``⌈β√|L|⌉`` per rid.

    ``left`` must have columns (lid, key_col); ``right`` (rid, key_col).
    """
    n_left = left.count()
    k = max(1, math.ceil(beta * math.sqrt(n_left)))
    l_tok = _exploded_tokens(left, "lid", key_col)
    r_tok = _exploded_tokens(right, "rid", key_col)
    idf = idf_table(l_tok, n_left)
    scores = (
        r_tok.join(F.broadcast(idf), "token")
        .join(l_tok, "token")
        .groupBy("rid", "lid")
        .agg(F.sum("weight").alias("score"))
    )
    return top_k(scores, "rid", "lid", k)


def block_ll(
    spark: SparkSession,
    left: DataFrame,
    *,
    key_col: str,
    beta: float = 1.0,
) -> DataFrame:
    """L–L candidate pairs ``(lid, lid2, score)``: per l, its top-k other ls."""
    n_left = left.count()
    k = max(1, math.ceil(beta * math.sqrt(n_left)))
    l_tok = _exploded_tokens(left, "lid", key_col)
    idf = idf_table(l_tok, n_left)
    l_tok2 = l_tok.withColumnRenamed("lid", "lid2")
    scores = (
        l_tok.join(F.broadcast(idf), "token")
        .join(l_tok2, "token")
        .where(F.col("lid") != F.col("lid2"))
        .groupBy("lid", "lid2")
        .agg(F.sum("weight").alias("score"))
    )
    return top_k(scores, "lid", "lid2", k)
