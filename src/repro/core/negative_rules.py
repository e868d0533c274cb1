"""Negative-rule learning and application (§3.3, Algorithm 2).

From L–L candidate pairs (post-blocking): preprocess with lowercasing,
stemming, punctuation removal; if the two word sets differ by exactly one
word on each side, learn the rule ``(Δ12, Δ21)``. A rule is stored order-
insensitively (a frozenset of the two words) — "2007" ≠ "2008" must fire
regardless of which side carries which token. Applying rules to L–R
candidate pairs drops any pair whose single-word-each-side difference
matches a learned rule.

Rules are learned on the driver (the L–L pair set is √|L|-bounded per
record) and applied to the Spark pair DataFrame via a broadcast set.
"""
from __future__ import annotations

from typing import Iterable

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import BooleanType

from repro.core.preprocess import preprocess

Rule = frozenset


def _norm_words(text: str) -> frozenset[str]:
    return frozenset(preprocess(text or "", "L+S+RP").split())


def _delta(w1: frozenset[str], w2: frozenset[str]) -> Rule | None:
    d1, d2 = w1 - w2, w2 - w1
    if len(d1) == 1 and len(d2) == 1:
        return frozenset((next(iter(d1)), next(iter(d2))))
    return None


def learn_rules(ll_pairs: Iterable[tuple[str, str]]) -> set[Rule]:
    """Negative rules from L–L record-value pairs (Alg. 2 lines 2–7)."""
    rules: set[Rule] = set()
    for v1, v2 in ll_pairs:
        rule = _delta(_norm_words(v1), _norm_words(v2))
        if rule is not None and len(rule) == 2:  # two distinct words
            rules.add(rule)
    return rules


def pair_violates(l_value: str, r_value: str, rules: set[Rule]) -> bool:
    """True if (l, r) differs by exactly one word each side matching a rule."""
    if not rules:
        return False
    rule = _delta(_norm_words(l_value), _norm_words(r_value))
    return rule is not None and rule in rules


def apply_rules_spark(
    spark: SparkSession,
    lr_pairs_with_values: DataFrame,
    rules: set[Rule],
    *,
    l_value_col: str,
    r_value_col: str,
) -> DataFrame:
    """Filter the L–R pair DataFrame, dropping rule-violating pairs.

    Rules are broadcast to executors; the check is a pandas UDF over the
    pair values (Alg. 2 lines 8–12).
    """
    if not rules:
        return lr_pairs_with_values
    bc = spark.sparkContext.broadcast(rules)

    @F.pandas_udf(BooleanType())
    def _ok(lv: pd.Series, rv: pd.Series) -> pd.Series:
        local = bc.value
        return pd.Series(
            [not pair_violates(a, b, local) for a, b in zip(lv, rv)]
        )

    return lr_pairs_with_values.where(_ok(F.col(l_value_col), F.col(r_value_col)))


def apply_rules_pandas(
    pairs: pd.DataFrame, rules: set[Rule], *, l_value_col: str, r_value_col: str
) -> pd.Series:
    """Boolean keep-mask for a pandas pair frame (driver-side path)."""
    return pd.Series(
        [
            not pair_violates(a, b, rules)
            for a, b in zip(pairs[l_value_col], pairs[r_value_col])
        ],
        index=pairs.index,
    )
