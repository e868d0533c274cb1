"""Tests for negative-rule learning/application (§3.3, Algorithm 2)."""
import pandas as pd
import pytest

from repro.core.negative_rules import (
    apply_rules_pandas,
    apply_rules_spark,
    learn_rules,
    pair_violates,
)


class TestLearnRules:
    def test_paper_example_sports(self):
        rules = learn_rules(
            [("2008 LSU Tigers baseball team", "2008 LSU Tigers football team")]
        )
        assert frozenset({"baseball", "football"}) in rules

    def test_paper_example_years(self):
        rules = learn_rules(
            [("2007 Wisconsin Badgers football team", "2008 Wisconsin Badgers football team")]
        )
        assert frozenset({"2007", "2008"}) in rules

    def test_two_word_difference_learns_nothing(self):
        rules = learn_rules(
            [("2007 LSU Tigers baseball team", "2008 LSU Tigers football team")]
        )
        assert rules == set()

    def test_subset_difference_learns_nothing(self):
        # One side has an extra word, other side nothing: |Δ21| = 0.
        rules = learn_rules([("LSU Tigers team", "LSU team")])
        assert rules == set()

    def test_stemming_normalizes(self):
        # "Bulldogs" vs "Bulldog" stem to the same word → no spurious rule.
        rules = learn_rules([("State Bulldogs team", "State Bulldog team")])
        assert rules == set()


class TestPairViolates:
    RULES = {frozenset({"baseball", "football"}), frozenset({"2007", "2008"})}

    def test_violation_detected(self):
        assert pair_violates(
            "2007 LSU Tigers football team", "2007 LSU Tigers baseball team", self.RULES
        )

    def test_symmetric(self):
        assert pair_violates(
            "2007 LSU Tigers baseball team", "2007 LSU Tigers football team", self.RULES
        )

    def test_year_rule(self):
        assert pair_violates(
            "2007 Wisconsin Badgers football team",
            "2008 Wisconsin Badgers football team",
            self.RULES,
        )

    def test_non_matching_difference_ok(self):
        assert not pair_violates(
            "2007 LSU Tigers football team", "2007 LSU Wildcats football team", self.RULES
        )

    def test_multi_word_difference_ok(self):
        # Rule only fires on exactly-one-word-each-side differences.
        assert not pair_violates(
            "2007 LSU baseball team", "2008 LSU football team", self.RULES
        )

    def test_empty_rules(self):
        assert not pair_violates("a b", "a c", set())


class TestApplyRules:
    PAIRS = pd.DataFrame(
        {
            "lid": [0, 1, 2],
            "rid": [0, 1, 2],
            "l_value": [
                "2007 LSU Tigers football team",
                "2008 LSU baseball team",
                "2007 Wisconsin Badgers football team",
            ],
            "r_value": [
                "2007 LSU Tigers baseball team",  # violates sports rule
                "2008 LSU basebal team",  # typo — fine
                "2008 Wisconsin Badgers football team",  # violates year rule
            ],
        }
    )
    RULES = {frozenset({"baseball", "football"}), frozenset({"2007", "2008"})}

    def test_pandas_mask(self):
        keep = apply_rules_pandas(
            self.PAIRS, self.RULES, l_value_col="l_value", r_value_col="r_value"
        )
        assert keep.tolist() == [False, True, False]

    def test_spark_filter_matches_pandas(self, spark):
        df = spark.createDataFrame(self.PAIRS)
        out = apply_rules_spark(
            spark, df, self.RULES, l_value_col="l_value", r_value_col="r_value"
        ).toPandas()
        assert sorted(out["lid"].tolist()) == [1]

    def test_spark_no_rules_passthrough(self, spark):
        df = spark.createDataFrame(self.PAIRS)
        out = apply_rules_spark(
            spark, df, set(), l_value_col="l_value", r_value_col="r_value"
        )
        assert out.count() == 3
