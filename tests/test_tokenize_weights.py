"""Unit tests for tokenization (T axis) and token weights (W axis)."""
import math

import pytest

from repro.core.tokenize import qgrams, space_tokens, tokenize
from repro.core.weights import TokenWeigher, idf_weights


class TestQgrams:
    def test_paper_figure2_example(self):
        # Figure 2: 3G of "2008 lsu baseball team" starts "$$2", "$20",
        # "200", "008", ... and ends "m$$".
        toks = qgrams("2008 lsu baseball team", 3)
        assert toks[0] == "$$2"
        assert toks[1] == "$20"
        assert toks[2] == "200"
        assert toks[3] == "008"
        assert toks[-1] == "m$$"

    def test_count(self):
        # len(padded) - q + 1 = (n + 2(q-1)) - q + 1 = n + q - 1.
        assert len(qgrams("abc", 3)) == 5

    def test_empty(self):
        assert qgrams("", 3) == ()

    def test_short_string(self):
        assert qgrams("a", 3) == ("$$a", "$a$", "a$$")


class TestSpaceTokens:
    def test_figure2_example(self):
        assert space_tokens("2008 lsu baseball team") == (
            "2008",
            "lsu",
            "baseball",
            "team",
        )

    def test_empty(self):
        assert space_tokens("") == ()

    def test_dispatch(self):
        assert tokenize("a b", "SP") == ("a", "b")
        assert tokenize("ab", "3G") == qgrams("ab", 3)
        with pytest.raises(ValueError):
            tokenize("x", "2G")


class TestIdfWeights:
    def test_rare_token_heavier(self):
        corpus = [("a", "b"), ("a", "c"), ("a", "d")]
        w = idf_weights(corpus)
        assert w["b"] > w["a"]

    def test_formula(self):
        w = idf_weights([("a",), ("a", "b")])
        assert w["a"] == pytest.approx(math.log(1 + 2 / 2))
        assert w["b"] == pytest.approx(math.log(1 + 2 / 1))

    def test_duplicates_in_record_count_once(self):
        w = idf_weights([("a", "a"), ("b",)])
        assert w["a"] == pytest.approx(math.log(1 + 2 / 1))


class TestTokenWeigher:
    def test_equal_weights(self):
        tw = TokenWeigher("EW")
        assert tw.weight("anything") == 1.0

    def test_idf_weights(self):
        tw = TokenWeigher("IDFW", {"a": 0.5, "b": 2.0})
        assert tw.weight("a") == 0.5
        assert tw.weight("unseen") == 2.0  # max idf for unseen tokens

    def test_idf_requires_map(self):
        with pytest.raises(ValueError):
            TokenWeigher("IDFW")

    def test_weight_map_deduplicates(self):
        tw = TokenWeigher("EW")
        assert tw.weight_map(("a", "a", "b")) == {"a": 1.0, "b": 1.0}

    def test_unknown_variant(self):
        with pytest.raises(ValueError):
            TokenWeigher("XX")
