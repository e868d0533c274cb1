"""Unit tests for preprocessing variants (P axis)."""
from repro.core.preprocess import (
    VARIANTS,
    preprocess,
    remove_punctuation,
    stem_text,
    stem_word,
)


class TestStemWord:
    def test_plural_stripped(self):
        assert stem_word("bulldogs") == "bulldog"

    def test_ing_stripped(self):
        assert stem_word("running") == "runn"

    def test_ed_stripped(self):
        assert stem_word("played") == "play"

    def test_short_word_untouched(self):
        assert stem_word("is") == "is"

    def test_number_untouched(self):
        assert stem_word("2008") == "2008"

    def test_ss_kept(self):
        assert stem_word("glass") == "glass"

    def test_ies_rule(self):
        assert stem_word("parties") == "parti"


class TestPreprocess:
    def test_lowercase_always(self):
        assert preprocess("2008 LSU Baseball Team", "L") == "2008 lsu baseball team"

    def test_figure2_example_stemming(self):
        # Paper Figure 2: S: "2008 LSU basebal team" — our lighter stemmer
        # at least merges the plural/suffix variants that matter.
        assert preprocess("2008 LSU Bulldogs team", "L+S") == "2008 lsu bulldog team"

    def test_remove_punct(self):
        assert preprocess("St. Mary's Hospital!", "L+RP") == "st marys hospital"

    def test_combined(self):
        out = preprocess("The Bulldogs' Games.", "L+S+RP")
        assert "bulldog" in out and "'" not in out and "." not in out

    def test_all_variants_defined(self):
        for v in VARIANTS:
            assert isinstance(preprocess("Some Text", v), str)

    def test_unknown_variant_raises(self):
        import pytest

        with pytest.raises(ValueError):
            preprocess("x", "BOGUS")

    def test_whitespace_collapsed(self):
        assert preprocess("a   b\t c", "L") == "a b c"


class TestHelpers:
    def test_remove_punctuation_keeps_words(self):
        assert remove_punctuation("a-b, c.d") == "ab cd"

    def test_stem_text_multiword(self):
        assert stem_text("tigers teams") == "tiger team"
