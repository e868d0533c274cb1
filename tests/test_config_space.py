"""Tests for the join-function space enumeration (Table 1)."""
from repro.core.config_space import (
    JoinFunction,
    full_space,
    reduced_space,
    threshold_grid,
)


class TestFullSpace:
    def test_exactly_140_functions(self):
        # Paper §5.1.3: 4×2 + 4×2×2×8 + 4×1 = 140.
        assert len(full_space()) == 140

    def test_family_counts(self):
        fns = full_space()
        fams = [f.family for f in fns]
        assert fams.count("char") == 8
        assert fams.count("set") == 128
        assert fams.count("embedding") == 4

    def test_unique_names(self):
        names = [f.name for f in full_space()]
        assert len(set(names)) == 140

    def test_char_functions_have_no_tokenization(self):
        for f in full_space():
            if f.family in ("char", "embedding"):
                assert f.tokenization is None and f.weighting is None
            else:
                assert f.tokenization in ("3G", "SP")
                assert f.weighting in ("EW", "IDFW")

    def test_deterministic_order(self):
        assert [f.name for f in full_space()] == [f.name for f in full_space()]


class TestReducedSpace:
    def test_size_24(self):
        assert len(reduced_space(24)) == 24

    def test_subset_of_full(self):
        full = {f.name for f in full_space()}
        assert all(f.name in full for f in reduced_space(24))

    def test_family_diversity(self):
        fams = {f.family for f in reduced_space(24)}
        assert fams == {"char", "set", "embedding"}

    def test_no_duplicates(self):
        names = [f.name for f in reduced_space(24)]
        assert len(set(names)) == len(names)


class TestThresholdGrid:
    def test_default_50_steps(self):
        g = threshold_grid(50)
        assert len(g) == 50
        assert g[0] == 0.02 and g[-1] == 1.0

    def test_monotone(self):
        g = threshold_grid(10)
        assert all(a < b for a, b in zip(g, g[1:]))


class TestJoinFunction:
    def test_name_format(self):
        f = JoinFunction("L", "SP", "EW", "JD")
        assert f.name == "L|SP|EW|JD"

    def test_hashable(self):
        assert len({JoinFunction("L", None, None, "ED"), JoinFunction("L", None, None, "ED")}) == 1
