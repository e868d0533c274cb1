"""Unit tests for distance kernels, pinned to the paper's Figure 2 example."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.distance import (
    SET_DISTANCES,
    embed,
    embedding_distance,
    jaro_similarity,
    jaro_winkler_distance,
    jw_batch,
    lev_batch,
    set_distances,
)

# Figure 2 worked example: l has 5 tokens, r has 4, intersection 4.
L_TOKENS = {t: 1.0 for t in ("2012", "tigers", "lsu", "baseball", "team")}
R_TOKENS = {t: 1.0 for t in ("2012", "lsu", "baseball", "team")}


class TestSetDistancesPaperExample:
    def test_jaccard(self):
        assert set_distances(L_TOKENS, R_TOKENS)["JD"] == pytest.approx(0.2)

    def test_cosine(self):
        # 1 - 4/sqrt(5*4) ≈ 0.1056 (paper rounds to 0.11)
        assert set_distances(L_TOKENS, R_TOKENS)["CD"] == pytest.approx(0.1056, abs=1e-3)

    def test_max_include_containment_gives_zero(self):
        assert set_distances(L_TOKENS, R_TOKENS)["MD"] == pytest.approx(0.0)

    def test_dice(self):
        # 1 - 2*4/9 ≈ 0.111 (paper rounds to 0.11)
        assert set_distances(L_TOKENS, R_TOKENS)["DD"] == pytest.approx(1 - 8 / 9)

    def test_intersection(self):
        # 1 - 4/9 ≈ 0.556 (paper: 0.56)
        assert set_distances(L_TOKENS, R_TOKENS)["ID"] == pytest.approx(1 - 4 / 9)

    def test_containment_hybrids_active_when_contained(self):
        d = set_distances(L_TOKENS, R_TOKENS)
        assert d["CJD"] == pytest.approx(d["JD"])
        assert d["CCD"] == pytest.approx(d["CD"])
        assert d["CDD"] == pytest.approx(d["DD"])

    def test_containment_hybrids_one_when_not_contained(self):
        a = {"x": 1.0, "y": 1.0}
        b = {"y": 1.0, "z": 1.0}
        d = set_distances(a, b)
        assert d["CJD"] == 1.0 and d["CCD"] == 1.0 and d["CDD"] == 1.0
        assert d["JD"] < 1.0  # standard distance still partial


class TestSetDistancesEdgeCases:
    def test_identical(self):
        d = set_distances(L_TOKENS, dict(L_TOKENS))
        for k in SET_DISTANCES:
            if k == "ID":
                # ID = 1 − ∩/(|a|+|b|) bottoms out at 0.5 for identical
                # sets (consistent with the paper's 0.56 worked example).
                assert d[k] == pytest.approx(0.5)
            else:
                assert d[k] == pytest.approx(0.0), k

    def test_disjoint(self):
        d = set_distances({"a": 1.0}, {"b": 1.0})
        for k in SET_DISTANCES:
            assert d[k] == pytest.approx(1.0), k

    def test_both_empty(self):
        d = set_distances({}, {})
        for k in SET_DISTANCES:
            assert d[k] == 0.0, k

    def test_one_empty(self):
        d = set_distances({"a": 1.0}, {})
        for k in SET_DISTANCES:
            assert d[k] == 1.0, k

    def test_weighted_jaccard(self):
        a = {"x": 2.0, "y": 1.0}
        b = {"x": 2.0, "z": 3.0}
        # inter = 2, union = 3 + 5 - 2 = 6
        assert set_distances(a, b)["JD"] == pytest.approx(1 - 2 / 6)

    @given(
        st.dictionaries(st.text(min_size=1, max_size=4), st.floats(0.1, 5.0), max_size=8),
        st.dictionaries(st.text(min_size=1, max_size=4), st.floats(0.1, 5.0), max_size=8),
    )
    @settings(max_examples=50, deadline=None)
    def test_bounds_and_symmetry(self, a, b):
        d1 = set_distances(a, b)
        d2 = set_distances(b, a)
        for k in SET_DISTANCES:
            assert 0.0 <= d1[k] <= 1.0 + 1e-9
            assert d1[k] == pytest.approx(d2[k], abs=1e-9)


class TestLevBatch:
    def test_known_distances(self):
        out = lev_batch(["kitten", "abc", "same"], ["sitting", "abc", "same"])
        assert out[0] == pytest.approx(3 / 7)
        assert out[1] == 0.0
        assert out[2] == 0.0

    def test_empty_vs_nonempty(self):
        out = lev_batch(["", "abc", ""], ["abc", "", ""])
        assert out[0] == 1.0
        assert out[1] == 1.0
        assert out[2] == 0.0

    def test_single_char_ops(self):
        out = lev_batch(["abc"], ["abd"])
        assert out[0] == pytest.approx(1 / 3)

    def test_empty_batch(self):
        assert lev_batch([], []).shape == (0,)

    def test_misaligned_raises(self):
        with pytest.raises(ValueError):
            lev_batch(["a"], [])

    @given(st.lists(st.tuples(st.text(max_size=12), st.text(max_size=12)), max_size=20))
    @settings(max_examples=40, deadline=None)
    def test_matches_reference_dp(self, pairs):
        a = [p[0] for p in pairs]
        b = [p[1] for p in pairs]
        got = lev_batch(a, b)
        for i, (x, y) in enumerate(pairs):
            assert got[i] == pytest.approx(_ref_lev(x, y), abs=1e-9)

    def test_symmetry(self):
        a, b = ["abcd", "xy"], ["dcba", "xyz"]
        assert np.allclose(lev_batch(a, b), lev_batch(b, a))


def _ref_lev(a: str, b: str) -> float:
    """Reference O(len²) Levenshtein, normalized."""
    if not a and not b:
        return 0.0
    prev = list(range(len(b) + 1))
    for i, ca in enumerate(a, 1):
        cur = [i]
        for j, cb in enumerate(b, 1):
            cur.append(min(prev[j] + 1, cur[-1] + 1, prev[j - 1] + (ca != cb)))
        prev = cur
    return prev[-1] / max(len(a), len(b))


class TestJaroWinkler:
    def test_identical(self):
        assert jaro_similarity("abc", "abc") == 1.0
        assert jaro_winkler_distance("abc", "abc") == 0.0

    def test_known_value_martha(self):
        # Classic example: jaro(MARTHA, MARHTA) = 0.944...
        assert jaro_similarity("martha", "marhta") == pytest.approx(0.9444, abs=1e-3)

    def test_winkler_prefix_boost(self):
        # Shared prefix should reduce distance vs plain Jaro.
        plain = 1 - jaro_similarity("prefixed", "prefixes")
        jw = jaro_winkler_distance("prefixed", "prefixes")
        assert jw < plain

    def test_disjoint(self):
        assert jaro_similarity("abc", "xyz") == 0.0
        assert jaro_winkler_distance("abc", "xyz") == 1.0

    def test_empty(self):
        assert jaro_winkler_distance("", "") == 0.0
        assert jaro_winkler_distance("a", "") == 1.0

    def test_batch_matches_scalar(self):
        a, b = ["martha", "abc"], ["marhta", "abd"]
        got = jw_batch(a, b)
        for i in range(2):
            assert got[i] == pytest.approx(jaro_winkler_distance(a[i], b[i]))

    @given(st.text(max_size=10), st.text(max_size=10))
    @settings(max_examples=50, deadline=None)
    def test_bounds_and_symmetry(self, a, b):
        d = jaro_winkler_distance(a, b)
        assert 0.0 <= d <= 1.0 + 1e-9
        assert d == pytest.approx(jaro_winkler_distance(b, a), abs=1e-9)


class TestEmbedding:
    def test_deterministic(self):
        assert embed("lsu tigers") == embed("lsu tigers")

    def test_identical_distance_zero(self):
        assert embedding_distance("abc def", "abc def") == pytest.approx(0.0, abs=1e-9)

    def test_typo_closer_than_unrelated(self):
        typo = embedding_distance("mississippi bulldogs", "missisippi bulldogs")
        unrelated = embedding_distance("mississippi bulldogs", "quartz zebra xylophone")
        assert typo < unrelated

    def test_bounds(self):
        for a, b in [("", ""), ("a", ""), ("abc", "xyz"), ("long text here", "short")]:
            assert 0.0 <= embedding_distance(a, b) <= 1.0

    def test_empty_vs_nonempty(self):
        assert embedding_distance("", "abc") == 1.0
