"""Unit tests for the driver-side baseline implementations."""
import numpy as np
import pytest

from repro.baselines import ecm, excel_like, fuzzywuzzy_like, zeroer_like
from repro.baselines.features import FEATURE_FNS, feature_indices, feature_matrix
from repro.core.config_space import full_space
from repro.core.pairs import build_idf_maps, compute_distance_matrix


class TestFuzzyWuzzyLike:
    def test_identical_scores_100(self):
        s = fuzzywuzzy_like.score_pairs(["LSU Tigers"], ["LSU Tigers"])
        assert s[0] == pytest.approx(100.0)

    def test_token_sort_handles_reorder(self):
        s = fuzzywuzzy_like.score_pairs(["tigers lsu"], ["lsu tigers"])
        assert s[0] == pytest.approx(100.0)

    def test_token_set_handles_subset(self):
        s = fuzzywuzzy_like.score_pairs(
            ["2008 LSU Tigers baseball team"], ["2008 LSU baseball team"]
        )
        assert s[0] > 90

    def test_unrelated_scores_low(self):
        s = fuzzywuzzy_like.score_pairs(["quartz zebra"], ["printing press"])
        assert s[0] < 50

    def test_typo_still_high(self):
        s = fuzzywuzzy_like.score_pairs(["Mississippi State"], ["Missisippi State"])
        assert s[0] > 85

    def test_batch(self):
        s = fuzzywuzzy_like.score_pairs(["a b", "c d"], ["a b", "x y"])
        assert len(s) == 2 and s[0] > s[1]


class TestExcelLike:
    @pytest.fixture(scope="class")
    def setup(self):
        fns = full_space()
        l = ["2008 LSU Tigers baseball team", "Springfield General Hospital"]
        r = ["2008 LSU baseball team", "totally unrelated words xyz"]
        idf = build_idf_maps(l)
        dist = compute_distance_matrix(l, r, fns, idf)
        return fns, dist

    def test_all_components_resolve(self, setup):
        fns, _ = setup
        assert len(excel_like.component_indices(fns)) == 5

    def test_score_bounds(self, setup):
        fns, dist = setup
        s = excel_like.score_pairs(dist, fns)
        assert np.all(s >= 0) and np.all(s <= 1.0 + 1e-9)

    def test_match_scores_higher(self, setup):
        fns, dist = setup
        s = excel_like.score_pairs(dist, fns)
        assert s[0] > s[1]


def _separable_features(n=400, d=5, frac_pos=0.2, seed=0):
    rng = np.random.default_rng(seed)
    n_pos = int(n * frac_pos)
    pos = np.clip(rng.normal(0.85, 0.08, (n_pos, d)), 0, 1)
    neg = np.clip(rng.normal(0.3, 0.12, (n - n_pos, d)), 0, 1)
    x = np.vstack([pos, neg])
    y = np.concatenate([np.ones(n_pos), np.zeros(n - n_pos)])
    perm = rng.permutation(n)
    return x[perm], y[perm]


class TestZeroerLike:
    def test_separates_two_populations(self):
        x, y = _separable_features()
        p = zeroer_like.fit_predict(x)
        assert p[y == 1].mean() > 0.8
        assert p[y == 0].mean() < 0.2

    def test_ranking_quality(self):
        x, y = _separable_features(seed=3)
        p = zeroer_like.fit_predict(x)
        # All positives should rank above nearly all negatives.
        thresh = np.sort(p)[-int(y.sum())]
        assert (p[y == 1] >= thresh).mean() > 0.9

    def test_empty_and_single(self):
        assert zeroer_like.fit_predict(np.zeros((0, 3))).shape == (0,)
        assert zeroer_like.fit_predict(np.ones((1, 3))).shape == (1,)


class TestECM:
    def test_binarize_at_mean(self):
        x = np.array([[0.1, 0.9], [0.9, 0.1], [0.5, 0.5]])
        g = ecm.binarize(x)
        assert g[:, 0].tolist() == [0.0, 1.0, 0.0]

    def test_separates_two_populations(self):
        x, y = _separable_features()
        p = ecm.fit_predict(x)
        assert p[y == 1].mean() > p[y == 0].mean() + 0.3

    def test_empty(self):
        assert ecm.fit_predict(np.zeros((0, 3))).shape == (0,)


class TestFeatures:
    def test_matrix_shape(self):
        fns = full_space()
        l = ["2008 LSU Tigers baseball team"]
        r = ["2008 LSU baseball team"]
        idf = build_idf_maps(l)
        dist = compute_distance_matrix(l, r, fns, idf)
        m = feature_matrix(dist, fns, l, r)
        assert m.shape == (1, len(FEATURE_FNS) + 2)
        assert np.all(m >= -1e-9) and np.all(m <= 1 + 1e-9)

    def test_all_feature_fns_exist_in_space(self):
        assert len(feature_indices(full_space())) == len(FEATURE_FNS)
