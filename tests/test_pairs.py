"""Tests for the candidate-pair distance tensor (driver kernels + Spark path)."""
import numpy as np
import pandas as pd
import pytest

from repro.core import distance as D
from repro.core.config_space import JoinFunction, full_space
from repro.core.pairs import build_idf_maps, compute_distance_matrix, pair_distances
from repro.core.preprocess import preprocess

L_VALUES = [
    "2008 LSU Tigers baseball team",
    "2008 LSU Tigers football team",
    "2008 Mississippi State Bulldogs baseball team",
]
R_VALUES = ["2008 LSU baseball team", "2008 Missisippi State Bulldog baseball team"]


@pytest.fixture(scope="module")
def idf_maps():
    return build_idf_maps(L_VALUES)


class TestBuildIdfMaps:
    def test_all_variants_present(self, idf_maps):
        assert len(idf_maps) == 8  # 4 preprocessing × 2 tokenizations

    def test_rare_token_heavier(self, idf_maps):
        m = idf_maps[("L", "SP")]
        assert m["mississippi"] > m["team"]


class TestComputeDistanceMatrix:
    def test_shape_and_bounds(self, idf_maps):
        fns = full_space()
        mat = compute_distance_matrix(
            ["2008 LSU baseball team"] * 2, ["2008 LSU baseball team", "totally different"],
            fns, idf_maps,
        )
        assert mat.shape == (2, 140)
        assert np.all(mat >= 0) and np.all(mat <= 1.0 + 1e-6)

    def test_identical_strings_near_zero(self, idf_maps):
        fns = [f for f in full_space() if f.dist != "ID"]  # ID bottoms at 0.5
        mat = compute_distance_matrix(["abc def"], ["abc def"], fns, idf_maps)
        assert np.all(mat[0] < 1e-6)

    def test_matches_direct_kernels(self, idf_maps):
        a, b = L_VALUES[0], R_VALUES[0]
        ed = JoinFunction("L", None, None, "ED")
        jd = JoinFunction("L", "SP", "EW", "JD")
        mat = compute_distance_matrix([a], [b], [ed, jd], idf_maps)
        pa, pb = preprocess(a, "L"), preprocess(b, "L")
        assert mat[0, 0] == pytest.approx(D.lev_batch([pa], [pb])[0], abs=1e-6)
        wa = {t: 1.0 for t in pa.split()}
        wb = {t: 1.0 for t in pb.split()}
        assert mat[0, 1] == pytest.approx(D.set_distances(wa, wb)["JD"], abs=1e-6)

    def test_figure3a_jaccard(self, idf_maps):
        # (l1, r1) of Figure 3(a): Jaccard distance 1/6 under space tokens
        # ({2008, lsu, tigers, baseball, team} vs {2008, lsu, baseball, team}).
        jd = JoinFunction("L", "SP", "EW", "JD")
        mat = compute_distance_matrix([L_VALUES[0]], [R_VALUES[0]], [jd], idf_maps)
        assert mat[0, 0] == pytest.approx(1 - 4 / 5, abs=1e-6) or mat[0, 0] == pytest.approx(0.2, abs=1e-6)

    def test_missing_max(self, idf_maps):
        fns = [JoinFunction("L", "SP", "EW", "JD")]
        mat = compute_distance_matrix([""], [""], fns, idf_maps, missing_max=True)
        assert mat[0, 0] == 1.0
        mat2 = compute_distance_matrix([""], [""], fns, idf_maps, missing_max=False)
        assert mat2[0, 0] == 0.0

    def test_none_treated_as_empty(self, idf_maps):
        fns = [JoinFunction("L", "SP", "EW", "JD")]
        mat = compute_distance_matrix([None], ["abc"], fns, idf_maps)
        assert mat[0, 0] == 1.0

    def test_empty_batch(self, idf_maps):
        mat = compute_distance_matrix([], [], full_space(), idf_maps)
        assert mat.shape == (0, 140)


class TestPairDistancesSpark:
    def test_matches_driver_side(self, spark, idf_maps):
        fns = full_space()[:12]
        left = spark.createDataFrame(
            pd.DataFrame({"lid": range(len(L_VALUES)), "value": L_VALUES})
        )
        right = spark.createDataFrame(
            pd.DataFrame({"rid": range(len(R_VALUES)), "value": R_VALUES})
        )
        pairs = spark.createDataFrame(
            pd.DataFrame({"lid": [0, 1, 2, 2], "rid": [0, 0, 1, 0]})
        )
        ids, tensor = pair_distances(
            spark, pairs, left, right, key_col="value", fns=fns, idf_maps=idf_maps
        )
        assert tensor.shape == (4, 12)
        # Driver-side reference for each returned row.
        for i in range(len(ids)):
            lv = L_VALUES[ids.loc[i, "lid"]]
            rv = R_VALUES[ids.loc[i, "rid"]]
            ref = compute_distance_matrix([lv], [rv], fns, idf_maps)[0]
            assert np.allclose(tensor[i], ref, atol=1e-6), (i, ids.loc[i])

    def test_empty_pairs(self, spark, idf_maps):
        fns = full_space()[:3]
        left = spark.createDataFrame(pd.DataFrame({"lid": [0], "value": ["a"]}))
        right = spark.createDataFrame(pd.DataFrame({"rid": [0], "value": ["b"]}))
        pairs = spark.createDataFrame(
            pd.DataFrame({"lid": pd.Series([], dtype="int64"), "rid": pd.Series([], dtype="int64")}),
            schema="lid long, rid long",
        )
        ids, tensor = pair_distances(
            spark, pairs, left, right, key_col="value", fns=fns, idf_maps=idf_maps
        )
        assert len(ids) == 0 and tensor.shape == (0, 3)
