"""Tests for multi-column datasets and Algorithm 3."""
import numpy as np
import pytest

from repro.benchgen.multi_column import (
    add_random_columns,
    all_multi_datasets,
    get_spec,
    make_multi_dataset,
    spec_names,
)
from repro.core.multi_column import multi_column_autofj, prepare_multi
from repro.eval.metrics import precision_recall


class TestMultiDatasetGen:
    def test_eight_datasets(self):
        assert len(spec_names()) == 8

    def test_spec_shapes(self):
        # Table 3 attribute counts: FZ 6, DA 4, AB 3, RI 10, BR 4, ABN 11,
        # IA 8, BB 16.
        expect = {"FZ": 6, "DA": 4, "AB": 3, "RI": 10, "BR": 4, "ABN": 11, "IA": 8, "BB": 16}
        for name, n_attr in expect.items():
            assert len(get_spec(name).columns) == n_attr, name

    def test_sizes_and_matches(self):
        ds = make_multi_dataset("DA")
        spec = get_spec("DA")
        assert len(ds.left) == spec.n_l
        assert len(ds.right) == spec.n_r
        assert ds.n_gt == spec.n_matches

    def test_gt_is_many_to_one_into_l(self):
        ds = make_multi_dataset("FZ")
        lids = set(ds.left["lid"])
        for rid, lid in ds.gt.items():
            if lid is not None:
                assert lid in lids

    def test_deterministic(self):
        a = make_multi_dataset("BR", seed=3)
        b = make_multi_dataset("BR", seed=3)
        assert a.left.equals(b.left) and a.right.equals(b.right)

    def test_key_columns_unique_in_l(self):
        ds = make_multi_dataset("RI")
        key_cols = [c.name for c in get_spec("RI").columns if c.role == "key"]
        # Reference-table property: no duplicate entities in L.
        assert not ds.left.duplicated(subset=key_cols).any()

    def test_missing_values_present(self):
        ds = make_multi_dataset("BB")
        assert (ds.left == "").any().any() or (ds.right == "").any().any()

    def test_all_datasets_build(self):
        for ds in all_multi_datasets():
            assert len(ds.key_cols) >= 3


class TestAddRandomColumns:
    def test_columns_added_both_sides(self):
        ds = make_multi_dataset("AB")
        noisy = add_random_columns(ds, 2, seed=0)
        assert len(noisy.key_cols) == len(ds.key_cols) + 2
        assert "rand_0" in noisy.left.columns and "rand_0" in noisy.right.columns

    def test_random_strings_in_range(self):
        ds = make_multi_dataset("AB")
        noisy = add_random_columns(ds, 1, seed=1)
        lens = noisy.left["rand_0"].str.len()
        assert lens.between(1, 50).all()

    def test_gt_unchanged(self):
        ds = make_multi_dataset("AB")
        noisy = add_random_columns(ds, 1)
        assert noisy.gt == ds.gt


@pytest.fixture(scope="module")
def fz_prep(spark):
    return prepare_multi(spark, make_multi_dataset("FZ", seed=0))


class TestPrepareMulti:
    def test_tensor_shapes(self, fz_prep):
        n_cols = len(fz_prep.cols)
        assert fz_prep.lr_dist.shape[0] == n_cols
        assert fz_prep.lr_dist.shape[1] == len(fz_prep.lr_pairs)
        assert fz_prep.lr_dist.shape[2] == len(fz_prep.fns)
        assert fz_prep.ll_dist.shape[0] == n_cols

    def test_column_tensors_aligned(self, fz_prep):
        # Same (lid, rid) ordering across columns: identical key column on
        # all column slices (checked via the builder's single lr_pairs).
        assert len(fz_prep.lr_pairs) > 0
        assert fz_prep.lr_pairs[["lid", "rid"]].duplicated().sum() == 0


class TestAlgorithm3:
    def test_selects_informative_column_first(self, fz_prep):
        res = multi_column_autofj(fz_prep, tau=0.85, s=20, g=4)
        assert res.selected, "no column selected"
        # The name (key) column, or a genuinely informative secondary,
        # must be selected; a noise column must never come first.
        spec = get_spec("FZ")
        roles = {c.name: c.role for c in spec.columns}
        assert roles[res.selected[0]] != "noise"

    def test_weights_normalized(self, fz_prep):
        res = multi_column_autofj(fz_prep, tau=0.85, s=20, g=4)
        assert res.weights.sum() == pytest.approx(1.0)
        assert (res.weights >= 0).all()

    def test_quality(self, fz_prep):
        res = multi_column_autofj(fz_prep, tau=0.9, s=20, g=4)
        assignment = fz_prep.assignment_to_dict(res.result.assignment)
        p, r = precision_recall(assignment, fz_prep.ds.gt)
        assert p >= 0.6 and r >= 0.3, (p, r)

    def test_robust_to_random_columns(self, spark):
        ds = make_multi_dataset("AB", seed=0)
        base_prep = prepare_multi(spark, ds)
        base = multi_column_autofj(base_prep, tau=0.85, s=20, g=4)
        noisy_prep = prepare_multi(spark, add_random_columns(ds, 2, seed=0))
        noisy = multi_column_autofj(noisy_prep, tau=0.85, s=20, g=4)
        # Random columns must not be selected (Table 4b).
        assert not any(c.startswith("rand_") for c in noisy.selected)
        p0, r0 = precision_recall(
            base_prep.assignment_to_dict(base.result.assignment), ds.gt
        )
        p1, r1 = precision_recall(
            noisy_prep.assignment_to_dict(noisy.result.assignment), ds.gt
        )
        assert abs(r1 - r0) < 0.15, (r0, r1)
