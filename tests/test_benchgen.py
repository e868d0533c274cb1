"""Tests for the single-column benchmark generator (DBPedia substitute)."""
import numpy as np
import pytest

from repro.benchgen import perturb as P
from repro.benchgen.single_column import (
    all_datasets,
    dataset_names,
    make_dataset,
)


class TestDatasetNames:
    def test_ten_domains(self):
        assert len(dataset_names()) == 10

    def test_unknown_raises(self):
        with pytest.raises(ValueError):
            make_dataset("NotADataset")


class TestDatasetProperties:
    @pytest.fixture(scope="class")
    def datasets(self):
        return all_datasets(seed=0)

    def test_l_is_duplicate_free(self, datasets):
        # The reference-table property (§2.1): L has no duplicates.
        for ds in datasets:
            assert ds.left["value"].is_unique, ds.name

    def test_no_equi_joins(self, datasets):
        # Paper removes trivial equi-joins from all datasets.
        for ds in datasets:
            l_set = set(ds.left["value"])
            overlap = [v for v in ds.right["value"] if v in l_set]
            assert not overlap, (ds.name, overlap[:3])

    def test_gt_covers_all_right_records(self, datasets):
        for ds in datasets:
            assert set(ds.gt.keys()) == set(ds.right["rid"]), ds.name

    def test_gt_lids_exist(self, datasets):
        for ds in datasets:
            lids = set(ds.left["lid"])
            for lid in ds.gt.values():
                if lid is not None:
                    assert lid in lids

    def test_incomplete_l(self, datasets):
        # Some R records must have no L counterpart (⊥ ground truth).
        bot = sum(sum(1 for v in ds.gt.values() if v is None) for ds in datasets)
        assert bot > 0

    def test_many_to_one_possible(self, datasets):
        # At least one dataset has two R variants of the same entity.
        many = False
        for ds in datasets:
            counts = {}
            for lid in ds.gt.values():
                if lid is not None:
                    counts[lid] = counts.get(lid, 0) + 1
            if any(c > 1 for c in counts.values()):
                many = True
        assert many

    def test_deterministic(self):
        a = make_dataset("Drugs", seed=7)
        b = make_dataset("Drugs", seed=7)
        assert a.left.equals(b.left)
        assert a.right.equals(b.right)
        assert a.gt == b.gt

    def test_seed_changes_data(self):
        a = make_dataset("Drugs", seed=1)
        b = make_dataset("Drugs", seed=2)
        assert not a.left.equals(b.left)

    def test_n_entities_scales(self):
        small = make_dataset("Hospitals", n_entities=50)
        big = make_dataset("Hospitals", n_entities=300)
        assert len(big.left) > len(small.left)


class TestPerturbations:
    def test_typo_changes_string(self):
        rng = np.random.default_rng(0)
        out = {P.typo("mississippi bulldogs", rng) for _ in range(20)}
        assert any(o != "mississippi bulldogs" for o in out)

    def test_typo_protects_digits_and_protected(self):
        rng = np.random.default_rng(0)
        for _ in range(20):
            out = P.typo("2008 team", rng, protected={"team"})
            assert out == "2008 team"  # nothing editable

    def test_drop_token(self):
        rng = np.random.default_rng(0)
        out = P.drop_token("a tigers b", rng, droppable={"tigers"})
        assert out == "a b"

    def test_drop_token_noop_without_candidates(self):
        rng = np.random.default_rng(0)
        assert P.drop_token("a b c", rng, droppable={"zz"}) == "a b c"

    def test_swap_suffix(self):
        rng = np.random.default_rng(0)
        assert (
            P.swap_suffix("lsu football team", rng, pairs=[("team", "season")])
            == "lsu football season"
        )

    def test_swap_suffix_reverse(self):
        rng = np.random.default_rng(0)
        assert (
            P.swap_suffix("lsu football season", rng, pairs=[("team", "season")])
            == "lsu football team"
        )

    def test_add_token(self):
        rng = np.random.default_rng(0)
        out = P.add_token("a b", rng, pool=["the"])
        assert "the" in out.split() and len(out.split()) == 3

    def test_abbreviate(self):
        rng = np.random.default_rng(0)
        out = P.abbreviate("Boston College Eagles", rng, phrases={"Boston College": "BC"})
        assert out == "BC Eagles"
