"""Integration test: the full Table-2 harness on one small dataset."""
import math

import pytest

from repro.benchgen.single_column import make_dataset
from repro.core.pipeline import prepare
from repro.eval.harness import SUPERVISED, UNSUPERVISED, evaluate_dataset


@pytest.fixture(scope="module")
def report(spark):
    ds = make_dataset("Hospitals", n_entities=120, seed=2)
    prep = prepare(spark, ds)
    return evaluate_dataset(spark, ds, prep=prep, s=25)


class TestHarness:
    def test_all_baseline_curves_present(self, report):
        for m in UNSUPERVISED + SUPERVISED:
            assert m in report.curves, m

    def test_autofj_hits_target_roughly(self, report):
        assert report.autofj_precision >= 0.7
        assert report.autofj_recall > 0.2

    def test_ubr_bounds_autofj_recall(self, report):
        assert report.autofj_recall <= report.ubr + 1e-9

    def test_ar_bounded_by_one(self, report):
        for m in UNSUPERVISED + SUPERVISED:
            assert 0.0 <= report.ar(m) <= 1.0 + 1e-9

    def test_auc_bounded(self, report):
        for m in UNSUPERVISED + SUPERVISED:
            assert 0.0 <= report.auc(m) <= 1.0 + 1e-9
        assert 0.0 <= report.autofj_auc <= 1.0 + 1e-9

    def test_bsj_curves_count(self, report):
        assert len(report.bsj_curves) == 140

    def test_correlations_defined_or_nan(self, report):
        # PEPCC is NaN only for one-iteration runs (paper's NA cells).
        assert math.isnan(report.pepcc) or -1.0 <= report.pepcc <= 1.0

    def test_ablation_recalls_sane(self, report):
        assert 0.0 <= report.uc_recall <= report.ubr + 1e-9
        assert 0.0 <= report.nr_recall <= report.ubr + 1e-9
