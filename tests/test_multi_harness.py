"""Integration test: the multi-column harness (Table 4a) on one dataset."""
import pytest

from repro.benchgen.multi_column import make_multi_dataset
from repro.core.multi_column import prepare_multi
from repro.eval.multi_harness import evaluate_multi_dataset
from repro.eval.tables import METHODS


@pytest.fixture(scope="module")
def report(spark):
    ds = make_multi_dataset("BR", seed=0)
    prep = prepare_multi(spark, ds)
    return evaluate_multi_dataset(spark, ds, prep=prep, s=20, g=4)


class TestMultiHarness:
    def test_all_curves_present(self, report):
        for m in METHODS:
            assert m in report.curves, m

    def test_autofj_quality(self, report):
        assert report.autofj_precision >= 0.6
        assert report.autofj_recall >= 0.3

    def test_key_column_selected(self, report):
        # BR's key column is beer_name; the noise-free secondary
        # factory_name is also legitimate. Noise columns are not.
        assert report.selected
        assert report.selected[0] in ("beer_name", "factory_name")

    def test_ar_and_auc_bounded(self, report):
        for m in METHODS:
            assert 0.0 <= report.ar(m) <= 1.0 + 1e-9
            assert 0.0 <= report.auc(m) <= 1.0 + 1e-9

    def test_weights_sum_to_one(self, report):
        assert sum(report.weights.values()) == pytest.approx(1.0)
