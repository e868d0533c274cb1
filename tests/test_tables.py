"""Tests for suite table formatting (driver-side, synthetic reports)."""
import numpy as np

from repro.eval.harness import DatasetReport
from repro.eval.metrics import PRPoint
from repro.eval.multi_harness import MultiReport
from repro.eval.tables import (
    METHODS,
    format_multi_prauc,
    format_prauc_table,
    format_table2,
    format_table4a,
    pick_best_static,
)


def _fake_report(name="DS", p=0.9, r=0.6, n_fn=3):
    curve = [PRPoint(0.95, 0.3, 0.9), PRPoint(0.85, 0.6, 0.5)]
    rep = DatasetReport(
        name=name, n_l=100, n_r=50, ubr=0.9,
        autofj_precision=p, autofj_recall=r,
        pepcc=0.9, rercc=0.95,
        autofj_curve=curve, uc_recall=0.5, nr_recall=0.55,
    )
    rep.bsj_curves = [
        [PRPoint(0.9, 0.1 * (j + 1), 0.5)] for j in range(n_fn)
    ]
    rep.curves = {m: curve for m in METHODS}
    return rep


def _fake_multi(name="FZ"):
    curve = [PRPoint(0.9, 0.5, 0.8)]
    rep = MultiReport(
        name=name, selected=["name"], weights={"name": 1.0},
        autofj_precision=0.88, autofj_recall=0.7, autofj_curve=curve,
    )
    rep.curves = {m: curve for m in METHODS}
    return rep


class TestPickBestStatic:
    def test_picks_highest_average_ar(self):
        reports = [_fake_report("A"), _fake_report("B")]
        # bsj_curves[j] has recall 0.1*(j+1) at precision 0.9 ≤ autofj 0.9.
        assert pick_best_static(reports) == 2


class TestFormatters:
    def test_table2_contains_all_columns(self):
        out = format_table2([_fake_report("X"), _fake_report("Y")])
        for m in METHODS:
            assert m in out
        assert "Average" in out and "X" in out and "UBR" in out

    def test_table2_average_row_math(self):
        out = format_table2([_fake_report(p=0.8, r=0.4), _fake_report(p=1.0, r=0.6)])
        avg_line = out.splitlines()[-1]
        assert "0.900" in avg_line  # mean precision
        assert "0.500" in avg_line  # mean recall

    def test_prauc_table(self):
        out = format_prauc_table([_fake_report()])
        assert "AutoFJ" in out and "BSJ" in out

    def test_table4a(self):
        out = format_table4a([_fake_multi()])
        assert "name:1.0" in out and "Average" in out

    def test_multi_prauc(self):
        out = format_multi_prauc([_fake_multi("AB"), _fake_multi("BR")])
        assert "AB" in out and "BR" in out and "Average" in out

    def test_nan_rendered_as_na(self):
        rep = _fake_report()
        rep.pepcc = float("nan")
        out = format_table2([rep])
        assert "NA" in out
