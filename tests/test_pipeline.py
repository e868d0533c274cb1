"""End-to-end single-column AutoFJ tests on small benchmark datasets."""
import numpy as np
import pytest

from repro.benchgen.single_column import make_dataset
from repro.core.autofj import apply_program
from repro.core.config_space import full_space, reduced_space
from repro.core.pipeline import precompute_for, prepare, run_autofj
from repro.eval.metrics import precision_recall


@pytest.fixture(scope="module")
def teams_prep(spark):
    ds = make_dataset("TeamSeasons", n_entities=160, seed=1)
    return prepare(spark, ds)


@pytest.fixture(scope="module")
def teams_run(spark, teams_prep):
    return run_autofj(spark, teams_prep.ds, prep=teams_prep, tau=0.9, s=25)


class TestPrepare:
    def test_tensor_shapes_consistent(self, teams_prep):
        assert teams_prep.lr_dist.shape == (len(teams_prep.lr_pairs), 140)
        assert teams_prep.ll_dist.shape == (len(teams_prep.ll_pairs), 140)
        assert teams_prep.nr_keep.shape == (len(teams_prep.lr_pairs),)

    def test_indices_in_range(self, teams_prep):
        assert teams_prep.lr_pairs["l_idx"].between(0, teams_prep.n_l - 1).all()
        assert teams_prep.lr_pairs["r_idx"].between(0, teams_prep.n_r - 1).all()

    def test_learned_negative_rules_look_right(self, teams_prep):
        # TeamSeasons L contains same-school different-sport rows, so at
        # least one sport-vs-sport or year-vs-year rule must be learned.
        assert len(teams_prep.rules) > 0
        flat = {w for rule in teams_prep.rules for w in rule}
        sports = {"football", "baseball", "basketball", "soccer", "hockey", "volleyball"}
        years = {str(y) for y in range(1990, 2016)}
        assert flat & (sports | years)

    def test_nr_filters_some_pairs_but_not_most(self, teams_prep):
        kept = teams_prep.nr_keep.mean()
        assert 0.3 < kept <= 1.0


class TestAutoFJEndToEnd:
    def test_meets_precision_target_roughly(self, teams_run):
        gt = teams_run.prep.ds.gt
        p, r = precision_recall(teams_run.assignment, gt)
        # τ = 0.9: estimator is approximate, allow slack (paper avg 0.886).
        assert p >= 0.75, (p, r)

    def test_nontrivial_recall(self, teams_run):
        gt = teams_run.prep.ds.gt
        _, r = precision_recall(teams_run.assignment, gt)
        assert r >= 0.3, r

    def test_multiple_configs_selected(self, teams_run):
        # The dataset mixes typo and token-drop variants: a union should form.
        assert len(teams_run.result.program) >= 1

    def test_estimated_precision_above_tau(self, teams_run):
        assert all(p > 0.9 for p in teams_run.result.est_precision)

    def test_apply_program_reproduces_assignment(self, teams_run):
        l_cur, _ = apply_program(teams_run.pre, teams_run.result.program)
        assert (l_cur == teams_run.result.assignment).all()

    def test_many_to_one(self, teams_run):
        # Each r joined at most once by construction of the assignment dict.
        a = teams_run.assignment
        assert len(a) == len(set(a.keys()))


class TestAblations:
    def test_no_nr_joins_at_least_as_many(self, spark, teams_prep):
        with_nr = run_autofj(spark, teams_prep.ds, prep=teams_prep, s=25)
        without = run_autofj(
            spark, teams_prep.ds, prep=teams_prep, s=25, use_negative_rules=False
        )
        assert len(without.assignment) >= 0  # runs
        # NR only removes candidate pairs → cannot join more records.
        assert len(with_nr.assignment) <= len(without.assignment) + 5

    def test_single_config_no_worse_than_empty(self, spark, teams_prep):
        uc = run_autofj(spark, teams_prep.ds, prep=teams_prep, s=25, single_config=True)
        assert len(uc.result.program) == 1
        p, r = precision_recall(uc.assignment, teams_prep.ds.gt)
        assert r > 0

    def test_union_recall_geq_single_config(self, spark, teams_prep):
        full = run_autofj(spark, teams_prep.ds, prep=teams_prep, s=25)
        uc = run_autofj(spark, teams_prep.ds, prep=teams_prep, s=25, single_config=True)
        _, r_full = precision_recall(full.assignment, teams_prep.ds.gt)
        _, r_uc = precision_recall(uc.assignment, teams_prep.ds.gt)
        assert r_full >= r_uc - 0.05


class TestReducedSpace:
    def test_reduced_space_runs_and_close(self, spark, teams_prep):
        sub_names = {f.name for f in reduced_space(24)}
        subset = [i for i, f in enumerate(full_space()) if f.name in sub_names]
        pre = precompute_for(teams_prep, fn_subset=subset, s=25)
        from repro.core.autofj import greedy_search

        res = greedy_search(pre, tau=0.9)
        assignment = teams_prep.assignment_to_dict(res.assignment)
        p, _ = precision_recall(assignment, teams_prep.ds.gt)
        assert p >= 0.7


class TestPrecisionEstimateQuality:
    def test_estimated_tracks_actual(self, teams_run):
        """PEPCC sanity: estimated precision should correlate or at least
        not wildly exceed actual precision across iterations."""
        gt = teams_run.prep.ds.gt
        actual = []
        for snap in teams_run.iteration_assignments():
            p, _ = precision_recall(snap, gt)
            actual.append(p)
        est = teams_run.result.est_precision
        assert len(actual) == len(est)
        # Mean absolute gap bounded (the estimate is meant to be informative,
        # not exact — §3.1).
        gap = np.mean([abs(a - e) for a, e in zip(actual, est)])
        assert gap < 0.25, (actual, est)
