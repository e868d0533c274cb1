"""Parity test: the Spark broadcast-join application of a learned
program must reproduce the driver-side greedy assignment exactly."""
import numpy as np
import pandas as pd
import pytest

from repro.benchgen.single_column import make_dataset
from repro.core.apply_spark import apply_program_spark, program_precision_table
from repro.core.pipeline import precompute_for, prepare, run_autofj


@pytest.fixture(scope="module")
def setup(spark):
    ds = make_dataset("Awards", n_entities=120, seed=3)
    prep = prepare(spark, ds)
    run = run_autofj(spark, ds, prep=prep, tau=0.9, s=25)
    return prep, run


class TestApplyProgramSpark:
    def test_matches_driver_assignment(self, spark, setup):
        prep, run = setup
        pre, program = run.pre, run.result.program
        assert program, "no program learned"
        mask = prep.nr_keep
        pdf = prep.lr_pairs.loc[mask, ["l_idx", "r_idx"]].reset_index(drop=True).copy()
        for k, (fn_i, _) in enumerate(program):
            pdf[f"d{k}"] = prep.lr_dist[mask][:, fn_i].astype(np.float64)
        pairs_df = spark.createDataFrame(pdf)
        prec_table = program_precision_table(
            pre, program,
            prep.ll_dist, prep.ll_pairs["l1_idx"].to_numpy(), prep.n_l,
        )
        out = apply_program_spark(spark, pairs_df, pre, program, prec_table).toPandas()
        got = dict(zip(out["r_idx"], out["l_idx"]))
        expected = {
            r: int(l) for r, l in enumerate(run.result.assignment) if l >= 0
        }
        assert got == expected

    def test_empty_program(self, spark, setup):
        prep, run = setup
        out = apply_program_spark(
            spark,
            spark.createDataFrame(pd.DataFrame({"l_idx": [0], "r_idx": [0], "d0": [0.1]})),
            run.pre,
            [],
            pd.DataFrame(columns=["cfg", "l_idx", "p"]),
        )
        assert out.count() == 0

    def test_confidence_matches(self, spark, setup):
        prep, run = setup
        pre, program = run.pre, run.result.program
        mask = prep.nr_keep
        pdf = prep.lr_pairs.loc[mask, ["l_idx", "r_idx"]].reset_index(drop=True).copy()
        for k, (fn_i, _) in enumerate(program):
            pdf[f"d{k}"] = prep.lr_dist[mask][:, fn_i].astype(np.float64)
        prec_table = program_precision_table(
            pre, program, prep.ll_dist, prep.ll_pairs["l1_idx"].to_numpy(), prep.n_l
        )
        out = apply_program_spark(
            spark, spark.createDataFrame(pdf), pre, program, prec_table
        ).toPandas()
        for _, row in out.iterrows():
            assert run.result.confidence[int(row["r_idx"])] == pytest.approx(
                row["p"], abs=1e-6
            )
