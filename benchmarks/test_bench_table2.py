"""Benchmark (Tables 2 & 5): the single-column AutoFJ pipeline — Spark
blocking, distance tensor, Eq. 9 precomputation, and the greedy search.

These are the components whose sum is the per-dataset cost in the
paper's efficiency analysis (§5.1.4: 33/50 datasets within 1 minute)."""
import numpy as np
import pytest

from repro.benchgen.single_column import make_dataset
from repro.core import blocking
from repro.core.autofj import greedy_search
from repro.core.pipeline import precompute_for, prepare, run_autofj


@pytest.fixture(scope="module")
def ds():
    return make_dataset("TeamSeasons", n_entities=200, seed=0)


@pytest.fixture(scope="module")
def prep(spark, ds):
    return prepare(spark, ds)


def test_bench_blocking(benchmark, spark, ds):
    left = spark.createDataFrame(ds.left[["lid", "value"]])
    right = spark.createDataFrame(ds.right[["rid", "value"]])

    def run():
        return blocking.block_lr(spark, left, right, key_col="value").count()

    n = benchmark.pedantic(run, rounds=2, iterations=1)
    assert n > 0


def test_bench_prepare_full(benchmark, spark, ds):
    out = benchmark.pedantic(
        lambda: prepare(spark, ds), rounds=1, iterations=1
    )
    assert out.lr_dist.shape[1] == 140


def test_bench_precompute(benchmark, prep):
    pre = benchmark.pedantic(
        lambda: precompute_for(prep, s=50), rounds=2, iterations=1
    )
    assert pre.precision.shape[0] == 140


def test_bench_greedy_search(benchmark, prep):
    pre = precompute_for(prep, s=50)
    res = benchmark.pedantic(lambda: greedy_search(pre, 0.9), rounds=3, iterations=1)
    assert len(res.program) >= 1


def test_bench_autofj_end_to_end(benchmark, spark, ds, prep):
    run = benchmark.pedantic(
        lambda: run_autofj(spark, ds, prep=prep, tau=0.9, s=50),
        rounds=2,
        iterations=1,
    )
    assert len(run.assignment) > 0
