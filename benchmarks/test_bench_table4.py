"""Benchmark (Tables 4 & 7): multi-column AutoFJ (Algorithm 3) and the
Spark PPJoin baseline."""
import pandas as pd
import pytest

from repro.baselines.ppjoin import ppjoin
from repro.benchgen.multi_column import make_multi_dataset
from repro.core.multi_column import multi_column_autofj, prepare_multi


@pytest.fixture(scope="module")
def fz(spark):
    ds = make_multi_dataset("FZ", seed=0)
    return ds, prepare_multi(spark, ds)


def test_bench_prepare_multi(benchmark, spark):
    ds = make_multi_dataset("AB", seed=0)
    mp = benchmark.pedantic(lambda: prepare_multi(spark, ds), rounds=1, iterations=1)
    assert mp.lr_dist.shape[0] == 3


def test_bench_algorithm3_search(benchmark, fz):
    _, mp = fz
    res = benchmark.pedantic(
        lambda: multi_column_autofj(mp, tau=0.9, s=20, g=4), rounds=2, iterations=1
    )
    assert res.trials > 0


def test_bench_ppjoin(benchmark, spark):
    ds = make_multi_dataset("DA", seed=0)
    left = spark.createDataFrame(ds.left[["lid", "title"]])
    right = spark.createDataFrame(ds.right[["rid", "title"]])

    def run():
        return ppjoin(spark, left, right, key_col="title", threshold=0.4).count()

    n = benchmark.pedantic(run, rounds=2, iterations=1)
    assert n >= 0
