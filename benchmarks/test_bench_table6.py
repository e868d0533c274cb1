"""Benchmark (Table 6): reduced 24-function space vs. full 140 — the
paper reports ~2× speedup with 24 configurations (§5.1.4 / Fig. 7d)."""
import pytest

from repro.benchgen.single_column import make_dataset
from repro.core.autofj import greedy_search
from repro.core.config_space import full_space, reduced_space
from repro.core.pipeline import precompute_for, prepare


@pytest.fixture(scope="module")
def prep(spark):
    return prepare(spark, make_dataset("Hospitals", n_entities=150, seed=0))


@pytest.fixture(scope="module")
def reduced_idx():
    keep = {f.name for f in reduced_space(24)}
    return [i for i, f in enumerate(full_space()) if f.name in keep]


def test_bench_precompute_reduced(benchmark, prep, reduced_idx):
    pre = benchmark.pedantic(
        lambda: precompute_for(prep, fn_subset=reduced_idx, s=50),
        rounds=3,
        iterations=1,
    )
    assert pre.precision.shape[0] == 24


def test_bench_search_reduced(benchmark, prep, reduced_idx):
    pre = precompute_for(prep, fn_subset=reduced_idx, s=50)
    res = benchmark.pedantic(lambda: greedy_search(pre, 0.9), rounds=3, iterations=1)
    assert res is not None
