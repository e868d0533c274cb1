"""Benchmark (Table 3): benchmark-dataset generation (both benches are
driver-side; generation must stay trivially cheap relative to joins)."""
from repro.benchgen.multi_column import make_multi_dataset
from repro.benchgen.single_column import make_dataset


def test_bench_single_column_generation(benchmark):
    ds = benchmark(lambda: make_dataset("TeamSeasons", seed=0))
    assert len(ds.left) > 100


def test_bench_multi_column_generation(benchmark):
    ds = benchmark(lambda: make_multi_dataset("BB", seed=0))
    assert len(ds.left) == 600
