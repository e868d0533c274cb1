"""Benchmark (Table 1): configuration-space enumeration and the distance
kernels that every configuration evaluation rests on."""
import numpy as np

from repro.core.config_space import full_space, reduced_space, threshold_grid
from repro.core.distance import jw_batch, lev_batch, set_distances
from repro.core.pairs import build_idf_maps, compute_distance_matrix

WORDS = ["2008 LSU Tigers baseball team", "2012 Wisconsin Badgers football season"]


def test_bench_space_enumeration(benchmark):
    out = benchmark(lambda: (full_space(), reduced_space(24), threshold_grid(50)))
    assert len(out[0]) == 140


def test_bench_lev_batch_1k(benchmark):
    a = [WORDS[0]] * 1000
    b = [WORDS[1]] * 1000
    out = benchmark(lev_batch, a, b)
    assert out.shape == (1000,)


def test_bench_jw_batch_1k(benchmark):
    a = [WORDS[0]] * 1000
    b = [WORDS[1]] * 1000
    out = benchmark(jw_batch, a, b)
    assert out.shape == (1000,)


def test_bench_set_distances(benchmark):
    wa = {t: 1.0 for t in WORDS[0].lower().split()}
    wb = {t: 1.0 for t in WORDS[1].lower().split()}
    out = benchmark(set_distances, wa, wb)
    assert 0 <= out["JD"] <= 1


def test_bench_full_tensor_500_pairs(benchmark):
    fns = full_space()
    idf = build_idf_maps([WORDS[0]])
    a = [WORDS[0]] * 500
    b = [WORDS[1]] * 500
    mat = benchmark.pedantic(
        compute_distance_matrix, args=(a, b, fns, idf), rounds=2, iterations=1
    )
    assert mat.shape == (500, 140)
