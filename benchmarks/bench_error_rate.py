"""Benchmark: Figure 6 cell cost — MTCSC-C on ILD at rising error rates.

The paper's efficiency claim is that MTCSC's cost is flat in the error
rate; the per-rate timings here regenerate Figure 6(b)'s MTCSC line.
"""
import pytest

from repro.core import SpeedConstraint, estimate_speed, mtcsc_c
from repro.datasets import ild
from repro.errors import inject_errors

N = 10_000


@pytest.fixture(scope="module")
def ild_data():
    t, X = ild(N)
    s = SpeedConstraint(estimate_speed(t, X, 0.995, scale=1.5), 10.0)
    return t, X, s


@pytest.mark.parametrize("rate", [0.05, 0.10, 0.20])
def test_bench_mtcsc_c_error_rate(benchmark, ild_data, rate):
    t, X, s = ild_data
    dirty, _ = inject_errors(X, rate, seed=0)
    benchmark.pedantic(lambda: mtcsc_c(t, dirty, s), rounds=1, iterations=1)
