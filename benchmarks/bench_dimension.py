"""Benchmark: Figure 13(b) — cleaning cost vs dimensionality on ECG.

The paper's claim: MTCSC-G/L/C times are linear in D.
"""
import pytest

from repro.core import SpeedConstraint, estimate_speed, mtcsc_c, mtcsc_g, mtcsc_l
from repro.datasets import ecg
from repro.errors import inject_errors

N = 5_000


def _make(d):
    t, X = ecg(N, d)
    s = SpeedConstraint(estimate_speed(t, X, 0.995, scale=1.5), 10.0)
    dirty, _ = inject_errors(X, 0.05, seed=0)
    return t, dirty, s


@pytest.mark.parametrize("d", [2, 8, 32])
@pytest.mark.parametrize(
    "algo", [mtcsc_g, mtcsc_l, mtcsc_c], ids=["mtcsc_g", "mtcsc_l", "mtcsc_c"]
)
def test_bench_dimension(benchmark, d, algo):
    t, dirty, s = _make(d)
    benchmark.pedantic(lambda: algo(t, dirty, s), rounds=1, iterations=1)
