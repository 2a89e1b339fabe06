"""Benchmark: Table 4 pipeline — per-method cleaning cost on GPS(Walk).

Regenerates the time column of Table 4 at benchmark scale (SF~=0.1 of
the experiment: n=5000 of the 11k series).  Run with
``pytest benchmarks/ --benchmark-only``.
"""
import numpy as np
import pytest

from repro.core import SpeedConstraint
from repro.datasets import gps_walk
from repro.methods import METHODS, Context

N = 5_000
WINDOW = 45.0


@pytest.fixture(scope="module")
def gps():
    t, dirty, truth, mask = gps_walk(N)
    return t, dirty, truth


@pytest.mark.parametrize(
    "method",
    ["MTCSC-G", "MTCSC-L", "MTCSC-C", "MTCSC-Uni", "SCREEN", "SpeedAcc", "LsGreedy", "EWMA", "RCSWS", "HTD"],
)
def test_bench_method(benchmark, gps, method):
    t, dirty, truth = gps
    ctx = Context(s=SpeedConstraint(1.6, WINDOW), truth=truth)
    fn = METHODS[method]
    benchmark.pedantic(lambda: fn(t, dirty, ctx), rounds=1, iterations=1)
