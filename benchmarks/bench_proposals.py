"""Benchmark: Figure 5(b) — time of the four proposals on Stock.

Paper shape: MTCSC-G slowest, MTCSC-L fastest, MTCSC-C in between
(less than half of G).
"""
import pytest

from repro.core import (
    SpeedConstraint,
    estimate_speed,
    mtcsc_a,
    mtcsc_c,
    mtcsc_g,
    mtcsc_l,
)
from repro.datasets import stock
from repro.errors import inject_errors

N = 12_000


@pytest.fixture(scope="module")
def stock_data():
    t, X = stock(N)
    s = SpeedConstraint(estimate_speed(t, X, 0.99, scale=1.2), 10.0)
    dirty, _ = inject_errors(X, 0.10, seed=0)
    return t, dirty, s


@pytest.mark.parametrize(
    "algo",
    [mtcsc_g, mtcsc_l, mtcsc_c, mtcsc_a],
    ids=["mtcsc_g", "mtcsc_l", "mtcsc_c", "mtcsc_a"],
)
def test_bench_proposal(benchmark, stock_data, algo):
    t, dirty, s = stock_data
    benchmark.pedantic(lambda: algo(t, dirty, s), rounds=1, iterations=1)


@pytest.mark.parametrize("variant", ["pruned", "naive"])
def test_bench_mtcsc_g_variants(benchmark, stock_data, variant):
    """Paper Figure 5(b) shows MTCSC-G as the slowest (O(Dn^2) DP).  Our
    default G uses an exact O(Dnw) pruning, so the paper's time shape only
    appears with the literal DP — benched here at n=2000 (quadratic cost)."""
    t, dirty, s = stock_data
    n = 2_000
    benchmark.pedantic(
        lambda: mtcsc_g(t[:n], dirty[:n], s, naive=(variant == "naive")),
        rounds=1,
        iterations=1,
    )
