"""Benchmark: Figure 7 — data-size scalability of the online cleaners.

The paper claims linear scaling in n; timings at doubling sizes
regenerate Figure 7(b)'s shape.  Includes the Spark chunked-parallel
path at the largest size to show the distributed speed-up lever.
"""
import numpy as np
import pytest

from repro.core import SpeedConstraint, estimate_speed, mtcsc_c, mtcsc_l
from repro.datasets import ild
from repro.errors import inject_errors


def _make(n):
    t, X = ild(n)
    s = SpeedConstraint(estimate_speed(t, X, 0.995, scale=1.5), 10.0)
    dirty, _ = inject_errors(X, 0.05, seed=0)
    return t, dirty, s


@pytest.mark.parametrize("n", [5_000, 10_000, 20_000])
def test_bench_mtcsc_l_size(benchmark, n):
    t, dirty, s = _make(n)
    benchmark.pedantic(lambda: mtcsc_l(t, dirty, s), rounds=1, iterations=1)


@pytest.mark.parametrize("n", [5_000, 10_000, 20_000])
def test_bench_mtcsc_c_size(benchmark, n):
    t, dirty, s = _make(n)
    benchmark.pedantic(lambda: mtcsc_c(t, dirty, s), rounds=1, iterations=1)


def test_bench_mtcsc_c_spark_chunked(benchmark, spark):
    """Chunked-parallel MTCSC-C on the largest size via applyInPandas."""
    from repro.core.spark_clean import clean_chunked, to_spark_long

    n = 20_000
    t, dirty, s = _make(n)
    df = to_spark_long(spark, t, dirty).cache()
    df.count()

    def run():
        return clean_chunked(
            df, lambda tt, XX: mtcsc_c(tt, XX, s), chunk_rows=2_500, warmup=3 * s.window
        ).count()

    benchmark.pedantic(run, rounds=1, iterations=1)
