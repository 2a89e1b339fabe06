"""Figure 13 — dimension sweep on ECG (2..32 leads).

Paper shape: time of MTCSC-G/L/C grows linearly in D; accuracy stays
good as D rises.

Usage: spark-submit jobs/fig13_dimension.py [--n 10000] [--dims 2,4,8,16,32]
"""
from __future__ import annotations

import argparse

import pandas as pd

from repro.core import SpeedConstraint, estimate_speed
from repro.datasets import ecg
from repro.experiments import aggregate_over_seeds, format_table, sweep_injected
from repro.jobrun import default_spark

PROPOSALS = ["MTCSC-G", "MTCSC-L", "MTCSC-C"]


def run_fig13(
    spark,
    *,
    n: int = 10_000,
    dims=(2, 4, 8, 16, 32),
    seeds: int = 3,
    rate: float = 0.05,
    window: float = 10.0,
) -> pd.DataFrame:
    frames = []
    for d in dims:
        t, X = ecg(n, d)
        s = SpeedConstraint(estimate_speed(t, X, 0.995, scale=1.5), window)
        out = sweep_injected(
            spark,
            t,
            X,
            s,
            methods=PROPOSALS,
            rates=[rate],
            seeds=range(seeds),
            pattern="together",
        )
        agg = aggregate_over_seeds(out)
        agg.insert(0, "D", d)
        frames.append(agg)
    return pd.concat(frames, ignore_index=True)


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--n", type=int, default=10_000)
    ap.add_argument("--dims", type=str, default="2,4,8,16,32")
    ap.add_argument("--seeds", type=int, default=3)
    args = ap.parse_args()
    dims = [int(x) for x in args.dims.split(",")]
    spark = default_spark("fig13-dimension")
    print(format_table(run_fig13(spark, n=args.n, dims=dims, seeds=args.seeds)))


if __name__ == "__main__":
    main()
