"""Figure 7 — data-size sweep on ILD at 5% injected errors.

Paper shape: MTCSC scales linearly, keeps high accuracy, repairs ~5% of
points at every size (tracking the injected fraction).

Usage: spark-submit jobs/fig7_ild_size.py [--sizes 5000,10000,20000,40000]
"""
from __future__ import annotations

import argparse

import pandas as pd

from repro.core import SpeedConstraint, estimate_speed
from repro.datasets import ild
from repro.experiments import aggregate_over_seeds, sweep_injected, format_table
from repro.jobrun import default_spark

METHODS = ["MTCSC-C", "MTCSC-Uni", "SCREEN", "SpeedAcc", "LsGreedy", "EWMA", "HoloClean", "TranAD", "CAE-M"]


def run_fig7(
    spark,
    *,
    sizes=(5_000, 10_000, 20_000, 40_000),
    seeds: int = 5,
    rate: float = 0.05,
    window: float = 10.0,
) -> pd.DataFrame:
    frames = []
    for n in sizes:
        t, X = ild(n)
        s = SpeedConstraint(estimate_speed(t, X, 0.995, scale=1.5), window)
        out = sweep_injected(
            spark,
            t,
            X,
            s,
            methods=METHODS,
            rates=[rate],
            seeds=range(seeds),
            pattern="together",
        )
        agg = aggregate_over_seeds(out)
        agg.insert(0, "size", n)
        frames.append(agg)
    return pd.concat(frames, ignore_index=True)


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--sizes", type=str, default="5000,10000,20000,40000")
    ap.add_argument("--seeds", type=int, default=5)
    args = ap.parse_args()
    sizes = [int(x) for x in args.sizes.split(",")]
    spark = default_spark("fig7-ild-size")
    print(format_table(run_fig7(spark, sizes=sizes, seeds=args.seeds)))


if __name__ == "__main__":
    main()
