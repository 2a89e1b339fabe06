"""Figures 8/9 — error patterns "separate" vs "together" on TAO and ECG.

Paper shape: under "together" MTCSC (multivariate) beats everything
including MTCSC-Uni; under "separate" MTCSC-Uni is slightly better than
MTCSC (per-dimension errors barely move the multivariate point).

Usage: spark-submit jobs/fig9_patterns.py [--n 20000] [--seeds 5]
"""
from __future__ import annotations

import argparse

import pandas as pd

from repro.core import SpeedConstraint, estimate_speed
from repro.datasets import ecg, tao
from repro.experiments import aggregate_over_seeds, format_table, sweep_injected
from repro.jobrun import default_spark

METHODS = ["MTCSC-C", "MTCSC-Uni", "SCREEN", "SpeedAcc", "LsGreedy", "EWMA"]
RATES = [0.05, 0.10, 0.20]


def run_fig9(
    spark, *, n: int = 20_000, seeds: int = 5, window: float = 10.0, ecg_dims: int = 8
) -> pd.DataFrame:
    frames = []
    for name, (t, X) in {
        "tao": tao(n),
        "ecg": ecg(n, ecg_dims),
    }.items():
        s = SpeedConstraint(estimate_speed(t, X, 0.995, scale=1.5), window)
        for pattern in ("separate", "together"):
            out = sweep_injected(
                spark,
                t,
                X,
                s,
                methods=METHODS,
                rates=RATES,
                seeds=range(seeds),
                pattern=pattern,
            )
            agg = aggregate_over_seeds(out)
            agg.insert(0, "pattern", pattern)
            agg.insert(0, "dataset", name)
            frames.append(agg)
    return pd.concat(frames, ignore_index=True)


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--n", type=int, default=20_000)
    ap.add_argument("--seeds", type=int, default=5)
    args = ap.parse_args()
    spark = default_spark("fig9-patterns")
    print(format_table(run_fig9(spark, n=args.n, seeds=args.seeds)))


if __name__ == "__main__":
    main()
