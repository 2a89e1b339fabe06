"""Figure 16 — classification (KNN/F1) and clustering (K-means/RI) over
clean, dirty and repaired training data on four UCR/UEA-like archives.

Protocol (Section 5.5): 10% random errors injected into the training
split only ("together" on multivariate sets); KNN K grid-searched;
K-means on the training set.  Paper shape: cleaning recovers most of the
clean-data accuracy, with MTCSC closest to "Clean".

The per-(dataset, method, series) cleaning fans out over Spark via
clean_per_series — every training series is an independent group.

Usage: spark-submit jobs/fig16_applications.py
"""
from __future__ import annotations

import argparse

import numpy as np
import pandas as pd

from repro.core import SpeedConstraint, estimate_speed
from repro.core.spark_clean import clean_per_series, to_spark_long
from repro.datasets import CLASSIFICATION
from repro.errors import inject_errors
from repro.jobrun import default_spark
from repro.methods import METHODS, Context, SkipMethod
from repro.mining import kmeans, knn_classify, rand_index
from repro.experiments import format_table

CLEANERS = ["MTCSC-C", "MTCSC-Uni", "SCREEN", "LsGreedy", "EWMA"]


def _clean_archive(spark, t, X3, method: str, s: SpeedConstraint) -> np.ndarray:
    """Clean every series of an archive in parallel on Spark."""
    fn = METHODS[method]
    ctx = Context(s=s)

    def kernel(tt, XX):
        return fn(tt, XX, ctx)

    pdf = pd.concat(
        [
            pd.DataFrame(
                {"series_id": str(i), "t": t, "v": list(map(list, X3[i]))}
            )
            for i in range(len(X3))
        ],
        ignore_index=True,
    )
    df = spark.createDataFrame(pdf)
    out = clean_per_series(df, kernel).toPandas()
    X_clean = np.empty_like(X3)
    for sid, grp in out.groupby("series_id"):
        grp = grp.sort_values("t")
        X_clean[int(sid)] = np.array(grp["repaired"].tolist())
    return X_clean


def run_fig16(
    spark, *, rate: float = 0.10, train_frac: float = 0.6, seed: int = 0
) -> pd.DataFrame:
    rows = []
    for name, gen in CLASSIFICATION.items():
        X, y = gen()
        g = np.random.default_rng(seed)
        idx = g.permutation(len(X))
        n_train = max(2, int(train_frac * len(X)))
        tr, te = idx[:n_train], idx[n_train:]
        t = np.arange(X.shape[1], dtype=float)
        # Inject 10% errors into each training series ("together").
        dirty = X[tr].copy()
        for i in range(len(dirty)):
            dirty[i], _ = inject_errors(
                dirty[i], rate, pattern="together", seed=seed * 1000 + i
            )
        k_classes = len(np.unique(y))

        def score(train_X, label):
            f1, _ = knn_classify(train_X, y[tr], X[te], y[te])
            ri = rand_index(y[tr], kmeans(train_X, k_classes, seed=seed))
            rows.append({"dataset": name, "train_data": label, "f1": f1, "ri": ri})

        score(X[tr], "Clean")
        score(dirty, "Dirty")
        # Speed constraint estimated from the dirty training data: pool
        # the per-series consecutive speeds (never diffing across series
        # boundaries) and take a mid quantile — with 10% errors the upper
        # tail is error speeds, which must not set the constraint.
        speeds = np.concatenate(
            [
                np.sqrt(np.sum(np.diff(series, axis=0) ** 2, axis=1))
                for series in dirty
            ]
        )
        s = SpeedConstraint(float(np.quantile(speeds, 0.90)) * 1.5, 10.0)
        for method in CLEANERS:
            try:
                repaired = _clean_archive(spark, t, dirty, method, s)
            except SkipMethod:
                continue
            score(repaired, method)
    return pd.DataFrame(rows)


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--rate", type=float, default=0.10)
    args = ap.parse_args()
    spark = default_spark("fig16-applications")
    print(format_table(run_fig16(spark, rate=args.rate)))


if __name__ == "__main__":
    main()
