"""Smoke-tests for the jobs/ entrypoints at tiny scale.

Each job's core function must run end-to-end on the session Spark and
produce the table it claims; shape assertions on the paper's qualitative
claims live here where cheap enough.
"""
import sys
from pathlib import Path

import numpy as np
import pytest

JOBS = Path(__file__).resolve().parents[1] / "jobs"
sys.path.insert(0, str(JOBS))

import fig5_stock  # noqa: E402
import fig13_dimension  # noqa: E402
import fig14_adaptive  # noqa: E402
import fig16_applications  # noqa: E402
import table2_datasets  # noqa: E402
import table4_gps  # noqa: E402


class TestTable2:
    def test_rows_match_paper_catalogue(self):
        rows = table2_rows = table2_datasets.table2_rows(scale=0.02)
        names = {r["dataset"] for r in rows}
        assert {"Stock", "ILD", "TAO", "ECG", "GPS(Walk)", "GPS(Mixed)"} <= names
        by = {r["dataset"]: r for r in rows}
        assert by["ILD"]["dims"] == 3
        assert by["ECG"]["dims"] == 32
        assert by["arrowhead"]["series"] == 211
        assert by["swj"]["dims"] == 4


class TestTable4:
    def test_small_run_has_all_methods(self, spark):
        df = table4_gps.run_table4(spark, n=800, window=30.0)
        assert list(df["method"])[0] == "Dirty"
        assert len(df) == len(table4_gps.PAPER_TABLE4)
        assert np.isfinite(df["rmse"]).all()

    def test_paper_reference_numbers_recorded(self):
        assert table4_gps.PAPER_TABLE4["MTCSC-C"][0] == 0.3386
        assert table4_gps.PAPER_TABLE4["EWMA"][2] == 10753


class TestFig5:
    def test_reduced_run(self, spark):
        df = fig5_stock.run_fig5(spark, n=1000, seeds=2)
        assert set(df["method"]) == set(fig5_stock.PROPOSALS)
        # Online L must be faster than batch G at every rate (paper 5(b)
        # relative ordering that survives our pruned-G optimization).
        l_t = df[df.method == "MTCSC-L"]["seconds"].mean()
        c_t = df[df.method == "MTCSC-C"]["seconds"].mean()
        assert l_t < c_t


class TestFig13:
    def test_dimension_scaling(self, spark):
        df = fig13_dimension.run_fig13(spark, n=1200, dims=(2, 8), seeds=1)
        assert set(df["D"]) == {2, 8}
        # Accuracy should hold up as D grows (rmse finite and better than
        # nothing at both dims for MTCSC-C).
        c = df[df.method == "MTCSC-C"]
        assert np.isfinite(c["rmse"]).all()


class TestFig14:
    def test_adaptive_beats_fixed_from_walk_init(self, spark):
        df = fig14_adaptive.run_fig14(spark, n=2400)
        walk = df[df.initial_speed == "walk(1.6)"]
        a = walk[walk.method == "MTCSC-A"].rmse.iloc[0]
        c = walk[walk.method == "MTCSC-C"].rmse.iloc[0]
        assert a < c

    def test_all_initial_speeds_present(self, spark):
        df = fig14_adaptive.run_fig14(spark, n=1500)
        assert set(df["initial_speed"]) >= set(fig14_adaptive.INITIAL)


class TestFig16:
    def test_applications_table(self, spark, monkeypatch):
        # Shrink to one archive for the smoke test.
        import repro.datasets as ds

        monkeypatch.setattr(
            fig16_applications,
            "CLEANERS",
            ["MTCSC-C", "EWMA"],
        )
        monkeypatch.setattr(
            ds, "CLASSIFICATION", {"arrowhead": lambda: ds.arrowhead()}
        )
        monkeypatch.setattr(
            fig16_applications, "CLASSIFICATION", {"arrowhead": ds.arrowhead}
        )
        df = fig16_applications.run_fig16(spark, rate=0.10)
        labels = set(df["train_data"])
        assert {"Clean", "Dirty", "MTCSC-C", "EWMA"} <= labels
        by = {r["train_data"]: r for _, r in df.iterrows()}
        # Clean data should classify at least as well as dirty.
        assert by["Clean"]["f1"] >= by["Dirty"]["f1"] - 1e-9
