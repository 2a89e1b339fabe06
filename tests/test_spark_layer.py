"""Spark dataflow layer: per-series and chunked parallel cleaning, metric
aggregations (oracle-checked against DuckDB), method registry."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import SpeedConstraint, mtcsc_c, mtcsc_l
from repro.core.spark_clean import (
    attach_truth,
    clean_chunked,
    clean_per_series,
    to_spark_long,
)
from repro.datasets import gps_walk
from repro.metrics import evaluate, spark_metrics
from repro.oracle import assert_equivalent

S = SpeedConstraint(1.6, 45.0)


def _clean_fn(t, X):
    return mtcsc_c(t, X, S)


@pytest.fixture(scope="module")
def gps_small():
    return gps_walk(1200, seed=2)


class TestToSparkLong:
    def test_roundtrip(self, spark, gps_small):
        t, dirty, truth, mask = gps_small
        df = to_spark_long(spark, t, dirty, truth=truth)
        assert df.count() == len(t)
        row = df.orderBy("t").first()
        assert row.series_id == "s0"
        assert row.v == pytest.approx(list(dirty[0]))
        assert row.truth == pytest.approx(list(truth[0]))


class TestCleanPerSeries:
    def test_matches_numpy_single_series(self, spark, gps_small):
        t, dirty, truth, mask = gps_small
        df = to_spark_long(spark, t, dirty)
        out = clean_per_series(df, _clean_fn).orderBy("t").toPandas()
        want, want_ch = mtcsc_c(t, dirty, S)
        got = np.array(out["repaired"].tolist())
        np.testing.assert_allclose(got, want, rtol=1e-9)
        np.testing.assert_array_equal(out["changed"].to_numpy(), want_ch)

    def test_multiple_series_independent(self, spark):
        # Two series cleaned in one job == each cleaned alone.
        t1, d1, _, _ = gps_walk(400, seed=3)
        t2, d2, _, _ = gps_walk(400, seed=4)
        df = to_spark_long(spark, t1, d1, series_id="a").unionByName(
            to_spark_long(spark, t2, d2, series_id="b")
        )
        out = clean_per_series(df, _clean_fn).toPandas()
        for sid, t, d in (("a", t1, d1), ("b", t2, d2)):
            part = out[out.series_id == sid].sort_values("t")
            want, _ = mtcsc_c(t, d, S)
            np.testing.assert_allclose(
                np.array(part["repaired"].tolist()), want, rtol=1e-9
            )


class TestCleanChunked:
    def test_close_to_sequential(self, spark, gps_small):
        t, dirty, truth, mask = gps_small
        df = to_spark_long(spark, t, dirty)
        out = (
            clean_chunked(df, _clean_fn, chunk_rows=300, warmup=3 * S.window)
            .orderBy("t")
            .toPandas()
        )
        assert len(out) == len(t)
        got = np.array(out["repaired"].tolist())
        want, _ = mtcsc_c(t, dirty, S)
        # Chunked online cleaning re-converges after each boundary; all
        # but a tiny fraction of points must agree with sequential.
        agree = np.all(np.abs(got - want) < 1e-6, axis=1).mean()
        assert agree > 0.98
        # And the chunked repair must still clean the data.
        m = evaluate(got, dirty, truth)
        dirty_rmse = evaluate(dirty, dirty, truth)["rmse"]
        assert m["rmse"] < 0.5 * dirty_rmse

    def test_rows_preserved_no_duplicates(self, spark, gps_small):
        t, dirty, truth, mask = gps_small
        df = to_spark_long(spark, t, dirty)
        out = clean_chunked(df, _clean_fn, chunk_rows=250, warmup=45.0)
        assert out.count() == len(t)
        assert out.select("t").distinct().count() == len(t)

    def test_invalid_params(self, spark, gps_small):
        t, dirty, truth, mask = gps_small
        df = to_spark_long(spark, t, dirty)
        with pytest.raises(ValueError):
            clean_chunked(df, _clean_fn, chunk_rows=0, warmup=1.0)
        with pytest.raises(ValueError):
            clean_chunked(df, _clean_fn, chunk_rows=10, warmup=-1.0)


class TestSparkMetrics:
    def test_matches_numpy(self, spark, gps_small):
        t, dirty, truth, mask = gps_small
        df = to_spark_long(spark, t, dirty, truth=truth)
        cleaned = clean_per_series(df, _clean_fn)
        joined = attach_truth(cleaned, df)
        got = spark_metrics(joined).first()
        repaired = np.array(
            clean_per_series(df, _clean_fn).orderBy("t").toPandas()["repaired"].tolist()
        )
        want = evaluate(repaired, dirty, truth)
        assert got.rmse == pytest.approx(want["rmse"], rel=1e-6)
        assert got.repair_distance == pytest.approx(want["repair_distance"], rel=1e-6)
        assert got.repair_number == want["repair_number"]

    def test_oracle_checked_against_duckdb(self, spark, gps_small):
        """The Spark metric aggregation, cross-checked row-for-row with an
        equivalent DuckDB SQL query over the exploded cell table."""
        t, dirty, truth, mask = gps_small
        df = to_spark_long(spark, t, dirty, truth=truth)
        cleaned = attach_truth(clean_per_series(df, _clean_fn), df)
        # Explode to scalar cells so DuckDB can aggregate the same data.
        cells = cleaned.select(
            "t",
            F.posexplode("repaired").alias("dim", "rep"),
        ).join(
            cleaned.select(
                "t", F.posexplode("truth").alias("dim", "tru")
            ),
            ["t", "dim"],
        )
        spark_agg = cells.agg(
            F.sqrt(F.avg((F.col("rep") - F.col("tru")) ** 2)).alias("rmse")
        )
        cells_pd = cells.toPandas()
        assert_equivalent(
            spark_agg,
            "SELECT sqrt(avg((rep - tru) * (rep - tru))) AS rmse FROM cells",
            cells=cells_pd,
        )


class TestMethodRegistry:
    def test_registry_covers_table4(self):
        from repro.methods import METHODS, TABLE4_ORDER

        for name in TABLE4_ORDER:
            assert name in METHODS

    def test_skip_method_on_wrong_dim(self):
        from repro.methods import METHODS, Context, SkipMethod

        ctx = Context(s=S)
        with pytest.raises(SkipMethod):
            METHODS["RCSWS"](np.arange(5.0), np.zeros((5, 3)), ctx)
