"""Structured Streaming online cleaning == batch result once drained."""
import numpy as np
import pandas as pd
import pytest

from repro.core import SpeedConstraint, mtcsc_c, mtcsc_l
from repro.core.streaming import (
    StreamingCleaner,
    run_file_stream,
    write_stream_files,
)
from repro.datasets import gps_walk

S = SpeedConstraint(1.6, 45.0)


class TestStreamingCleaner:
    def test_batch_feed_equals_batch_algorithm(self):
        t, dirty, truth, mask = gps_walk(600, seed=5)
        sc = StreamingCleaner(S, variant="local")
        pdf = pd.DataFrame(
            {"series_id": "s0", "t": t, "v": list(map(list, dirty))}
        )
        # Feed in 7 uneven micro-batches.
        for part in np.array_split(pdf, 7):
            sc.process_batch(part)
        out = sc.finish()
        want, _ = mtcsc_l(t, dirty, S)
        got = np.array(out["repaired"].tolist())
        np.testing.assert_allclose(got, want, rtol=1e-9)

    def test_cluster_variant(self):
        t, dirty, truth, mask = gps_walk(400, seed=6)
        sc = StreamingCleaner(S, variant="cluster")
        pdf = pd.DataFrame(
            {"series_id": "s0", "t": t, "v": list(map(list, dirty))}
        )
        sc.process_batch(pdf)
        out = sc.finish()
        want, _ = mtcsc_c(t, dirty, S)
        np.testing.assert_allclose(
            np.array(out["repaired"].tolist()), want, rtol=1e-9
        )

    def test_two_series_interleaved(self):
        t1, d1, _, _ = gps_walk(200, seed=7)
        t2, d2, _, _ = gps_walk(200, seed=8)
        rows = []
        for i in range(200):
            rows.append(("a", t1[i], list(d1[i])))
            rows.append(("b", t2[i], list(d2[i])))
        pdf = pd.DataFrame(rows, columns=["series_id", "t", "v"])
        sc = StreamingCleaner(S, variant="local")
        for part in np.array_split(pdf, 5):
            sc.process_batch(part)
        out = sc.finish()
        for sid, t, d in (("a", t1, d1), ("b", t2, d2)):
            got = np.array(
                out[out.series_id == sid]["repaired"].tolist()
            )
            want, _ = mtcsc_l(t, d, S)
            np.testing.assert_allclose(got, want, rtol=1e-9)

    def test_unknown_variant_raises(self):
        with pytest.raises(ValueError):
            StreamingCleaner(S, variant="global")


class TestFileStream:
    def test_write_stream_files(self, tmp_path):
        t, dirty, truth, mask = gps_walk(250, seed=9)
        n = write_stream_files(t, dirty, tmp_path, batch_rows=100)
        assert n == 3
        files = sorted(tmp_path.glob("*.json"))
        assert len(files) == 3

    def test_structured_streaming_matches_batch(self, spark, tmp_path):
        """End-to-end: file-source micro-batches through foreachBatch with
        carried state reproduce the batch MTCSC-L repair exactly."""
        t, dirty, truth, mask = gps_walk(500, seed=10)
        write_stream_files(t, dirty, tmp_path / "in", batch_rows=120)
        out = run_file_stream(
            spark, tmp_path / "in", S, variant="local", max_files_per_trigger=1
        )
        want, _ = mtcsc_l(t, dirty, S)
        got = np.array(out["repaired"].tolist())
        assert len(got) == len(t)
        np.testing.assert_allclose(got, want, rtol=1e-9)
