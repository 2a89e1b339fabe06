"""Table 2 — dataset summary, regenerated from our synthetic equivalents.

Usage: spark-submit jobs/table2_datasets.py  (or plain python)
"""
from __future__ import annotations

import numpy as np

from repro import datasets


def table2_rows(scale: float = 1.0) -> list[dict]:
    """Sizes/dims of every generated dataset (scaled for quick runs)."""
    rows = []

    def add(name, size, dim, error, n_series):
        rows.append(
            {"dataset": name, "size": size, "dims": dim, "error": error, "series": n_series}
        )

    t, X = datasets.stock(int(12_000 * scale))
    add("Stock", len(t), X.shape[1], "Clean", 1)
    t, X = datasets.ild(int(43_000 * scale))
    add("ILD", len(t), X.shape[1], "Clean (synthetic)", 1)
    t, X = datasets.tao(int(568_000 * scale))
    add("TAO", len(t), X.shape[1], "Clean (synthetic)", 1)
    t, X = datasets.ecg(int(94_000 * scale))
    add("ECG", len(t), X.shape[1], "Clean (synthetic)", 1)
    t, d, tr, m = datasets.gps_walk(int(11_000 * scale))
    add("GPS(Walk)", len(t), d.shape[1], f"Embedded ({m.sum()} pts)", 1)
    t, d, tr, m, mode = datasets.gps_mixed(int(8_000 * scale))
    add("GPS(Mixed)", len(t), d.shape[1], f"Embedded ({m.sum()} pts)", 1)
    for name, fn in datasets.CLASSIFICATION.items():
        X, y = fn()
        add(name, X.shape[1], X.shape[2], "Clean", X.shape[0])
    return rows


def main() -> None:
    rows = table2_rows()
    print(f"{'dataset':12s} {'size':>8s} {'dims':>5s} {'series':>7s}  error")
    for r in rows:
        print(
            f"{r['dataset']:12s} {r['size']:8d} {r['dims']:5d} {r['series']:7d}  {r['error']}"
        )


if __name__ == "__main__":
    main()
