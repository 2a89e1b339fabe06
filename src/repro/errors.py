"""Synthetic error injection, following Section 5.1.1 of the paper.

Errors replace the value of a randomly chosen e% of data points in a
dimension with a uniform random value between the dataset minimum and
maximum of that dimension.  Two multivariate patterns (Section 5.3.3):

- ``separate`` — each dimension is hit independently (e% is split evenly
  across dimensions: 5% on 2-D data means 2.5% of points per dimension);
- ``together`` — all dimensions of the chosen points are hit at once
  (simulating a sensor/transmission failure).

Experiments run 10 seeds and average (Section 5.1.1).
"""
from __future__ import annotations

import numpy as np


def inject_errors(
    X: np.ndarray,
    rate: float,
    *,
    pattern: str = "together",
    seed: int = 0,
) -> tuple[np.ndarray, np.ndarray]:
    """Inject uniform-replacement errors at ``rate`` (fraction of points).

    Returns ``(dirty, cell_mask)`` where ``cell_mask`` has shape
    ``(n, D)`` and marks the replaced cells.  The first point is never
    corrupted (every online method trusts it, as in the paper's setup).
    """
    if not 0 <= rate < 1:
        raise ValueError(f"rate must be in [0, 1), got {rate}")
    if pattern not in ("separate", "together"):
        raise ValueError(f"unknown pattern {pattern!r}")
    X = np.atleast_2d(np.asarray(X, float))
    n, D = X.shape
    g = np.random.default_rng(seed)
    dirty = X.copy()
    mask = np.zeros((n, D), dtype=bool)
    lo = X.min(axis=0)
    hi = X.max(axis=0)
    if pattern == "together":
        k = int(round(rate * n))
        rows = g.choice(np.arange(1, n), size=min(k, n - 1), replace=False)
        for d in range(D):
            dirty[rows, d] = lo[d] + g.random(len(rows)) * (hi[d] - lo[d])
            mask[rows, d] = True
    else:  # separate: e% split evenly across dimensions, disjoint rows
        k_dim = int(round(rate * n / D))
        taken = np.zeros(n, dtype=bool)
        taken[0] = True
        for d in range(D):
            avail = np.nonzero(~taken)[0]
            rows = g.choice(avail, size=min(k_dim, len(avail)), replace=False)
            taken[rows] = True
            dirty[rows, d] = lo[d] + g.random(len(rows)) * (hi[d] - lo[d])
            mask[rows, d] = True
    return dirty, mask
