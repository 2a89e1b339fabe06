"""MTCSC-A — adaptive speed constraint capture, Algorithm 5 + Section 4.

MTCSC-C with the speed constraint re-estimated online: observed speeds
between consecutive arrivals fill two adjacent sliding windows ``W1``
and ``W2`` (``m`` speeds each).  Speeds are bucketed into ``b`` equal
intervals over ``[0, s]`` plus an overflow bucket ``(s, inf)``; once the
KL divergence ``KL(W1 || W2)`` exceeds the threshold ``tau``, the series'
character has changed and the constraint becomes
``s' = quantile95(W2) / beta`` (Example 4.1).

Hyper-parameters (paper defaults, Section 5.4.3): b=6, tau=0.75, m=150,
beta=0.75.
"""
from __future__ import annotations

from collections import deque

import numpy as np

from .mtcsc_c import ClusterCleaner
from .speed import SpeedConstraint, distance


def bucketize(speeds: np.ndarray, b: int, s: float) -> np.ndarray:
    """Histogram counts over b buckets: b-1 equal bins on [0, s] + (s, inf).

    Matches Example 4.1: s=2.2, b=6 gives bin edges 0, .44, .88, 1.32,
    1.76, 2.2, inf (5 equal bins of width s/(b-1) plus the overflow).
    """
    if b < 2:
        raise ValueError("need at least 2 buckets")
    edges = np.linspace(0.0, s, b)  # b-1 interior bins
    idx = np.clip(np.searchsorted(edges[1:], speeds, side="left"), 0, b - 1)
    counts = np.bincount(idx, minlength=b)
    return counts.astype(float)


def kl_divergence(p_counts: np.ndarray, q_counts: np.ndarray) -> float:
    """KL(P || Q) with natural log; terms with p=0 contribute 0.

    Buckets where p>0 but q=0 are smoothed with a tiny epsilon so the
    divergence is large-but-finite (the comparison against tau is all
    that matters).
    """
    p = np.asarray(p_counts, float)
    q = np.asarray(q_counts, float)
    p = p / p.sum() if p.sum() else p
    q = q / q.sum() if q.sum() else q
    mask = p > 0
    q_safe = np.where(q > 0, q, 1e-12)
    return float(np.sum(p[mask] * np.log(p[mask] / q_safe[mask])))


class AdaptiveSpeed:
    """Stateful Algorithm 5: feed consecutive speeds, get the current s."""

    def __init__(
        self,
        s0: float,
        *,
        b: int = 6,
        tau: float = 0.75,
        m: int = 150,
        beta: float = 0.75,
    ):
        self.s = float(s0)
        self.b, self.tau, self.m, self.beta = b, tau, m, beta
        self.w1: deque[float] = deque()
        self.w2: deque[float] = deque()
        self.n_updates = 0  # number of constraint changes (for tests/metrics)

    def observe(self, speed: float) -> float:
        """Push one observed speed, return the (possibly updated) constraint."""
        s1 = float(speed)
        if len(self.w1) < self.m:
            self.w1.append(s1)
        elif len(self.w2) < self.m:
            self.w2.append(s1)
        else:
            c1 = bucketize(np.array(self.w1), self.b, self.s)
            c2 = bucketize(np.array(self.w2), self.b, self.s)
            if kl_divergence(c1, c2) > self.tau:
                self.s = float(np.quantile(np.array(self.w2), 0.95)) / self.beta
                self.n_updates += 1
            # Slide: oldest of W2 moves into W1, the new speed enters W2.
            s2 = self.w2.popleft()
            self.w1.append(s2)
            self.w1.popleft()
            self.w2.append(s1)
        return self.s


class AdaptiveCleaner(ClusterCleaner):
    """MTCSC-C with Algorithm 5 spliced in before each key-point decision."""

    def __init__(
        self,
        s: SpeedConstraint,
        *,
        b: int = 6,
        tau: float = 0.75,
        m: int = 150,
        beta: float = 0.75,
        reset_after: float | None = -1.0,
    ):
        # MTCSC-A exists precisely because the constraint can be mis-set,
        # so the stale-anchor reset defaults ON (one window) — without it
        # a transport-mode change can strand the anchor before the KL
        # monitor has updated s (see ClusterCleaner.reset_after).  Pass
        # reset_after=None to disable.
        if reset_after is not None and reset_after < 0:
            reset_after = s.window
        super().__init__(s, reset_after=reset_after)
        self._adaptive = AdaptiveSpeed(s.smax, b=b, tau=tau, m=m, beta=beta)
        self._last_raw_t: float | None = None
        self._last_raw_x: np.ndarray | None = None

    def _pre_step(self, tk: float, xk: np.ndarray) -> None:
        # "AdaptiveSpeed(x_{k-1}, x_k, ...)": the monitored speed is the
        # one between consecutive *observations*.  Using the previous
        # repaired point instead would poison the distribution whenever a
        # too-small constraint makes repairs lag the data (carry-forward
        # during a transport-mode change), inflating s far past the new
        # mode's real bound.
        try:
            if self._last_raw_t is not None:
                dt = tk - self._last_raw_t
                if dt > 0:
                    s_new = self._adaptive.observe(
                        distance(xk, self._last_raw_x) / dt
                    )
                    if s_new != self.s.smax:
                        self.s = SpeedConstraint(s_new, self.s.window)
        finally:
            self._last_raw_t = tk
            self._last_raw_x = np.asarray(xk, float)

    @property
    def n_speed_updates(self) -> int:
        return self._adaptive.n_updates

    @property
    def current_speed(self) -> float:
        return self._adaptive.s


def mtcsc_a(
    t: np.ndarray,
    X: np.ndarray,
    s: SpeedConstraint,
    *,
    b: int = 6,
    tau: float = 0.75,
    m: int = 150,
    beta: float = 0.75,
    reset_after: float | None = -1.0,
) -> tuple[np.ndarray, np.ndarray]:
    """Batch wrapper over :class:`AdaptiveCleaner`.

    Returns ``(X_repaired, changed_mask)``.
    """
    t = np.asarray(t, float)
    X = np.atleast_2d(np.asarray(X, float))
    cleaner = AdaptiveCleaner(s, b=b, tau=tau, m=m, beta=beta, reset_after=reset_after)
    for i in range(len(t)):
        cleaner.push(t[i], X[i])
    cleaner.flush()
    rows = cleaner.drain()
    Xr = np.vstack([r[1] for r in rows]) if rows else X.copy()
    changed = np.array([r[2] for r in rows], dtype=bool)
    changed &= np.any(Xr != X, axis=1)
    return Xr, changed
