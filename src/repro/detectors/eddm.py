"""EDDM (Early Drift Detection Method) — Baena-García et al. 2006.

Monitors the distance (number of observations) between consecutive
classification errors. Under a stationary concept the mean distance
grows; a significant drop of ``mean + 2*std`` relative to its running
maximum signals warning/drift. Used by the RCD baseline.
"""
from __future__ import annotations

import numpy as np


class EDDM:
    """Feed 0/1 error indicators via ``add``; returns 'drift' | 'warning' | None."""

    WARNING_LEVEL = 0.95
    DRIFT_LEVEL = 0.90
    MIN_ERRORS = 30
    #: consecutive drift-level breaches required — a single noisy dip in
    #: the cumulative mean+2std metric is not evidence of drift
    CONSECUTIVE = 2

    def __init__(self):
        self.reset()

    def reset(self) -> None:
        self._i = 0
        self._last_error_at = -1
        self._n_errors = 0
        self._dist_mean = 0.0
        self._dist_m2 = 0.0
        self._max_metric = 0.0
        self._breaches = 0

    def add(self, error: int) -> str | None:
        self._i += 1
        if not error:
            return None
        if self._last_error_at >= 0:
            dist = self._i - self._last_error_at
            self._n_errors += 1
            delta = dist - self._dist_mean
            self._dist_mean += delta / self._n_errors
            self._dist_m2 += delta * (dist - self._dist_mean)
        self._last_error_at = self._i
        if self._n_errors < self.MIN_ERRORS:
            return None
        std = np.sqrt(self._dist_m2 / self._n_errors)
        metric = self._dist_mean + 2.0 * std
        if metric > self._max_metric:
            self._max_metric = metric
            self._breaches = 0
            return None
        ratio = metric / self._max_metric if self._max_metric > 0 else 1.0
        if ratio < self.DRIFT_LEVEL:
            self._breaches += 1
            if self._breaches >= self.CONSECUTIVE:
                self.reset()
                return "drift"
            return "warning"
        self._breaches = 0
        if ratio < self.WARNING_LEVEL:
            return "warning"
        return None
