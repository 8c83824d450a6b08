"""Incremental Gaussian Naive Bayes.

Used standalone as the DWM expert and inside Hoeffding-tree leaves for
naive-Bayes-adaptive prediction. Per-class, per-feature running Gaussian
statistics via Welford updates; O(d) per observation.
"""
from __future__ import annotations

import numpy as np

_EPS = 1e-9


class GaussianNB:
    """Online Gaussian NB over ``n_features`` numeric features."""

    def __init__(self, n_features: int, n_classes: int):
        self.n_features = n_features
        self.n_classes = n_classes
        self.counts = np.zeros(n_classes)
        self._mean = np.zeros((n_classes, n_features))
        self._m2 = np.zeros((n_classes, n_features))

    @property
    def n_seen(self) -> float:
        return float(self.counts.sum())

    def partial_fit(self, x: np.ndarray, y: int) -> None:
        self.counts[y] += 1
        delta = x - self._mean[y]
        self._mean[y] += delta / self.counts[y]
        self._m2[y] += delta * (x - self._mean[y])

    def predict_proba(self, x: np.ndarray) -> np.ndarray:
        total = self.counts.sum()
        if total == 0:
            return np.full(self.n_classes, 1.0 / self.n_classes)
        log_p = np.full(self.n_classes, -np.inf)
        for c in range(self.n_classes):
            if self.counts[c] == 0:
                continue
            prior = np.log(self.counts[c] / total)
            if self.counts[c] < 2:
                log_p[c] = prior
                continue
            var = self._m2[c] / self.counts[c] + _EPS
            ll = -0.5 * np.sum(
                np.log(2 * np.pi * var) + (x - self._mean[c]) ** 2 / var
            )
            log_p[c] = prior + ll
        log_p -= log_p.max()
        p = np.exp(log_p)
        return p / p.sum()

    def predict(self, x: np.ndarray) -> int:
        return int(np.argmax(self.predict_proba(x)))
