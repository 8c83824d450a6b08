"""ADWIN (ADaptive WINdowing) drift detector — Bifet & Gavaldà 2007.

Exponential-histogram implementation: the window of real values is kept
as buckets of exponentially growing capacity (``M`` buckets per level).
On each update every admissible cut point between buckets is tested with
the ADWIN bound; if the two sub-window means differ significantly the
older sub-window is dropped and drift is flagged.

FiCSUM feeds the fingerprint-similarity series into ADWIN; HTCD and ARF
feed 0/1 error indicators.
"""
from __future__ import annotations

from collections import deque

import numpy as np


class _Bucket:
    __slots__ = ("total", "variance", "count")

    def __init__(self, total: float, variance: float, count: int):
        self.total = total
        self.variance = variance
        self.count = count


class ADWIN:
    """Adaptive windowing over a stream of real values.

    ``add(x)`` returns True when a drift was detected at this step (the
    window has been shrunk to the post-change regime).
    """

    def __init__(self, delta: float = 0.002, max_buckets_per_level: int = 5,
                 min_window: int = 10, check_period: int = 4):
        self.delta = delta
        self.M = max_buckets_per_level
        self.min_window = min_window
        self.check_period = check_period
        self.buckets: deque[_Bucket] = deque()  # oldest first
        self.total = 0.0
        self.width = 0
        self.variance_sum = 0.0  # sum over buckets of internal variance*count
        self._tick = 0

    @property
    def mean(self) -> float:
        return self.total / self.width if self.width else 0.0

    def reset(self) -> None:
        self.buckets.clear()
        self.total = 0.0
        self.width = 0
        self.variance_sum = 0.0
        self._tick = 0

    # ------------------------------------------------------------------ core
    def add(self, x: float) -> bool:
        self._insert(x)
        self._compress()
        self._tick += 1
        if self.width < self.min_window or self._tick % self.check_period:
            return False
        return self._detect()

    def _insert(self, x: float) -> None:
        if self.width:
            mean = self.mean
            self.variance_sum += (x - mean) ** 2 * self.width / (self.width + 1)
        self.buckets.append(_Bucket(x, 0.0, 1))
        self.total += x
        self.width += 1

    def _compress(self) -> None:
        # merge oldest pair at any level holding more than M buckets
        buckets = list(self.buckets)
        merged = False
        counts: dict[int, list[int]] = {}
        for idx, b in enumerate(buckets):
            counts.setdefault(b.count, []).append(idx)
        for cnt in sorted(counts):
            idxs = counts[cnt]
            if len(idxs) > self.M:
                i1, i2 = idxs[0], idxs[1]
                b1, b2 = buckets[i1], buckets[i2]
                n = b1.count + b2.count
                mu1, mu2 = b1.total / b1.count, b2.total / b2.count
                var = (
                    b1.variance + b2.variance
                    + b1.count * b2.count / n * (mu1 - mu2) ** 2
                )
                buckets[i1] = _Bucket(b1.total + b2.total, var, n)
                del buckets[i2]
                merged = True
                break
        if merged:
            self.buckets = deque(buckets)

    def _detect(self) -> bool:
        drift = False
        while self.width >= self.min_window:
            # scan cut points oldest→newest
            n0, sum0 = 0.0, 0.0
            found = False
            buckets = list(self.buckets)
            n_total, sum_total = self.width, self.total
            var_total = self.variance_sum / self.width if self.width else 0.0
            for b in buckets[:-1]:
                n0 += b.count
                sum0 += b.total
                n1 = n_total - n0
                if n0 < 1 or n1 < 1:
                    continue
                mu0, mu1 = sum0 / n0, (sum_total - sum0) / n1
                m = 1.0 / (1.0 / n0 + 1.0 / n1)
                dd = np.log(2.0 * np.log(max(n_total, 2)) / self.delta)
                eps = np.sqrt(2.0 * m * var_total * dd) / m + 2.0 / (3.0 * m) * dd
                if abs(mu0 - mu1) > eps:
                    found = True
                    break
            if not found:
                break
            drift = True
            self._drop_oldest()
        return drift

    def _drop_oldest(self) -> None:
        b = self.buckets.popleft()
        self.total -= b.total
        self.width -= b.count
        self.variance_sum = max(0.0, self.variance_sum - b.variance)
        if not self.buckets:
            self.variance_sum = 0.0
