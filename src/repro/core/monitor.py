"""Classifier-free fingerprint drift monitor.

The detection path of Algorithm 1 factored out of FiCSUM: maintain the
active/buffer windows, periodically fingerprint them, track the concept
fingerprint and the similarity series, and flag drift via ADWIN plus the
μ−3σ breach rule. No classifier and no repository — labels ``y`` and
upstream predictions ``l`` (optional) arrive with the observations.

This is the state object carried by the Structured Streaming stateful
operator (``repro.sparkjobs.streaming``); it is picklable and processes
observations strictly in sequence order.
"""
from __future__ import annotations

from collections import deque

import numpy as np

from repro.core.fingerprint import FingerprintSchema, Normalizer, compute_fingerprint
from repro.core.repository import _Welford
from repro.core.similarity import dynamic_weights, similarity
from repro.detectors.adwin import ADWIN


class DriftMonitor:
    """Sequential drift detection over (X, y, l) observations."""

    def __init__(
        self,
        n_features: int,
        *,
        window_size: int = 50,
        buffer_len: int = 12,
        period: int = 3,
        incorporate_every: int = 3,
        adwin_delta: float = 0.02,
        min_sim_history: int = 8,
        supervised: bool = True,
    ):
        from repro.core.fingerprint import ConceptFingerprint
        from repro.core.meta_features import SEQUENCE_FUNCTIONS

        self.window_size = window_size
        self.buffer_len = buffer_len
        self.period = period
        self.incorporate_every = incorporate_every
        self.min_sim_history = min_sim_history
        self.schema = FingerprintSchema(
            n_features=n_features,
            source_mode="all" if supervised else "unsupervised",
            functions=tuple(SEQUENCE_FUNCTIONS),  # no shapley: no tree here
        )
        self.normalizer = Normalizer(self.schema.dim)
        self.concept = ConceptFingerprint(self.schema.dim)
        self.sim = _Welford()
        self.detector = ADWIN(delta=adwin_delta)
        self._deque: deque = deque(maxlen=window_size + buffer_len)
        self.i = 0
        self._tick = 0
        self._breaches = 0
        self._cooldown_until = 0
        self.n_drifts = 0

    def _fingerprint(self, items) -> np.ndarray:
        X = np.stack([it[0] for it in items])
        y = np.array([it[1] for it in items])
        l = np.array([it[2] for it in items])
        raw = compute_fingerprint(X, y, l, self.schema, None)
        self.normalizer.update(raw)
        return self.normalizer.normalize(raw)

    def _weights(self) -> np.ndarray:
        sigma = np.where(self.concept.count >= 2, self.concept.sigma, 1.0)
        w = dynamic_weights(sigma, None, None)
        degenerate = (self.normalizer.hi - self.normalizer.lo) < 1e-9
        return np.where(degenerate, 0.0, w)

    def add(self, x: np.ndarray, y: int, l: int | None = None) -> tuple[float, bool]:
        """Process one observation; returns (similarity, drift_flag).

        Similarity is NaN until the concept fingerprint is trained.
        """
        self._deque.append((np.asarray(x, dtype=float), int(y), int(l if l is not None else y)))
        self.i += 1
        if len(self._deque) < self.window_size or self.i % self.period:
            return float("nan"), False
        self._tick += 1
        items = list(self._deque)
        if len(items) == self.window_size + self.buffer_len and (
            self._tick % self.incorporate_every == 0 or self.concept.n_incorporated < 2
        ):
            F_B = self._fingerprint(items[: self.window_size])
            if self.concept.n_incorporated >= 2:
                sim_b = similarity(self.concept.mu, F_B, self._weights())
                suspect = (
                    self.sim.n >= 5
                    and sim_b < self.sim.mean - 3.5 * max(self.sim.std, 0.03)
                )
                if not suspect:
                    self.sim.update(sim_b)
                    self.concept.incorporate(F_B)
            else:
                self.concept.incorporate(F_B)
        if self.concept.n_incorporated < 2 or self.i < self._cooldown_until:
            return float("nan"), False
        F_A = self._fingerprint(items[-self.window_size:])
        sim_a = similarity(self.concept.mu, F_A, self._weights())
        breach = (
            self.sim.n >= 5
            and sim_a < self.sim.mean - 3.5 * max(self.sim.std, 0.03)
        )
        self._breaches = self._breaches + 1 if breach else 0
        adwin_drift = self.detector.add(sim_a)
        drift = self.sim.n >= self.min_sim_history and (
            adwin_drift or self._breaches >= 4
        )
        if drift:
            self.n_drifts += 1
            self._reset_concept()
        return sim_a, drift

    def _reset_concept(self) -> None:
        from repro.core.fingerprint import ConceptFingerprint

        self.concept = ConceptFingerprint(self.schema.dim)
        self.sim = _Welford()
        self.detector.reset()
        self._breaches = 0
        self._cooldown_until = self.i + self.window_size
