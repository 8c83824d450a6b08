"""Concept repository (Algorithm 1's ``R``).

Each stored concept holds its concept fingerprint, incremental
classifier, the running (μ_c, σ_c) of the similarity ``Sim(F_c, F_B)``
observed while the concept was active, and ``sc_stats`` — the online
distribution of fingerprints produced by this concept's classifier on
*foreign* windows (F_SC), which feeds the intra-classifier Fisher
weight.
"""
from __future__ import annotations

import numpy as np

from repro.core.fingerprint import ConceptFingerprint


class _Welford:
    """Scalar online mean/std, exponentially recency-weighted.

    The similarity scale drifts as normalization and dynamic weights
    train (paper Section IV), so the (μ_c, σ_c) acceptance records must
    track the *current* weighting regime rather than the all-time
    average — an EW estimate with α≈0.15 does that in O(1).
    """

    ALPHA = 0.15

    def __init__(self):
        self.n = 0
        self.mean = 0.0
        self.var = 0.0

    def update(self, x: float) -> None:
        self.n += 1
        if self.n == 1:
            self.mean = x
            return
        a = max(self.ALPHA, 1.0 / self.n)
        d = x - self.mean
        self.mean += a * d
        self.var = (1.0 - a) * (self.var + a * d * d)

    @property
    def std(self) -> float:
        return float(np.sqrt(max(self.var, 0.0)))


class ConceptRecord:
    """One stored concept: fingerprint, classifier and similarity stats."""

    def __init__(self, concept_id: int, dim: int, classifier, created_at: int):
        self.id = concept_id
        self.fingerprint = ConceptFingerprint(dim)
        self.classifier = classifier
        self.sim = _Welford()  # μ_c, σ_c of Sim(F_c, F_B)
        self.sc_stats = ConceptFingerprint(dim)  # distribution of F_SC vectors
        #: last incorporated fingerprint — re-calibrates stale similarity
        #: records under the current weighting regime (paper Section IV)
        self.calib_vec: np.ndarray | None = None
        self.created_at = created_at

    @property
    def mature(self) -> bool:
        """Enough similarity history for the μ±2σ acceptance test."""
        return self.sim.n >= 3


class Repository:
    """Ordered collection of ConceptRecords with stat-stack helpers."""

    def __init__(self, dim: int):
        self.dim = dim
        self.records: list[ConceptRecord] = []
        self._next_id = 0

    def __len__(self) -> int:
        return len(self.records)

    def __iter__(self):
        return iter(self.records)

    def create(self, classifier, created_at: int) -> ConceptRecord:
        rec = ConceptRecord(self._next_id, self.dim, classifier, created_at)
        self._next_id += 1
        self.records.append(rec)
        return rec

    def remove(self, rec: ConceptRecord) -> None:
        self.records.remove(rec)

    def stat_stacks(self) -> tuple[np.ndarray, np.ndarray, np.ndarray] | None:
        """(μ, σ, σ_SC) stacks over concepts with trained fingerprints."""
        trained = [r for r in self.records if r.fingerprint.n_incorporated >= 2]
        if len(trained) < 2:
            return None
        mus = np.stack([r.fingerprint.mu for r in trained])
        sigmas = np.stack([r.fingerprint.sigma for r in trained])
        sc = np.stack(
            [
                r.sc_stats.sigma
                if r.sc_stats.n_incorporated >= 2
                else np.zeros(self.dim)
                for r in trained
            ]
        )
        return mus, sigmas, sc
