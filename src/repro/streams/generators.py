"""Concept generators: labelling functions and p(X) modulation.

A *concept* is a pair (labeler, channel):

- the **labeler** defines p(y|X) on a latent uniform feature vector
  ``u`` ∈ [0,1]^d — STAGGER rules, RBF centroid mixtures, random
  decision trees, or hyperplanes;
- the **channel** defines p(X): the observed features are a per-concept
  transform of the latent Gaussian process behind ``u`` — mean/scale/
  skew shifts (distribution drift), an AR(1) coefficient (autocorrelation
  drift) and a sine overlay (frequency drift), mirroring how the paper
  injects p(X) change in HPLANE-U / RTREE-U / Synth_{D,A,F}.

Keeping the labeler on the latent ``u`` while drifting the observation
transform lets Synth_* streams drift purely in p(X) (fixed labeler),
while the -U datasets change labeler *and* channel per concept.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.classifiers.hoeffding_tree import _erf


def _norm_cdf(z: np.ndarray) -> np.ndarray:
    return 0.5 * (1.0 + _erf(z / np.sqrt(2.0)))


# --------------------------------------------------------------- labelers
class StaggerLabeler:
    """Classic STAGGER rules over 3 categorical features (encoded 0/1/2).

    variant 0: size=small AND color=red; 1: color=green OR shape=circle;
    2: size in {medium, large}.
    """

    n_features = 3
    n_classes = 2

    def __init__(self, variant: int):
        self.variant = variant % 3

    def label(self, u: np.ndarray) -> int:
        size, color, shape = (np.minimum((u * 3).astype(int), 2))[:3]
        if self.variant == 0:
            return int(size == 0 and color == 0)
        if self.variant == 1:
            return int(color == 1 or shape == 0)
        return int(size >= 1)


class RBFLabeler:
    """Radial-basis labeler: fixed centroids, per-concept class permutation.

    Centroid positions are shared across concepts of a dataset (seeded by
    ``base_seed``); each concept permutes the centroid→class map, so the
    drift is purely in p(y|X) — matching the paper's note that RBF's main
    discriminant is the labelling function.
    """

    def __init__(self, n_features: int, n_classes: int, base_seed: int,
                 concept_seed: int, n_centroids: int = 12):
        self.n_features = n_features
        self.n_classes = n_classes
        g = np.random.default_rng(base_seed)
        self.centroids = g.random((n_centroids, n_features))
        gc = np.random.default_rng(concept_seed)
        base = np.arange(n_centroids) % n_classes
        self.classes = gc.permutation(base)

    def label(self, u: np.ndarray) -> int:
        d = np.linalg.norm(self.centroids - u[: self.n_features], axis=1)
        return int(self.classes[int(np.argmin(d))])


class RandomTreeLabeler:
    """Random binary decision tree over [0,1]^d (scikit-multiflow style)."""

    def __init__(self, n_features: int, n_classes: int, seed: int, depth: int = 2):
        self.n_features = n_features
        self.n_classes = n_classes
        # leaves must cover all classes; shallow trees keep concepts
        # learnable at our scaled segment lengths (see EXPERIMENTS.md)
        depth = max(depth, int(np.ceil(np.log2(max(n_classes, 2)))))
        g = np.random.default_rng(seed)
        self.feats: list[int] = []
        self.thrs: list[float] = []
        self.leaves: np.ndarray
        n_internal = 2**depth - 1
        self.feats = list(g.integers(0, n_features, n_internal))
        self.thrs = list(g.random(n_internal) * 0.6 + 0.2)
        n_leaves = 2**depth
        # round-robin base guarantees every class appears, then shuffle
        base = np.arange(n_leaves) % n_classes
        self.leaves = g.permutation(base)
        self.depth = depth

    def label(self, u: np.ndarray) -> int:
        node = 0
        for _ in range(self.depth):
            node = 2 * node + (1 if u[self.feats[node]] > self.thrs[node] else 2)
        return int(self.leaves[node - (2**self.depth - 1)])


class HyperplaneLabeler:
    """label = 1 iff w·u > w·0.5 (through-the-center hyperplane)."""

    n_classes = 2

    def __init__(self, n_features: int, seed: int):
        self.n_features = n_features
        g = np.random.default_rng(seed)
        self.w = g.normal(size=n_features)

    def label(self, u: np.ndarray) -> int:
        return int(np.dot(self.w, u[: self.n_features]) > 0.5 * self.w.sum())


# ---------------------------------------------------------------- channel
@dataclass
class Channel:
    """Observation transform of the latent Gaussian process.

    z_t = rho * z_{t-1} + sqrt(1-rho²) ε_t;  u_t = Φ(z_t) feeds the
    labeler;  x_t = shift + scale * g(z_t) + amp * sin(2π freq t + phase)
    with g a per-feature skew transform.
    """

    n_features: int
    shift: np.ndarray = None
    scale: np.ndarray = None
    skew: np.ndarray = None
    rho: np.ndarray = None
    amp: np.ndarray = None
    freq: np.ndarray = None
    phase: np.ndarray = None

    def __post_init__(self):
        d = self.n_features
        z = np.zeros(d)
        self.shift = z if self.shift is None else np.asarray(self.shift, float)
        self.scale = np.ones(d) if self.scale is None else np.asarray(self.scale, float)
        self.skew = z.copy() if self.skew is None else np.asarray(self.skew, float)
        self.rho = z.copy() if self.rho is None else np.asarray(self.rho, float)
        self.amp = z.copy() if self.amp is None else np.asarray(self.amp, float)
        self.freq = z.copy() if self.freq is None else np.asarray(self.freq, float)
        self.phase = z.copy() if self.phase is None else np.asarray(self.phase, float)

    @staticmethod
    def random(n_features: int, seed: int, *, distribution=False,
               autocorrelation=False, frequency=False) -> "Channel":
        """Concept-specific channel with the requested drift axes enabled."""
        g = np.random.default_rng(seed)
        kw: dict = {"n_features": n_features}
        if distribution:
            kw["shift"] = g.uniform(-1.5, 1.5, n_features)
            kw["scale"] = g.uniform(0.4, 2.0, n_features)
            kw["skew"] = g.uniform(-1.2, 1.2, n_features)
        if autocorrelation:
            kw["rho"] = g.uniform(0.0, 0.95, n_features)
        if frequency:
            kw["amp"] = g.uniform(0.3, 1.2, n_features)
            kw["freq"] = g.uniform(0.02, 0.3, n_features)
            kw["phase"] = g.uniform(0, 2 * np.pi, n_features)
        return Channel(**kw)


def generate_segment(
    labeler,
    channel: Channel,
    n: int,
    rng: np.random.Generator,
    t0: int = 0,
    z0: np.ndarray | None = None,
) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    """Generate ``n`` observations of one concept.

    Returns (X observed features, y labels, z_final) — ``z_final`` lets
    consecutive segments of the same AR process stay continuous.
    """
    d = channel.n_features
    z = rng.normal(size=d) if z0 is None else z0.copy()
    eps = rng.normal(size=(n, d))
    Z = np.empty((n, d))
    innov = np.sqrt(1.0 - channel.rho**2)
    for t in range(n):
        z = channel.rho * z + innov * eps[t]
        Z[t] = z
    U = _norm_cdf(Z)
    skew = channel.skew
    G = np.where(
        np.abs(skew) > 1e-9,
        (np.exp(skew * Z) - 1.0) / np.where(np.abs(skew) > 1e-9, skew, 1.0),
        Z,
    )
    tt = (t0 + np.arange(n))[:, None]
    X = channel.shift + channel.scale * G + channel.amp * np.sin(
        2 * np.pi * channel.freq * tt + channel.phase
    )
    y = np.array([labeler.label(u) for u in U])
    return X, y, z
