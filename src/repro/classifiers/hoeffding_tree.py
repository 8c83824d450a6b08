"""Hoeffding Tree (VFDT) incremental classifier — substrate for FiCSUM.

A from-scratch Very Fast Decision Tree over numeric features:

- per-leaf, per-class, per-feature Gaussian observers (Welford stats);
- candidate binary splits at quantiles of the pooled class Gaussians;
- information-gain criterion with the Hoeffding bound + tie threshold;
- naive-Bayes-adaptive leaf prediction (majority vs NB, whichever has
  been more accurate at that leaf);
- ``growth_events`` counter so FiCSUM can detect "the tree learned a new
  branch" and reset classifier-dependent fingerprint dimensions
  (Section IV plasticity);
- ``feature_contributions`` — Saabas-style path attribution used as the
  Shapley-value meta-information feature (DESIGN.md substitution #3).
"""
from __future__ import annotations

import numpy as np

_EPS = 1e-9
_N_CANDIDATES = 8


class _LeafStats:
    """Sufficient statistics held by one leaf."""

    def __init__(self, n_features: int, n_classes: int):
        self.class_counts = np.zeros(n_classes)
        # Welford per (class, feature)
        self.mean = np.zeros((n_classes, n_features))
        self.m2 = np.zeros((n_classes, n_features))
        self.nb_correct = 0.0
        self.mc_correct = 0.0

    def update(self, x: np.ndarray, y: int) -> None:
        self.class_counts[y] += 1
        n = self.class_counts[y]
        delta = x - self.mean[y]
        self.mean[y] += delta / n
        self.m2[y] += delta * (x - self.mean[y])

    @property
    def total(self) -> float:
        return float(self.class_counts.sum())


def _entropy(counts: np.ndarray) -> float:
    total = counts.sum()
    if total <= 0:
        return 0.0
    p = counts[counts > 0] / total
    return float(-(p * np.log2(p)).sum())


class _Node:
    __slots__ = (
        "stats", "split_feature", "threshold", "left", "right",
        "depth", "n_seen_at_split",
    )

    def __init__(self, stats: _LeafStats, depth: int):
        self.stats = stats
        self.split_feature: int | None = None
        self.threshold = 0.0
        self.left: _Node | None = None
        self.right: _Node | None = None
        self.depth = depth
        self.n_seen_at_split = 0.0

    @property
    def is_leaf(self) -> bool:
        return self.split_feature is None


class HoeffdingTree:
    """Incremental VFDT classifier.

    Parameters mirror the MOA/scikit-multiflow defaults the paper uses:
    ``grace_period`` observations between split attempts, split
    confidence ``delta``, and tie threshold ``tau``.
    """

    def __init__(
        self,
        n_features: int,
        n_classes: int,
        *,
        grace_period: int = 30,
        delta: float = 0.01,
        tau: float = 0.15,
        max_depth: int = 12,
        seed: int = 0,
    ):
        self.n_features = n_features
        self.n_classes = n_classes
        self.grace_period = grace_period
        self.delta = delta
        self.tau = tau
        self.max_depth = max_depth
        self.root = _Node(_LeafStats(n_features, n_classes), depth=0)
        self.growth_events = 0
        self.n_seen = 0
        #: cumulative info-gain mass per feature (importance signal)
        self.split_gain = np.zeros(n_features)

    # ------------------------------------------------------------------ sort
    def _sort(self, x: np.ndarray) -> _Node:
        node = self.root
        while not node.is_leaf:
            node = node.left if x[node.split_feature] <= node.threshold else node.right
        return node

    def _path(self, x: np.ndarray) -> list[_Node]:
        node, path = self.root, [self.root]
        while not node.is_leaf:
            node = node.left if x[node.split_feature] <= node.threshold else node.right
            path.append(node)
        return path

    # --------------------------------------------------------------- predict
    def _leaf_proba(self, leaf: _Node, x: np.ndarray) -> np.ndarray:
        st = leaf.stats
        total = st.total
        if total == 0:
            return np.full(self.n_classes, 1.0 / self.n_classes)
        mc = st.class_counts / total
        if st.nb_correct < st.mc_correct or total < 2 * self.n_classes:
            return mc
        # naive Bayes over the leaf Gaussians
        log_p = np.full(self.n_classes, -np.inf)
        for c in range(self.n_classes):
            nc = st.class_counts[c]
            if nc == 0:
                continue
            prior = np.log(nc / total)
            if nc < 2:
                log_p[c] = prior
                continue
            var = st.m2[c] / nc + _EPS
            log_p[c] = prior - 0.5 * np.sum(
                np.log(2 * np.pi * var) + (x - st.mean[c]) ** 2 / var
            )
        log_p -= log_p.max()
        p = np.exp(log_p)
        return p / p.sum()

    def predict_proba(self, x: np.ndarray) -> np.ndarray:
        return self._leaf_proba(self._sort(x), x)

    def predict(self, x: np.ndarray) -> int:
        return int(np.argmax(self.predict_proba(x)))

    # ----------------------------------------------------------------- train
    def partial_fit(self, x: np.ndarray, y: int) -> None:
        self.n_seen += 1
        leaf = self._sort(x)
        st = leaf.stats
        if st.total > 0:
            mc_pred = int(np.argmax(st.class_counts))
            st.mc_correct += mc_pred == y
            nb = self._leaf_proba(leaf, x)
            st.nb_correct += int(np.argmax(nb)) == y
        st.update(x, y)
        if (
            leaf.depth < self.max_depth
            and st.total - leaf.n_seen_at_split >= self.grace_period
            and _entropy(st.class_counts) > 0
        ):
            self._try_split(leaf)
            leaf.n_seen_at_split = st.total

    def _candidate_gain(self, st: _LeafStats, feat: int) -> tuple[float, float]:
        """Best (gain, threshold) for ``feat`` from the class Gaussians."""
        present = st.class_counts > 1
        if present.sum() == 0:
            return 0.0, 0.0
        means = st.mean[present, feat]
        stds = np.sqrt(st.m2[present, feat] / st.class_counts[present]) + _EPS
        lo = float(np.min(means - 2 * stds))
        hi = float(np.max(means + 2 * stds))
        if hi - lo < _EPS:
            return 0.0, 0.0
        base = _entropy(st.class_counts)
        best_gain, best_thr = 0.0, 0.0
        counts = st.class_counts
        total = counts.sum()
        for thr in np.linspace(lo, hi, _N_CANDIDATES + 2)[1:-1]:
            # P(x_feat <= thr | class) under the leaf Gaussian
            z = (thr - st.mean[:, feat]) / (
                np.sqrt(st.m2[:, feat] / np.maximum(counts, 1)) + _EPS
            )
            cdf = 0.5 * (1 + _erf(z / np.sqrt(2)))
            left = counts * cdf
            right = counts - left
            lt, rt = left.sum(), right.sum()
            if lt < 1 or rt < 1:
                continue
            gain = base - (lt / total) * _entropy(left) - (rt / total) * _entropy(right)
            if gain > best_gain:
                best_gain, best_thr = float(gain), float(thr)
        return best_gain, best_thr

    def _try_split(self, leaf: _Node) -> None:
        st = leaf.stats
        gains = [self._candidate_gain(st, f) for f in range(self.n_features)]
        order = sorted(range(self.n_features), key=lambda f: -gains[f][0])
        g1 = gains[order[0]][0]
        g2 = gains[order[1]][0] if self.n_features > 1 else 0.0
        rng = np.log2(max(self.n_classes, 2))
        eps = np.sqrt(rng**2 * np.log(1 / self.delta) / (2 * st.total))
        if g1 > 0 and (g1 - g2 > eps or eps < self.tau):
            feat = order[0]
            leaf.split_feature = feat
            leaf.threshold = gains[feat][1]
            leaf.left = _Node(_LeafStats(self.n_features, self.n_classes), leaf.depth + 1)
            leaf.right = _Node(_LeafStats(self.n_features, self.n_classes), leaf.depth + 1)
            # warm-start children's class priors from the parent split estimate
            self.growth_events += 1
            self.split_gain[feat] += g1 * st.total

    # ------------------------------------------------------------ importance
    def feature_contributions(self, x: np.ndarray) -> np.ndarray:
        """Saabas path attribution: |Δ max-class-probability| per feature.

        Walking root→leaf, the change in the predicted class distribution
        at each split is attributed to the split feature. The window-mean
        of these vectors is FiCSUM's Shapley-value meta-feature.
        """
        contrib = np.zeros(self.n_features)
        path = self._path(x)
        prev = path[0].stats.class_counts
        prev_p = prev / prev.sum() if prev.sum() > 0 else np.full(self.n_classes, 1 / self.n_classes)
        for parent, child in zip(path[:-1], path[1:]):
            cc = child.stats.class_counts
            cur_p = cc / cc.sum() if cc.sum() > 0 else prev_p
            contrib[parent.split_feature] += float(np.abs(cur_p - prev_p).sum()) / 2
            prev_p = cur_p
        return contrib


def _erf(z: np.ndarray | float) -> np.ndarray:
    """Abramowitz–Stegun 7.1.26 erf approximation (|err| < 1.5e-7), vectorized."""
    z = np.asarray(z, dtype=float)
    sign = np.where(z >= 0, 1.0, -1.0)
    z = np.abs(z)
    t = 1.0 / (1.0 + 0.3275911 * z)
    y = 1.0 - (
        ((((1.061405429 * t - 1.453152027) * t) + 1.421413741) * t - 0.284496736) * t
        + 0.254829592
    ) * t * np.exp(-z * z)
    return sign * y
