"""HTCD baseline: Hoeffding Tree reset on ADWIN error drift (Table VI).

A single incremental tree; 0/1 prequential errors feed ADWIN; on drift
the tree is discarded and a fresh one built — no repository, so every
segment gets a new model id (its C-F1 is bounded by segment length).
"""
from __future__ import annotations

import numpy as np

from repro.classifiers.hoeffding_tree import HoeffdingTree
from repro.detectors.adwin import ADWIN


class HTCD:
    def __init__(self, n_features: int, n_classes: int, *, delta: float = 0.002,
                 grace_period: int = 30, seed: int = 0):
        self.n_features = n_features
        self.n_classes = n_classes
        self.grace_period = grace_period
        self.seed = seed
        self.tree = HoeffdingTree(n_features, n_classes, grace_period=grace_period, seed=seed)
        self.detector = ADWIN(delta=delta)
        self.model_id = 0
        self.n_drifts = 0

    def process(self, x: np.ndarray, y: int):
        pred = self.tree.predict(x)
        self.tree.partial_fit(x, y)
        if self.detector.add(float(pred != y)):
            self.n_drifts += 1
            self.model_id += 1
            self.tree = HoeffdingTree(
                self.n_features, self.n_classes,
                grace_period=self.grace_period, seed=self.seed + self.model_id,
            )
            self.detector.reset()
        return pred, self.model_id
