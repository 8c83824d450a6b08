"""Benchmark dataset builders (Table II + Table V Synth_*).

Every builder returns a ``StreamDataset``: observed features X, labels
y, and the ground-truth concept id per observation (needed for C-F1 and
discrimination ability). Streams are sequences of segments; each
concept occurs ``reps`` times and the order of appearance is shuffled
per seed (no immediate self-repeat), mirroring the paper's recurring-
concept construction.

Real-world datasets are unavailable offline, so each is substituted by a
synthetic analogue with the Table II shape (scaled length) and the drift
*type* the paper attributes to it — see DESIGN.md substitution #2:

- AQSex / AQTemp / STAGGER / RBF / RTREE: drift mainly in p(y|X)
  (per-concept labelers, shared observation channel);
- Arabic / CMC / QG / UCI-Wine / HPLANE-U / RTREE-U: drift in p(X)
  (per-concept channels; -U datasets also change the labeler).

QG's analogue includes correlated (redundant) feature copies, which the
paper offers as the reason FiCSUM's discrimination drops there.
"""
from __future__ import annotations

import zlib
from dataclasses import dataclass

import numpy as np

from repro.streams.generators import (
    Channel,
    HyperplaneLabeler,
    RBFLabeler,
    RandomTreeLabeler,
    StaggerLabeler,
    generate_segment,
)


@dataclass
class StreamDataset:
    name: str
    X: np.ndarray
    y: np.ndarray
    concept_ids: np.ndarray
    n_classes: int

    @property
    def n_features(self) -> int:
        return self.X.shape[1]

    def __len__(self) -> int:
        return len(self.y)


@dataclass(frozen=True)
class _Spec:
    n_features: int
    n_classes: int
    n_concepts: int
    reps: int
    seg_len: int
    labeler: str              # stagger | rbf | rtree | hplane
    label_drift: bool         # new labeler per concept?
    channel_axes: tuple[str, ...]  # drift axes for per-concept channels
    redundant_features: int = 0    # extra correlated copies (QG analogue)


#: Table II datasets (lengths scaled; see EXPERIMENTS.md).
SPECS: dict[str, _Spec] = {
    # ---- drift mainly in p(y|X) (paper Table IV top segment) ----
    "AQSex": _Spec(10, 2, 6, 3, 250, "rbf", True, ()),
    "AQTemp": _Spec(10, 3, 6, 3, 250, "rtree", True, ()),
    "STAGGER": _Spec(3, 2, 3, 3, 250, "stagger", True, ()),
    "RBF": _Spec(10, 4, 6, 3, 250, "rbf", True, ()),
    "RTREE": _Spec(10, 3, 6, 3, 250, "rtree", True, ()),
    # ---- drift mainly in p(X) (paper Table IV bottom segment) ----
    # Arabic: 10 digit classes in the paper; 4 here to stay learnable at
    # scaled segment lengths (class count is not load-bearing for the claims)
    "Arabic": _Spec(10, 4, 10, 2, 220, "rtree", False, ("distribution",)),
    "CMC": _Spec(8, 3, 2, 3, 250, "rtree", False, ("distribution",)),
    "QG": _Spec(8, 2, 10, 2, 200, "rtree", False, ("distribution",),
                redundant_features=8),
    "UCI-Wine": _Spec(11, 2, 2, 3, 300, "rtree", False, ("distribution",)),
    "HPLANE-U": _Spec(10, 2, 6, 3, 250, "hplane", True,
                      ("distribution", "autocorrelation", "frequency")),
    "RTREE-U": _Spec(10, 3, 6, 3, 250, "rtree", True,
                     ("distribution", "autocorrelation", "frequency")),
}

#: Table V datasets: fixed random-tree labeler, drift only in p(X) axes.
_SYNTH_AXES = {
    "Synth_D": ("distribution",),
    "Synth_A": ("autocorrelation",),
    "Synth_F": ("frequency",),
    "Synth_DA": ("distribution", "autocorrelation"),
    "Synth_DF": ("distribution", "frequency"),
    "Synth_AF": ("autocorrelation", "frequency"),
    "Synth_DAF": ("distribution", "autocorrelation", "frequency"),
}
for _name, _axes in _SYNTH_AXES.items():
    SPECS[_name] = _Spec(5, 2, 4, 3, 250, "rtree", False, _axes)

DATASET_NAMES = list(SPECS)


def _make_labeler(spec: _Spec, concept: int, seed: int):
    base = seed * 1000 + 17
    cseed = base + (concept if spec.label_drift else 0)
    if spec.labeler == "stagger":
        return StaggerLabeler(concept if spec.label_drift else 0)
    if spec.labeler == "rbf":
        return RBFLabeler(spec.n_features, spec.n_classes, base, cseed)
    if spec.labeler == "rtree":
        return RandomTreeLabeler(spec.n_features, spec.n_classes, cseed)
    if spec.labeler == "hplane":
        return HyperplaneLabeler(spec.n_features, cseed)
    raise ValueError(spec.labeler)


def _make_channel(spec: _Spec, concept: int, seed: int) -> Channel:
    if not spec.channel_axes:
        return Channel(n_features=spec.n_features)
    axes = {axis: True for axis in spec.channel_axes}
    return Channel.random(
        spec.n_features,
        seed * 7919 + concept * 13 + 1,
        distribution=axes.get("distribution", False),
        autocorrelation=axes.get("autocorrelation", False),
        frequency=axes.get("frequency", False),
    )


def _occurrence_order(n_concepts: int, reps: int, rng: np.random.Generator) -> list[int]:
    """Shuffled concept order, avoiding immediate self-repeats when possible."""
    order = list(rng.permutation(np.repeat(np.arange(n_concepts), reps)))
    for _ in range(20):
        bad = [i for i in range(1, len(order)) if order[i] == order[i - 1]]
        if not bad:
            break
        i = bad[0]
        swaps = [j for j in range(len(order)) if order[j] != order[i]
                 and (j == 0 or order[j - 1] != order[i])
                 and (j + 1 >= len(order) or order[j + 1] != order[i])]
        if not swaps:
            break
        j = swaps[int(rng.integers(len(swaps)))]
        order[i], order[j] = order[j], order[i]
    return [int(c) for c in order]


def build_dataset(name: str, seed: int = 0, *, length_scale: float = 1.0) -> StreamDataset:
    """Materialize the named dataset at ``length_scale`` of its spec."""
    spec = SPECS[name]
    # zlib.crc32, not hash(): str hash is salted per process, which would
    # make Spark executors generate different data than the driver
    rng = np.random.default_rng(seed * 104729 + zlib.crc32(name.encode()) % 10007)
    seg_len = max(40, int(spec.seg_len * length_scale))
    labelers = [_make_labeler(spec, c, seed) for c in range(spec.n_concepts)]
    channels = [_make_channel(spec, c, seed) for c in range(spec.n_concepts)]
    order = _occurrence_order(spec.n_concepts, spec.reps, rng)
    Xs, ys, cids = [], [], []
    t0 = 0
    z = None
    for c in order:
        X, y, z = generate_segment(labelers[c], channels[c], seg_len, rng, t0=t0, z0=z)
        Xs.append(X)
        ys.append(y)
        cids.append(np.full(seg_len, c))
        t0 += seg_len
    X = np.vstack(Xs)
    if spec.redundant_features:
        g = np.random.default_rng(seed + 31)
        idx = g.integers(0, spec.n_features, spec.redundant_features)
        noise = g.normal(0, 0.05, (len(X), spec.redundant_features))
        X = np.hstack([X, X[:, idx] + noise])
    return StreamDataset(
        name=name,
        X=X,
        y=np.concatenate(ys),
        concept_ids=np.concatenate(cids),
        n_classes=spec.n_classes,
    )


def dataset_characteristics(length_scale: float = 1.0) -> list[dict]:
    """Rows for Table II: our scaled shapes next to the paper's."""
    paper = {
        "AQTemp": (24000, 25, 6), "AQSex": (24000, 25, 6),
        "Arabic": (8800, 10, 10), "CMC": (1473, 8, 2), "QG": (4010, 63, 10),
        "UCI-Wine": (6498, 11, 2), "RBF": (30000, 10, 6),
        "RTREE": (30000, 10, 6), "STAGGER": (30000, 3, 3),
        "HPLANE-U": (30000, 10, 6), "RTREE-U": (30000, 10, 6),
    }
    rows = []
    for name, (plen, pfeat, pctx) in paper.items():
        spec = SPECS[name]
        seg = max(40, int(spec.seg_len * length_scale))
        rows.append(
            {
                "dataset": name,
                "paper_length": plen, "paper_features": pfeat, "paper_contexts": pctx,
                "our_length": spec.n_concepts * spec.reps * seg,
                "our_features": spec.n_features + spec.redundant_features,
                "our_contexts": spec.n_concepts,
            }
        )
    return rows
