"""Sequential experiment harness: one (dataset, method, seed) stream run.

``run_stream`` is the unit of work the Spark sweep fans out
(``repro.sparkjobs.sweep``). It builds the dataset, streams it through
the method prequentially, and returns the Table III–VI metrics: κ,
C-F1, discrimination ability, wall-clock runtime, model/drift counts.

Method names:

- ``FiCSUM`` / ``S-MI`` / ``U-MI`` / ``ER`` — fingerprint variants
  (Tables III & IV);
- ``mi:<group>`` — FiCSUM restricted to one meta-information function
  group, e.g. ``mi:mean`` (Table V);
- ``HTCD`` / ``RCD`` / ``DWM`` / ``ARF`` — frameworks (Table VI).
"""
from __future__ import annotations

import time

import numpy as np

from repro.baselines.htcd import HTCD
from repro.baselines.rcd import RCD
from repro.classifiers.ensembles import ARF, DWM
from repro.core.ficsum import FiCSUM, FicsumConfig
from repro.core.meta_features import FUNCTION_GROUPS
from repro.core.similarity import similarity
from repro.metrics import best_tracking_model, c_f1, kappa, separation_zscore
from repro.streams.datasets import StreamDataset, build_dataset

_SOURCE_MODES = {"FiCSUM": "all", "S-MI": "supervised", "U-MI": "unsupervised",
                 "ER": "error_rate"}


def make_method(name: str, n_features: int, n_classes: int, seed: int,
                ficsum_overrides: dict | None = None):
    """Instantiate a method by registry name."""
    overrides = dict(ficsum_overrides or {})
    if name in _SOURCE_MODES:
        cfg = FicsumConfig(source_mode=_SOURCE_MODES[name], **overrides)
        return FiCSUM(n_features, n_classes, cfg, seed=seed)
    if name.startswith("mi:"):
        group = name[3:]
        funcs = tuple(FUNCTION_GROUPS[group])
        cfg = FicsumConfig(source_mode="all", functions=funcs, **overrides)
        return FiCSUM(n_features, n_classes, cfg, seed=seed)
    if name == "HTCD":
        return HTCD(n_features, n_classes, seed=seed)
    if name == "RCD":
        return RCD(n_features, n_classes, seed=seed)
    if name == "DWM":
        return DWM(n_features, n_classes, seed=seed)
    if name == "ARF":
        return ARF(n_features, n_classes, seed=seed)
    raise ValueError(f"unknown method {name!r}")


def _segments(concept_ids: np.ndarray) -> list[tuple[int, int, int]]:
    """(start, end, concept) for each contiguous ground-truth segment."""
    out = []
    start = 0
    for i in range(1, len(concept_ids) + 1):
        if i == len(concept_ids) or concept_ids[i] != concept_ids[start]:
            out.append((start, i, int(concept_ids[start])))
            start = i
    return out


def discrimination_ability(model: FiCSUM, ds: StreamDataset,
                           model_ids: np.ndarray, max_probes: int = 24) -> float:
    """Mean z-score separation of the correct stored fingerprint on probe
    windows drawn from segment midpoints (DESIGN.md substitution #8)."""
    records = [r for r in model.repo
               if r.mature and r.fingerprint.n_incorporated >= 2]
    if len(records) < 2:
        return 0.0
    mapping = best_tracking_model(ds.concept_ids, model_ids)
    by_id = {r.id: r for r in records}
    w = model.cfg.window_size
    segs = [s for s in _segments(ds.concept_ids) if s[1] - s[0] >= 2 * w]
    if len(segs) > max_probes:
        idx = np.linspace(0, len(segs) - 1, max_probes).astype(int)
        segs = [segs[i] for i in idx]
    zs = []
    for start, end, concept in segs:
        assigned = by_id.get(mapping.get(concept, -1))
        if assigned is None:
            continue
        mid = (start + end) // 2
        Xw = ds.X[mid: mid + w]
        yw = ds.y[mid: mid + w]
        items = [(Xw[j], int(yw[j]), 0) for j in range(len(Xw))]
        sims = {}
        for rec in records:
            F = model._relabel_fingerprint(items, rec)
            sims[rec.id] = similarity(
                rec.fingerprint.mu, F, model._weights(rec.fingerprint)
            )
        others = [s for rid, s in sims.items() if rid != assigned.id]
        zs.append(separation_zscore(sims[assigned.id], others))
    return float(np.mean(zs)) if zs else 0.0


def run_stream(dataset: str, method: str, seed: int, *,
               length_scale: float = 1.0,
               ficsum_overrides: dict | None = None) -> dict:
    """Run one prequential stream and return its metrics row."""
    ds = build_dataset(dataset, seed, length_scale=length_scale)
    model = make_method(method, ds.n_features, ds.n_classes, seed, ficsum_overrides)
    preds = np.empty(len(ds), dtype=int)
    mids = np.empty(len(ds), dtype=int)
    t0 = time.perf_counter()
    for i in range(len(ds)):
        out = model.process(ds.X[i], int(ds.y[i]))
        if isinstance(out, tuple):
            preds[i], mids[i] = out
        else:  # FiCSUM StepResult
            preds[i], mids[i] = out.prediction, out.model_id
    runtime = time.perf_counter() - t0
    # discrimination is a property of the representation (Sec II-A); it is
    # measured in the oracle setting so Table III/V isolate it from
    # drift-detection quality (paper reports the isolated variant too)
    if isinstance(model, FiCSUM):
        from repro.core.discrimination import oracle_discrimination_ds

        disc = oracle_discrimination_ds(
            ds,
            source_mode=model.schema.source_mode,
            functions=model.cfg.functions,
            window_size=model.cfg.window_size,
        )
    else:
        disc = 0.0
    return {
        "dataset": dataset,
        "method": method,
        "seed": seed,
        "kappa": kappa(ds.y, preds),
        "accuracy": float(np.mean(ds.y == preds)),
        "c_f1": c_f1(ds.concept_ids, mids),
        "discrimination": disc,
        "runtime_s": runtime,
        "n_models": int(len(np.unique(mids))),
        "n_drifts": int(getattr(model, "n_drifts", 0)),
    }
