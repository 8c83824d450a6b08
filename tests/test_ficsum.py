"""Integration tests for the FiCSUM main loop, repository, monitor and
baseline frameworks."""
import numpy as np
import pytest

from repro.baselines.htcd import HTCD
from repro.baselines.rcd import RCD, buffers_match
from repro.core.ficsum import FiCSUM, FicsumConfig
from repro.core.monitor import DriftMonitor
from repro.core.repository import Repository, _Welford
from repro.streams.datasets import build_dataset


def _run(model, ds, n=None):
    n = n or len(ds)
    preds, mids = [], []
    for i in range(n):
        out = model.process(ds.X[i], int(ds.y[i]))
        if isinstance(out, tuple):
            preds.append(out[0]); mids.append(out[1])
        else:
            preds.append(out.prediction); mids.append(out.model_id)
    return np.array(preds), np.array(mids)


class TestWelford:
    def test_tracks_recent_regime(self):
        w = _Welford()
        for _ in range(50):
            w.update(0.0)
        for _ in range(50):
            w.update(1.0)
        assert w.mean > 0.9  # recency-weighted, not 0.5

    def test_std_nonnegative(self):
        w = _Welford()
        for x in [0.2, 0.4, 0.6]:
            w.update(x)
        assert w.std >= 0.0


class TestRepository:
    def test_create_assigns_increasing_ids(self):
        r = Repository(4)
        a, b = r.create(None, 0), r.create(None, 5)
        assert (a.id, b.id) == (0, 1)
        assert len(r) == 2

    def test_remove(self):
        r = Repository(4)
        a = r.create(None, 0)
        r.remove(a)
        assert len(r) == 0

    def test_stat_stacks_requires_trained(self):
        r = Repository(3)
        r.create(None, 0)
        r.create(None, 0)
        assert r.stat_stacks() is None
        for rec in r:
            rec.fingerprint.incorporate(np.random.default_rng(rec.id).random(3))
            rec.fingerprint.incorporate(np.random.default_rng(rec.id + 9).random(3))
        mus, sigmas, sc = r.stat_stacks()
        assert mus.shape == (2, 3) and sigmas.shape == (2, 3) and sc.shape == (2, 3)

    def test_mature_needs_history(self):
        r = Repository(2)
        rec = r.create(None, 0)
        assert not rec.mature
        for _ in range(3):
            rec.sim.update(0.9)
        assert rec.mature


@pytest.mark.parametrize("mode", ["FiCSUM", "ER", "S-MI", "U-MI"])
def test_variants_run_end_to_end(mode):
    from repro.runner import make_method

    ds = build_dataset("STAGGER", 0, length_scale=0.25)
    model = make_method(mode, ds.n_features, ds.n_classes, seed=0)
    preds, mids = _run(model, ds)
    assert len(preds) == len(ds)
    assert np.mean(preds == ds.y) > 0.5  # better than chance


def test_ficsum_detects_abrupt_label_drift():
    """Two long STAGGER-style segments with inverted labels."""
    g = np.random.default_rng(0)
    X = g.random((1600, 3))
    y = np.concatenate([(X[:800, 0] > 0.5), (X[800:, 0] <= 0.5)]).astype(int)
    m = FiCSUM(3, 2, FicsumConfig())
    for i in range(1600):
        m.process(X[i], int(y[i]))
    assert m.n_drifts >= 1
    assert len(m.repo) >= 2


def test_ficsum_stationary_stream_stays_single_concept():
    g = np.random.default_rng(1)
    X = g.random((1200, 3))
    y = (X[:, 0] > 0.5).astype(int)
    m = FiCSUM(3, 2, FicsumConfig())
    for i in range(1200):
        m.process(X[i], int(y[i]))
    assert m.n_drifts <= 1  # at most an early transient

    # repository summary is consistent
    summary = m.repository_summary()
    assert any(s["active"] for s in summary)


def test_ficsum_config_buffer_len():
    assert FicsumConfig(window_size=80, buffer_ratio=0.25).buffer_len == 20
    assert FicsumConfig(window_size=4, buffer_ratio=0.01).buffer_len == 1


def test_ficsum_schema_respects_overrides():
    m = FiCSUM(5, 2, FicsumConfig(source_mode="supervised"))
    assert m.schema.source_mode == "supervised"
    m2 = FiCSUM(5, 2, FicsumConfig(functions=("mean",)))
    assert m2.schema.dim == 9  # (5+4) sources x mean


def test_ficsum_model_ids_recorded_per_observation():
    ds = build_dataset("STAGGER", 1, length_scale=0.25)
    m = FiCSUM(ds.n_features, ds.n_classes, FicsumConfig())
    _, mids = _run(m, ds)
    assert set(np.unique(mids)) <= {r.id for r in m.repo} | set(np.unique(mids))
    assert mids[0] == 0


class TestDriftMonitor:
    def test_detects_distribution_shift_promptly(self):
        g = np.random.default_rng(0)
        X = np.vstack([g.normal(0, 1, (700, 3)), g.normal(4, 1, (700, 3))])
        y = g.integers(0, 2, 1400)
        mon = DriftMonitor(3, supervised=False)
        drifts = [i for i in range(1400) if mon.add(X[i], int(y[i]))[1]]
        # a drift fires shortly after the true boundary at 700 (the
        # monitor is deliberately sensitive, so earlier noise-triggered
        # drifts may also occur — what matters is prompt detection)
        assert any(700 <= d <= 900 for d in drifts)

    def test_bounded_false_drift_rate_on_stationary(self):
        g = np.random.default_rng(1)
        X = g.normal(0, 1, (1200, 3))
        y = g.integers(0, 2, 1200)
        mon = DriftMonitor(3, supervised=False)
        drifts = [i for i in range(1200) if mon.add(X[i], int(y[i]))[1]]
        assert len(drifts) <= 3  # sensitive, but not thrashing

    def test_similarity_nan_until_trained(self):
        mon = DriftMonitor(2)
        sim, drift = mon.add(np.zeros(2), 0, 0)
        assert np.isnan(sim) and not drift

    def test_picklable(self):
        import pickle

        mon = DriftMonitor(2)
        g = np.random.default_rng(0)
        for i in range(200):
            mon.add(g.random(2), int(g.integers(0, 2)), 0)
        mon2 = pickle.loads(pickle.dumps(mon))
        x, y = g.random(2), 1
        assert mon2.add(x, y, 0)[0] == mon.add(x, y, 0)[0]


class TestHTCD:
    def test_resets_on_drift_and_bumps_model_id(self):
        g = np.random.default_rng(0)
        X = g.random((2000, 3))
        y = np.concatenate([(X[:1000, 0] > 0.5), (X[1000:, 0] <= 0.5)]).astype(int)
        m = HTCD(3, 2)
        _, mids = _run(m, type("DS", (), {"X": X, "y": y})(), n=2000)
        assert m.n_drifts >= 1
        assert mids[-1] == m.n_drifts

    def test_no_reset_on_stationary(self):
        g = np.random.default_rng(1)
        X = g.random((1500, 3))
        y = (X[:, 0] > 0.5).astype(int)
        m = HTCD(3, 2)
        _run(m, type("DS", (), {"X": X, "y": y})(), n=1500)
        assert m.n_drifts == 0


class TestRCD:
    def test_buffers_match_same_distribution(self):
        g = np.random.default_rng(0)
        assert buffers_match(g.normal(0, 1, (100, 4)), g.normal(0, 1, (100, 4)))

    def test_buffers_mismatch_shifted_distribution(self):
        g = np.random.default_rng(0)
        assert not buffers_match(g.normal(0, 1, (100, 4)), g.normal(3, 1, (100, 4)))

    def test_runs_and_creates_concepts(self):
        ds = build_dataset("Synth_D", 0, length_scale=0.4)
        m = RCD(ds.n_features, ds.n_classes)
        preds, mids = _run(m, ds)
        assert len(np.unique(mids)) >= 1
        assert np.mean(preds == ds.y) > 0.4
