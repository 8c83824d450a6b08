"""Unit tests for stream generators and benchmark dataset builders."""
import numpy as np
import pytest

from repro.streams import datasets as D
from repro.streams.generators import (
    Channel,
    HyperplaneLabeler,
    RBFLabeler,
    RandomTreeLabeler,
    StaggerLabeler,
    generate_segment,
)


class TestLabelers:
    @pytest.mark.parametrize(
        "variant,u,expected",
        [
            (0, np.array([0.1, 0.1, 0.5]), 1),   # small & red
            (0, np.array([0.9, 0.1, 0.5]), 0),   # not small
            (1, np.array([0.5, 0.5, 0.1]), 1),   # green
            (1, np.array([0.1, 0.1, 0.9]), 0),   # neither green nor circle
            (2, np.array([0.5, 0.9, 0.9]), 1),   # medium
            (2, np.array([0.1, 0.9, 0.9]), 0),   # small
        ],
    )
    def test_stagger_truth_table(self, variant, u, expected):
        assert StaggerLabeler(variant).label(u) == expected

    def test_rbf_concepts_differ_only_in_labels(self):
        a = RBFLabeler(5, 3, base_seed=1, concept_seed=10)
        b = RBFLabeler(5, 3, base_seed=1, concept_seed=20)
        np.testing.assert_array_equal(a.centroids, b.centroids)
        assert not np.array_equal(a.classes, b.classes)

    def test_rbf_covers_all_classes(self):
        lab = RBFLabeler(4, 3, base_seed=0, concept_seed=0)
        assert set(lab.classes) == {0, 1, 2}

    @pytest.mark.parametrize("k", [2, 3, 5])
    def test_random_tree_labels_in_range(self, k):
        lab = RandomTreeLabeler(6, k, seed=3)
        g = np.random.default_rng(0)
        labels = {lab.label(g.random(6)) for _ in range(300)}
        assert labels <= set(range(k))
        assert len(labels) >= 2

    def test_random_tree_deterministic(self):
        a = RandomTreeLabeler(4, 2, seed=7)
        b = RandomTreeLabeler(4, 2, seed=7)
        u = np.random.default_rng(1).random(4)
        assert a.label(u) == b.label(u)

    def test_random_tree_depth_covers_classes(self):
        lab = RandomTreeLabeler(4, 7, seed=1)  # needs depth >= 3
        assert len(lab.leaves) >= 7
        assert set(lab.leaves) >= set(range(7))

    def test_hyperplane_splits_space(self):
        lab = HyperplaneLabeler(5, seed=2)
        g = np.random.default_rng(0)
        labels = [lab.label(g.random(5)) for _ in range(500)]
        assert 0.15 < np.mean(labels) < 0.85


class TestChannel:
    def test_identity_channel_preserves_latent(self):
        ch = Channel(n_features=3)
        rng = np.random.default_rng(0)
        X, y, _ = generate_segment(RandomTreeLabeler(3, 2, 0), ch, 500, rng)
        assert abs(X.mean()) < 0.2 and abs(X.std() - 1.0) < 0.2

    def test_distribution_axis_shifts_observed_features(self):
        rng = np.random.default_rng(0)
        lab = RandomTreeLabeler(3, 2, 0)
        base, _, _ = generate_segment(lab, Channel(n_features=3), 800, rng)
        ch = Channel.random(3, seed=5, distribution=True)
        mod, _, _ = generate_segment(lab, ch, 800, np.random.default_rng(0))
        assert np.abs(base.mean(0) - mod.mean(0)).max() > 0.3

    def test_autocorrelation_axis_induces_acf(self):
        rng = np.random.default_rng(0)
        lab = RandomTreeLabeler(2, 2, 0)
        ch = Channel(n_features=2, rho=np.array([0.95, 0.0]))
        X, _, _ = generate_segment(lab, ch, 2000, rng)

        def acf1(v):
            v = v - v.mean()
            return np.dot(v[:-1], v[1:]) / np.dot(v, v)

        assert acf1(X[:, 0]) > 0.7
        assert abs(acf1(X[:, 1])) < 0.15

    def test_frequency_axis_adds_sine_power(self):
        rng = np.random.default_rng(0)
        lab = RandomTreeLabeler(2, 2, 0)
        ch = Channel(n_features=2, amp=np.array([2.0, 0.0]), freq=np.array([0.05, 0.0]))
        X, _, _ = generate_segment(lab, ch, 1000, rng)
        # dominant FFT bin of feature 0 at the injected frequency
        spec = np.abs(np.fft.rfft(X[:, 0] - X[:, 0].mean()))
        peak = np.argmax(spec[1:]) + 1
        assert abs(peak / 1000 - 0.05) < 0.01

    def test_segment_continuity_of_ar_state(self):
        lab = RandomTreeLabeler(2, 2, 0)
        ch = Channel(n_features=2, rho=np.array([0.9, 0.9]))
        rng = np.random.default_rng(1)
        _, _, z1 = generate_segment(lab, ch, 100, rng)
        X2, _, _ = generate_segment(lab, ch, 5, rng, z0=z1)
        assert np.all(np.isfinite(X2))

    def test_channel_random_axes_off_means_identity(self):
        ch = Channel.random(3, seed=1)
        np.testing.assert_array_equal(ch.shift, np.zeros(3))
        np.testing.assert_array_equal(ch.rho, np.zeros(3))
        np.testing.assert_array_equal(ch.amp, np.zeros(3))


class TestDatasets:
    @pytest.mark.parametrize("name", D.DATASET_NAMES)
    def test_build_all_datasets(self, name):
        ds = D.build_dataset(name, 0, length_scale=0.25)
        spec = D.SPECS[name]
        assert len(ds) == len(ds.y) == len(ds.concept_ids)
        assert ds.n_features == spec.n_features + spec.redundant_features
        assert set(np.unique(ds.concept_ids)) == set(range(spec.n_concepts))
        assert np.all(ds.y >= 0) and np.all(ds.y < spec.n_classes)
        assert np.all(np.isfinite(ds.X))

    def test_deterministic_in_seed(self):
        a = D.build_dataset("RTREE", 3, length_scale=0.2)
        b = D.build_dataset("RTREE", 3, length_scale=0.2)
        np.testing.assert_array_equal(a.X, b.X)
        np.testing.assert_array_equal(a.y, b.y)

    def test_different_seeds_differ(self):
        a = D.build_dataset("RTREE", 1, length_scale=0.2)
        b = D.build_dataset("RTREE", 2, length_scale=0.2)
        assert not np.array_equal(a.X, b.X)

    def test_each_concept_recurs(self):
        ds = D.build_dataset("STAGGER", 0, length_scale=0.2)
        segs, start = [], 0
        cids = ds.concept_ids
        for i in range(1, len(cids) + 1):
            if i == len(cids) or cids[i] != cids[start]:
                segs.append(int(cids[start])); start = i
        for c in range(D.SPECS["STAGGER"].n_concepts):
            assert segs.count(c) == D.SPECS["STAGGER"].reps

    def test_occurrence_order_avoids_self_repeat(self):
        rng = np.random.default_rng(0)
        for _ in range(10):
            order = D._occurrence_order(4, 3, rng)
            assert all(a != b for a, b in zip(order, order[1:]))

    def test_qg_has_redundant_features(self):
        ds = D.build_dataset("QG", 0, length_scale=0.2)
        assert ds.n_features == 16
        # redundant copies correlate strongly with an original feature
        corr = np.corrcoef(ds.X.T)
        assert (np.abs(corr[8:, :8]).max(axis=1) > 0.9).all()

    def test_characteristics_rows(self):
        rows = D.dataset_characteristics()
        assert len(rows) == 11
        for r in rows:
            assert r["our_contexts"] == r["paper_contexts"]
            # scaled down, except tiny CMC which rounds up marginally
            assert r["our_length"] <= r["paper_length"] * 1.1

    def test_synth_datasets_share_labeler_across_concepts(self):
        """Synth_* drift only in p(X): labeler identical across concepts."""
        spec = D.SPECS["Synth_D"]
        assert not spec.label_drift
        la = D._make_labeler(spec, 0, seed=0)
        lb = D._make_labeler(spec, 1, seed=0)
        u = np.random.default_rng(0).random(spec.n_features)
        assert la.label(u) == lb.label(u)
