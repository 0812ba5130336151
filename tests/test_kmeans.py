"""Tests for k-means and the grow-until-bounded partitioning (Lemma 1)."""
import numpy as np
import pytest

from repro.core.kmeans import grow_partition, kmeans, max_dist_to_centroid


def _blob_data(seed=0, n=200, k=4, spread=0.05):
    g = np.random.default_rng(seed)
    centers = g.uniform(-1, 1, (k, 2))
    pts = centers[g.integers(0, k, n)] + g.normal(0, spread, (n, 2))
    return pts


class TestKMeans:
    @pytest.mark.parametrize("k", [1, 2, 3, 5, 8])
    def test_labels_in_range(self, k):
        pts = _blob_data(seed=k)
        labels, cents = kmeans(pts, k, seed=1)
        assert labels.min() >= 0
        assert labels.max() < len(cents)
        assert len(cents) == k

    def test_k_clamped_to_n(self):
        pts = _blob_data(n=3)
        labels, cents = kmeans(pts, 10, seed=0)
        assert len(cents) == 3

    def test_k_one_returns_mean(self):
        pts = _blob_data(n=50)
        labels, cents = kmeans(pts, 1, seed=0)
        assert np.allclose(cents[0], pts.mean(axis=0))
        assert (labels == 0).all()

    def test_separated_blobs_recovered(self):
        g = np.random.default_rng(0)
        centers = np.array([[0.0, 0.0], [10.0, 10.0], [-10.0, 10.0]])
        pts = np.vstack([c + g.normal(0, 0.1, (40, 2)) for c in centers])
        labels, cents = kmeans(pts, 3, seed=0)
        # every blob maps to exactly one cluster
        for s in range(3):
            blk = labels[s * 40 : (s + 1) * 40]
            assert len(np.unique(blk)) == 1
        assert len(np.unique(labels)) == 3

    def test_1d_input(self):
        vals = np.array([0.0, 0.1, 5.0, 5.1, 5.2])
        labels, cents = kmeans(vals, 2, seed=0)
        assert len(np.unique(labels)) == 2

    def test_deterministic(self):
        pts = _blob_data(seed=5)
        l1, c1 = kmeans(pts, 4, seed=3)
        l2, c2 = kmeans(pts, 4, seed=3)
        assert np.array_equal(l1, l2)
        assert np.allclose(c1, c2)

    def test_identical_points(self):
        pts = np.ones((20, 2))
        labels, cents = kmeans(pts, 3, seed=0)
        assert np.allclose(cents[labels], 1.0)


class TestGrowPartition:
    @pytest.mark.parametrize("eps", [0.5, 0.2, 0.1, 0.05])
    def test_bound_satisfied(self, eps):
        pts = _blob_data(seed=1, n=300)
        labels, cents, _ = grow_partition(pts, eps, seed=0)
        for j in np.unique(labels):
            assert max_dist_to_centroid(pts[labels == j], cents[j]) <= eps + 1e-12

    def test_tighter_eps_more_partitions(self):
        pts = _blob_data(seed=2, n=300)
        _, c1, _ = grow_partition(pts, 0.5, seed=0)
        _, c2, _ = grow_partition(pts, 0.05, seed=0)
        assert len(np.unique(_labels(pts, c2))) >= len(np.unique(_labels(pts, c1)))

    def test_single_point(self):
        labels, cents, rounds = grow_partition(np.array([[1.0, 2.0]]), 0.01, seed=0)
        assert labels.tolist() == [0]
        assert rounds == 0

    def test_identical_points_one_partition(self):
        pts = np.ones((50, 2)) * 3.0
        labels, cents, rounds = grow_partition(pts, 1e-9, seed=0)
        assert len(np.unique(labels)) == 1
        assert rounds == 0

    def test_tiny_eps_terminates(self):
        g = np.random.default_rng(3)
        pts = g.random((40, 2))
        labels, cents, _ = grow_partition(pts, 1e-12, seed=0)
        # effectively every distinct point becomes its own partition
        for j in np.unique(labels):
            assert max_dist_to_centroid(pts[labels == j], cents[j]) <= 1e-12

    def test_rounds_positive_when_split_needed(self):
        pts = _blob_data(seed=4, n=200)
        _, _, rounds = grow_partition(pts, 0.05, seed=0)
        assert rounds >= 1

    def test_loose_eps_single_partition(self):
        pts = _blob_data(seed=5, n=100)
        labels, _, rounds = grow_partition(pts, 100.0, seed=0)
        assert len(np.unique(labels)) == 1
        assert rounds == 0

    def test_1d_features(self):
        g = np.random.default_rng(6)
        vals = np.concatenate([g.normal(0, 0.01, 50), g.normal(5, 0.01, 50)])
        labels, cents, _ = grow_partition(vals, 0.1, seed=0)
        assert len(np.unique(labels)) >= 2

    def test_duplicate_heavy_data(self):
        pts = np.repeat(np.array([[0.0, 0.0], [1.0, 1.0]]), 30, axis=0)
        labels, cents, _ = grow_partition(pts, 0.1, seed=0)
        for j in np.unique(labels):
            assert max_dist_to_centroid(pts[labels == j], cents[j]) <= 0.1


def _labels(pts, cents):
    d = ((pts[:, None, :] - cents[None, :, :]) ** 2).sum(axis=2)
    return d.argmin(axis=1)


class TestMaxDist:
    def test_zero_for_single(self):
        assert max_dist_to_centroid(np.array([[1.0, 1.0]]), np.array([1.0, 1.0])) == 0

    def test_known_value(self):
        pts = np.array([[0.0, 0.0], [3.0, 4.0]])
        assert max_dist_to_centroid(pts, np.array([0.0, 0.0])) == pytest.approx(5.0)
