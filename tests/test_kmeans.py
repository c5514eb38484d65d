"""Unit tests for the seeded numpy k-means (S3)."""
import numpy as np
import pytest

from repro.core.kmeans import assign, kmeans


def _blobs(n_per, centers, sigma=0.05, seed=0):
    g = np.random.default_rng(seed)
    pts = np.concatenate(
        [c + sigma * g.standard_normal((n_per, len(c))) for c in centers]
    )
    labels = np.repeat(np.arange(len(centers)), n_per)
    return pts, labels


class TestAssign:
    def test_nearest_center(self):
        centers = np.array([[0.0, 0.0], [10.0, 10.0]])
        x = np.array([[0.1, 0.2], [9.0, 9.5], [5.1, 5.1]])
        assert assign(x, centers).tolist() == [0, 1, 1]

    def test_single_center(self):
        x = np.random.default_rng(0).random((20, 3))
        assert (assign(x, x[:1]) == 0).all()


class TestKMeans:
    def test_recovers_separated_blobs(self):
        x, true = _blobs(50, [[0, 0], [5, 5], [-5, 5]], seed=1)
        centers, labels = kmeans(x, 3, seed=0)
        # Each true blob must map to exactly one learned cluster.
        for b in range(3):
            assert len(np.unique(labels[true == b])) == 1
        assert len(np.unique(labels)) == 3

    def test_deterministic_in_seed(self):
        x = np.random.default_rng(2).random((200, 8))
        c1, l1 = kmeans(x, 10, seed=7)
        c2, l2 = kmeans(x, 10, seed=7)
        np.testing.assert_array_equal(l1, l2)
        np.testing.assert_array_equal(c1, c2)

    def test_k_capped_at_n(self):
        x = np.random.default_rng(3).random((5, 2))
        centers, labels = kmeans(x, 50, seed=0)
        assert len(centers) == 5
        assert sorted(np.unique(labels)) == list(range(5))

    @pytest.mark.parametrize("k", [1, 2, 4, 16])
    def test_labels_match_assign(self, k):
        x = np.random.default_rng(4).random((300, 6))
        centers, labels = kmeans(x, k, seed=0)
        np.testing.assert_array_equal(labels, assign(x, centers))

    def test_no_empty_clusters_on_duplicates(self):
        # All-identical points: k-means must not crash, and must still
        # return k centers with valid labels.
        x = np.ones((100, 4))
        centers, labels = kmeans(x, 8, seed=0)
        assert centers.shape == (8, 4)
        assert ((labels >= 0) & (labels < 8)).all()

    def test_empty_input_rejected(self):
        with pytest.raises(ValueError):
            kmeans(np.empty((0, 3)), 2)

    def test_inertia_not_worse_than_random_labels(self):
        x = np.random.default_rng(5).random((400, 5))
        centers, labels = kmeans(x, 20, seed=0)
        inertia = ((x - centers[labels]) ** 2).sum()
        g = np.random.default_rng(6)
        rnd = g.integers(0, 20, len(x))
        rnd_centers = np.stack([x[rnd == j].mean(axis=0) for j in range(20)])
        rnd_inertia = ((x - rnd_centers[rnd]) ** 2).sum()
        assert inertia < rnd_inertia
