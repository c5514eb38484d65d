"""Unit tests for the distance kernels and top-k selection."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.distance import merge_topk, pairwise_scores, topk_rows


class TestPairwiseScores:
    def test_l2_matches_naive(self):
        g = np.random.default_rng(0)
        q, x = g.random((5, 7)), g.random((11, 7))
        got = pairwise_scores(q, x, "l2")
        naive = ((q[:, None, :] - x[None, :, :]) ** 2).sum(axis=2)
        np.testing.assert_allclose(got, naive, atol=1e-9)

    def test_ip_matches_naive(self):
        g = np.random.default_rng(1)
        q, x = g.random((4, 6)), g.random((9, 6))
        np.testing.assert_allclose(
            pairwise_scores(q, x, "ip"), -(q @ x.T), atol=1e-12
        )

    def test_l2_exact_on_integer_vectors(self):
        # Integer-valued vectors give exactly-representable squared L2 —
        # the property the DuckDB oracle tests rely on.
        g = np.random.default_rng(2)
        q = g.integers(0, 50, (3, 8)).astype(float)
        x = g.integers(0, 50, (6, 8)).astype(float)
        s = pairwise_scores(q, x, "l2")
        assert np.array_equal(s, np.round(s))

    def test_self_distance_zero(self):
        x = np.random.default_rng(3).random((10, 4))
        np.testing.assert_allclose(
            np.diag(pairwise_scores(x, x, "l2")), 0.0, atol=1e-9
        )

    def test_unknown_metric(self):
        with pytest.raises(ValueError):
            pairwise_scores(np.zeros((1, 2)), np.zeros((1, 2)), "cosine")

    def test_ip_smaller_is_more_similar(self):
        q = np.array([[1.0, 0.0]])
        x = np.array([[1.0, 0.0], [0.0, 1.0]])
        s = pairwise_scores(q, x, "ip")[0]
        assert s[0] < s[1]  # aligned vector scores lower (better)


class TestTopkRows:
    def test_basic(self):
        scores = np.array([[3.0, 1.0, 2.0]])
        ids = np.array([10, 20, 30])
        tid, tsc = topk_rows(scores, ids, 2)
        assert tid.tolist() == [[20, 30]]
        assert tsc.tolist() == [[1.0, 2.0]]

    def test_tie_broken_by_id(self):
        scores = np.array([[1.0, 1.0, 1.0, 0.5]])
        ids = np.array([30, 10, 20, 99])
        tid, _ = topk_rows(scores, ids, 3)
        assert tid.tolist() == [[99, 10, 20]]

    def test_k_larger_than_n(self):
        scores = np.array([[2.0, 1.0]])
        ids = np.array([1, 2])
        tid, tsc = topk_rows(scores, ids, 10)
        assert tid.shape == (1, 2)
        assert tid.tolist() == [[2, 1]]

    def test_k_zero(self):
        tid, tsc = topk_rows(np.ones((2, 3)), np.arange(3), 0)
        assert tid.shape == (2, 0)

    def test_multiple_rows_independent(self):
        scores = np.array([[1.0, 2.0], [2.0, 1.0]])
        ids = np.array([7, 8])
        tid, _ = topk_rows(scores, ids, 1)
        assert tid.tolist() == [[7], [8]]

    @given(
        st.integers(1, 6),
        st.integers(1, 30),
        st.integers(1, 12),
        st.integers(0, 10_000),
    )
    @settings(max_examples=40, deadline=None)
    def test_matches_sorted_reference(self, nq, n, k, seed):
        g = np.random.default_rng(seed)
        scores = g.integers(0, 8, (nq, n)).astype(float)  # many ties
        ids = g.permutation(n).astype(np.int64)
        tid, tsc = topk_rows(scores, ids, k)
        for r in range(nq):
            ref = sorted(zip(scores[r], ids), key=lambda t: (t[0], t[1]))
            ref = ref[: min(k, n)]
            assert tid[r].tolist() == [i for _, i in ref]
            assert tsc[r].tolist() == [s for s, _ in ref]


class TestMergeTopk:
    def test_merge_two_partials(self):
        ids_a = np.array([[1, 3]])
        sc_a = np.array([[0.1, 0.3]])
        ids_b = np.array([[2, 4]])
        sc_b = np.array([[0.2, 0.4]])
        mid, msc = merge_topk(ids_a, sc_a, ids_b, sc_b, 3)
        assert mid.tolist() == [[1, 2, 3]]
        assert msc.tolist() == [[0.1, 0.2, 0.3]]

    def test_merge_with_padding(self):
        from repro.core.ivf import PAD_ID

        ids_a = np.array([[5, PAD_ID]])
        sc_a = np.array([[0.5, np.inf]])
        ids_b = np.array([[6, PAD_ID]])
        sc_b = np.array([[0.1, np.inf]])
        mid, msc = merge_topk(ids_a, sc_a, ids_b, sc_b, 2)
        assert mid.tolist() == [[6, 5]]

    def test_merge_tie_by_id(self):
        ids_a = np.array([[9]])
        sc_a = np.array([[1.0]])
        ids_b = np.array([[4]])
        sc_b = np.array([[1.0]])
        mid, _ = merge_topk(ids_a, sc_a, ids_b, sc_b, 2)
        assert mid.tolist() == [[4, 9]]
