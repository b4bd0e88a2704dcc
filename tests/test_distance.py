"""Unit tests for the distance kernels (repro.hnsw.distance)."""
import numpy as np
import pytest
from hypothesis import given, settings, strategies as st

from repro.hnsw.distance import (
    METRICS,
    batch_distances,
    cross_distances,
    normalize_rows,
    pairwise_argsort_topk,
    validate_metric,
)


def _naive_l2(q, pts):
    return np.sqrt(((pts.astype(np.float64) - q.astype(np.float64)) ** 2).sum(axis=1))


def _naive_cosine(q, pts):
    qn = q / np.linalg.norm(q)
    pn = pts / np.linalg.norm(pts, axis=1, keepdims=True)
    return 1.0 - pn @ qn


class TestValidateMetric:
    @pytest.mark.parametrize("m", METRICS)
    def test_accepts_known(self, m):
        assert validate_metric(m) == m

    @pytest.mark.parametrize("m", ["l1", "euclid", "", "L2", "ip"])
    def test_rejects_unknown(self, m):
        with pytest.raises(ValueError):
            validate_metric(m)


class TestNormalizeRows:
    def test_unit_norm(self):
        g = np.random.default_rng(0)
        x = g.normal(size=(50, 7)).astype(np.float32)
        n = np.linalg.norm(normalize_rows(x), axis=1)
        np.testing.assert_allclose(n, 1.0, rtol=1e-5)

    def test_zero_row_stays_zero(self):
        x = np.zeros((3, 4), dtype=np.float32)
        x[1] = [1, 0, 0, 0]
        out = normalize_rows(x)
        assert np.all(out[0] == 0) and np.all(out[2] == 0)
        np.testing.assert_allclose(out[1], [1, 0, 0, 0])

    def test_preserves_direction(self):
        x = np.array([[3.0, 4.0]], dtype=np.float32)
        np.testing.assert_allclose(normalize_rows(x), [[0.6, 0.8]], rtol=1e-6)


class TestBatchDistances:
    @pytest.mark.parametrize("dim", [1, 2, 8, 33, 128])
    def test_l2_matches_naive(self, dim):
        g = np.random.default_rng(dim)
        q = g.normal(size=dim).astype(np.float32)
        pts = g.normal(size=(40, dim)).astype(np.float32)
        np.testing.assert_allclose(
            batch_distances(q, pts, "l2"), _naive_l2(q, pts), rtol=1e-4, atol=1e-4
        )

    @pytest.mark.parametrize("dim", [2, 8, 64])
    def test_cosine_matches_naive(self, dim):
        g = np.random.default_rng(dim + 100)
        q = g.normal(size=dim).astype(np.float32)
        pts = g.normal(size=(40, dim)).astype(np.float32)
        np.testing.assert_allclose(
            batch_distances(q, pts, "cosine"), _naive_cosine(q, pts), rtol=1e-4, atol=1e-4
        )

    def test_self_distance_zero(self):
        g = np.random.default_rng(3)
        pts = g.normal(size=(5, 6)).astype(np.float32)
        for i in range(5):
            assert batch_distances(pts[i], pts, "l2")[i] == pytest.approx(0, abs=1e-3)

    def test_cosine_range(self):
        g = np.random.default_rng(4)
        d = batch_distances(
            g.normal(size=8).astype(np.float32),
            g.normal(size=(100, 8)).astype(np.float32),
            "cosine",
        )
        assert np.all(d >= -1e-6) and np.all(d <= 2 + 1e-6)

    def test_unknown_metric_raises(self):
        with pytest.raises(ValueError):
            batch_distances(np.zeros(2), np.zeros((1, 2)), "manhattan")


class TestCrossDistances:
    @pytest.mark.parametrize("metric", METRICS)
    def test_matches_batch(self, metric):
        g = np.random.default_rng(5)
        qs = g.normal(size=(6, 9)).astype(np.float32)
        pts = g.normal(size=(30, 9)).astype(np.float32)
        full = cross_distances(qs, pts, metric)
        for i in range(6):
            np.testing.assert_allclose(
                full[i], batch_distances(qs[i], pts, metric), rtol=1e-3, atol=1e-3
            )

    def test_l2_symmetric(self):
        g = np.random.default_rng(6)
        x = g.normal(size=(12, 5)).astype(np.float32)
        d = cross_distances(x, x, "l2")
        np.testing.assert_allclose(d, d.T, atol=1e-4)
        np.testing.assert_allclose(np.diag(d), 0, atol=1e-3)

    def test_nonnegative(self):
        g = np.random.default_rng(7)
        d = cross_distances(
            g.normal(size=(8, 3)).astype(np.float32),
            g.normal(size=(8, 3)).astype(np.float32),
        )
        assert np.all(d >= 0)


class TestPairwiseArgsortTopk:
    def test_matches_full_argsort(self):
        g = np.random.default_rng(8)
        qs = g.normal(size=(10, 6)).astype(np.float32)
        pts = g.normal(size=(200, 6)).astype(np.float32)
        idx, dist = pairwise_argsort_topk(qs, pts, 7)
        full = cross_distances(qs, pts)
        for i in range(10):
            expect = np.argsort(full[i], kind="stable")[:7]
            np.testing.assert_array_equal(idx[i], expect)

    def test_sorted_ascending(self):
        g = np.random.default_rng(9)
        _, dist = pairwise_argsort_topk(
            g.normal(size=(5, 4)).astype(np.float32),
            g.normal(size=(50, 4)).astype(np.float32),
            10,
        )
        assert np.all(np.diff(dist, axis=1) >= 0)

    def test_k_exceeds_n(self):
        g = np.random.default_rng(10)
        idx, dist = pairwise_argsort_topk(
            g.normal(size=(3, 4)).astype(np.float32),
            g.normal(size=(5, 4)).astype(np.float32),
            50,
        )
        assert idx.shape == (3, 5) and dist.shape == (3, 5)

    def test_tie_broken_by_row_index(self):
        pts = np.zeros((4, 3), dtype=np.float32)  # all identical -> all ties
        idx, _ = pairwise_argsort_topk(np.zeros((1, 3), np.float32), pts, 4)
        np.testing.assert_array_equal(idx[0], [0, 1, 2, 3])

    def test_k_nonpositive_raises(self):
        with pytest.raises(ValueError):
            pairwise_argsort_topk(np.zeros((1, 2)), np.zeros((3, 2)), 0)

    def test_query_is_nearest_to_itself(self):
        g = np.random.default_rng(11)
        pts = g.normal(size=(30, 5)).astype(np.float32)
        idx, _ = pairwise_argsort_topk(pts, pts, 1)
        np.testing.assert_array_equal(idx[:, 0], np.arange(30))


@settings(max_examples=25, deadline=None)
@given(
    n=st.integers(2, 40),
    dim=st.integers(1, 16),
    k=st.integers(1, 10),
    seed=st.integers(0, 1000),
)
def test_property_topk_contains_true_minimum(n, dim, k, seed):
    g = np.random.default_rng(seed)
    pts = g.normal(size=(n, dim)).astype(np.float32)
    q = g.normal(size=(1, dim)).astype(np.float32)
    idx, dist = pairwise_argsort_topk(q, pts, k)
    full = batch_distances(q[0], pts)
    assert idx[0, 0] == np.argmin(full)
    assert np.all(np.diff(dist[0]) >= 0)
    assert len(set(idx[0].tolist())) == idx.shape[1]  # no duplicates
