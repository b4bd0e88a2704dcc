"""Unit tests for the local exact k-NN (repro.bruteforce.local)."""
import numpy as np
import pytest

from repro.bruteforce.local import exact_topk
from repro.hnsw.distance import cross_distances


@pytest.fixture(scope="module")
def data():
    g = np.random.default_rng(0)
    return (
        g.normal(size=(30, 6)).astype(np.float32),
        g.normal(size=(500, 6)).astype(np.float32),
    )


class TestExactTopk:
    def test_matches_full_sort(self, data):
        qs, base = data
        ids, dists = exact_topk(qs, base, 9)
        full = cross_distances(qs, base)
        for i in range(qs.shape[0]):
            np.testing.assert_array_equal(ids[i], np.argsort(full[i], kind="stable")[:9])

    def test_blocking_invariant(self, data):
        qs, base = data
        a = exact_topk(qs, base, 7, block=4)
        b = exact_topk(qs, base, 7, block=10_000)
        np.testing.assert_array_equal(a[0], b[0])
        np.testing.assert_allclose(a[1], b[1])

    def test_external_ids(self, data):
        qs, base = data
        ext = np.arange(500) * 3 + 11
        ids, _ = exact_topk(qs, base, 5, ids=ext)
        raw, _ = exact_topk(qs, base, 5)
        np.testing.assert_array_equal(ids, ext[raw])

    def test_k_exceeds_n(self):
        g = np.random.default_rng(1)
        ids, dists = exact_topk(
            g.normal(size=(2, 3)).astype(np.float32),
            g.normal(size=(4, 3)).astype(np.float32),
            99,
        )
        assert ids.shape == (2, 4)
        assert np.all(np.diff(dists, axis=1) >= 0)

    def test_cosine_metric(self, data):
        qs, base = data
        ids_l2, _ = exact_topk(qs, base, 5, metric="l2")
        ids_cos, _ = exact_topk(qs, base, 5, metric="cosine")
        # different metrics must be able to disagree on this data
        assert not np.array_equal(ids_l2, ids_cos)

    def test_identical_point_first(self, data):
        _, base = data
        ids, dists = exact_topk(base[:10], base, 1)
        np.testing.assert_array_equal(ids[:, 0], np.arange(10))
        # |a|^2+|b|^2-2ab expansion in float32: self-distance is ~1e-3,
        # not exactly 0 (catastrophic cancellation) — bounded, not zero.
        np.testing.assert_allclose(dists[:, 0], 0, atol=1e-2)
