"""Unit tests for perShardTopK (Sec 5.3.2) and the recall-bound theory
(Sec 4.3.2, Thm 1 / Fig 4)."""
import math

import numpy as np
import pytest
from hypothesis import given, settings, strategies as st

from repro.core.theory import (
    failure_bound_1nn,
    failure_bound_knn,
    fig4_failure_approx,
    potential_phi,
    potential_phi_k,
)
from repro.core.topk import per_shard_topk


class TestPerShardTopK:
    def test_single_shard_identity(self):
        assert per_shard_topk(100, 1) == 100

    def test_paper_pymk_configuration(self):
        """S=20, topK=100, p=0.95: s'=0.05, ci = 0.05+1.96*sqrt(.05*.95/100)
        ≈ 0.0927 → ceil(9.27) = 10 per shard (vs 100 naively)."""
        assert per_shard_topk(100, 20, 0.95) == 10

    def test_two_shards_sift_configuration(self):
        # S=2, topK=100: ci = 0.5 + 1.96*sqrt(0.25/100) = 0.598 → 60
        assert per_shard_topk(100, 2, 0.95) == 60

    def test_never_exceeds_topk(self):
        for s in (1, 2, 3, 8, 50):
            for k in (1, 10, 100, 1000):
                assert per_shard_topk(k, s) <= k

    def test_monotone_decreasing_in_shards(self):
        vals = [per_shard_topk(200, s) for s in (1, 2, 4, 8, 16, 32)]
        assert vals == sorted(vals, reverse=True)

    def test_higher_confidence_larger_k(self):
        assert per_shard_topk(100, 4, 0.99) >= per_shard_topk(100, 4, 0.8)

    def test_always_at_least_expected_share(self):
        for s in (2, 5, 10):
            assert per_shard_topk(100, s) >= math.ceil(100 / s)

    @pytest.mark.parametrize(
        "args", [(0, 2, 0.95), (10, 0, 0.95), (10, 2, 0.0), (10, 2, 1.0)]
    )
    def test_invalid_inputs(self, args):
        with pytest.raises(ValueError):
            per_shard_topk(*args)

    @settings(max_examples=50, deadline=None)
    @given(k=st.integers(1, 2000), s=st.integers(1, 64), p=st.floats(0.5, 0.999))
    def test_property_bounds(self, k, s, p):
        v = per_shard_topk(k, s, p)
        assert 1 <= v <= k


@pytest.fixture(scope="module")
def cloud():
    g = np.random.default_rng(0)
    return g.normal(size=(500, 8)).astype(np.float32), g.normal(size=8).astype(np.float32)


class TestPotentials:
    def test_phi_hand_computed(self):
        """Collinear points at distances 1,2,4 from q: Φ_m = (1/m)(1/2+1/4)."""
        q = np.zeros(2, dtype=np.float32)
        pts = np.array([[1, 0], [2, 0], [4, 0]], dtype=np.float32)
        assert potential_phi(q, pts, m=3) == pytest.approx(0.75 / 3)

    def test_phi_k_hand_computed(self):
        """k=2: mean of two nearest = 1.5; tail i=3: 1.5/4."""
        q = np.zeros(2, dtype=np.float32)
        pts = np.array([[1, 0], [2, 0], [4, 0]], dtype=np.float32)
        assert potential_phi_k(q, pts, k=2, m=2) == pytest.approx((1.5 / 4) / 2)

    def test_phi_decreases_with_m(self, cloud):
        pts, q = cloud
        assert potential_phi(q, pts, m=100) > potential_phi(q, pts, m=400)

    def test_phi_in_unit_interval_scaled(self, cloud):
        """Each ratio <= 1, so Φ_m <= (n-1)/m."""
        pts, q = cloud
        n = pts.shape[0]
        assert 0 < potential_phi(q, pts, m=n) <= (n - 1) / n

    def test_phi_well_separated_nn_is_small(self):
        """q on top of x_(1), far from everything else ⇒ Φ ≈ 0."""
        q = np.zeros(4, dtype=np.float32)
        pts = np.vstack(
            [np.zeros(4), 100 + np.random.default_rng(1).normal(size=(50, 4))]
        ).astype(np.float32)
        assert potential_phi(q, pts, m=pts.shape[0]) < 1e-6

    def test_invalid_args(self, cloud):
        pts, q = cloud
        with pytest.raises(ValueError):
            potential_phi(q, pts, m=0)
        with pytest.raises(ValueError):
            potential_phi_k(q, pts, k=0, m=10)

    def test_phi_k_fewer_points_than_k(self):
        q = np.zeros(2, dtype=np.float32)
        pts = np.ones((3, 2), dtype=np.float32)
        assert potential_phi_k(q, pts, k=5, m=1) == 0.0


class TestFailureBounds:
    def test_bound_increases_with_depth(self, cloud):
        pts, q = cloud
        b = [failure_bound_1nn(q, pts, d, 0.15) for d in (0, 1, 2, 3)]
        assert all(x <= y + 1e-12 for x, y in zip(b, b[1:]))

    def test_bound_decreases_with_alpha(self, cloud):
        pts, q = cloud
        assert failure_bound_1nn(q, pts, 2, 0.05) >= failure_bound_1nn(q, pts, 2, 0.3)

    def test_bound_capped_at_one(self, cloud):
        pts, q = cloud
        assert failure_bound_knn(q, pts, 50, 5, 0.05) <= 1.0

    def test_easy_instance_bound_below_one(self):
        """Query sitting on its nearest neighbor, everything else far:
        the Thm-1 bound should be nearly 0."""
        g = np.random.default_rng(2)
        q = np.zeros(6, dtype=np.float32)
        pts = np.vstack([q + 0.001, 1000 + g.normal(size=(999, 6))]).astype(np.float32)
        assert failure_bound_1nn(q, pts, 3, 0.15) < 0.01

    def test_invalid_alpha(self, cloud):
        pts, q = cloud
        with pytest.raises(ValueError):
            failure_bound_1nn(q, pts, 2, 0.0)
        with pytest.raises(ValueError):
            failure_bound_knn(q, pts, 5, 2, 0.5)


class TestFig4Approx:
    def test_increases_with_levels(self):
        vals = [fig4_failure_approx(L, 0.15) for L in range(1, 9)]
        assert vals == sorted(vals)

    def test_decreases_with_alpha(self):
        assert fig4_failure_approx(4, 0.05) > fig4_failure_approx(4, 0.30)

    def test_decreases_with_n(self):
        assert fig4_failure_approx(4, 0.15, n=1000) > fig4_failure_approx(4, 0.15, n=100_000)

    def test_level_one_value(self):
        # L=1: 1 / (2 * 0.65 * 10000)
        assert fig4_failure_approx(1, 0.15) == pytest.approx(1 / (2 * 0.65 * 10_000))

    def test_invalid_levels(self):
        with pytest.raises(ValueError):
            fig4_failure_approx(0, 0.15)
