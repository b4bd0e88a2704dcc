"""Recall-bound theory for spill trees — paper Sec 4.3.2 (Thm 1, Fig 4).

Implements the potential functions (Eq 1-2) of Dasgupta & Sinha's
Randomized Partition Trees and the failure-probability bounds (Eq 3-4)
for a depth-L tree with spill α, plus the simplified data-independent
approximation plotted in the paper's Figure 4.
"""
from __future__ import annotations

import numpy as np

from repro.hnsw.distance import batch_distances


def _sorted_dists(q: np.ndarray, points: np.ndarray, metric: str) -> np.ndarray:
    d = np.sort(batch_distances(q, points, metric).astype(np.float64))
    # Guard against a zero nearest distance (q coincides with a point):
    # the potential ratios are then 0/d, handled naturally; avoid 0/0.
    return d


def potential_phi(
    q: np.ndarray, points: np.ndarray, m: float, *, metric: str = "l2"
) -> float:
    """Eq 1: Φ_m(q, x_1..x_n) = (1/m) Σ_{i=2}^n ||q-x_(1)|| / ||q-x_(i)||."""
    if m <= 0:
        raise ValueError(f"m must be positive, got {m}")
    d = _sorted_dists(q, points, metric)
    if d.shape[0] < 2:
        return 0.0
    tail = d[1:]
    ratios = np.divide(d[0], tail, out=np.ones_like(tail), where=tail > 0)
    return float(ratios.sum() / m)


def potential_phi_k(
    q: np.ndarray, points: np.ndarray, k: int, m: float, *, metric: str = "l2"
) -> float:
    """Eq 2: Φ_{k,m} = (1/m) Σ_{i=k+1}^n (mean_{j<=k} ||q-x_(j)||) / ||q-x_(i)||."""
    if k < 1:
        raise ValueError(f"k must be >= 1, got {k}")
    if m <= 0:
        raise ValueError(f"m must be positive, got {m}")
    d = _sorted_dists(q, points, metric)
    if d.shape[0] <= k:
        return 0.0
    num = float(d[:k].mean())
    tail = d[k:]
    ratios = np.divide(num, tail, out=np.ones_like(tail), where=tail > 0)
    return float(ratios.sum() / m)


def failure_bound_1nn(
    q: np.ndarray, points: np.ndarray, depth: int, alpha: float, *, metric: str = "l2"
) -> float:
    """Eq 3: P[tree misses x_(1)] <= (1/2α) Σ_{i=0}^L Φ_{(0.5+α)^i n}."""
    if not (0.0 < alpha < 0.5):
        raise ValueError(f"alpha must be in (0, 0.5), got {alpha}")
    n = points.shape[0]
    total = sum(
        potential_phi(q, points, (0.5 + alpha) ** i * n, metric=metric)
        for i in range(depth + 1)
    )
    return min(1.0, total / (2.0 * alpha))


def failure_bound_knn(
    q: np.ndarray,
    points: np.ndarray,
    k: int,
    depth: int,
    alpha: float,
    *,
    metric: str = "l2",
) -> float:
    """Eq 4: P[tree misses any of x_(1)..x_(k)] <= (k/α) Σ_i Φ_{k,(0.5+α)^i n}."""
    if not (0.0 < alpha < 0.5):
        raise ValueError(f"alpha must be in (0, 0.5), got {alpha}")
    n = points.shape[0]
    total = sum(
        potential_phi_k(q, points, k, (0.5 + alpha) ** i * n, metric=metric)
        for i in range(depth + 1)
    )
    return min(1.0, k * total / alpha)


def fig4_failure_approx(levels: int, alpha: float, n: int = 10_000) -> float:
    """The paper's Fig-4 data-independent approximation:
    P(L) ≈ Σ_{l=1}^{L} 1 / (2 (0.5+α)^l n) — increases with depth L,
    decreases with spill α and data size n."""
    if levels < 1:
        raise ValueError(f"levels must be >= 1, got {levels}")
    return float(
        sum(1.0 / (2.0 * (0.5 + alpha) ** l * n) for l in range(1, levels + 1))
    )
