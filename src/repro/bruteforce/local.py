"""Exact k-NN on the driver — the recall oracle's ground truth.

The paper computes ground truth with an in-house Spark brute force
(Sec 5.4, reproduced in ``spark_bf``); at our reduced scales a blocked
numpy scan on one machine is exact and fast, and serves as the reference
the Spark implementation is itself tested against.
"""
from __future__ import annotations

import numpy as np

from repro.hnsw.distance import pairwise_argsort_topk


def exact_topk(
    queries: np.ndarray,
    base: np.ndarray,
    k: int,
    *,
    ids: np.ndarray | None = None,
    metric: str = "l2",
    block: int = 1024,
) -> tuple[np.ndarray, np.ndarray]:
    """Exact top-k: returns (ids (q, k'), dists (q, k')) ascending.

    Blocked over queries to bound the (block, n) distance-matrix memory.
    Ties broken by base row order, then mapped through ``ids`` — matching
    the deterministic ordering the DuckDB oracle SQL uses.
    """
    queries = np.asarray(queries, dtype=np.float32)
    base = np.asarray(base, dtype=np.float32)
    if ids is None:
        ids = np.arange(base.shape[0], dtype=np.int64)
    ids = np.asarray(ids, dtype=np.int64)
    out_i, out_d = [], []
    for s in range(0, queries.shape[0], block):
        idx, d = pairwise_argsort_topk(queries[s : s + block], base, k, metric)
        out_i.append(ids[idx])
        out_d.append(d)
    return np.vstack(out_i), np.vstack(out_d)
