"""Recall computation (paper Sec 1: fraction of true k-nearest neighbors
returned in a result set of size k — R@k compares the top-k of the
approximate result against the top-k of the exact ground truth)."""
from __future__ import annotations

import numpy as np
import pandas as pd


def _result_matrix(results: pd.DataFrame, n_queries: int, k: int) -> list[set]:
    """(query_id, neighbor_id, rank) rows -> per-query set of top-k ids."""
    top = results[results["rank"] <= k]
    sets = [set() for _ in range(n_queries)]
    for qid, nid in zip(top["query_id"].to_numpy(), top["neighbor_id"].to_numpy()):
        sets[int(qid)].add(int(nid))
    return sets


def recall_at_k(
    results: pd.DataFrame, gt_ids: np.ndarray, k: int
) -> float:
    """Mean over queries of |result top-k ∩ true top-k| / k.

    ``results``: (query_id, neighbor_id, rank, ...) — query_id must be
    the row index into ``gt_ids`` (q, K>=k), exact neighbors ascending.
    Queries with no result rows contribute recall 0 (a miss, not an
    error, matching how a production outage would score).
    """
    if k < 1:
        raise ValueError(f"k must be >= 1, got {k}")
    if gt_ids.shape[1] < k:
        raise ValueError(f"ground truth has only {gt_ids.shape[1]} < {k} neighbors")
    n_q = gt_ids.shape[0]
    got = _result_matrix(results, n_q, k)
    hits = sum(len(got[i] & set(gt_ids[i, :k].tolist())) for i in range(n_q))
    return hits / (n_q * k)


def recall_table(
    results: pd.DataFrame, gt_ids: np.ndarray, ks: tuple[int, ...] = (1, 5, 10, 15, 50, 100)
) -> dict[int, float]:
    """R@k for each k — one row of the paper's Tables 1/4."""
    return {k: recall_at_k(results, gt_ids, k) for k in ks if k <= gt_ids.shape[1]}
