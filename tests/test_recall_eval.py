"""Tests for recall computation (repro.eval.recall) — with the recall
aggregate itself oracle-verified in DuckDB."""
import numpy as np
import pandas as pd
import pytest

from repro.eval.recall import recall_at_k, recall_table
from repro.oracle import assert_equivalent


def _results(rows):
    return pd.DataFrame(rows, columns=["query_id", "neighbor_id", "rank"])


class TestRecallAtK:
    def test_perfect(self):
        gt = np.array([[1, 2, 3], [4, 5, 6]])
        res = _results(
            [(0, 1, 1), (0, 2, 2), (0, 3, 3), (1, 4, 1), (1, 5, 2), (1, 6, 3)]
        )
        assert recall_at_k(res, gt, 3) == 1.0

    def test_partial(self):
        gt = np.array([[1, 2], [3, 4]])
        res = _results([(0, 1, 1), (0, 99, 2), (1, 98, 1), (1, 97, 2)])
        assert recall_at_k(res, gt, 2) == pytest.approx(0.25)

    def test_rank_cutoff_applied(self):
        """Neighbors beyond rank k must not count toward R@k."""
        gt = np.array([[1, 2]])
        res = _results([(0, 9, 1), (0, 1, 2), (0, 2, 3)])
        assert recall_at_k(res, gt, 1) == 0.0
        assert recall_at_k(res, gt, 2) == pytest.approx(0.5)

    def test_missing_query_scores_zero(self):
        gt = np.array([[1], [2]])
        res = _results([(0, 1, 1)])  # query 1 absent
        assert recall_at_k(res, gt, 1) == pytest.approx(0.5)

    def test_invalid_k(self):
        gt = np.array([[1, 2]])
        with pytest.raises(ValueError):
            recall_at_k(_results([]), gt, 0)
        with pytest.raises(ValueError):
            recall_at_k(_results([]), gt, 5)

    def test_order_within_topk_irrelevant(self):
        gt = np.array([[1, 2, 3]])
        res_a = _results([(0, 3, 1), (0, 1, 2), (0, 2, 3)])
        res_b = _results([(0, 1, 1), (0, 2, 2), (0, 3, 3)])
        assert recall_at_k(res_a, gt, 3) == recall_at_k(res_b, gt, 3)


class TestRecallTable:
    def test_ks_filtered_by_gt_width(self):
        gt = np.tile(np.arange(10), (4, 1))
        res = _results([(q, n, n + 1) for q in range(4) for n in range(10)])
        table = recall_table(res, gt, ks=(1, 5, 10, 50, 100))
        assert set(table) == {1, 5, 10}
        assert all(v == 1.0 for v in table.values())


class TestRecallOracle:
    def test_recall_matches_duckdb(self, spark):
        """Cross-check the numpy recall aggregate against DuckDB SQL
        computing |result∩truth|/ (q*k) from the same tables."""
        g = np.random.default_rng(0)
        n_q, k = 25, 8
        gt = np.stack([g.choice(500, k, replace=False) for _ in range(n_q)])
        rows = []
        for q in range(n_q):
            hits = g.integers(0, k + 1)
            picked = list(gt[q, :hits]) + list(1000 + g.choice(500, k - hits, replace=False))
            for r, n in enumerate(picked, 1):
                rows.append((q, int(n), r))
        res = _results(rows)
        expected = recall_at_k(res, gt, k)
        gt_pdf = pd.DataFrame(
            [(q, int(gt[q, j])) for q in range(n_q) for j in range(k)],
            columns=["query_id", "neighbor_id"],
        )
        got_df = spark.createDataFrame(
            pd.DataFrame({"recall": [round(expected, 6)]})
        )
        assert_equivalent(
            got_df,
            f"""
            SELECT round(count(*) / ({n_q} * {k}.0), 6) AS recall
            FROM res JOIN gt USING (query_id, neighbor_id)
            WHERE res.rank <= {k}
            """,
            res=res,
            gt=gt_pdf,
        )
