"""Tests for the distributed brute force (Sec 5.4) — oracle-verified
against DuckDB computing the same top-k directly from the vectors."""
import numpy as np
import pandas as pd
import pytest

from repro.bruteforce import exact_topk, spark_brute_force
from repro.oracle import assert_equivalent
from repro.synth_data import gaussian_mixture, vectors_to_df


@pytest.fixture(scope="module")
def ds():
    return gaussian_mixture(n=400, dim=8, n_clusters=6, n_queries=15, seed=31)


@pytest.fixture(scope="module")
def base_df(spark, ds):
    return vectors_to_df(spark, ds.base, ds.ids).cache()


def _query_pdf(ds):
    return pd.DataFrame(
        {"query_id": np.arange(ds.queries.shape[0], dtype=np.int64),
         "vector": list(ds.queries)}
    )


BF_SQL = """
SELECT query_id, neighbor_id, rank FROM (
  SELECT q.query_id AS query_id, b.id AS neighbor_id,
         row_number() OVER (
            PARTITION BY q.query_id
            ORDER BY list_distance(b.vector, q.vector), b.id
         ) AS rank
  FROM queries q CROSS JOIN base b
) WHERE rank <= {k}
"""


@pytest.mark.parametrize("k", [1, 5, 10])
def test_oracle_equivalence(spark, ds, base_df, k):
    """The whole distributed pipeline vs DuckDB's cross-join + window —
    neighbor identity AND rank must match exactly."""
    got = spark_brute_force(spark, base_df, ds.queries, k).select(
        "query_id", "neighbor_id", "rank"
    )
    assert_equivalent(
        got,
        BF_SQL.format(k=k),
        base=base_df.toPandas(),
        queries=_query_pdf(ds),
    )


def test_matches_local_exact(spark, ds, base_df):
    got = spark_brute_force(spark, base_df, ds.queries, 7).toPandas()
    gt_ids, gt_d = exact_topk(ds.queries, ds.base, 7, ids=ds.ids)
    for q in range(ds.queries.shape[0]):
        rows = got[got.query_id == q].sort_values("rank")
        np.testing.assert_array_equal(rows.neighbor_id.to_numpy(), gt_ids[q])
        np.testing.assert_allclose(rows.dist.to_numpy(), gt_d[q], rtol=1e-5)


def test_partition_count_invariant(spark, ds, base_df):
    """Results must not depend on how the base set is partitioned."""
    a = spark_brute_force(spark, base_df, ds.queries, 5, n_partitions=2).toPandas()
    b = spark_brute_force(spark, base_df, ds.queries, 5, n_partitions=13).toPandas()
    key = ["query_id", "rank"]
    a = a.sort_values(key).reset_index(drop=True)
    b = b.sort_values(key).reset_index(drop=True)
    pd.testing.assert_frame_equal(a[key + ["neighbor_id"]], b[key + ["neighbor_id"]])


def test_checkpointing_writes_files(spark, ds, base_df, tmp_path):
    spark_brute_force(
        spark, base_df, ds.queries, 3, checkpoint_dir=str(tmp_path)
    ).count()
    names = [p.name for p in tmp_path.iterdir()]
    assert any(n.startswith("bf-partials-") for n in names)
    assert any(n.startswith("bf-merged-") for n in names)


def test_k_larger_than_dataset(spark, ds, base_df):
    out = spark_brute_force(spark, base_df, ds.queries[:2], 1000).toPandas()
    assert out.groupby("query_id").size().max() == ds.n
