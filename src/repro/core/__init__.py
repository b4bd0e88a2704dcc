"""LANNS core: two-level partitioning, offline indexing and querying.

The paper's primary contribution (Sec 4-5): hash sharding + learnt
segmentation, parallel per-(shard, segment) HNSW builds, the partitioned
query pipeline with two-level merging, and the perShardTopK optimization.
"""
from repro.core.partitioner import shard_of, tag_partitions, route_queries
from repro.core.index_store import IndexStore, IndexMetadata
from repro.core.indexing import build_index
from repro.core.querying import query_index
from repro.core.topk import per_shard_topk
from repro.core import theory

__all__ = [
    "shard_of",
    "tag_partitions",
    "route_queries",
    "IndexStore",
    "IndexMetadata",
    "build_index",
    "query_index",
    "per_shard_topk",
    "theory",
]
