"""From-scratch HNSW (Malkov & Yashunin) — the substrate LANNS partitions.

The container ships no ANN library (no hnswlib/FAISS), so the graph index
is implemented here in numpy: multi-layer proximity graph, geometric level
sampling, greedy upper-layer descent, ef-bounded base-layer search, and
heuristic neighbor selection.
"""
from repro.hnsw.distance import batch_distances, pairwise_argsort_topk
from repro.hnsw.graph import HNSWIndex

__all__ = ["HNSWIndex", "batch_distances", "pairwise_argsort_topk"]
