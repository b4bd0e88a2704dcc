"""Exact k-NN: local numpy ground truth + Spark brute force (paper Sec 5.4)."""
from repro.bruteforce.local import exact_topk
from repro.bruteforce.spark_bf import spark_brute_force

__all__ = ["exact_topk", "spark_brute_force"]
