"""Shared hyperplane-tree machinery for the RH and APD segmenters.

Paper Sec 4.3.2: each internal node holds a unit hyperplane ``h``, a
median split point ``s`` and spill boundaries ``l``/``r`` (the 0.5∓α
fractiles of the projections ``U = D·h``). Leaves are segment ids in
left-to-right order, so a depth-L tree yields 2^L segments.

Insertion (data side, no spill): ``x·h < s`` → left else right.
Query (virtual spill):           ``q·h < l`` → left, ``q·h > r`` → right,
                                 else both sides.
Physical spill swaps the two rules (data duplicates inside [l, r],
queries take the median rule). See footnote 1 in the paper.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable, Optional, Union

import numpy as np

from repro.segmenters.base import Segmenter, validate_spill


@dataclass
class Node:
    """One internal node: hyperplane + split point + spill band."""

    h: np.ndarray  # (d,) unit hyperplane normal
    s: float  # median split (0.5 fractile of projections)
    l: float  # 0.5 - alpha fractile
    r: float  # 0.5 + alpha fractile
    left: Union["Node", int]  # subtree or leaf segment id
    right: Union["Node", int]

    def __post_init__(self):
        if not (self.l <= self.s <= self.r):
            raise ValueError(f"spill band must bracket split: l={self.l} s={self.s} r={self.r}")


HyperplaneFn = Callable[[np.ndarray, np.random.Generator], np.ndarray]


def learn_tree(
    sample: np.ndarray,
    depth: int,
    alpha: float,
    hyperplane_fn: HyperplaneFn,
    *,
    seed: int = 0,
    min_node: int = 4,
) -> Node:
    """Recursively learn a depth-``depth`` tree of splitting hyperplanes.

    ``hyperplane_fn(node_sample, rng) -> (d,) unit vector`` supplies the
    direction (random for RH, approximate principal direction for APD).
    ``alpha`` is the spill fraction (paper uses 0.15 → ~30% of queries
    spill to both sides at each level).
    """
    sample = np.asarray(sample, dtype=np.float32)
    if sample.ndim != 2 or sample.shape[0] < 2:
        raise ValueError(f"need a (n>=2, d) sample, got {sample.shape}")
    if depth < 1:
        raise ValueError(f"depth must be >= 1, got {depth}")
    if not (0.0 <= alpha < 0.5):
        raise ValueError(f"alpha must be in [0, 0.5), got {alpha}")
    rng = np.random.default_rng(seed)
    next_leaf = iter(range(1 << depth))

    def build(node_sample: np.ndarray, level: int) -> Union[Node, int]:
        if level == depth:
            return next(next_leaf)
        if node_sample.shape[0] < min_node:
            # Degenerate node: fall back to a balanced random direction so
            # the tree keeps its full shape (leaf numbering stays dense).
            h = rng.standard_normal(node_sample.shape[1]).astype(np.float32)
            h /= np.linalg.norm(h)
        else:
            h = np.asarray(hyperplane_fn(node_sample, rng), dtype=np.float32)
            nrm = float(np.linalg.norm(h))
            if nrm <= 0:
                raise ValueError("hyperplane_fn returned a zero vector")
            h = h / nrm
        u = node_sample @ h
        s = float(np.median(u))
        lo = float(np.quantile(u, 0.5 - alpha))
        hi = float(np.quantile(u, 0.5 + alpha))
        left = build(node_sample[u < s], level + 1)
        right = build(node_sample[u >= s], level + 1)
        return Node(h=h, s=s, l=min(lo, s), r=max(hi, s), left=left, right=right)

    root = build(sample, 0)
    assert isinstance(root, Node)
    return root


def tree_depth(node: Union[Node, int]) -> int:
    """Depth of the tree (0 for a bare leaf)."""
    if isinstance(node, (int, np.integer)):
        return 0
    return 1 + max(tree_depth(node.left), tree_depth(node.right))


class HyperplaneTreeSegmenter(Segmenter):
    """Segmenter backed by a learnt hyperplane tree (RH or APD)."""

    def __init__(self, root: Node, *, kind: str, alpha: float) -> None:
        self._root = root
        self._kind = kind
        self.alpha = float(alpha)
        self.n_segments = 1 << tree_depth(root)

    @property
    def kind(self) -> str:
        return self._kind

    @property
    def root(self) -> Node:
        return self._root

    def _collect(
        self, vectors: np.ndarray, *, spilling: bool
    ) -> list[np.ndarray]:
        """Route each row down the tree.

        ``spilling=False`` → median rule, exactly one leaf per row.
        ``spilling=True``  → [l, r] band duplicates rows to both subtrees.
        """
        vectors = np.asarray(vectors, dtype=np.float32)
        if vectors.ndim == 1:
            vectors = vectors[None, :]
        n = vectors.shape[0]
        out: list[list[int]] = [[] for _ in range(n)]

        def walk(node: Union[Node, int], rows: np.ndarray) -> None:
            if rows.size == 0:
                return
            if isinstance(node, (int, np.integer)):
                leaf = int(node)
                for i in rows:
                    out[i].append(leaf)
                return
            u = vectors[rows] @ node.h
            if spilling:
                go_left = u <= node.r
                go_right = u >= node.l
            else:
                go_left = u < node.s
                go_right = ~go_left
            walk(node.left, rows[go_left])
            walk(node.right, rows[go_right])

        walk(self._root, np.arange(n))
        return [np.asarray(sorted(set(x)), dtype=np.int64) for x in out]

    def assign(
        self, vectors: np.ndarray, ids: np.ndarray, *, spill: str = "virtual"
    ) -> list[np.ndarray]:
        validate_spill(spill)
        # virtual spill: data goes to exactly one segment;
        # physical spill: data inside the band is duplicated.
        return self._collect(vectors, spilling=(spill == "physical"))

    def route(self, vectors: np.ndarray, *, spill: str = "virtual") -> list[np.ndarray]:
        validate_spill(spill)
        # virtual spill: queries in the band fan out; physical: single leaf.
        return self._collect(vectors, spilling=(spill == "virtual"))
