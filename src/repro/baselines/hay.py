"""HAY baseline [29]: spanning-tree sampling for edge ER.

For an edge ``(s,t) ∈ E``, ``r(s,t)`` equals the probability that the
edge belongs to a uniform spanning tree (Kirchhoff), so HAY samples
``N = ⌈ln(2/δ)/(2ε²)⌉`` USTs (Hoeffding for a [0,1] indicator) with
Wilson's loop-erased random walk algorithm — implemented from scratch —
and reports the membership frequency.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

import numpy as np

from repro.graphs.csr import CSRGraph


def wilson_spanning_tree(
    g: CSRGraph, rng: np.random.Generator, root: int = 0
) -> tuple[np.ndarray, int]:
    """Sample a uniform spanning tree via Wilson's algorithm.

    Returns (parent, steps): ``parent[u]`` is u's successor toward the
    root (−1 at the root); ``steps`` counts random-walk steps taken.
    The classic cycle-popping implementation: record the *last* exit
    from each node during a random walk until the tree is hit, then
    retrace — the loop-erased path.
    """
    n = g.n
    in_tree = np.zeros(n, dtype=bool)
    parent = np.full(n, -1, dtype=np.int64)
    in_tree[root] = True
    steps = 0
    for start in range(n):
        u = start
        while not in_tree[u]:
            nbrs = g.neighbors(u)
            parent[u] = int(nbrs[int(rng.random() * len(nbrs))])
            u = parent[u]
            steps += 1
        u = start
        while not in_tree[u]:
            in_tree[u] = True
            u = parent[u]
    return parent, steps


@dataclass
class HAYResult:
    r: float
    trees: int
    walk_steps: int


def hay_edge_er(
    g: CSRGraph,
    s: int,
    t: int,
    eps: float,
    delta: float = 0.01,
    seed: int = 0,
    max_trees: int | None = None,
) -> HAYResult:
    """Estimate r(s,t) for an edge (s,t) as UST-membership frequency."""
    if t not in g.neighbors(s):
        raise ValueError("HAY only supports edge queries (s,t) in E")
    rng = np.random.default_rng(seed)
    n_trees = math.ceil(math.log(2 / delta) / (2 * eps**2))
    if max_trees is not None:
        n_trees = min(n_trees, max_trees)
    hits = 0
    steps = 0
    for _ in range(n_trees):
        parent, st = wilson_spanning_tree(g, rng, root=0)
        steps += st
        if parent[s] == t or parent[t] == s:
            hits += 1
    return HAYResult(hits / n_trees, n_trees, steps)
