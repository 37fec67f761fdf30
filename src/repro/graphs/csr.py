"""Local CSR graph kernel.

The numeric workhorse shared by every algorithm in this reproduction:
a compressed-sparse-row adjacency over ``n`` nodes with ``m`` undirected
edges, exposing exactly the three primitives the paper's algorithms
need —

* ``spmv(x)``        — one application of the transition operator
  ``(P x)(u) = (1/d(u)) * sum_{v in N(u)} x(v)`` (Algorithm 2, Line 4);
* ``walk`` / ``walks_visit_sums`` — batched simple-random-walk
  simulation (Algorithm 1, Line 6);
* degree lookups.

Instances are plain numpy arrays, cheap to pickle, and are broadcast to
Spark executors by the distributed samplers in ``repro.core.walks``.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass(frozen=True)
class CSRGraph:
    """Undirected, unweighted graph in CSR form.

    ``indptr`` has length ``n+1``; the neighbors of node ``u`` are
    ``indices[indptr[u]:indptr[u+1]]``. Every undirected edge appears in
    both endpoints' neighbor lists, so ``indices`` has length ``2*m``.
    """

    indptr: np.ndarray
    indices: np.ndarray

    @property
    def n(self) -> int:
        """Number of nodes."""
        return len(self.indptr) - 1

    @property
    def m(self) -> int:
        """Number of undirected edges."""
        return len(self.indices) // 2

    @property
    def degrees(self) -> np.ndarray:
        """Degree vector d, shape (n,)."""
        return np.diff(self.indptr)

    def degree(self, u: int) -> int:
        """Degree of node ``u``."""
        return int(self.indptr[u + 1] - self.indptr[u])

    def neighbors(self, u: int) -> np.ndarray:
        """Neighbor ids of node ``u`` (view into ``indices``)."""
        return self.indices[self.indptr[u] : self.indptr[u + 1]]

    # ---------------------------------------------------------------- SpMV
    def spmv(self, x: np.ndarray) -> np.ndarray:
        """Return ``P x`` where ``P = D^{-1} A`` is the transition matrix.

        ``(P x)(u)`` averages ``x`` over u's neighbors. Implemented with
        one gather + segment-sum; O(m) time, no dense matrix.
        """
        gathered = x[self.indices]
        sums = np.add.reduceat(gathered, self.indptr[:-1])
        # reduceat misbehaves on empty segments, but a connected graph
        # has no isolated nodes; assert instead of handling.
        return sums / self.degrees

    def spmv_transpose(self, x: np.ndarray) -> np.ndarray:
        """Return ``Pᵀ x`` (i.e. distribute mass forward along walks)."""
        y = np.zeros(self.n)
        contrib = (x / self.degrees)[  # x(u)/d(u) pushed to each neighbor
            np.repeat(np.arange(self.n), self.degrees)
        ]
        np.add.at(y, self.indices, contrib)
        return y

    # -------------------------------------------------------------- walks
    def walks_visit_sums(
        self,
        start: int,
        weight: np.ndarray,
        length: int,
        n_walks: int,
        rng: np.random.Generator,
    ) -> np.ndarray:
        """Simulate ``n_walks`` length-``length`` walks from ``start``.

        Returns, per walk, ``sum_{i=1..length} weight[w_i]`` where
        ``w_1..w_length`` are the visited nodes *excluding* the start —
        exactly the per-walk sums in Algorithm 1, Line 7 (the series in
        Eq. 12 starts at i=1).

        Vectorized over walks: one ``rng.random`` draw per step for the
        whole batch, then a gather through CSR offsets.
        """
        if length <= 0 or n_walks <= 0:
            return np.zeros(n_walks)
        cur = np.full(n_walks, start, dtype=np.int64)
        acc = np.zeros(n_walks)
        deg = self.degrees
        for _ in range(length):
            offs = (rng.random(n_walks) * deg[cur]).astype(np.int64)
            cur = self.indices[self.indptr[cur] + offs]
            acc += weight[cur]
        return acc

    def walk_endpoints(
        self, start: int, length: int, n_walks: int, rng: np.random.Generator
    ) -> np.ndarray:
        """Endpoints of ``n_walks`` length-``length`` walks from ``start``."""
        cur = np.full(n_walks, start, dtype=np.int64)
        deg = self.degrees
        for _ in range(length):
            offs = (rng.random(n_walks) * deg[cur]).astype(np.int64)
            cur = self.indices[self.indptr[cur] + offs]
        return cur

    def walk_until_hit(
        self,
        start: int,
        targets: tuple[int, ...],
        max_steps: int,
        rng: np.random.Generator,
    ) -> tuple[int, int, int]:
        """Walk from ``start`` until a node in ``targets`` is hit.

        Returns ``(hit_node, steps, predecessor)`` where ``predecessor``
        is the node visited immediately before the hit. If ``max_steps``
        is exhausted first, returns ``(-1, max_steps, -1)``. Used by the
        MC (escape probability) and MC2 (first-visit-via-edge) baselines,
        whose walks have no fixed length.
        """
        cur = start
        prev = -1
        tset = set(targets)
        for step in range(1, max_steps + 1):
            nbrs = self.neighbors(cur)
            nxt = int(nbrs[int(rng.random() * len(nbrs))])
            if nxt in tset:
                return nxt, step, cur
            prev = cur
            cur = nxt
        return -1, max_steps, prev

    # --------------------------------------------------------- validation
    def validate(self) -> None:
        """Sanity-check structural invariants; raises AssertionError."""
        assert self.indptr[0] == 0 and self.indptr[-1] == len(self.indices)
        assert np.all(np.diff(self.indptr) >= 1), "isolated node"
        assert self.indices.min() >= 0 and self.indices.max() < self.n
        # symmetry: (u,v) present iff (v,u) present
        src = np.repeat(np.arange(self.n), self.degrees)
        fwd = set(zip(src.tolist(), self.indices.tolist()))
        assert all((v, u) in fwd for (u, v) in fwd), "asymmetric adjacency"


def csr_from_edges(n: int, edges: np.ndarray) -> CSRGraph:
    """Build a :class:`CSRGraph` from an (m, 2) array of undirected edges.

    Each input row (u, v) with u != v contributes both directions;
    duplicate edges and self-loops are rejected (the paper's graphs are
    simple).
    """
    edges = np.asarray(edges, dtype=np.int64)
    if edges.size == 0:
        raise ValueError("graph must have at least one edge")
    u, v = edges[:, 0], edges[:, 1]
    if np.any(u == v):
        raise ValueError("self-loops are not allowed")
    lo, hi = np.minimum(u, v), np.maximum(u, v)
    keys = lo * n + hi
    if len(np.unique(keys)) != len(keys):
        raise ValueError("duplicate edges are not allowed")
    src = np.concatenate([u, v])
    dst = np.concatenate([v, u])
    order = np.lexsort((dst, src))
    src, dst = src[order], dst[order]
    counts = np.bincount(src, minlength=n)
    indptr = np.concatenate([[0], np.cumsum(counts)])
    return CSRGraph(indptr=indptr, indices=dst)
