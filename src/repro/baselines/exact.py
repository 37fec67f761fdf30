"""EXACT baseline (§5.1): pseudo-inverse of the Laplacian, Definition 2.1.

Materializes L† once (O(n³) time, O(n²) space — the paper notes it only
fits the smallest dataset) and answers each query in O(1).
"""
from __future__ import annotations

import numpy as np

from repro.graphs.csr import CSRGraph
from repro.linalg.laplacian import pinv_laplacian


class ExactIndex:
    """Precomputed L†; queries read three entries."""

    def __init__(self, g: CSRGraph):
        self.lpinv = pinv_laplacian(g)

    def query(self, s: int, t: int) -> float:
        Li = self.lpinv
        return float(Li[s, s] + Li[t, t] - 2 * Li[s, t])


def exact_query(g: CSRGraph, s: int, t: int) -> float:
    """One-shot exact ER (builds the index each call — §5.1's EXACT cost
    profile; reuse :class:`ExactIndex` to amortize)."""
    return ExactIndex(g).query(s, t)
