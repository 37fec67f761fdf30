"""RP baseline: Spielman–Srivastava random projection [62].

Preprocessing builds ``Z ≈ Q·B·L†`` where B is the m×n signed incidence
matrix and Q a k×m random ±1/√k Johnson–Lindenstrauss sheet with
``k = ⌈24·ln n / ε²⌉``; then any query is answered in O(k) as
``r'(s,t) = ‖Z(e_s − e_t)‖²``.

The authors use an SDD solver for the k Laplacian solves; our substrate
is the Jacobi-preconditioned CG of :mod:`repro.linalg.laplacian`
(DESIGN.md §3). The k×n dense sheet is why the paper reports RP running
out of memory on large graphs; ``max_k`` lets the harness cap the sheet
(logged in results) when the full k would exceed the time budget —
errors then exceed the JL guarantee, matching RP's role in Fig. 6 as
the least accurate method.
"""
from __future__ import annotations

import math

import numpy as np

from repro.graphs.csr import CSRGraph
from repro.linalg.laplacian import solve_laplacian_cg


class RPIndex:
    """The preprocessed k×n sketch Z; query cost O(k)."""

    def __init__(
        self,
        g: CSRGraph,
        eps: float,
        seed: int = 0,
        scale: float = 24.0,
        max_k: int | None = None,
    ):
        self.k = math.ceil(scale * math.log(g.n) / eps**2)
        self.k_capped = max_k is not None and self.k > max_k
        if self.k_capped:
            self.k = max_k
        rng = np.random.default_rng(seed)
        n = g.n
        # incidence rows over the canonical (u < v) edge orientation
        src = np.repeat(np.arange(n), g.degrees)
        mask = src < g.indices
        eu, ev = src[mask], g.indices[mask]
        # Y = Bᵀ Qᵀ  accumulated edge-wise:  Y[u] += q_e, Y[v] -= q_e
        Q = rng.choice([-1.0, 1.0], size=(self.k, g.m)) / math.sqrt(self.k)
        Y = np.zeros((n, self.k))
        np.add.at(Y, eu, Q.T)
        np.subtract.at(Y, ev, Q.T)
        # Z: solve L z_i = y_i for each sketch row
        self.Z = np.stack(
            [solve_laplacian_cg(g, Y[:, i], tol=1e-10) for i in range(self.k)],
            axis=0,
        )

    def query(self, s: int, t: int) -> float:
        diff = self.Z[:, s] - self.Z[:, t]
        return float(diff @ diff)
