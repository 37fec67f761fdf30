"""Dense Laplacian toolbox.

Provides the EXACT baseline (Definition 2.1: ``r(s,t) = (e_s-e_t) L†
(e_s-e_t)ᵀ``), the reproduction's ground truth, and a conjugate-gradient
solver for Laplacian systems — the substrate the RP baseline [62] needs
in place of a Spielman–Teng SDD solver (no such solver ships offline;
Jacobi-preconditioned CG is exact-in-the-limit and fast at lite scale).
"""
from __future__ import annotations

import numpy as np

from repro.graphs.csr import CSRGraph


def laplacian_dense(g: CSRGraph) -> np.ndarray:
    """Dense Laplacian L = D - A."""
    n = g.n
    L = np.zeros((n, n))
    src = np.repeat(np.arange(n), g.degrees)
    L[src, g.indices] = -1.0
    L[np.arange(n), np.arange(n)] = g.degrees
    return L


def pinv_laplacian(g: CSRGraph) -> np.ndarray:
    """Moore–Penrose pseudo-inverse L† via the rank-1 shift identity.

    For a connected graph, ``L† = (L + J/n)^{-1} − J/n`` with J the
    all-ones matrix — cheaper and better-conditioned than numpy's SVD
    pinv, and exact for our purposes.
    """
    n = g.n
    J = np.full((n, n), 1.0 / n)
    return np.linalg.inv(laplacian_dense(g) + J) - J


def exact_er_matrix(g: CSRGraph) -> np.ndarray:
    """All-pairs exact ER matrix: r(u,v) = L†(u,u)+L†(v,v)-2L†(u,v)."""
    Li = pinv_laplacian(g)
    d = np.diag(Li)
    return d[:, None] + d[None, :] - 2 * Li


def exact_er(g: CSRGraph, s: int, t: int) -> float:
    """Exact effective resistance of one pair via a single linear solve."""
    if s == t:
        return 0.0
    n = g.n
    b = np.zeros(n)
    b[s], b[t] = 1.0, -1.0
    x = solve_laplacian_cg(g, b)
    return float(b @ x)


def solve_laplacian_cg(
    g: CSRGraph, b: np.ndarray, tol: float = 1e-12, max_iter: int = 20000
) -> np.ndarray:
    """Solve ``L x = b`` for b ⟂ 𝟙 with Jacobi-preconditioned CG.

    Returns the solution with zero mean (the representative in range(L)).
    """
    n = g.n
    deg = g.degrees.astype(float)
    b = b - b.mean()

    def Lmul(x: np.ndarray) -> np.ndarray:
        # L x = D x - A x; A x is the un-normalized neighbor sum.
        return deg * x - deg * g.spmv(x)

    x = np.zeros(n)
    r = b - Lmul(x)
    z = r / deg
    p = z.copy()
    rz = r @ z
    bnorm = np.linalg.norm(b)
    for _ in range(max_iter):
        Ap = Lmul(p)
        alpha = rz / (p @ Ap)
        x += alpha * p
        r -= alpha * Ap
        if np.linalg.norm(r) <= tol * bnorm:
            break
        z = r / deg
        rz_new = r @ z
        p = z + (rz_new / rz) * p
        rz = rz_new
    return x - x.mean()
