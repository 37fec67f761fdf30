"""AMC — Adaptive Monte Carlo PER estimation (Algorithm 1).

Estimates ``q(s,t)`` (Eq. 12) — and hence the ε-approximate effective
resistance via Theorem 3.4 — by batches of truncated random walks that
stop early once the empirical Bernstein error (Lemma 3.2 / Eq. 7) drops
under ε/2. Batch sizes double from ⌈η*/2^{τ−1}⌉ up to the Hoeffding
cap η* (Eq. 8), so the adaptive scheme never costs more than ~2× the
non-adaptive bound while typically terminating after a small fraction.

Backends: ``local`` (numpy kernel) and ``spark`` (Monte Carlo fan-out of
:func:`repro.core.walks.sample_batch_spark`). Both run the identical
control flow; only batch evaluation differs.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

import numpy as np
from pyspark.sql import SparkSession

from repro.core import walks
from repro.core.lengths import ell_ours
from repro.graphs.csr import CSRGraph


def top_two(x: np.ndarray) -> tuple[float, float]:
    """(max₁, max₂): the two largest entries of a vector (Table 2)."""
    if len(x) < 2:
        return (float(x[0]), 0.0) if len(x) else (0.0, 0.0)
    part = np.partition(x, len(x) - 2)
    return float(part[-1]), float(part[-2])


def psi_bound(
    s_vec: np.ndarray, t_vec: np.ndarray, d_s: int, d_t: int, ell_f: int
) -> float:
    """Eq. (9): the range bound ψ with ψ/2 ≥ |Z_k| (via Lemma 3.3)."""
    s1, s2 = top_two(s_vec)
    t1, t2 = top_two(t_vec)
    half_up = math.ceil(ell_f / 2)
    half_dn = ell_f // 2
    return 2 * half_up * (s1 / d_s + t1 / d_t) + 2 * half_dn * (s2 / d_s + t2 / d_t)


def eta_star(psi: float, eps: float, tau: int, delta: float) -> int:
    """Eq. (8): Hoeffding cap on the number of samples."""
    if psi == 0.0:
        return 0
    return math.ceil(2 * psi**2 * math.log(2 * tau / delta) / eps**2)


def bernstein_error(n: int, var: float, psi: float, delta: float) -> float:
    """Eq. (7): empirical Bernstein half-width f(n, σ̂², ψ, δ)."""
    var = max(var, 0.0)  # σ̂² can dip below 0 by floating-point cancellation
    return math.sqrt(2 * var * math.log(3 / delta) / n) + 3 * psi * math.log(
        3 / delta
    ) / n


def h_samples(psi: float, eps: float, tau: int, delta: float) -> int:
    """§3.3.2: h = (2^τ − 1)·⌈η*/2^{τ−1}⌉ — AMC's worst-case sample count.

    This is the right-hand side of GEER's greedy switch rule (Eq. 17).
    """
    es = eta_star(psi, eps, tau, delta)
    if es == 0:
        return 0
    return (2**tau - 1) * math.ceil(es / 2 ** (tau - 1))


@dataclass
class AMCResult:
    """Outcome + instrumentation of one AMC invocation."""

    r_f: float          # the estimate Z of q(s,t) (Line 16)
    eta_star: int       # Hoeffding cap (Eq. 8)
    samples_used: int   # Σ batch sizes actually simulated
    batches_run: int
    early_stop: bool    # terminated via the Bernstein test (Line 13)
    walk_steps: int     # 2 · samples_used · ell_f — the op-count metric


def amc(
    g: CSRGraph,
    s: int,
    t: int,
    s_vec: np.ndarray,
    t_vec: np.ndarray,
    eps: float,
    ell_f: int,
    tau: int = 5,
    delta: float = 0.01,
    seed: int = 0,
    backend: str = "local",
    spark: SparkSession | None = None,
    g_bc=None,
) -> AMCResult:
    """Algorithm 1. ``s_vec``/``t_vec`` are the non-negative input vectors
    (one-hot for a direct PER query; SMM's smoothed vectors inside GEER).

    For ``backend="spark"``, pass the session and optionally a
    pre-broadcast CSR (``g_bc``); the weight vector is broadcast here.
    """
    if tau < 1:
        raise ValueError("tau must be >= 1")
    d_s, d_t = g.degree(s), g.degree(t)
    if ell_f <= 0:
        return AMCResult(0.0, 0, 0, 0, True, 0)
    psi = psi_bound(s_vec, t_vec, d_s, d_t, ell_f)
    e_star = eta_star(psi, eps, tau, delta)
    if e_star == 0:
        return AMCResult(0.0, 0, 0, 0, True, 0)
    weight = walks.make_weight(s_vec, t_vec, d_s, d_t)

    if backend == "spark":
        if spark is None:
            raise ValueError("backend='spark' requires a SparkSession")
        if g_bc is None:
            g_bc = walks.broadcast_graph(spark, g)
        w_bc = walks.broadcast_vector(spark, weight)
    rng = np.random.default_rng(seed)

    eta = max(1, math.ceil(e_star / 2 ** (tau - 1)))
    samples = 0
    z_mean = 0.0
    early = False
    batches = 0
    for i in range(1, tau + 1):
        if backend == "spark":
            z_sum, z2_sum, cnt = walks.sample_batch_spark(
                spark, g_bc, s, t, w_bc, ell_f, eta, seed=seed * 1_000_003 + i
            )
        else:
            z_sum, z2_sum, cnt = walks.sample_batch_local(
                g, s, t, weight, ell_f, eta, rng
            )
        samples += cnt
        batches = i
        z_mean = z_sum / cnt
        var = z2_sum / cnt - z_mean**2
        if bernstein_error(cnt, var, psi, delta / tau) <= eps / 2:
            early = True
            break
        eta *= 2
    return AMCResult(
        r_f=z_mean,
        eta_star=e_star,
        samples_used=samples,
        batches_run=batches,
        early_stop=early,
        walk_steps=2 * samples * ell_f,
    )


def amc_er(
    g: CSRGraph,
    s: int,
    t: int,
    eps: float,
    lam: float,
    tau: int = 5,
    delta: float = 0.01,
    seed: int = 0,
    backend: str = "local",
    spark: SparkSession | None = None,
    g_bc=None,
) -> tuple[float, AMCResult]:
    """Answer an ε-approximate PER query with plain AMC (Theorem 3.4):
    one-hot inputs, ℓ_f = ℓ of Eq. (6), and the +𝟙_{s≠t}(1/d(s)+1/d(t))
    zeroth/diagonal correction."""
    if s == t:
        return 0.0, AMCResult(0.0, 0, 0, 0, True, 0)
    d_s, d_t = g.degree(s), g.degree(t)
    ell = ell_ours(eps, lam, d_s, d_t)
    s_vec = np.zeros(g.n)
    t_vec = np.zeros(g.n)
    s_vec[s] = 1.0
    t_vec[t] = 1.0
    res = amc(
        g, s, t, s_vec, t_vec, eps, ell, tau, delta, seed, backend, spark, g_bc
    )
    return res.r_f + 1.0 / d_s + 1.0 / d_t, res
