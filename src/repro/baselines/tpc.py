"""TPC baseline (§2.3.2): collision-probability variant of TP.

Regards ``p_i(s,t)`` as a collision probability of two half-length
walks. With ``a = ⌈i/2⌉, b = ⌊i/2⌋`` and reversibility,

    p_i(s,t)/d(t) = Σ_v p_a(s,v)·p_b(t,v)/d(v),

estimated by the endpoint-histogram product of independent half-walk
sets (the 1/d(v)-weighted collision counter). The diagonal terms use
two *independent* half-walk sets from the same source. Since
``p_i(s,t)/d(t) = p_i(t,s)/d(s)``, Eq. (4)'s term becomes
``A_i + B_i − 2·C_i``.

The paper's sample count per length is
``40000·(ℓ√(ℓβ_i)/ε + ℓ³β_i^{3/2}/ε²)`` where βᵢ must upper-bound the
collision mass; βᵢ is unknown and the paper uses undisclosed heuristic
settings, so we use ``β_i = 1/(2m) + λ^i·(1/d(s)+1/d(t))`` (matches the
identity ``Σ_v p_i(s,v)²/d(v) = p_{2i}(s,s)/d(s)`` which decays to the
stationary floor at rate λ; DESIGN.md §3). As with TP, a
``sample_factor`` keeps timing benches within budget; op counts report
the unscaled formula.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

import numpy as np

from repro.core.lengths import ell_peng
from repro.graphs.csr import CSRGraph


@dataclass
class TPCResult:
    r: float
    ell: int
    walks_done: int
    walks_formula: int
    walk_steps: int


def _collision(
    ends_a: np.ndarray, ends_b: np.ndarray, inv_deg: np.ndarray, n: int
) -> float:
    """(1/(N_a·N_b)) Σ_v cnt_a(v)·cnt_b(v)/d(v)."""
    ca = np.bincount(ends_a, minlength=n)
    cb = np.bincount(ends_b, minlength=n)
    return float((ca * cb * inv_deg).sum() / (len(ends_a) * len(ends_b)))


def tpc_er(
    g: CSRGraph,
    s: int,
    t: int,
    eps: float,
    lam: float,
    delta: float = 0.01,
    seed: int = 0,
    sample_factor: float = 1.0,
    max_walks_per_len: int | None = None,
) -> TPCResult:
    """Estimate r(s,t) with TPC (heuristic βᵢ — no formal guarantee,
    exactly as in the paper's experiments)."""
    if s == t:
        return TPCResult(0.0, 0, 0, 0, 0)
    rng = np.random.default_rng(seed)
    d_s, d_t = g.degree(s), g.degree(t)
    n = g.n
    inv_deg = 1.0 / g.degrees
    ell = ell_peng(eps, lam)
    base = 1.0 / d_s + 1.0 / d_t
    r = base  # i = 0 terms
    walks_done = 0
    walks_formula = 0
    steps = 0
    for i in range(1, ell + 1):
        a, b = (i + 1) // 2, i // 2
        beta = 1.0 / (2 * g.m) + lam**i * base
        n_formula = math.ceil(
            40000
            * (ell * math.sqrt(ell * beta) / eps + ell**3 * beta**1.5 / eps**2)
        )
        n_w = max(2, math.ceil(sample_factor * n_formula))
        if max_walks_per_len is not None:
            n_w = min(n_w, max_walks_per_len)
        walks_formula += 4 * n_formula
        # four independent endpoint sets: s-length-a, s-length-b (b may be 0
        # -> all endpoints are s itself), t-length-a, t-length-b
        sa = g.walk_endpoints(s, a, n_w, rng)
        sb = g.walk_endpoints(s, b, n_w, rng) if b > 0 else np.full(n_w, s)
        ta = g.walk_endpoints(t, a, n_w, rng)
        tb = g.walk_endpoints(t, b, n_w, rng) if b > 0 else np.full(n_w, t)
        A = _collision(sa, sb, inv_deg, n)   # p_i(s,s)/d(s)
        B = _collision(ta, tb, inv_deg, n)   # p_i(t,t)/d(t)
        C = _collision(sa, tb, inv_deg, n)   # p_i(s,t)/d(t) = p_i(t,s)/d(s)
        r += A + B - 2 * C
        walks_done += 4 * n_w
        steps += 2 * n_w * (a + b)
    return TPCResult(r, ell, walks_done, walks_formula, steps)
