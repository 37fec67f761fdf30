"""TP baseline (§2.3.2): truncated-path Monte Carlo (Peng et al. [49]).

For each length ``i ∈ [1, ℓ]`` (ℓ from Eq. 5), simulates fresh length-i
walks from both ``s`` and ``t``, estimates the return/crossing
probabilities ``p_i(s,s), p_i(s,t), p_i(t,t), p_i(t,s)`` as endpoint
frequencies, and sums them into Eq. (4).

Per the paper, ``n_i = 40·ℓ²·ln(8ℓ/δ)/ε²`` walks per length — the sheer
count that makes TP "suffer severe efficiency issues even on small
graphs". A ``sample_factor`` (default 1.0) scales the count for the
*timing* benchmarks where the full constant would exceed the harness
budget exactly as it exceeded the paper's one-day budget; accuracy
tests keep it at 1. Op counts always report the unscaled formula.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

import numpy as np

from repro.core.lengths import ell_peng
from repro.graphs.csr import CSRGraph


@dataclass
class TPResult:
    r: float
    ell: int
    walks_done: int         # walks actually simulated (after sample_factor)
    walks_formula: int      # the paper's unscaled count
    walk_steps: int         # Σ i·(walks at length i), actually simulated


def tp_er(
    g: CSRGraph,
    s: int,
    t: int,
    eps: float,
    lam: float,
    delta: float = 0.01,
    seed: int = 0,
    sample_factor: float = 1.0,
    max_walks_per_len: int | None = None,
) -> TPResult:
    """Estimate r(s,t) with TP."""
    if s == t:
        return TPResult(0.0, 0, 0, 0, 0)
    rng = np.random.default_rng(seed)
    d_s, d_t = g.degree(s), g.degree(t)
    ell = ell_peng(eps, lam)
    n_formula = math.ceil(40 * ell**2 * math.log(8 * ell / delta) / eps**2)
    n_i = max(1, math.ceil(sample_factor * n_formula))
    if max_walks_per_len is not None:
        n_i = min(n_i, max_walks_per_len)
    r = 1.0 / d_s + 1.0 / d_t  # i = 0 terms (p_0(s,s)=p_0(t,t)=1)
    walks_done = 0
    steps = 0
    for i in range(1, ell + 1):
        ends_s = g.walk_endpoints(s, i, n_i, rng)
        ends_t = g.walk_endpoints(t, i, n_i, rng)
        p_ss = float(np.mean(ends_s == s))
        p_st = float(np.mean(ends_s == t))
        p_tt = float(np.mean(ends_t == t))
        p_ts = float(np.mean(ends_t == s))
        r += p_ss / d_s + p_tt / d_t - p_st / d_t - p_ts / d_s
        walks_done += 2 * n_i
        steps += 2 * n_i * i
    return TPResult(r, ell, walks_done, 2 * ell * n_formula, steps)
