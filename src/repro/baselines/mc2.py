"""MC2 baseline (§2.3.1): edge-query Monte Carlo.

For ``(s,t) ∈ E``, ``r(s,t)`` equals the probability that a random walk
started at ``s`` visits ``t`` for the first time *via the edge (s,t)*
(i.e. the step into t comes from s). MC2 estimates that probability
directly: simulate walks from ``s`` until they first hit ``t`` and count
those whose predecessor at the hit is ``s``.

Sample count (paper): ``η = 3·log(1/δ) / (ε²·γ)`` under the assumption
``r(s,t) > γ``. γ is unknown in practice; the harness uses the
degree-based heuristic ``γ = 1/(d(s)+d(t))`` (DESIGN.md §3) and tests
assert it lower-bounds the true edge ER on the evaluated graphs.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

import numpy as np

from repro.graphs.csr import CSRGraph


@dataclass
class MC2Result:
    r: float
    walks: int
    successes: int
    total_steps: int


def default_gamma(g: CSRGraph, s: int, t: int) -> float:
    """Heuristic lower bound on edge ER (see module docstring)."""
    return 1.0 / (g.degree(s) + g.degree(t))


def mc2_edge_er(
    g: CSRGraph,
    s: int,
    t: int,
    eps: float,
    delta: float = 0.01,
    gamma: float | None = None,
    seed: int = 0,
    max_walks: int | None = None,
    max_steps: int | None = None,
) -> MC2Result:
    """Estimate r(s,t) for an edge (s,t) via first-visit-edge walks."""
    if t not in g.neighbors(s):
        raise ValueError("MC2 only supports edge queries (s,t) in E")
    rng = np.random.default_rng(seed)
    eta = math.ceil(
        3 * math.log(1 / delta) / (eps**2 * (gamma or default_gamma(g, s, t)))
    )
    if max_walks is not None:
        eta = min(eta, max_walks)
    if max_steps is None:
        max_steps = 20 * g.m
    successes = 0
    steps_total = 0
    for _ in range(eta):
        hit, steps, pred = g.walk_until_hit(s, (t,), max_steps, rng)
        steps_total += steps
        if hit == t and pred == s:
            successes += 1
    return MC2Result(successes / eta, eta, successes, steps_total)
