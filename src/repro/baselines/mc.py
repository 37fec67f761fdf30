"""MC baseline (§2.3.1): commute-time Monte Carlo for general pairs.

Uses the escape-probability identity behind the paper's description: a
random walk from ``s`` reaches ``t`` before returning to ``s`` with
probability ``1 / (d(s)·r(s,t))``, so with η walks of which η_r succeed,
``r'(s,t) = η / (d(s)·η_r)``.

The paper's sample bound ``η = 3γ·d(s)·log(1/δ)/ε²`` assumes a known ER
upper bound γ; the harness supplies ``γ = 2·max ground-truth ER`` over
its query set (DESIGN.md §3). Walks are uncapped in theory; we cap at
``max_steps`` (default 20·m, far above the expected hitting time on the
lite graphs) and count a capped walk as a non-return, the standard
truncation for this estimator.
"""
from __future__ import annotations

import math
from dataclasses import dataclass

import numpy as np

from repro.graphs.csr import CSRGraph


@dataclass
class MCResult:
    r: float
    walks: int
    successes: int
    total_steps: int


def mc_er(
    g: CSRGraph,
    s: int,
    t: int,
    eps: float,
    gamma: float,
    delta: float = 0.01,
    seed: int = 0,
    max_walks: int | None = None,
    max_steps: int | None = None,
) -> MCResult:
    """Estimate r(s,t) via escape-probability Monte Carlo."""
    if s == t:
        return MCResult(0.0, 0, 0, 0)
    rng = np.random.default_rng(seed)
    d_s = g.degree(s)
    eta = math.ceil(3 * gamma * d_s * math.log(1 / delta) / eps**2)
    if max_walks is not None:
        eta = min(eta, max_walks)
    if max_steps is None:
        max_steps = 20 * g.m
    successes = 0
    steps_total = 0
    for _ in range(eta):
        # walk from s until it hits t (success) or returns to s (failure)
        hit, steps, _ = g.walk_until_hit(s, (s, t), max_steps, rng)
        steps_total += steps
        if hit == t:
            successes += 1
    if successes == 0:
        # no escape observed: report the bound itself (r >= eta/(d_s * 1))
        return MCResult(float("inf"), eta, 0, steps_total)
    return MCResult(eta / (d_s * successes), eta, successes, steps_total)
