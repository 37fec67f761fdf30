"""Maximum random-walk length bounds.

Two truncation lengths guaranteeing ``|r(s,t) − r_ℓ(s,t)| ≤ ε/2``:

* :func:`ell_peng` — Peng et al.'s generic bound (Eq. 5), independent of
  the query pair;
* :func:`ell_ours` — the paper's refined per-pair bound (Theorem 3.1 /
  Eq. 6), which shrinks with the query nodes' degrees and is the source
  of AMC/GEER's `1/d²` complexity improvement.

Both need ``λ = max(|λ₂|, |λ_n|)`` from the preprocessing step
(:mod:`repro.linalg.eigen`).
"""
from __future__ import annotations

import math

# The paper's ground truth uses SMM with 1000 iterations; a tighter λ→1
# graph would blow the closed-form bound past any practical horizon, so
# both bounds clamp there (only reachable for near-bipartite or
# near-disconnected graphs outside the evaluated regime).
MAX_ELL = 100_000


def _clamp(raw: float) -> int:
    return int(min(max(math.ceil(raw), 1), MAX_ELL))


def ell_peng(eps: float, lam: float) -> int:
    """Eq. (5): ℓ = ⌈ ln(4 / (ε(1−λ))) / ln(1/λ) − 1 ⌉."""
    if not (0.0 < eps):
        raise ValueError("eps must be positive")
    if lam <= 0.0:
        return 1
    if lam >= 1.0:
        raise ValueError("lambda must be < 1 (connected, non-bipartite graph)")
    return _clamp(math.log(4.0 / (eps * (1.0 - lam))) / math.log(1.0 / lam) - 1.0)


def ell_ours(eps: float, lam: float, d_s: int, d_t: int) -> int:
    """Eq. (6): ℓ = ⌈ log( (2/d(s)+2/d(t)) / (ε(1−λ)) ) / log(1/λ) − 1 ⌉."""
    if not (0.0 < eps):
        raise ValueError("eps must be positive")
    if min(d_s, d_t) < 1:
        raise ValueError("degrees must be >= 1")
    if lam <= 0.0:
        return 1
    if lam >= 1.0:
        raise ValueError("lambda must be < 1 (connected, non-bipartite graph)")
    num = 2.0 / d_s + 2.0 / d_t
    return _clamp(math.log(num / (eps * (1.0 - lam))) / math.log(1.0 / lam) - 1.0)
