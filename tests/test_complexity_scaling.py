"""Table 1 — asymptotic complexity claims, asserted via op-count scaling."""
import math

import numpy as np
import pytest

from repro.baselines.tp import tp_er
from repro.core.amc import amc_er, eta_star, psi_bound
from repro.core.lengths import ell_ours
from repro.graphs import generators as gen
from repro.graphs.csr import csr_from_edges
from repro.linalg.eigen import lambda_max_local


@pytest.fixture(scope="module")
def g():
    return csr_from_edges(*gen.chung_lu(400, 12.0, seed=71))


def test_amc_eta_scales_with_inverse_eps_squared():
    psi = 1.7
    assert eta_star(psi, 0.05, 5, 0.01) == pytest.approx(
        4 * eta_star(psi, 0.1, 5, 0.01), rel=0.01
    )


def test_amc_eta_scales_with_inverse_degree_squared(g):
    """Table 1: AMC/GEER ∝ 1/d² where d = min(d(s), d(t)) — the paper's
    improvement factor over TP."""
    n = g.n
    one = np.eye(n)
    ell = 10
    deg = g.degrees
    hi = int(np.argmax(deg))
    lo = int(np.argmin(deg))
    psi_hi = psi_bound(one[hi], one[hi], deg[hi], deg[hi], ell)
    psi_lo = psi_bound(one[lo], one[lo], deg[lo], deg[lo], ell)
    ratio = eta_star(psi_lo, 0.1, 5, 0.01) / eta_star(psi_hi, 0.1, 5, 0.01)
    assert ratio == pytest.approx((deg[hi] / deg[lo]) ** 2, rel=0.1)


def test_tp_formula_dominates_amc_by_20ell_factor(g):
    """§3.3.2 Remark: TP needs >= 20ℓ/(1/d(s)+1/d(t))² times more walks."""
    lam = lambda_max_local(g)
    s, t = 0, 200
    d_s, d_t = g.degree(s), g.degree(t)
    eps, delta, tau = 0.2, 0.01, 5
    ell = ell_ours(eps, lam, d_s, d_t)
    amc_walks = 2 * eta_star(
        psi_bound(np.eye(g.n)[s], np.eye(g.n)[t], d_s, d_t, ell),
        eps, tau, delta,
    )
    from repro.core.lengths import ell_peng

    ell_p = ell_peng(eps, lam)
    tp_walks = 2 * ell_p * math.ceil(
        40 * ell_p**2 * math.log(8 * ell_p / delta) / eps**2
    )
    factor = 20 * ell / (1 / d_s + 1 / d_t) ** 2
    assert tp_walks > factor * amc_walks / 10  # order-of-magnitude check
    assert tp_walks > 100 * amc_walks


def test_geer_walk_steps_shrink_vs_amc_empirically(g):
    from repro.core.geer import geer

    lam = lambda_max_local(g)
    s, t = 5, 300
    _, ares = amc_er(g, s, t, 0.1, lam, seed=0)
    gres = geer(g, s, t, 0.1, lam, seed=0)
    assert gres.amc.walk_steps < ares.walk_steps


def test_tp_cost_grows_when_eps_shrinks(g):
    lam = lambda_max_local(g)
    a = tp_er(g, 0, 1, 0.5, lam, sample_factor=1e-3)
    b = tp_er(g, 0, 1, 0.25, lam, sample_factor=1e-3)
    assert b.walks_formula > 3 * a.walks_formula
