"""Tests for the truncation length bounds (Eq. 5 and Eq. 6)."""
import numpy as np
import pytest

from repro.core.lengths import MAX_ELL, ell_ours, ell_peng
from repro.graphs import generators as gen
from repro.graphs.csr import csr_from_edges
from repro.linalg.eigen import lambda_max_local
from repro.linalg.laplacian import exact_er


def test_ours_never_exceeds_peng_for_degrees_ge_1():
    # 2/d(s)+2/d(t) <= 4, so the refined bound is never larger.
    for lam in [0.3, 0.6, 0.9, 0.99]:
        for eps in [0.01, 0.1, 0.5]:
            for ds, dt in [(1, 1), (2, 7), (10, 10), (100, 3)]:
                assert ell_ours(eps, lam, ds, dt) <= ell_peng(eps, lam)


def test_ours_shrinks_with_degree():
    lam, eps = 0.9, 0.1
    l_small = ell_ours(eps, lam, 2, 2)
    l_big = ell_ours(eps, lam, 50, 50)
    assert l_big < l_small


def test_peng_known_value():
    # hand-computed: eps=0.1, lam=0.5 -> log2(4/0.05) - 1 = 5.32 -> 6
    assert ell_peng(0.1, 0.5) == 6


def test_ours_known_value():
    # eps=0.1, lam=0.5, d=4,4 -> log((1)/(0.05))/log(2) - 1 = 3.32 -> 4
    assert ell_ours(0.1, 0.5, 4, 4) == 4


def test_clamps():
    assert ell_ours(10.0, 0.5, 100, 100) == 1  # raw negative -> 1
    assert ell_peng(1e-9, 0.999999) <= MAX_ELL
    assert ell_peng(0.1, 0.0) == 1
    assert ell_ours(0.1, -0.5, 3, 3) == 1


def test_input_validation():
    with pytest.raises(ValueError):
        ell_peng(0.0, 0.5)
    with pytest.raises(ValueError):
        ell_peng(0.1, 1.0)
    with pytest.raises(ValueError):
        ell_ours(0.1, 0.5, 0, 3)


@pytest.mark.parametrize("eps", [0.05, 0.2, 0.5])
def test_truncation_guarantee_theorem_3_1(eps):
    """|r(s,t) - r_ell(s,t)| <= eps/2 with ell from Eq. (6)."""
    g = csr_from_edges(*gen.chung_lu(200, 6.0, seed=11))
    lam = lambda_max_local(g)
    rng = np.random.default_rng(0)
    from repro.core.smm import smm_er

    for _ in range(5):
        s, t = rng.choice(g.n, 2, replace=False)
        s, t = int(s), int(t)
        ell = ell_ours(eps, lam, g.degree(s), g.degree(t))
        r_ell, _ = smm_er(g, s, t, ell)
        assert abs(exact_er(g, s, t) - r_ell) <= eps / 2 + 1e-9


@pytest.mark.parametrize("eps", [0.05, 0.2, 0.5])
def test_truncation_guarantee_peng(eps):
    """Same guarantee for Peng et al.'s generic ell (Eq. 5)."""
    g = csr_from_edges(*gen.erdos_renyi(150, 5.0, seed=12))
    lam = lambda_max_local(g)
    from repro.core.smm import smm_er

    s, t = 3, 77
    ell = ell_peng(eps, lam)
    r_ell, _ = smm_er(g, s, t, ell)
    assert abs(exact_er(g, s, t) - r_ell) <= eps / 2 + 1e-9
