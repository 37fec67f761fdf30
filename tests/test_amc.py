"""Tests for AMC (Algorithm 1): bounds, adaptivity, accuracy, backends."""
import math

import numpy as np
import pytest

from repro.core.amc import (
    AMCResult,
    amc,
    amc_er,
    bernstein_error,
    eta_star,
    h_samples,
    psi_bound,
    top_two,
)
from repro.graphs import generators as gen
from repro.graphs.csr import csr_from_edges
from repro.linalg.eigen import lambda_max_local
from repro.linalg.laplacian import exact_er_matrix


@pytest.fixture(scope="module")
def setup():
    g = csr_from_edges(*gen.chung_lu(300, 8.0, seed=31))
    return g, lambda_max_local(g), exact_er_matrix(g)


def test_top_two():
    assert top_two(np.array([3.0, 1.0, 2.0])) == (3.0, 2.0)
    assert top_two(np.array([5.0])) == (5.0, 0.0)
    assert top_two(np.array([2.0, 2.0])) == (2.0, 2.0)


def test_psi_one_hot_closed_form():
    # With one-hot vectors, Eq. 9 reduces to 2*ceil(l/2)*(1/ds + 1/dt).
    n = 10
    s_vec, t_vec = np.eye(n)[0], np.eye(n)[1]
    for ell in [1, 2, 7, 8]:
        psi = psi_bound(s_vec, t_vec, 2, 7, ell)
        assert psi == pytest.approx(2 * math.ceil(ell / 2) * (1 / 2 + 1 / 7))


def test_psi_shrinks_with_smoothed_vectors():
    # §4.1.2: smoothing the vectors shrinks psi and hence eta*.
    n = 50
    one_hot = np.eye(n)[0]
    smooth = np.full(n, 1.0 / n)
    psi_hot = psi_bound(one_hot, one_hot, 5, 5, 10)
    psi_smooth = psi_bound(smooth, smooth, 5, 5, 10)
    assert psi_smooth < psi_hot / 10


def test_eta_star_scaling():
    # eta* ∝ psi^2 / eps^2  (Eq. 8)
    base = eta_star(1.0, 0.1, 5, 0.01)
    assert eta_star(2.0, 0.1, 5, 0.01) == pytest.approx(4 * base, rel=0.01)
    assert eta_star(1.0, 0.05, 5, 0.01) == pytest.approx(4 * base, rel=0.01)
    assert eta_star(0.0, 0.1, 5, 0.01) == 0


def test_bernstein_error_decreases_with_n():
    errs = [bernstein_error(n, 0.5, 2.0, 0.01) for n in [10, 100, 1000, 10000]]
    assert errs == sorted(errs, reverse=True)


def test_bernstein_negative_variance_clamped():
    assert np.isfinite(bernstein_error(10, -1e-18, 1.0, 0.01))


def test_h_samples_vs_eta_star():
    # h = (2^tau - 1) * ceil(eta*/2^(tau-1)) < 2 eta* + 2^tau
    for psi in [0.5, 1.0, 3.0]:
        es = eta_star(psi, 0.2, 5, 0.01)
        h = h_samples(psi, 0.2, 5, 0.01)
        assert es <= h <= 2 * es + 2**5
    assert h_samples(0.0, 0.2, 5, 0.01) == 0


def test_amc_zero_length_noop(setup):
    g, lam, _ = setup
    res = amc(g, 0, 1, np.eye(g.n)[0], np.eye(g.n)[1], 0.1, ell_f=0)
    assert res == AMCResult(0.0, 0, 0, 0, True, 0)


def test_amc_rejects_bad_tau(setup):
    g, _, _ = setup
    with pytest.raises(ValueError):
        amc(g, 0, 1, np.eye(g.n)[0], np.eye(g.n)[1], 0.1, 5, tau=0)


def test_amc_sample_budget_respected(setup):
    # total samples <= (2^tau - 1) * ceil(eta*/2^(tau-1)) ~ 2 eta*
    g, lam, _ = setup
    res = amc(g, 0, 5, np.eye(g.n)[0], np.eye(g.n)[5], 0.3, ell_f=8, tau=4)
    cap = (2**4 - 1) * math.ceil(res.eta_star / 2**3)
    assert 0 < res.samples_used <= cap
    assert res.walk_steps == 2 * res.samples_used * 8


@pytest.mark.parametrize("eps", [0.1, 0.3])
def test_amc_er_accuracy(setup, eps):
    """Theorem 3.4: eps-approximation (delta=0.01; seeds fixed)."""
    g, lam, R = setup
    rng = np.random.default_rng(7)
    for trial in range(6):
        s, t = rng.choice(g.n, 2, replace=False)
        r, res = amc_er(g, int(s), int(t), eps, lam, seed=trial, delta=0.01)
        assert abs(r - R[s, t]) <= eps, (s, t, r, R[s, t])


def test_amc_er_same_node(setup):
    g, lam, _ = setup
    r, _ = amc_er(g, 4, 4, 0.1, lam)
    assert r == 0.0


def test_amc_adaptive_saves_samples(setup):
    """The Bernstein early stop uses far fewer samples than eta*."""
    g, lam, _ = setup
    r, res = amc_er(g, 0, 100, 0.1, lam, tau=5, seed=1)
    assert res.early_stop
    assert res.samples_used < 0.6 * res.eta_star


def test_amc_tau_1_runs_full_batch(setup):
    g, lam, _ = setup
    r, res = amc_er(g, 0, 100, 0.3, lam, tau=1, seed=1)
    assert res.batches_run == 1
    assert res.samples_used >= res.eta_star


def test_amc_deterministic_in_seed(setup):
    g, lam, _ = setup
    r1, _ = amc_er(g, 0, 50, 0.2, lam, seed=9)
    r2, _ = amc_er(g, 0, 50, 0.2, lam, seed=9)
    assert r1 == r2
    r3, _ = amc_er(g, 0, 50, 0.2, lam, seed=10)
    assert r1 != r3


def test_amc_spark_backend_accuracy(spark, setup):
    g, lam, R = setup
    r, res = amc_er(
        g, 0, 100, 0.2, lam, seed=3, backend="spark", spark=spark
    )
    assert abs(r - R[0, 100]) <= 0.2
    assert res.samples_used > 0


def test_amc_failure_rate_statistical():
    """Repeated trials: |error| <= eps in well over 1-delta of runs."""
    g = csr_from_edges(*gen.erdos_renyi(80, 5.0, seed=33))
    lam = lambda_max_local(g)
    R = exact_er_matrix(g)
    s, t = 0, 40
    eps = 0.25
    fails = sum(
        abs(amc_er(g, s, t, eps, lam, seed=k, delta=0.05)[0] - R[s, t]) > eps
        for k in range(40)
    )
    assert fails <= 2  # delta=0.05 -> expect ~0-2 failures in 40
