"""Property-based tests (hypothesis) over random small graphs."""
import numpy as np
import pytest
from hypothesis import given, settings, strategies as st

from repro.core.amc import bernstein_error, eta_star, psi_bound, top_two
from repro.core.lengths import ell_ours, ell_peng
from repro.core.smm import smm_local
from repro.graphs import generators as gen
from repro.graphs.csr import csr_from_edges
from repro.linalg.eigen import lambda_max_local
from repro.linalg.laplacian import exact_er_matrix


def random_graph(n: int, avg_deg: float, seed: int):
    return csr_from_edges(*gen.erdos_renyi(n, avg_deg, seed=seed))


graphs = st.builds(
    random_graph,
    n=st.integers(8, 40),
    avg_deg=st.floats(2.5, 6.0),
    seed=st.integers(0, 10_000),
)


@settings(max_examples=25, deadline=None)
@given(g=graphs)
def test_er_matrix_invariants(g):
    R = exact_er_matrix(g)
    assert np.allclose(R, R.T, atol=1e-8)
    assert np.allclose(np.diag(R), 0, atol=1e-8)
    assert (R >= -1e-9).all()
    # Foster's theorem
    src = np.repeat(np.arange(g.n), g.degrees)
    assert R[src, g.indices].sum() / 2 == pytest.approx(g.n - 1, abs=1e-5)


@settings(max_examples=25, deadline=None)
@given(g=graphs)
def test_spmv_stochastic_property(g):
    assert np.allclose(g.spmv(np.ones(g.n)), 1.0, atol=1e-12)
    pi = g.degrees / (2 * g.m)
    assert np.allclose(g.spmv_transpose(pi), pi, atol=1e-12)


@settings(max_examples=25, deadline=None)
@given(g=graphs)
def test_lambda_strictly_below_one(g):
    lam = lambda_max_local(g, tol=1e-8)
    assert 0.0 <= lam < 1.0


@settings(max_examples=15, deadline=None)
@given(g=graphs, ell=st.integers(1, 12))
def test_smm_truncation_spectral_bound(g, ell):
    # Theorem 3.1's inner bound: |r - r_ell| <= λ^{ell+1}/(1-λ)·(1/ds+1/dt)
    # (note: partial sums can overshoot r — odd-i terms are negative when
    # P has negative eigenvalues — so only this two-sided bound is valid)
    R = exact_er_matrix(g)
    s, t = 0, g.n - 1
    res = smm_local(g, s, t, ell)
    lam = lambda_max_local(g, tol=1e-9)
    bound = lam ** (ell + 1) / (1 - lam) * (1 / g.degree(s) + 1 / g.degree(t))
    assert abs(res.r_b - R[s, t]) <= bound + 1e-6


@settings(max_examples=50, deadline=None)
@given(
    eps=st.floats(0.01, 1.0),
    lam=st.floats(0.01, 0.995),
    ds=st.integers(1, 500),
    dt=st.integers(1, 500),
)
def test_ell_ours_never_exceeds_peng(eps, lam, ds, dt):
    assert 1 <= ell_ours(eps, lam, ds, dt) <= ell_peng(eps, lam)


@settings(max_examples=50, deadline=None)
@given(
    x=st.lists(st.floats(0, 1e6), min_size=1, max_size=50),
)
def test_top_two_property(x):
    arr = np.array(x)
    m1, m2 = top_two(arr)
    s = sorted(x, reverse=True)
    assert m1 == s[0]
    if len(x) > 1:
        assert m2 == s[1]


@settings(max_examples=50, deadline=None)
@given(
    psi=st.floats(1e-6, 100),
    eps=st.floats(0.01, 1.0),
    tau=st.integers(1, 10),
)
def test_eta_star_positive_and_monotone_in_psi(psi, eps, tau):
    a = eta_star(psi, eps, tau, 0.01)
    b = eta_star(2 * psi, eps, tau, 0.01)
    assert 0 < a <= b


@settings(max_examples=50, deadline=None)
@given(
    n=st.integers(1, 10**6),
    var=st.floats(0, 100),
    psi=st.floats(0, 100),
)
def test_bernstein_error_nonnegative(n, var, psi):
    assert bernstein_error(n, var, psi, 0.01) >= 0


@settings(max_examples=20, deadline=None)
@given(g=graphs, ell=st.integers(1, 10))
def test_psi_bounds_zk(g, ell):
    """ψ/2 really bounds |Z_k| (Lemma 3.3) on sampled walks."""
    rng = np.random.default_rng(0)
    s, t = 0, g.n // 2
    if s == t:
        return
    sv = np.eye(g.n)[s]
    tv = np.eye(g.n)[t]
    d_s, d_t = g.degree(s), g.degree(t)
    psi = psi_bound(sv, tv, d_s, d_t, ell)
    w = sv / d_s - tv / d_t
    zs = g.walks_visit_sums(s, w, ell, 200, rng)
    zt = g.walks_visit_sums(t, w, ell, 200, rng)
    assert np.abs(zs - zt).max() <= psi / 2 + 1e-12
