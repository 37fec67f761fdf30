"""Tests for the competitor implementations (EXACT, MC, MC2, TP, TPC, RP, HAY)."""
import numpy as np
import pytest

from repro.baselines.exact import ExactIndex, exact_query
from repro.baselines.hay import hay_edge_er, wilson_spanning_tree
from repro.baselines.mc import mc_er
from repro.baselines.mc2 import default_gamma, mc2_edge_er
from repro.baselines.rp import RPIndex
from repro.baselines.tp import tp_er
from repro.baselines.tpc import tpc_er
from repro.graphs import generators as gen
from repro.graphs.csr import csr_from_edges
from repro.linalg.eigen import lambda_max_local
from repro.linalg.laplacian import exact_er_matrix


@pytest.fixture(scope="module")
def setup():
    g = csr_from_edges(*gen.chung_lu(120, 6.0, seed=61))
    return g, lambda_max_local(g), exact_er_matrix(g)


def first_edge_pairs(g, k=3):
    pairs = []
    for u in range(g.n):
        for v in g.neighbors(u):
            if u < v:
                pairs.append((u, int(v)))
            if len(pairs) == k:
                return pairs
    return pairs


# ------------------------------------------------------------------ EXACT
def test_exact_matches_ground_truth(setup):
    g, _, R = setup
    idx = ExactIndex(g)
    rng = np.random.default_rng(0)
    for _ in range(10):
        s, t = rng.integers(0, g.n, 2)
        assert idx.query(int(s), int(t)) == pytest.approx(R[s, t], abs=1e-9)
    assert exact_query(g, 1, 2) == pytest.approx(R[1, 2], abs=1e-9)


# --------------------------------------------------------------------- MC
def test_mc_accuracy(setup):
    g, _, R = setup
    s, t = 0, 60
    gamma = 2 * R.max()
    res = mc_er(g, s, t, eps=0.3, gamma=gamma, delta=0.05, seed=1,
                max_walks=20000)
    assert abs(res.r - R[s, t]) <= 0.3
    assert res.walks > 0 and res.total_steps > 0


def test_mc_same_node(setup):
    g, _, _ = setup
    assert mc_er(g, 3, 3, 0.1, gamma=1.0).r == 0.0


def test_mc_escape_probability_identity():
    """On K_4: escape prob s->t before returning to s is 1/(d(s)·r) with
    r = 2/n = 0.5 -> prob = 2/3."""
    g = csr_from_edges(*gen.complete(4))
    res = mc_er(g, 0, 1, eps=0.1, gamma=1.0, seed=2, max_walks=30000)
    assert res.successes / res.walks == pytest.approx(2 / 3, abs=0.02)


# -------------------------------------------------------------------- MC2
def test_mc2_accuracy(setup):
    g, _, R = setup
    for (s, t) in first_edge_pairs(g, 3):
        res = mc2_edge_er(g, s, t, eps=0.15, delta=0.05, seed=3,
                          max_walks=30000)
        assert abs(res.r - R[s, t]) <= 0.15, (s, t)


def test_mc2_rejects_non_edges(setup):
    g, _, _ = setup
    rng = np.random.default_rng(4)
    while True:
        s, t = rng.integers(0, g.n, 2)
        if s != t and t not in g.neighbors(int(s)):
            break
    with pytest.raises(ValueError):
        mc2_edge_er(g, int(s), int(t), 0.1)


def test_mc2_default_gamma_is_lower_bound(setup):
    """The heuristic gamma must lower-bound true edge ER here (DESIGN §3)."""
    g, _, R = setup
    src = np.repeat(np.arange(g.n), g.degrees)
    for u, v in zip(src, g.indices):
        if u < v:
            assert default_gamma(g, int(u), int(v)) <= R[u, v] + 1e-9


# --------------------------------------------------------------------- TP
@pytest.mark.parametrize("eps", [0.3, 0.5])
def test_tp_accuracy_full_constants(setup, eps):
    g, lam, R = setup
    s, t = 2, 80
    res = tp_er(g, s, t, eps, lam, delta=0.05, seed=5)
    assert abs(res.r - R[s, t]) <= eps
    assert res.walks_done == res.walks_formula  # factor 1: unscaled
    assert res.walk_steps > 0


def test_tp_sample_factor_scales_down(setup):
    g, lam, _ = setup
    full = tp_er(g, 0, 1, 0.5, lam, seed=6)
    scaled = tp_er(g, 0, 1, 0.5, lam, seed=6, sample_factor=0.01)
    assert scaled.walks_done < full.walks_done
    assert scaled.walks_formula == full.walks_formula


def test_tp_same_node(setup):
    g, lam, _ = setup
    assert tp_er(g, 4, 4, 0.1, lam).r == 0.0


# -------------------------------------------------------------------- TPC
def test_tpc_accuracy(setup):
    g, lam, R = setup
    s, t = 1, 90
    res = tpc_er(g, s, t, 0.3, lam, seed=7, max_walks_per_len=20000)
    assert abs(res.r - R[s, t]) <= 0.3
    assert res.walks_formula >= res.walks_done


def test_tpc_collision_identity():
    """The 1/d-weighted collision estimator converges to p_i(s,t)/d(t)."""
    from repro.baselines.tpc import _collision

    g = csr_from_edges(*gen.ring(7))
    rng = np.random.default_rng(8)
    s, t, i = 0, 2, 4
    a, b = 2, 2
    N = 150_000
    sa = g.walk_endpoints(s, a, N, rng)
    tb = g.walk_endpoints(t, b, N, rng)
    est = _collision(sa, tb, 1.0 / g.degrees, g.n)
    # exact p_i(s,t): power the transition forward
    x = np.zeros(g.n)
    x[s] = 1.0
    for _ in range(i):
        x = g.spmv_transpose(x)
    assert est == pytest.approx(x[t] / g.degree(t), abs=0.003)


def test_tpc_same_node(setup):
    g, lam, _ = setup
    assert tpc_er(g, 4, 4, 0.1, lam).r == 0.0


# --------------------------------------------------------------------- RP
def test_rp_accuracy(setup):
    g, _, R = setup
    idx = RPIndex(g, eps=0.35, seed=9)
    rng = np.random.default_rng(10)
    errs = []
    for _ in range(20):
        s, t = rng.choice(g.n, 2, replace=False)
        errs.append(abs(idx.query(int(s), int(t)) - R[s, t]) / max(R[s, t], 1e-9))
    # JL guarantee is multiplicative (1 ± eps) w.h.p.
    assert np.median(errs) <= 0.35
    assert max(errs) <= 2 * 0.35


def test_rp_k_formula_and_cap(setup):
    g, _, _ = setup
    import math

    idx = RPIndex(g, eps=0.5, seed=0)
    assert idx.k == math.ceil(24 * math.log(g.n) / 0.25)
    assert not idx.k_capped
    capped = RPIndex(g, eps=0.5, seed=0, max_k=10)
    assert capped.k == 10 and capped.k_capped


# -------------------------------------------------------------------- HAY
def test_wilson_tree_is_spanning_tree(setup):
    g, _, _ = setup
    rng = np.random.default_rng(11)
    parent, steps = wilson_spanning_tree(g, rng, root=0)
    assert parent[0] == -1
    assert (parent[1:] >= 0).all()
    assert steps > 0
    # every parent pointer is a real graph edge, and all nodes reach root
    for u in range(1, g.n):
        assert parent[u] in g.neighbors(u)
        v, hops = u, 0
        while parent[v] != -1:
            v = parent[v]
            hops += 1
            assert hops <= g.n
        assert v == 0


def test_wilson_uniformity_on_cycle():
    """On C_n every spanning tree omits exactly one edge uniformly, so
    each edge's UST-membership probability is (n-1)/n."""
    n = 5
    edges = np.stack([np.arange(n), (np.arange(n) + 1) % n], axis=1)
    g = csr_from_edges(n, edges)
    rng = np.random.default_rng(12)
    count = 0
    trials = 4000
    for _ in range(trials):
        parent, _ = wilson_spanning_tree(g, rng)
        count += parent[0] == 1 or parent[1] == 0
    assert count / trials == pytest.approx((n - 1) / n, abs=0.02)


def test_hay_accuracy(setup):
    g, _, R = setup
    for (s, t) in first_edge_pairs(g, 2):
        res = hay_edge_er(g, s, t, eps=0.1, delta=0.05, seed=13)
        assert abs(res.r - R[s, t]) <= 0.1, (s, t)
        assert res.trees > 0


def test_hay_rejects_non_edges(setup):
    g, _, _ = setup
    with pytest.raises(ValueError):
        # nodes 0 and the last node are non-adjacent in this graph
        candidates = [v for v in range(g.n) if v not in g.neighbors(0) and v != 0]
        hay_edge_er(g, 0, candidates[-1], 0.1)
