"""Ground-truth tests: exact effective resistance and CG solver."""
import numpy as np
import pytest

from repro.graphs import generators as gen
from repro.graphs.csr import csr_from_edges
from repro.linalg.laplacian import (
    exact_er,
    exact_er_matrix,
    laplacian_dense,
    pinv_laplacian,
    solve_laplacian_cg,
)


@pytest.fixture(scope="module")
def er_graph():
    return csr_from_edges(*gen.erdos_renyi(60, 5.0, seed=3))


def test_laplacian_rows_sum_zero(er_graph):
    L = laplacian_dense(er_graph)
    np.testing.assert_allclose(L.sum(axis=1), 0.0, atol=1e-12)
    np.testing.assert_allclose(L, L.T)


def test_pinv_matches_numpy_pinv(er_graph):
    L = laplacian_dense(er_graph)
    np.testing.assert_allclose(
        pinv_laplacian(er_graph), np.linalg.pinv(L), atol=1e-8
    )


def test_exact_er_path_graph_series_law():
    # On a tree, ER = path length (resistors in series).
    n = 6
    edges = np.stack([np.arange(n - 1), np.arange(1, n)], axis=1)
    g = csr_from_edges(n, edges)
    R = exact_er_matrix(g)
    for s in range(n):
        for t in range(n):
            assert R[s, t] == pytest.approx(abs(s - t), abs=1e-9)


def test_exact_er_cycle_parallel_law():
    # C_n: two parallel paths of length k and n-k -> r = k(n-k)/n.
    n = 7
    edges = np.stack([np.arange(n), (np.arange(n) + 1) % n], axis=1)
    g = csr_from_edges(n, edges)
    R = exact_er_matrix(g)
    for k in range(1, n):
        assert R[0, k] == pytest.approx(k * (n - k) / n, abs=1e-9)


def test_exact_er_complete_graph():
    n = 9
    g = csr_from_edges(*gen.complete(n))
    R = exact_er_matrix(g)
    off = R[~np.eye(n, dtype=bool)]
    np.testing.assert_allclose(off, 2.0 / n, atol=1e-9)


def test_er_is_metric(er_graph):
    R = exact_er_matrix(er_graph)
    n = er_graph.n
    assert np.allclose(np.diag(R), 0.0, atol=1e-9)
    assert np.allclose(R, R.T, atol=1e-9)
    rng = np.random.default_rng(0)
    for _ in range(200):
        a, b, c = rng.integers(0, n, 3)
        assert R[a, c] <= R[a, b] + R[b, c] + 1e-9


def test_fosters_theorem(er_graph):
    # Sum of ER over edges equals n - 1.
    R = exact_er_matrix(er_graph)
    g = er_graph
    src = np.repeat(np.arange(g.n), g.degrees)
    total = R[src, g.indices].sum() / 2  # each edge counted twice
    assert total == pytest.approx(g.n - 1, abs=1e-6)


def test_edge_er_bounds(er_graph):
    # 1/(2m) <= r(s,t) <= 1 for every edge (Lemma 6.5 in [45]).
    R = exact_er_matrix(er_graph)
    g = er_graph
    src = np.repeat(np.arange(g.n), g.degrees)
    vals = R[src, g.indices]
    assert vals.min() >= 1 / (2 * g.m) - 1e-12
    assert vals.max() <= 1 + 1e-12


def test_exact_er_single_pair_matches_matrix(er_graph):
    R = exact_er_matrix(er_graph)
    rng = np.random.default_rng(1)
    for _ in range(10):
        s, t = rng.integers(0, er_graph.n, 2)
        assert exact_er(er_graph, int(s), int(t)) == pytest.approx(
            R[s, t], abs=1e-8
        )
    assert exact_er(er_graph, 3, 3) == 0.0


def test_cg_solves_laplacian(er_graph):
    L = laplacian_dense(er_graph)
    rng = np.random.default_rng(2)
    b = rng.standard_normal(er_graph.n)
    b -= b.mean()
    x = solve_laplacian_cg(er_graph, b)
    np.testing.assert_allclose(L @ x, b, atol=1e-7)
    assert abs(x.mean()) < 1e-10


def test_er_series_representation_matches_pinv():
    # Eq. (3): r(s,t) = sum_i p_i(s,s)/d(s)+p_i(t,t)/d(t)-p_i(s,t)/d(t)-p_i(t,s)/d(s)
    g = csr_from_edges(*gen.erdos_renyi(30, 4.0, seed=5))
    R = exact_er_matrix(g)
    s, t = 0, g.n // 2
    es, et = np.zeros(g.n), np.zeros(g.n)
    es[s] = 1.0
    et[t] = 1.0
    xs, xt = es.copy(), et.copy()
    acc = 0.0
    ds, dt = g.degree(s), g.degree(t)
    for i in range(4000):
        acc += xs[s] / ds + xt[t] / dt - xs[t] / ds - xt[s] / dt
        xs, xt = g.spmv(xs), g.spmv(xt)
    assert acc == pytest.approx(R[s, t], abs=1e-5)
