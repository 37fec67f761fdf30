"""Unit tests for the local CSR graph kernel."""
import numpy as np
import pytest

from repro.graphs.csr import csr_from_edges
from repro.graphs import generators as gen


def small_graphs():
    return {
        "triangle": (3, np.array([[0, 1], [1, 2], [0, 2]])),
        "path4": gen.path(4),
        "ring5": gen.ring(5),
        "complete6": gen.complete(6),
        "barbell4": gen.barbell(4),
        "er": gen.erdos_renyi(40, 4.0, seed=1),
        "cl": gen.chung_lu(60, 6.0, seed=2),
    }


@pytest.fixture(params=sorted(small_graphs()))
def graph(request):
    n, edges = small_graphs()[request.param]
    return csr_from_edges(n, edges)


def test_validate_passes(graph):
    graph.validate()


def test_degree_sum_is_2m(graph):
    assert graph.degrees.sum() == 2 * graph.m


def test_neighbors_match_indptr(graph):
    for u in range(graph.n):
        assert len(graph.neighbors(u)) == graph.degree(u)
        assert u not in graph.neighbors(u)  # no self-loops


def test_spmv_matches_dense(graph):
    n = graph.n
    A = np.zeros((n, n))
    src = np.repeat(np.arange(n), graph.degrees)
    A[src, graph.indices] = 1.0
    P = A / graph.degrees[:, None]
    rng = np.random.default_rng(0)
    for _ in range(3):
        x = rng.standard_normal(n)
        np.testing.assert_allclose(graph.spmv(x), P @ x, atol=1e-12)


def test_spmv_row_stochastic(graph):
    ones = np.ones(graph.n)
    np.testing.assert_allclose(graph.spmv(ones), ones, atol=1e-12)


def test_spmv_preserves_stationary(graph):
    pi = graph.degrees / (2 * graph.m)
    np.testing.assert_allclose(graph.spmv_transpose(pi), pi, atol=1e-12)


def test_spmv_transpose_is_adjoint(graph):
    rng = np.random.default_rng(1)
    x, y = rng.standard_normal(graph.n), rng.standard_normal(graph.n)
    np.testing.assert_allclose(y @ graph.spmv(x), x @ graph.spmv_transpose(y), atol=1e-10)


def test_walk_endpoint_distribution_matches_power():
    n, edges = gen.ring(5)
    g = csr_from_edges(n, edges)
    rng = np.random.default_rng(3)
    length, n_walks = 3, 60000
    ends = g.walk_endpoints(0, length, n_walks, rng)
    emp = np.bincount(ends, minlength=n) / n_walks
    x = np.zeros(n)
    x[0] = 1.0
    for _ in range(length):
        x = g.spmv_transpose(x)
    np.testing.assert_allclose(emp, x, atol=0.01)


def test_walks_visit_sums_expectation():
    # E[sum over visited of w] = sum_i (P^T)^i e_s . w  for i=1..L
    n, edges = gen.barbell(3)
    g = csr_from_edges(n, edges)
    rng = np.random.default_rng(4)
    w = np.arange(n, dtype=float)
    L, N = 4, 80000
    sums = g.walks_visit_sums(0, w, L, N, rng)
    x = np.zeros(n)
    x[0] = 1.0
    expect = 0.0
    for _ in range(L):
        x = g.spmv_transpose(x)
        expect += x @ w
    assert abs(sums.mean() - expect) < 0.05 * max(1.0, abs(expect))


def test_walks_zero_length_returns_zeros():
    n, edges = gen.ring(5)
    g = csr_from_edges(n, edges)
    rng = np.random.default_rng(0)
    assert np.all(g.walks_visit_sums(0, np.ones(n), 0, 7, rng) == 0)


def test_walk_until_hit_returns_target_and_predecessor():
    n, edges = gen.path(5)
    g = csr_from_edges(n, edges)
    rng = np.random.default_rng(5)
    hit, steps, pred = g.walk_until_hit(0, (4,), max_steps=10000, rng=rng)
    assert hit == 4
    assert pred in g.neighbors(4)
    assert steps >= 1


def test_walk_until_hit_exhaustion():
    n, edges = gen.barbell(5)
    g = csr_from_edges(n, edges)
    rng = np.random.default_rng(6)
    hit, steps, _ = g.walk_until_hit(0, (9,), max_steps=1, rng=rng)
    assert hit == -1 and steps == 1


def test_csr_rejects_self_loops_and_duplicates():
    with pytest.raises(ValueError):
        csr_from_edges(3, np.array([[0, 0], [1, 2]]))
    with pytest.raises(ValueError):
        csr_from_edges(3, np.array([[0, 1], [1, 0], [1, 2]]))
    with pytest.raises(ValueError):
        csr_from_edges(3, np.empty((0, 2)))
