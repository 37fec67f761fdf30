"""Tests for the synthetic graph generators (dataset substitutes)."""
import numpy as np
import pytest

from repro.graphs import generators as gen
from repro.graphs.csr import csr_from_edges


def _is_connected(g) -> bool:
    seen = np.zeros(g.n, dtype=bool)
    stack = [0]
    seen[0] = True
    while stack:
        u = stack.pop()
        for v in g.neighbors(u):
            if not seen[v]:
                seen[v] = True
                stack.append(int(v))
    return bool(seen.all())


def _is_bipartite(g) -> bool:
    color = -np.ones(g.n, dtype=int)
    for s in range(g.n):
        if color[s] >= 0:
            continue
        color[s] = 0
        stack = [s]
        while stack:
            u = stack.pop()
            for v in g.neighbors(u):
                if color[v] < 0:
                    color[v] = 1 - color[u]
                    stack.append(int(v))
                elif color[v] == color[u]:
                    return False
    return True


ALL_DATASETS = sorted(gen.DATASET_SPECS)


@pytest.mark.parametrize("name", ALL_DATASETS)
def test_dataset_lite_connected_nonbipartite(name):
    g = gen.dataset_lite_csr(name)
    g.validate()
    assert _is_connected(g), f"{name} not connected"
    assert not _is_bipartite(g), f"{name} bipartite"


@pytest.mark.parametrize("name", ALL_DATASETS)
def test_dataset_lite_avg_degree_matches_paper_regime(name):
    spec = gen.DATASET_SPECS[name]
    g = gen.dataset_lite_csr(name)
    avg = 2 * g.m / g.n
    # within 25% of the paper dataset's average degree
    assert abs(avg - spec["avg_degree"]) / spec["avg_degree"] < 0.25


@pytest.mark.parametrize("name", ALL_DATASETS)
def test_dataset_lite_deterministic(name):
    n1, e1 = gen.dataset_lite(name, seed=42)
    n2, e2 = gen.dataset_lite(name, seed=42)
    assert n1 == n2
    np.testing.assert_array_equal(e1, e2)


def test_dataset_lite_seed_changes_graph():
    _, e1 = gen.dataset_lite("dblp_lite", seed=1)
    _, e2 = gen.dataset_lite("dblp_lite", seed=2)
    assert e1.shape != e2.shape or not np.array_equal(e1, e2)


def test_chung_lu_heavy_tail():
    g = csr_from_edges(*gen.chung_lu(2000, 10.0, seed=0))
    d = g.degrees
    # power-law-ish: max degree far above average, like social graphs
    assert d.max() > 5 * d.mean()


@pytest.mark.parametrize(
    "maker",
    [
        lambda: gen.erdos_renyi(100, 5.0, seed=0),
        lambda: gen.barabasi_albert(100, 3, seed=0),
        lambda: gen.ring(9),
        lambda: gen.path(12),
        lambda: gen.complete(8),
        lambda: gen.barbell(5),
    ],
    ids=["er", "ba", "ring", "path", "complete", "barbell"],
)
def test_basic_generators_valid(maker):
    n, edges = maker()
    g = csr_from_edges(n, edges)
    g.validate()
    assert _is_connected(g)
    assert not _is_bipartite(g)


def test_toy_example_degrees():
    n, edges, s, t = gen.toy_example()
    g = csr_from_edges(n, edges)
    g.validate()
    assert n == 11
    assert g.degree(s) == 2
    assert g.degree(t) == 7
    assert _is_connected(g)
    assert not _is_bipartite(g)


def test_complete_graph_edge_count():
    n, edges = gen.complete(7)
    assert len(edges) == 7 * 6 // 2


def test_ba_min_degree():
    n, edges = gen.barabasi_albert(50, 3, seed=1)
    g = csr_from_edges(n, edges)
    assert g.degrees.min() >= 3 - 1  # dedupe may drop at most the triangle fix
