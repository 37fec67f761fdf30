"""Tests for the spectral-gap solver (substitute for ARPACK)."""
import numpy as np
import pytest

from repro.graphs import generators as gen
from repro.graphs.csr import csr_from_edges
from repro.graphs.spark_graph import SparkGraph
from repro.linalg.eigen import lambda_max_local, lambda_max_spark


def dense_lambda(g) -> float:
    """Reference: max(|λ₂|,|λ_n|) from a dense symmetric eigendecomposition."""
    n = g.n
    A = np.zeros((n, n))
    src = np.repeat(np.arange(n), g.degrees)
    A[src, g.indices] = 1.0
    sd = np.sqrt(g.degrees.astype(float))
    N = A / sd[:, None] / sd[None, :]
    ev = np.sort(np.linalg.eigvalsh(N))
    return float(max(abs(ev[-2]), abs(ev[0])))


GRAPHS = {
    "complete8": gen.complete(8),
    "ring9": gen.ring(9),
    "barbell5": gen.barbell(5),
    "er": gen.erdos_renyi(80, 6.0, seed=1),
    "cl": gen.chung_lu(100, 8.0, seed=2),
    "toy": gen.toy_example()[:2],
}


@pytest.mark.parametrize("name", sorted(GRAPHS))
def test_lambda_local_matches_dense(name):
    g = csr_from_edges(*GRAPHS[name])
    ref = dense_lambda(g)
    got = lambda_max_local(g, tol=1e-9, max_iter=20000)
    assert got == pytest.approx(ref, abs=2e-4)


def test_lambda_in_unit_interval():
    for name in GRAPHS:
        g = csr_from_edges(*GRAPHS[name])
        lam = lambda_max_local(g)
        assert 0.0 <= lam < 1.0  # connected non-bipartite => strictly < 1


def test_complete_graph_lambda_closed_form():
    # K_n: N has eigenvalues 1 and -1/(n-1) (multiplicity n-1).
    n = 10
    g = csr_from_edges(*gen.complete(n))
    assert lambda_max_local(g, tol=1e-10) == pytest.approx(1 / (n - 1), abs=1e-6)


def test_lambda_deterministic_in_seed():
    g = csr_from_edges(*GRAPHS["er"])
    assert lambda_max_local(g, seed=7) == pytest.approx(
        lambda_max_local(g, seed=7), abs=0
    )


@pytest.mark.parametrize("name", ["complete8", "toy"])
def test_lambda_spark_matches_local(spark, name):
    # Distributed variant: same math, checked to a looser tolerance at a
    # bounded iteration count (each iteration is a Spark job).
    g = csr_from_edges(*GRAPHS[name])
    sg = SparkGraph.from_csr(spark, g)
    ref = dense_lambda(g)
    got = lambda_max_spark(sg, tol=1e-5, max_iter=60)
    sg.unpersist()
    assert got == pytest.approx(ref, abs=2e-2)
