"""Tests for SMM (Algorithm 2): local + Spark backends, DuckDB oracle."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.smm import smm_er, smm_local, smm_spark, spmv_spark
from repro.graphs import generators as gen
from repro.graphs.csr import csr_from_edges
from repro.graphs.spark_graph import SparkGraph
from repro.linalg.eigen import lambda_max_local
from repro.linalg.laplacian import exact_er_matrix
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def g():
    return csr_from_edges(*gen.chung_lu(150, 7.0, seed=41))


@pytest.fixture(scope="module")
def sg(spark, g):
    graph = SparkGraph.from_csr(spark, g)
    yield graph
    graph.unpersist()


def test_smm_vectors_are_pullback_probabilities(g):
    # Eq. (15): after i iterations, s*(v) = p_i(v, s).
    s, t = 0, 10
    res = smm_local(g, s, t, ell_b=4)
    # p_i(v, s) = (P^i e_s)(v)
    x = np.zeros(g.n)
    x[s] = 1.0
    for _ in range(4):
        x = g.spmv(x)
    np.testing.assert_allclose(res.s_vec, x, atol=1e-12)
    assert np.all(res.s_vec >= 0)
    # column sum is not 1 (rows of P^i are), but values stay in [0,1]
    assert res.s_vec.max() <= 1.0 + 1e-12


def test_smm_truncated_sum_matches_eq4(g):
    # r_b after ell_b iterations == the Eq. (4) partial sum via powers.
    s, t = 3, 99
    ds, dt = g.degree(s), g.degree(t)
    res = smm_local(g, s, t, ell_b=6)
    xs, xt = np.eye(g.n)[s], np.eye(g.n)[t]
    acc = 0.0
    for _ in range(7):  # i = 0..6
        acc += xs[s] / ds + xt[t] / dt - xs[t] / ds - xt[s] / dt
        xs, xt = g.spmv(xs), g.spmv(xt)
    assert res.r_b == pytest.approx(acc, abs=1e-12)


def test_smm_converges_to_exact(g):
    R = exact_er_matrix(g)
    s, t = 1, 50
    r, _ = smm_er(g, s, t, ell_b=800)
    assert r == pytest.approx(R[s, t], abs=1e-6)


def test_smm_truncation_error_shrinks_geometrically(g):
    # Theorem 3.1: |r - r_ell| <= λ^{ell+1}/(1-λ)·(1/ds+1/dt) for every ell.
    s, t = 2, 70
    lam = lambda_max_local(g, tol=1e-9)
    R = exact_er_matrix(g)
    coeff = (1 / g.degree(s) + 1 / g.degree(t)) / (1 - lam)
    for ell in [1, 4, 16, 64, 256]:
        v, _ = smm_er(g, s, t, ell_b=ell)
        assert abs(v - R[s, t]) <= lam ** (ell + 1) * coeff + 1e-9


def test_smm_same_node(g):
    r, _ = smm_er(g, 5, 5, ell_b=10)
    assert r == 0.0


def test_smm_ops_counted(g):
    res = smm_local(g, 0, 1, ell_b=3)
    assert res.spmv_ops > 0
    # first iteration touches exactly d(s)+d(t) edges
    res1 = smm_local(g, 0, 1, ell_b=1)
    assert res1.spmv_ops == g.degree(0) + g.degree(1)


def test_spmv_spark_matches_numpy(spark, g, sg):
    rng = np.random.default_rng(2)
    x = rng.random(g.n)
    y = rng.random(g.n)
    vec = spark.createDataFrame(
        pd.DataFrame({"node": np.arange(g.n), "sval": x, "tval": y})
    )
    out = spmv_spark(sg, vec).toPandas().sort_values("node")
    np.testing.assert_allclose(out["sval"].to_numpy(), g.spmv(x), atol=1e-10)
    np.testing.assert_allclose(out["tval"].to_numpy(), g.spmv(y), atol=1e-10)


def test_spmv_spark_matches_duckdb_oracle(spark, g, sg):
    """The DataFrame SpMV equals the equivalent SQL join-aggregate."""
    rng = np.random.default_rng(3)
    x = rng.random(g.n)
    vec_pdf = pd.DataFrame({"node": np.arange(g.n), "sval": x, "tval": 0.0})
    vec = spark.createDataFrame(vec_pdf)
    out = spmv_spark(sg, vec).select("node", "sval")
    assert_equivalent(
        out,
        """
        SELECT e.src AS node, sum(v.sval) / d.degree AS sval
        FROM edges e
        JOIN vec v ON v.node = e.dst
        JOIN (SELECT src AS node, count(*) AS degree FROM edges GROUP BY src) d
          ON d.node = e.src
        GROUP BY e.src, d.degree
        """,
        edges=sg.edges_pdf(),
        vec=vec_pdf,
    )


def test_smm_spark_matches_local(spark, g, sg):
    s, t = 0, 30
    loc = smm_local(g, s, t, ell_b=5)
    dist = smm_spark(sg, s, t, ell_b=5)
    assert dist.r_b == pytest.approx(loc.r_b, abs=1e-9)
    np.testing.assert_allclose(dist.s_vec, loc.s_vec, atol=1e-10)
    np.testing.assert_allclose(dist.t_vec, loc.t_vec, atol=1e-10)
    assert dist.spmv_ops == loc.spmv_ops


def test_smm_er_accuracy_guarantee(g):
    # With ell_b = ell(eps) from Eq. 6, SMM is an eps-approximation.
    from repro.core.lengths import ell_ours

    lam = lambda_max_local(g)
    R = exact_er_matrix(g)
    for (s, t) in [(0, 20), (5, 140), (33, 77)]:
        eps = 0.1
        ell = ell_ours(eps, lam, g.degree(s), g.degree(t))
        r, _ = smm_er(g, s, t, ell)
        assert abs(r - R[s, t]) <= eps / 2 + 1e-9
