"""Tests for the walk samplers: unbiasedness, backend agreement, and the
DataFrame-join stepper cross-check."""
import numpy as np
import pytest

from repro.core import walks
from repro.graphs import generators as gen
from repro.graphs.csr import csr_from_edges
from repro.graphs.spark_graph import SparkGraph
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def g():
    return csr_from_edges(*gen.chung_lu(80, 6.0, seed=21))


def exact_q(g, s, t, weight, ell_f):
    """q(s,t) of Eq. (12) by exact forward propagation."""
    xs = np.zeros(g.n)
    xt = np.zeros(g.n)
    xs[s], xt[t] = 1.0, 1.0
    total = 0.0
    for _ in range(ell_f):
        xs = g.spmv_transpose(xs)
        xt = g.spmv_transpose(xt)
        total += (xs - xt) @ weight
    return total


def test_make_weight():
    s_vec = np.array([1.0, 0.0, 0.5])
    t_vec = np.array([0.0, 2.0, 0.5])
    w = walks.make_weight(s_vec, t_vec, 2, 4)
    np.testing.assert_allclose(w, [0.5, -0.5, 0.125])


def test_local_sampler_unbiased(g):
    s, t = 0, 40
    rng = np.random.default_rng(5)
    w = walks.make_weight(
        np.eye(g.n)[s], np.eye(g.n)[t], g.degree(s), g.degree(t)
    )
    ell_f, eta = 5, 200_000
    z_sum, z2_sum, cnt = walks.sample_batch_local(g, s, t, w, ell_f, eta, rng)
    assert cnt == eta
    q = exact_q(g, s, t, w, ell_f)
    se = np.sqrt(max(z2_sum / cnt - (z_sum / cnt) ** 2, 0) / cnt)
    assert abs(z_sum / cnt - q) < 6 * se + 1e-4


def test_local_sampler_z2_consistent(g):
    rng = np.random.default_rng(6)
    w = np.zeros(g.n)  # zero weight -> all Z_k = 0
    z_sum, z2_sum, cnt = walks.sample_batch_local(g, 0, 1, w, 4, 100, rng)
    assert z_sum == 0.0 and z2_sum == 0.0 and cnt == 100


def test_chunk_plan_covers_eta():
    for eta in [1, 100, walks.CHUNK_SIZE, walks.CHUNK_SIZE + 1, 10_000]:
        plan = walks._chunk_plan(eta, seed=3)
        assert plan["n_walks"].sum() == eta
        assert (plan["n_walks"] > 0).all()
        # deterministic
        plan2 = walks._chunk_plan(eta, seed=3)
        assert plan.equals(plan2)


def test_spark_sampler_matches_exact_q(spark, g):
    s, t = 2, 60
    g_bc = walks.broadcast_graph(spark, g)
    w = walks.make_weight(
        np.eye(g.n)[s], np.eye(g.n)[t], g.degree(s), g.degree(t)
    )
    w_bc = walks.broadcast_vector(spark, w)
    ell_f, eta = 4, 60_000
    z_sum, z2_sum, cnt = walks.sample_batch_spark(
        spark, g_bc, s, t, w_bc, ell_f, eta, seed=9
    )
    assert cnt == eta
    q = exact_q(g, s, t, w, ell_f)
    se = np.sqrt(max(z2_sum / cnt - (z_sum / cnt) ** 2, 0) / cnt)
    assert abs(z_sum / cnt - q) < 6 * se + 1e-4


def test_spark_sampler_deterministic(spark, g):
    g_bc = walks.broadcast_graph(spark, g)
    w_bc = walks.broadcast_vector(spark, np.linspace(0, 1, g.n))
    a = walks.sample_batch_spark(spark, g_bc, 0, 1, w_bc, 3, 5000, seed=4)
    b = walks.sample_batch_spark(spark, g_bc, 0, 1, w_bc, 3, 5000, seed=4)
    assert a == b
    c = walks.sample_batch_spark(spark, g_bc, 0, 1, w_bc, 3, 5000, seed=5)
    assert a != c


def test_dataframe_join_stepper_distribution(spark):
    """The pure-DataFrame walk stepper's endpoint histogram matches the
    transition-power distribution (tiny graph, chi-square-style bound)."""
    n, edges = gen.ring(6)
    g = csr_from_edges(n, edges)
    sg = SparkGraph.from_csr(spark, g)
    length, n_walks = 3, 40_000
    hist = walks.walk_endpoint_counts_spark(sg, 0, length, n_walks, seed=8)
    total = hist.agg({"cnt": "sum"}).collect()[0][0]
    assert total == n_walks  # every walker stepped every round
    x = np.zeros(n)
    x[0] = 1.0
    for _ in range(length):
        x = g.spmv_transpose(x)
    got = {r["node"]: r["cnt"] / n_walks for r in hist.collect()}
    for v in range(n):
        assert abs(got.get(v, 0.0) - x[v]) < 0.015
    sg.unpersist()


def test_dataframe_join_stepper_oracle(spark):
    """One DataFrame-join step == the equivalent SQL over edges (DuckDB)."""
    n, edges = gen.complete(5)
    g = csr_from_edges(n, edges)
    sg = SparkGraph.from_csr(spark, g)
    out = walks.walk_endpoint_counts_spark(sg, 0, 1, 999, seed=1)
    # After one step from node 0 on K5, endpoints are exactly 0's neighbors;
    # check the support via SQL (counts are random, support is not).
    import pandas as pd

    support = out.select("node").distinct()
    assert_equivalent(
        support,
        "SELECT DISTINCT dst AS node FROM edges WHERE src = 0",
        edges=sg.edges_pdf(),
    )
    sg.unpersist()
