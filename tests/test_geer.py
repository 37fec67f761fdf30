"""Tests for GEER (Algorithm 3): accuracy, switch rule, backends."""
import numpy as np
import pytest

from repro.core.amc import amc_er
from repro.core.geer import geer
from repro.graphs import generators as gen
from repro.graphs.csr import csr_from_edges
from repro.graphs.spark_graph import SparkGraph
from repro.linalg.eigen import lambda_max_local
from repro.linalg.laplacian import exact_er_matrix


@pytest.fixture(scope="module")
def setup():
    g = csr_from_edges(*gen.chung_lu(400, 10.0, seed=51))
    return g, lambda_max_local(g), exact_er_matrix(g)


@pytest.mark.parametrize("eps", [0.1, 0.3])
def test_geer_accuracy(setup, eps):
    g, lam, R = setup
    rng = np.random.default_rng(1)
    for trial in range(6):
        s, t = rng.choice(g.n, 2, replace=False)
        res = geer(g, int(s), int(t), eps, lam, seed=trial)
        assert abs(res.r - R[s, t]) <= eps, (s, t, res.r, R[s, t])


def test_geer_same_node(setup):
    g, lam, _ = setup
    assert geer(g, 7, 7, 0.1, lam).r == 0.0


def test_geer_consistency_r_equals_rb_plus_rf(setup):
    g, lam, _ = setup
    res = geer(g, 0, 200, 0.2, lam, seed=2)
    assert res.r == pytest.approx(res.r_b + res.amc.r_f, abs=1e-12)
    assert 0 <= res.ell_b <= res.ell


def test_geer_switch_reduces_samples_vs_amc(setup):
    """§4.1.2: GEER's AMC stage needs far fewer samples than plain AMC."""
    g, lam, _ = setup
    s, t = 0, 200
    _, amc_res = amc_er(g, s, t, 0.1, lam, seed=3)
    geer_res = geer(g, s, t, 0.1, lam, seed=3)
    assert geer_res.amc.samples_used < amc_res.samples_used
    assert geer_res.amc.eta_star < amc_res.eta_star


def test_geer_runs_at_least_one_smm_iteration(setup):
    # Algorithm 3 is repeat-until: ell_b >= 1 whenever ell >= 1.
    g, lam, _ = setup
    res = geer(g, 1, 300, 0.2, lam, seed=4)
    assert res.ell_b >= 1
    assert res.spmv_ops > 0


def test_geer_forced_ell_b(setup):
    g, lam, _ = setup
    for forced in [0, 2, 5]:
        res = geer(g, 0, 100, 0.2, lam, seed=5, forced_ell_b=forced)
        assert res.ell_b == forced
    # forcing ell_b = 0 degrades GEER to pure AMC (plus the i=0 term)
    res0 = geer(g, 0, 100, 0.2, lam, seed=5, forced_ell_b=0)
    r_amc, _ = amc_er(g, 0, 100, 0.2, lam, seed=5)
    assert res0.r == pytest.approx(r_amc, abs=1e-12)


def test_geer_forced_beyond_ell_makes_amc_noop(setup):
    g, lam, R = setup
    res = geer(g, 0, 100, 0.3, lam, seed=6, forced_ell_b=geer(
        g, 0, 100, 0.3, lam, seed=6
    ).ell + 3)
    assert res.amc.samples_used == 0
    assert abs(res.r - R[0, 100]) <= 0.3


def test_geer_optimal_switch_cheaper_than_extremes(setup):
    """The Eq. 17 switch point's total cost (ops + walk steps) beats
    forcing ell_b to 0 (pure AMC) — the Fig. 10 phenomenon."""
    g, lam, _ = setup
    s, t = 3, 350
    auto = geer(g, s, t, 0.1, lam, seed=7)
    forced0 = geer(g, s, t, 0.1, lam, seed=7, forced_ell_b=0)
    cost_auto = auto.spmv_ops + auto.amc.walk_steps
    cost0 = forced0.spmv_ops + forced0.amc.walk_steps
    assert cost_auto < cost0


def test_geer_deterministic(setup):
    g, lam, _ = setup
    a = geer(g, 0, 111, 0.2, lam, seed=8)
    b = geer(g, 0, 111, 0.2, lam, seed=8)
    assert a.r == b.r and a.ell_b == b.ell_b


def test_geer_spark_backend(spark, setup):
    g, lam, R = setup
    sg = SparkGraph.from_csr(spark, g)
    res = geer(
        g, 0, 200, 0.25, lam, seed=9, backend="spark", spark=spark, sg=sg
    )
    assert abs(res.r - R[0, 200]) <= 0.25
    assert res.ell_b >= 1
    sg.unpersist()


def test_geer_spark_switch_matches_local(spark, setup):
    """Same query, both backends: same ell (deterministic) and both
    within eps of truth; switch points agree (same rule, same inputs)."""
    g, lam, R = setup
    sg = SparkGraph.from_csr(spark, g)
    loc = geer(g, 5, 250, 0.3, lam, seed=10)
    dist = geer(
        g, 5, 250, 0.3, lam, seed=10, backend="spark", spark=spark, sg=sg
    )
    assert dist.ell == loc.ell
    assert dist.ell_b == loc.ell_b
    assert dist.r_b == pytest.approx(loc.r_b, abs=1e-9)
    sg.unpersist()
