"""Unit tests for the experiment harness and table builders."""
import math

import numpy as np
import pandas as pd
import pytest

from repro.experiments import harness, tables
from repro.experiments.paper_numbers import FIG2_TABLE, TABLE3
from repro.graphs import generators as gen


@pytest.fixture(scope="module")
def ds():
    # small custom dataset to keep harness tests fast
    d = harness.Dataset.load("facebook_lite")
    return d


def test_random_pairs_valid(ds):
    pairs = harness.random_pairs(ds.g, 20, seed=1)
    assert len(pairs) == 20
    assert all(s != t and 0 <= s < ds.g.n and 0 <= t < ds.g.n for s, t in pairs)
    assert pairs == harness.random_pairs(ds.g, 20, seed=1)
    assert pairs != harness.random_pairs(ds.g, 20, seed=2)


def test_edge_pairs_are_edges(ds):
    pairs = harness.edge_pairs(ds.g, 20, seed=1)
    assert len(pairs) == 20
    for s, t in pairs:
        assert t in ds.g.neighbors(s)
    assert len(set(pairs)) == 20  # sampled without replacement


def test_run_method_basic(ds):
    pairs = harness.random_pairs(ds.g, 2, seed=0)
    for method in ["GEER", "AMC", "SMM"]:
        run = harness.run_method(method, ds, pairs, eps=0.3)
        assert not run.timed_out
        assert run.avg_time_ms > 0
        assert run.avg_abs_err <= 0.3
        assert run.n_queries == 2


def test_run_method_exact_and_rp(ds):
    pairs = harness.random_pairs(ds.g, 2, seed=0)
    ex = harness.run_method("EXACT", ds, pairs, eps=0.3)
    assert ex.avg_abs_err < 1e-8
    rp = harness.run_method("RP", ds, pairs, eps=0.5)
    assert rp.avg_abs_err is not None
    assert "amortized" in rp.note


def test_run_method_unknown_raises(ds):
    with pytest.raises(ValueError):
        harness.run_method("NOPE", ds, harness.random_pairs(ds.g, 1), 0.3)


def test_run_method_probe_extrapolates(ds):
    """TPC's unscaled formula is infeasible -> probe + extrapolated note."""
    pairs = harness.random_pairs(ds.g, 1, seed=0)
    run = harness.run_method("TPC", ds, pairs, eps=0.05, step_budget=1e5)
    assert "extrapolated" in run.note
    assert run.avg_time_ms is not None and run.avg_time_ms > 0
    assert not run.timed_out


def test_run_method_wall_budget(ds):
    pairs = harness.random_pairs(ds.g, 3, seed=0)
    run = harness.run_method("AMC", ds, pairs, eps=0.05, budget_s=0.0)
    assert run.timed_out


def test_predictors_scale_inversely_with_eps(ds):
    s, t = harness.random_pairs(ds.g, 1, seed=0)[0]
    for fn in [
        lambda e: harness._predict_tp_steps(ds, e, 0.01),
        lambda e: harness._predict_tpc_steps(ds, s, t, e, 0.01),
        lambda e: harness._predict_mc_steps(ds, s, t, e, 0.01, 1.0),
        lambda e: harness._predict_mc2_steps(ds, s, t, e, 0.01),
        lambda e: harness._predict_hay_steps(ds, e, 0.01),
    ]:
        assert fn(0.05) > fn(0.1) > 0


def test_to_markdown():
    df = pd.DataFrame({"a": [1.23456, float("nan")], "b": ["x", "y"]})
    md = tables.to_markdown(df)
    lines = md.splitlines()
    assert lines[0] == "| a | b |"
    assert "1.235" in lines[2]
    assert "—" in lines[3]


def test_count_simple_paths_path_graph():
    # pure path 0-1-2-3: from node 0 exactly one simple path per length
    import numpy as np

    from repro.graphs.csr import csr_from_edges

    g = csr_from_edges(4, np.array([[0, 1], [1, 2], [2, 3]]))
    assert tables.count_simple_paths(g, 0, 3) == [1, 2, 3]


def test_fig2_table_shape():
    df = tables.fig2_table()
    assert list(df.ell_f) == FIG2_TABLE["ell_f"]
    assert (df.paths_total == df.paths_s + df.paths_t).all()
    assert df.paths_total.is_monotonic_increasing
    # crossover exists, as in the paper's table
    assert (df.paths_total < df.eta_star).iloc[0]
    assert (df.paths_total > df.eta_star).any()


def test_table3_matches_paper_regime():
    df = tables.table3_datasets()
    assert len(df) == len(TABLE3)
    rel = (df.avg_degree - df.paper_avg_degree).abs() / df.paper_avg_degree
    assert (rel < 0.25).all()


def test_save_table(tmp_path):
    df = pd.DataFrame({"x": [1, 2]})
    path = tables.save_table(df, "unit", results_dir=str(tmp_path))
    assert path.endswith("unit.md")
    assert (tmp_path / "unit.csv").exists()
    assert "| x |" in (tmp_path / "unit.md").read_text()


def test_fig6_filters_timeouts():
    df = pd.DataFrame(
        {
            "dataset": ["a", "a"],
            "method": ["GEER", "TP"],
            "eps": [0.1, 0.1],
            "avg_abs_err": [0.01, None],
            "timed_out": [False, True],
        }
    )
    out = tables.fig6_error_random(df)
    assert list(out.method) == ["GEER"]
