"""Shared evaluation harness for the §5 experiments.

Mirrors the paper's setup at lite scale (DESIGN.md §3):

* datasets — the six `-lite` substitutes of Table 3;
* query sets — ``n_queries`` uniformly random node pairs and random
  edges (paper: 100 of each; benches default to fewer, configurable);
* ground truth — exact ER from the Laplacian pseudo-inverse (the paper
  uses SMM with 1000 iterations; at lite scale the dense solve is exact
  and cheaper);
* per-method time budget replacing the paper's one-day cutoff, plus an
  op-count *pre-check* for the Monte Carlo baselines whose unscaled
  sample formulas would exceed any budget (they are reported as
  timeouts, exactly how the paper reports TP/TPC/SMM gaps).

Every method is exposed through one uniform runner that records
wall-clock time, absolute error against ground truth, and op counts.
"""
from __future__ import annotations

import math
import time
from dataclasses import dataclass, field

import numpy as np

from repro.baselines.exact import ExactIndex
from repro.baselines.hay import hay_edge_er
from repro.baselines.mc import mc_er
from repro.baselines.mc2 import mc2_edge_er
from repro.baselines.rp import RPIndex
from repro.baselines.tp import tp_er
from repro.baselines.tpc import tpc_er
from repro.core.amc import amc_er
from repro.core.geer import geer
from repro.core.lengths import ell_ours, ell_peng
from repro.core.smm import smm_er
from repro.graphs import generators as gen
from repro.graphs.csr import CSRGraph
from repro.linalg.eigen import lambda_max_local
from repro.linalg.laplacian import exact_er_matrix

# Step budget for the Monte Carlo pre-check: ~a minute of numpy walking.
DEFAULT_STEP_BUDGET = 3e8
# MC/MC2/HAY step through Python loops (~100x slower than numpy gathers).
PY_STEP_BUDGET = 2e7
# When a method's unscaled sample formula exceeds its budget, run a probe
# at this many steps and extrapolate the full-cost wall time (the paper
# instead reports "did not finish within one day"; extrapolation keeps the
# shape comparison quantitative — flagged in the run's note).
PROBE_STEPS = 2e6
PY_PROBE_STEPS = 3e5


@dataclass
class Dataset:
    """A lite dataset with its preprocessing (λ) and ground truth."""

    name: str
    g: CSRGraph
    lam: float
    R: np.ndarray  # exact all-pairs ER

    @classmethod
    def load(cls, name: str, seed: int = 42) -> "Dataset":
        g = gen.dataset_lite_csr(name, seed)
        return cls(name, g, lambda_max_local(g), exact_er_matrix(g))


_DS_CACHE: dict[str, Dataset] = {}
_INDEX_CACHE: dict[tuple, tuple] = {}


def load_dataset(name: str) -> Dataset:
    """Cached dataset loader (λ and ground truth are reused across benches)."""
    if name not in _DS_CACHE:
        _DS_CACHE[name] = Dataset.load(name)
    return _DS_CACHE[name]


def random_pairs(g: CSRGraph, k: int, seed: int = 0) -> list[tuple[int, int]]:
    """The paper's random query set: k uniform node pairs, s != t."""
    rng = np.random.default_rng(seed)
    pairs = []
    while len(pairs) < k:
        s, t = rng.integers(0, g.n, 2)
        if s != t:
            pairs.append((int(s), int(t)))
    return pairs


def edge_pairs(g: CSRGraph, k: int, seed: int = 0) -> list[tuple[int, int]]:
    """The paper's edge query set: k edges sampled uniformly from E."""
    rng = np.random.default_rng(seed)
    src = np.repeat(np.arange(g.n), g.degrees)
    mask = src < g.indices
    eu, ev = src[mask], g.indices[mask]
    idx = rng.choice(len(eu), size=min(k, len(eu)), replace=False)
    return [(int(eu[i]), int(ev[i])) for i in idx]


@dataclass
class MethodRun:
    """Aggregated outcome of one (method, dataset, ε, query-set) cell."""

    method: str
    dataset: str
    eps: float
    n_queries: int
    avg_time_ms: float | None      # None => timed out / infeasible
    avg_abs_err: float | None
    avg_ops: float | None          # method-specific op count (walk steps etc.)
    timed_out: bool = False
    note: str = ""


def _predict_tp_steps(ds: Dataset, eps: float, delta: float) -> float:
    ell = ell_peng(eps, ds.lam)
    n_i = 40 * ell**2 * math.log(8 * ell / delta)/ eps**2
    return 2 * n_i * ell * (ell + 1) / 2


def _predict_tpc_steps(ds: Dataset, s: int, t: int, eps: float, delta: float) -> float:
    ell = ell_peng(eps, ds.lam)
    base = 1 / ds.g.degree(s) + 1 / ds.g.degree(t)
    total = 0.0
    for i in range(1, ell + 1):
        beta = 1 / (2 * ds.g.m) + ds.lam**i * base
        n_i = 40000 * (
            ell * math.sqrt(ell * beta) / eps + ell**3 * beta**1.5 / eps**2
        )
        total += 2 * n_i * i
    return total


def _predict_mc_steps(ds: Dataset, s: int, t: int, eps: float, delta: float,
                      gamma: float) -> float:
    # eta walks, each with expected length ~ commute-time scale m * r
    eta = 3 * gamma * ds.g.degree(s) * math.log(1 / delta) / eps**2
    return eta * 2 * ds.g.m * max(ds.R[s, t], 1e-6)


def _predict_mc2_steps(ds: Dataset, s: int, t: int, eps: float, delta: float) -> float:
    from repro.baselines.mc2 import default_gamma

    eta = 3 * math.log(1 / delta) / (eps**2 * default_gamma(ds.g, s, t))
    # expected steps/walk ~ hitting time of t from s <= commute = 2m·r
    return eta * 2 * ds.g.m * max(ds.R[s, t], 1e-6)


def _predict_hay_steps(ds: Dataset, eps: float, delta: float) -> float:
    # Wilson's algorithm costs ~ mean hitting time per tree; 2m is the
    # usual order on the lite graphs.
    n_trees = math.log(2 / delta) / (2 * eps**2)
    return n_trees * 2 * ds.g.m


def run_method(
    method: str,
    ds: Dataset,
    pairs: list[tuple[int, int]],
    eps: float,
    delta: float = 0.01,
    tau: int = 5,
    seed: int = 0,
    budget_s: float = 30.0,
    step_budget: float = DEFAULT_STEP_BUDGET,
    spark=None,
    sg=None,
    forced_ell_b: int | None = None,
    ell_variant: str = "ours",
) -> MethodRun:
    """Run one method over a query set; returns the aggregated cell.

    ``method`` ∈ {GEER, AMC, SMM, TP, TPC, MC, MC2, HAY, RP, EXACT,
    GEER-spark, AMC-spark}. The wall clock covers per-query work; for
    the index methods (RP, EXACT) the one-off build is amortized over
    the query set, noted in ``note``.
    """
    g, lam, R = ds.g, ds.lam, ds.R
    times: list[float] = []
    errs: list[float] = []
    ops: list[float] = []
    note = ""
    start_all = time.perf_counter()

    def out_of_budget() -> bool:
        return time.perf_counter() - start_all > budget_s

    if method in ("RP", "EXACT"):
        key = (method, ds.name, eps if method == "RP" else None, seed)
        if key not in _INDEX_CACHE:
            t0 = time.perf_counter()
            idx = (
                RPIndex(g, eps, seed=seed, max_k=2000)
                if method == "RP"
                else ExactIndex(g)
            )
            _INDEX_CACHE[key] = (idx, time.perf_counter() - t0)
        idx, build = _INDEX_CACHE[key]
        if method == "RP" and idx.k_capped:
            note = f"k capped at {idx.k}"
        note = (note + "; " if note else "") + "build amortized over queries"
        for s, t in pairs:
            t0 = time.perf_counter()
            r = idx.query(s, t)
            times.append(time.perf_counter() - t0 + build / len(pairs))
            errs.append(abs(r - R[s, t]))
            ops.append(0)
        return MethodRun(
            method, ds.name, eps, len(pairs),
            1e3 * float(np.mean(times)), float(np.mean(errs)),
            float(np.mean(ops)), False, note,
        )

    gamma_mc = 2 * float(R.max())
    # scale factor < 1 => probe mode: simulate `factor` of the formula's
    # samples, report time extrapolated by 1/factor (note records it).
    factor = 1.0
    extrapolated = False
    for qi, (s, t) in enumerate(pairs):
        # ---- pre-check: would the unscaled sample formula exceed budget?
        pred = None
        probe_target = PROBE_STEPS
        budget = step_budget
        if method == "TP":
            pred = _predict_tp_steps(ds, eps, delta)
        elif method == "TPC":
            pred = _predict_tpc_steps(ds, s, t, eps, delta)
        elif method == "MC":
            pred = _predict_mc_steps(ds, s, t, eps, delta, gamma_mc)
            probe_target, budget = PY_PROBE_STEPS, PY_STEP_BUDGET
        elif method == "MC2":
            pred = _predict_mc2_steps(ds, s, t, eps, delta)
            probe_target, budget = PY_PROBE_STEPS, PY_STEP_BUDGET
        elif method == "HAY":
            pred = _predict_hay_steps(ds, eps, delta)
            probe_target, budget = PY_PROBE_STEPS, PY_STEP_BUDGET
        if pred is not None and pred > budget:
            factor = min(factor, probe_target / pred)
            extrapolated = True
        if out_of_budget():
            return MethodRun(
                method, ds.name, eps, len(pairs), None, None, None, True,
                f"wall budget {budget_s}s exhausted after {qi} queries",
            )
        t0 = time.perf_counter()
        if method == "GEER":
            res = geer(g, s, t, eps, lam, tau, delta, seed + qi)
            r, op = res.r, res.spmv_ops + res.amc.walk_steps
        elif method == "GEER-spark":
            res = geer(g, s, t, eps, lam, tau, delta, seed + qi,
                       backend="spark", spark=spark, sg=sg)
            r, op = res.r, res.spmv_ops + res.amc.walk_steps
        elif method == "GEER-forced":
            res = geer(g, s, t, eps, lam, tau, delta, seed + qi,
                       forced_ell_b=forced_ell_b)
            r, op = res.r, res.spmv_ops + res.amc.walk_steps
        elif method == "AMC":
            r, ares = amc_er(g, s, t, eps, lam, tau, delta, seed + qi)
            op = ares.walk_steps
        elif method == "AMC-spark":
            r, ares = amc_er(g, s, t, eps, lam, tau, delta, seed + qi,
                             backend="spark", spark=spark)
            op = ares.walk_steps
        elif method == "SMM":
            if ell_variant == "peng":
                ell = ell_peng(eps, lam)
            else:
                ell = ell_ours(eps, lam, g.degree(s), g.degree(t))
            r, sres = smm_er(g, s, t, ell)
            op = sres.spmv_ops
        elif method == "TP":
            res = tp_er(g, s, t, eps, lam, delta, seed + qi,
                        sample_factor=factor)
            r, op = res.r, res.walk_steps / factor
        elif method == "TPC":
            res = tpc_er(g, s, t, eps, lam, delta, seed + qi,
                         sample_factor=factor)
            r, op = res.r, res.walk_steps / factor
        elif method == "MC":
            eta_full = math.ceil(
                3 * gamma_mc * g.degree(s) * math.log(1 / delta) / eps**2
            )
            res = mc_er(g, s, t, eps, gamma_mc, delta, seed + qi,
                        max_walks=max(1, math.ceil(factor * eta_full)))
            r, op = res.r, res.total_steps / factor
        elif method == "MC2":
            from repro.baselines.mc2 import default_gamma

            eta_full = math.ceil(
                3 * math.log(1 / delta) / (eps**2 * default_gamma(g, s, t))
            )
            res = mc2_edge_er(g, s, t, eps, delta, seed=seed + qi,
                              max_walks=max(1, math.ceil(factor * eta_full)))
            r, op = res.r, res.total_steps / factor
        elif method == "HAY":
            trees_full = math.ceil(math.log(2 / delta) / (2 * eps**2))
            res = hay_edge_er(g, s, t, eps, delta, seed + qi,
                              max_trees=max(1, math.ceil(factor * trees_full)))
            r, op = res.r, res.walk_steps / factor
        else:
            raise ValueError(f"unknown method {method!r}")
        elapsed = time.perf_counter() - t0
        times.append(elapsed / factor)
        errs.append(abs(r - R[s, t]))
        ops.append(op)
    if extrapolated:
        note = (
            f"time extrapolated from a {factor:.2g}-scale probe "
            "(full sample formula exceeds the step budget); error is the probe's"
        )
    return MethodRun(
        method, ds.name, eps, len(pairs),
        1e3 * float(np.mean(times)), float(np.mean(errs)),
        float(np.mean(ops)), False, note,
    )


def sweep(
    methods: list[str],
    dataset_names: list[str],
    eps_list: list[float],
    query_kind: str = "random",
    n_queries: int = 5,
    seed: int = 0,
    budget_s: float = 30.0,
    **kwargs,
) -> list[MethodRun]:
    """Grid runner behind Figs. 4–7: methods × datasets × ε."""
    runs: list[MethodRun] = []
    for name in dataset_names:
        ds = load_dataset(name)
        pairs = (
            random_pairs(ds.g, n_queries, seed)
            if query_kind == "random"
            else edge_pairs(ds.g, n_queries, seed)
        )
        for eps in eps_list:
            for method in methods:
                runs.append(
                    run_method(method, ds, pairs, eps, seed=seed,
                               budget_s=budget_s, **kwargs)
                )
    return runs
