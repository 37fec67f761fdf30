"""GEER — Greedy Estimation of Effective Resistance (Algorithm 3).

Runs SMM iterations while they are the cheaper move, then hands the
smoothed vectors ``s*, t*`` to AMC for the remaining length. The switch
fires at the first iteration where the next SpMV's cost (the frontier
volume ``Σ_{v∈V_s} d(v) + Σ_{v∈V_t} d(v)``) exceeds AMC's current
worst-case sample count ``h(ℓ−ℓ_b)`` (Eq. 17) — whose ψ (Eq. 9) shrinks
as the vectors smooth out, which is exactly why handing AMC ``s*, t*``
instead of one-hots prunes most of its walks (§4.1.2).

The estimate is ``r'(s,t) = r_b(s,t) + r_f(s,t)``; by Theorem 3.4 plus
Theorem 3.1 it is an ε-approximate ER with probability ≥ 1−δ.

Backends: ``local`` (numpy SMM + local AMC) and ``spark`` (DataFrame
SpMV + fan-out AMC). Identical control flow.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.core.amc import AMCResult, amc, h_samples, psi_bound
from repro.core.lengths import ell_ours
from repro.core.smm import _pair_term, _pair_term_spark, spmv_spark
from repro.graphs.csr import CSRGraph
from repro.graphs.spark_graph import SparkGraph


@dataclass
class GEERResult:
    """GEER's answer plus stage-level instrumentation."""

    r: float            # r'(s,t) = r_b + r_f
    r_b: float          # SMM stage partial sum (Eq. 16, first half)
    ell: int            # total truncation length (Eq. 6)
    ell_b: int          # SMM iterations actually run (switch point)
    amc: AMCResult      # the random-walk stage
    spmv_ops: int       # Σ frontier volumes over SMM iterations


def geer(
    g: CSRGraph,
    s: int,
    t: int,
    eps: float,
    lam: float,
    tau: int = 5,
    delta: float = 0.01,
    seed: int = 0,
    backend: str = "local",
    spark: SparkSession | None = None,
    sg: SparkGraph | None = None,
    g_bc=None,
    forced_ell_b: int | None = None,
) -> GEERResult:
    """Algorithm 3. ``lam`` is the preprocessed λ = max(|λ₂|,|λ_n|).

    ``forced_ell_b`` disables the Eq. 17 switch rule and runs exactly
    that many SMM iterations — the Fig. 10 parameter study.
    """
    if s == t:
        return GEERResult(0.0, 0.0, 0, 0, AMCResult(0.0, 0, 0, 0, True, 0), 0)
    if backend == "spark":
        if spark is None or sg is None:
            raise ValueError("backend='spark' requires spark and sg")
        return _geer_spark(
            sg, s, t, eps, lam, tau, delta, seed, spark, g, g_bc, forced_ell_b
        )
    return _geer_local(g, s, t, eps, lam, tau, delta, seed, forced_ell_b)


def _switch_now(
    frontier_volume: int,
    s_vec: np.ndarray,
    t_vec: np.ndarray,
    d_s: int,
    d_t: int,
    remaining: int,
    eps: float,
    tau: int,
    delta: float,
) -> bool:
    """Eq. (17): next SpMV cost vs AMC's current worst-case samples."""
    psi = psi_bound(s_vec, t_vec, d_s, d_t, remaining)
    return frontier_volume > h_samples(psi, eps, tau, delta)


def _geer_local(
    g: CSRGraph,
    s: int,
    t: int,
    eps: float,
    lam: float,
    tau: int,
    delta: float,
    seed: int,
    forced_ell_b: int | None,
) -> GEERResult:
    d_s, d_t = g.degree(s), g.degree(t)
    ell = ell_ours(eps, lam, d_s, d_t)
    deg = g.degrees
    sv = np.zeros(g.n)
    tv = np.zeros(g.n)
    sv[s], tv[t] = 1.0, 1.0
    r_b = _pair_term(sv, tv, s, t, d_s, d_t)
    ell_b = 0
    ops = 0
    max_iters = ell if forced_ell_b is None else forced_ell_b
    while ell_b < max_iters:
        ops += int(deg[sv != 0].sum() + deg[tv != 0].sum())
        sv = g.spmv(sv)
        tv = g.spmv(tv)
        ell_b += 1
        r_b += _pair_term(sv, tv, s, t, d_s, d_t)
        if forced_ell_b is None:
            vol = int(deg[sv != 0].sum() + deg[tv != 0].sum())
            if _switch_now(vol, sv, tv, d_s, d_t, ell - ell_b, eps, tau, delta):
                break
    res = amc(
        g, s, t, sv, tv, eps, ell - ell_b, tau, delta, seed, backend="local"
    )
    return GEERResult(r_b + res.r_f, r_b, ell, ell_b, res, ops)


def _geer_spark(
    sg: SparkGraph,
    s: int,
    t: int,
    eps: float,
    lam: float,
    tau: int,
    delta: float,
    seed: int,
    spark: SparkSession,
    g: CSRGraph,
    g_bc,
    forced_ell_b: int | None,
) -> GEERResult:
    d_s, d_t = sg.degree_of(s), sg.degree_of(t)
    ell = ell_ours(eps, lam, d_s, d_t)
    vec = spark.createDataFrame(
        pd.DataFrame(
            {"node": [s, t], "sval": [1.0, 0.0], "tval": [0.0, 1.0]}
        ).astype({"node": "int64"})
    )
    r_b = _pair_term_spark(vec, s, t, d_s, d_t)
    ell_b = 0
    ops = 0

    def volume(v) -> int:
        return int(
            v.join(sg.degrees, "node")
            .agg(
                F.sum(F.when(F.col("sval") != 0, F.col("degree")).otherwise(0))
                + F.sum(F.when(F.col("tval") != 0, F.col("degree")).otherwise(0))
            )
            .collect()[0][0]
        )

    max_iters = ell if forced_ell_b is None else forced_ell_b
    while ell_b < max_iters:
        ops += volume(vec)
        vec = spmv_spark(sg, vec).localCheckpoint(eager=True)
        ell_b += 1
        r_b += _pair_term_spark(vec, s, t, d_s, d_t)
        if forced_ell_b is None:
            vol = volume(vec)
            # ψ needs the two largest entries per side — a Spark top-2.
            tops = vec.agg(
                F.array_sort(F.collect_list("sval")).alias("ss"),
                F.array_sort(F.collect_list("tval")).alias("tt"),
            ).collect()[0]
            ss = ([0.0, 0.0] + list(tops["ss"]))[-2:]
            tt = ([0.0, 0.0] + list(tops["tt"]))[-2:]
            svec2 = np.array(ss)
            tvec2 = np.array(tt)
            if _switch_now(
                vol, svec2, tvec2, d_s, d_t, ell - ell_b, eps, tau, delta
            ):
                break
    pdf = vec.toPandas()
    sv = np.zeros(sg.n)
    tv = np.zeros(sg.n)
    idx = pdf["node"].to_numpy(dtype=np.int64)
    sv[idx] = pdf["sval"].to_numpy()
    tv[idx] = pdf["tval"].to_numpy()
    res = amc(
        g,
        s,
        t,
        sv,
        tv,
        eps,
        ell - ell_b,
        tau,
        delta,
        seed,
        backend="spark",
        spark=spark,
        g_bc=g_bc,
    )
    return GEERResult(r_b + res.r_f, r_b, ell, ell_b, res, ops)
