"""SMM — deterministic traversal by sparse matrix-vector multiplication
(Algorithm 2).

Iterates ``s* ← P s*`` and ``t* ← P t*`` from one-hot starts and
accumulates

    r_b += s*(s)/d(s) + t*(t)/d(t) − s*(t)/d(s) − t*(s)/d(t)

per iteration (after the zeroth term), so that after ℓ_b iterations
``r_b = r_{ℓ_b}(s,t)`` of Eq. (4) and ``s*(v) = p_i(v,s)`` (Eq. 15).
With ``ℓ_b = ℓ`` of Eq. (6) the result is an ε-approximate ER. SMM is
also the reproduction's ground-truth engine (1000 iterations, §5.1) and
the first stage of GEER.

Backends:

* local — ``CSRGraph.spmv`` (numpy);
* spark — :func:`spmv_spark`: the SpMV as an edges⋈vector join +
  groupBy over a ``(node, sval, tval)`` DataFrame, both vectors pushed
  through one join. Lineage is truncated with ``localCheckpoint`` each
  iteration, the standard Spark idiom for iterative dataflow.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graphs.csr import CSRGraph
from repro.graphs.spark_graph import SparkGraph


@dataclass
class SMMResult:
    """r_b plus the final vectors and op-count instrumentation."""

    r_b: float
    s_vec: np.ndarray   # s*(v) = p_{ℓ_b}(v, s)
    t_vec: np.ndarray   # t*(v) = p_{ℓ_b}(v, t)
    ell_b: int
    spmv_ops: int       # Σ per-iteration frontier volumes (edge touches)


def _pair_term(
    sv: np.ndarray, tv: np.ndarray, s: int, t: int, d_s: int, d_t: int
) -> float:
    return sv[s] / d_s + tv[t] / d_t - sv[t] / d_s - tv[s] / d_t


def smm_local(g: CSRGraph, s: int, t: int, ell_b: int) -> SMMResult:
    """Algorithm 2 on the numpy kernel."""
    d_s, d_t = g.degree(s), g.degree(t)
    sv = np.zeros(g.n)
    tv = np.zeros(g.n)
    sv[s], tv[t] = 1.0, 1.0
    r_b = _pair_term(sv, tv, s, t, d_s, d_t)
    deg = g.degrees
    ops = 0
    for _ in range(ell_b):
        ops += int(deg[sv != 0].sum() + deg[tv != 0].sum())
        sv = g.spmv(sv)
        tv = g.spmv(tv)
        r_b += _pair_term(sv, tv, s, t, d_s, d_t)
    return SMMResult(r_b, sv, tv, ell_b, ops)


def spmv_spark(sg: SparkGraph, vec: DataFrame) -> DataFrame:
    """One transition-operator application on a ``(node, sval, tval)``
    DataFrame: ``(P x)(u) = (1/d(u)) Σ_{v∈N(u)} x(v)``."""
    return (
        sg.edges.join(vec.withColumnRenamed("node", "dst"), "dst")
        .groupBy("src")
        .agg(F.sum("sval").alias("sval"), F.sum("tval").alias("tval"))
        .withColumnRenamed("src", "node")
        .join(sg.degrees, "node")
        .select(
            "node",
            (F.col("sval") / F.col("degree")).alias("sval"),
            (F.col("tval") / F.col("degree")).alias("tval"),
        )
    )


def _pair_term_spark(vec: DataFrame, s: int, t: int, d_s: int, d_t: int) -> float:
    rows = {
        r["node"]: r for r in vec.where(F.col("node").isin([s, t])).collect()
    }
    sv_s = rows[s]["sval"] if s in rows else 0.0
    sv_t = rows[t]["sval"] if t in rows else 0.0
    tv_s = rows[s]["tval"] if s in rows else 0.0
    tv_t = rows[t]["tval"] if t in rows else 0.0
    return sv_s / d_s + tv_t / d_t - sv_t / d_s - tv_s / d_t


def smm_spark(sg: SparkGraph, s: int, t: int, ell_b: int) -> SMMResult:
    """Algorithm 2 as iterative DataFrame dataflow."""
    d_s, d_t = sg.degree_of(s), sg.degree_of(t)
    vec = sg.spark.createDataFrame(
        pd.DataFrame(
            {"node": [s, t], "sval": [1.0, 0.0], "tval": [0.0, 1.0]}
        ).astype({"node": "int64"})
    )
    r_b = _pair_term_spark(vec, s, t, d_s, d_t)
    ops = 0
    for _ in range(ell_b):
        ops += int(
            vec.join(sg.degrees, "node")
            .agg(
                F.sum(F.when(F.col("sval") != 0, F.col("degree")).otherwise(0))
                + F.sum(F.when(F.col("tval") != 0, F.col("degree")).otherwise(0))
            )
            .collect()[0][0]
        )
        vec = spmv_spark(sg, vec).localCheckpoint(eager=True)
        r_b += _pair_term_spark(vec, s, t, d_s, d_t)
    pdf = vec.toPandas()
    sv = np.zeros(sg.n)
    tv = np.zeros(sg.n)
    idx = pdf["node"].to_numpy(dtype=np.int64)
    sv[idx] = pdf["sval"].to_numpy()
    tv[idx] = pdf["tval"].to_numpy()
    return SMMResult(r_b, sv, tv, ell_b, ops)


def smm_er(
    g: CSRGraph,
    s: int,
    t: int,
    ell_b: int,
    backend: str = "local",
    sg: SparkGraph | None = None,
) -> tuple[float, SMMResult]:
    """Answer a PER query with pure SMM: run ℓ_b iterations, return r_b.

    With ``ell_b`` set from Eq. (6) (the §5 baseline configuration) the
    truncation error is at most ε/2, so r_b is an ε-approximate ER.
    """
    if s == t:
        return 0.0, SMMResult(0.0, np.zeros(1), np.zeros(1), 0, 0)
    if backend == "spark":
        if sg is None:
            raise ValueError("backend='spark' requires a SparkGraph")
        res = smm_spark(sg, s, t, ell_b)
    else:
        res = smm_local(g, s, t, ell_b)
    return res.r_b, res
