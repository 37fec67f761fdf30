"""Spectral-gap parameter ``λ = max(|λ₂|, |λ_n|)`` of the transition matrix.

The paper computes λ₂, λ_n of ``P = D^{-1}A`` with ARPACK in a one-off
preprocessing step (§3.1). ARPACK/scipy is not available offline, so we
implement the same sparse iterative scheme from scratch:

``P`` is similar to the symmetric ``N = D^{-1/2} A D^{-1/2}``
(``N = D^{1/2} P D^{-1/2}``), so both have the same real spectrum.  The
top eigenpair of N is known in closed form (λ₁=1, v₁ ∝ D^{1/2}𝟙); after
deflating v₁, power iteration on N converges to the eigenvalue of
largest magnitude among the remainder — exactly ``max(|λ₂|,|λ_n|)``.
We track the norm ratio ``‖Nx‖/‖x‖`` which converges even when λ₂ and
−λ_n tie in magnitude (the iterate then oscillates in their span but
the ratio is still the common magnitude).

Two implementations with identical math:

* :func:`lambda_max_local`  — numpy over the CSR kernel (the
  preprocessing path used by the algorithms);
* :func:`lambda_max_spark`  — the same iteration expressed as DataFrame
  SpMV over a :class:`repro.graphs.spark_graph.SparkGraph`, i.e. the
  distributed variant demanded by graphs that exceed one machine.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import functions as F

from repro.graphs.csr import CSRGraph
from repro.graphs.spark_graph import SparkGraph


def _nmul(g: CSRGraph, x: np.ndarray, sqrt_d: np.ndarray) -> np.ndarray:
    """One application of N = D^{-1/2} A D^{-1/2} via the CSR kernel."""
    # A y = D · (P y); with y = x / sqrt(d):  N x = sqrt(d) · P (x/sqrt(d)).
    return sqrt_d * g.spmv(x / sqrt_d)


def lambda_max_local(
    g: CSRGraph,
    tol: float = 1e-7,
    max_iter: int = 5000,
    seed: int = 0,
) -> float:
    """``max(|λ₂|, |λ_n|)`` by deflated power iteration (numpy backend)."""
    n = g.n
    sqrt_d = np.sqrt(g.degrees.astype(float))
    v1 = sqrt_d / np.linalg.norm(sqrt_d)
    rng = np.random.default_rng(seed)
    x = rng.standard_normal(n)
    x -= (v1 @ x) * v1
    x /= np.linalg.norm(x)
    lam = 0.0
    for _ in range(max_iter):
        y = _nmul(g, x, sqrt_d)
        y -= (v1 @ y) * v1  # re-deflate: guards numeric drift back onto v1
        norm = np.linalg.norm(y)
        if norm == 0.0:
            return 0.0
        new_lam = norm  # ‖Nx‖/‖x‖ with ‖x‖=1
        x = y / norm
        if abs(new_lam - lam) <= tol * max(new_lam, 1e-30):
            return float(min(new_lam, 1.0 - 1e-12))
        lam = new_lam
    return float(min(lam, 1.0 - 1e-12))


def lambda_max_spark(
    sg: SparkGraph,
    tol: float = 1e-5,
    max_iter: int = 200,
    seed: int = 0,
) -> float:
    """Distributed variant of :func:`lambda_max_local`.

    The vector lives as a ``(node, val)`` DataFrame; one iteration is
    an edges⋈vector join + groupBy (the N-SpMV), followed by DataFrame
    aggregations for the deflation coefficient and the norm. The loop
    (a scalar recurrence) runs on the driver, as Spark iterative
    algorithms do.
    """
    spark = sg.spark
    import pandas as pd

    deg_pdf = sg.degrees.toPandas().sort_values("node")
    sqrt_d = np.sqrt(deg_pdf["degree"].to_numpy(dtype=float))
    nodes = deg_pdf["node"].to_numpy()
    norm_v1 = float(np.linalg.norm(sqrt_d))
    v1_df = spark.createDataFrame(
        pd.DataFrame({"node": nodes, "v1": sqrt_d / norm_v1})
    ).cache()

    rng = np.random.default_rng(seed)
    x0 = rng.standard_normal(len(nodes))
    x0 -= (sqrt_d / norm_v1) @ x0 * (sqrt_d / norm_v1)
    x0 /= np.linalg.norm(x0)
    x = spark.createDataFrame(pd.DataFrame({"node": nodes, "val": x0}))

    # Pre-join inverse sqrt-degree onto both edge endpoints once.
    inv_sqrt = spark.createDataFrame(
        pd.DataFrame({"node": nodes, "isd": 1.0 / sqrt_d})
    )
    edges_w = (
        sg.edges.join(inv_sqrt.withColumnRenamed("node", "src"), "src")
        .withColumnRenamed("isd", "isd_src")
        .join(inv_sqrt.withColumnRenamed("node", "dst"), "dst")
        .withColumnRenamed("isd", "isd_dst")
        .withColumn("w", F.col("isd_src") * F.col("isd_dst"))
        .select("src", "dst", "w")
        .cache()
    )

    lam = 0.0
    for _ in range(max_iter):
        y = (
            edges_w.join(x.withColumnRenamed("node", "dst"), "dst")
            .groupBy("src")
            .agg(F.sum(F.col("w") * F.col("val")).alias("val"))
            .withColumnRenamed("src", "node")
        )
        joined = y.join(v1_df, "node", "left").fillna({"v1": 0.0})
        c = joined.agg(F.sum(F.col("val") * F.col("v1"))).collect()[0][0] or 0.0
        y = joined.withColumn("val", F.col("val") - F.lit(float(c)) * F.col("v1")).select(
            "node", "val"
        )
        norm = float(
            y.agg(F.sqrt(F.sum(F.col("val") * F.col("val")))).collect()[0][0]
        )
        if norm == 0.0:
            return 0.0
        x = y.withColumn("val", F.col("val") / F.lit(norm)).select("node", "val")
        if abs(norm - lam) <= tol * max(norm, 1e-30):
            lam = norm
            break
        lam = norm
    edges_w.unpersist()
    v1_df.unpersist()
    return float(min(lam, 1.0 - 1e-12))
