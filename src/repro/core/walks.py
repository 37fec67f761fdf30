"""Random-walk samplers for AMC (Algorithm 1, Lines 5–10).

One *sample* k performs two independent length-``ell_f`` walks — ``S_k``
from ``s`` and ``T_k`` from ``t`` — and evaluates

    Z_k = Σ_{u∈S_k} w(u) − Σ_{u∈T_k} w(u),
    with  w = s_vec/d(s) − t_vec/d(t)                        (Line 7)

over the visited nodes (start excluded; the series in Eq. 12 starts at
i=1). The batch estimator only needs ``ΣZ_k`` and ``ΣZ_k²`` (Lines
11–12), so samplers return those two scalars plus the sample count.

Backends:

* :func:`sample_batch_local` — vectorized numpy over the CSR kernel;
* :func:`sample_batch_spark` — the Monte Carlo fan-out as a Spark job:
  a driver-built *chunk* DataFrame (chunk id, walk count, RNG seed) is
  partitioned across executors; ``mapInPandas`` simulates each chunk's
  walks against the **broadcast CSR + weight vector** and emits partial
  ``(Σ Z, Σ Z², count)`` rows that a Spark aggregation folds. Seeds ride
  in the rows, so results are deterministic regardless of partitioning.
* :func:`walk_endpoint_counts_spark` — a pure DataFrame-join walk
  stepper (one edges⋈frontier join per step). Exponentially slower than
  the fan-out (a shuffle per step) and used only as a tiny-scale
  distributional cross-check of the samplers, as DESIGN.md §5 explains.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.graphs.csr import CSRGraph
from repro.graphs.spark_graph import SparkGraph

# Walks per mapInPandas chunk: large enough to amortize task overhead,
# small enough to fan out across ~16 cores for the batch sizes AMC uses.
CHUNK_SIZE = 2048


def make_weight(
    s_vec: np.ndarray, t_vec: np.ndarray, d_s: int, d_t: int
) -> np.ndarray:
    """w = s_vec/d(s) − t_vec/d(t), the per-node walk payoff of Line 7."""
    return s_vec / d_s - t_vec / d_t


def sample_batch_local(
    g: CSRGraph,
    s: int,
    t: int,
    weight: np.ndarray,
    ell_f: int,
    eta: int,
    rng: np.random.Generator,
) -> tuple[float, float, int]:
    """Simulate ``eta`` samples locally; returns (ΣZ, ΣZ², eta)."""
    zs = g.walks_visit_sums(s, weight, ell_f, eta, rng)
    zt = g.walks_visit_sums(t, weight, ell_f, eta, rng)
    z = zs - zt
    return float(z.sum()), float((z * z).sum()), eta


def _chunk_plan(eta: int, seed: int) -> pd.DataFrame:
    """Split ``eta`` samples into seeded chunks (driver-side, tiny)."""
    n_chunks = max(1, (eta + CHUNK_SIZE - 1) // CHUNK_SIZE)
    sizes = np.full(n_chunks, CHUNK_SIZE, dtype=np.int64)
    sizes[-1] = eta - CHUNK_SIZE * (n_chunks - 1)
    seeds = np.random.SeedSequence(seed).generate_state(n_chunks)
    return pd.DataFrame(
        {"chunk": np.arange(n_chunks), "n_walks": sizes, "seed": seeds.astype(np.int64)}
    )


def sample_batch_spark(
    spark: SparkSession,
    g_bc,  # pyspark Broadcast[CSRGraph]
    s: int,
    t: int,
    weight_bc,  # pyspark Broadcast[np.ndarray]
    ell_f: int,
    eta: int,
    seed: int,
) -> tuple[float, float, int]:
    """Distributed batch: returns (ΣZ, ΣZ², eta).

    ``g_bc``/``weight_bc`` are broadcast once per query (see
    :func:`broadcast_graph`) so repeated batches reuse the executors'
    copies.
    """
    plan = spark.createDataFrame(_chunk_plan(eta, seed)).repartition(
        spark.sparkContext.defaultParallelism
    )

    def simulate(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        g = g_bc.value
        w = weight_bc.value
        for pdf in batches:
            for _, row in pdf.iterrows():
                rng = np.random.default_rng(np.uint64(row["seed"]))
                k = int(row["n_walks"])
                zs = g.walks_visit_sums(s, w, ell_f, k, rng)
                zt = g.walks_visit_sums(t, w, ell_f, k, rng)
                z = zs - zt
                yield pd.DataFrame(
                    {
                        "z_sum": [float(z.sum())],
                        "z2_sum": [float((z * z).sum())],
                        "cnt": [k],
                    }
                )

    out = plan.mapInPandas(
        simulate, schema="z_sum double, z2_sum double, cnt long"
    ).agg(
        F.sum("z_sum").alias("z_sum"),
        F.sum("z2_sum").alias("z2_sum"),
        F.sum("cnt").alias("cnt"),
    ).collect()[0]
    return float(out["z_sum"]), float(out["z2_sum"]), int(out["cnt"])


def broadcast_graph(spark: SparkSession, g: CSRGraph):
    """Broadcast the CSR kernel to executors (one call per query graph)."""
    return spark.sparkContext.broadcast(g)


def broadcast_vector(spark: SparkSession, x: np.ndarray):
    """Broadcast a dense weight vector to executors."""
    return spark.sparkContext.broadcast(x)


def walk_endpoint_counts_spark(
    sg: SparkGraph, start: int, length: int, n_walks: int, seed: int
) -> DataFrame:
    """Endpoint histogram of ``n_walks`` length-``length`` walks, computed
    with *pure DataFrame joins* — one edges⋈frontier join + random
    neighbor pick per step.

    The random pick selects, per (walker, step), the neighbor whose rank
    equals ``floor(hash-uniform · d(u))``: a deterministic function of
    (walker id, step, seed), so the result is a reproducible DataFrame
    program. Used to cross-validate the mapInPandas sampler's endpoint
    distribution at tiny scale.
    """
    spark = sg.spark
    # rank neighbors of each node once
    from pyspark.sql import Window

    ranked = sg.edges.withColumn(
        "rank",
        F.row_number().over(Window.partitionBy("src").orderBy("dst")) - 1,
    ).join(sg.degrees.withColumnRenamed("node", "src"), "src")

    walkers = spark.range(n_walks).select(
        F.col("id").alias("walker"), F.lit(start).alias("node")
    )
    for step in range(length):
        # uniform in [0,1) from a salted 64-bit hash of (walker, step)
        u01 = (
            F.pmod(F.xxhash64(F.col("walker"), F.lit(step), F.lit(seed)), F.lit(1 << 40))
            / F.lit(float(1 << 40))
        )
        walkers = (
            walkers.join(ranked.withColumnRenamed("src", "node"), "node")
            .where(F.col("rank") == F.floor(u01 * F.col("degree")))
            .select("walker", F.col("dst").alias("node"))
        )
    return walkers.groupBy("node").agg(F.count("*").alias("cnt"))
