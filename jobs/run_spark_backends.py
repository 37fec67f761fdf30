"""spark-submit entrypoint: distributed-backend demonstration.

Runs GEER and AMC with their Spark backends (DataFrame SpMV + mapInPandas
Monte Carlo fan-out) next to the local kernels on one lite dataset, and
reports times, answers and agreement with ground truth — the
distributed-dataflow half of the reproduction (DESIGN.md §5).

Usage: spark-submit jobs/run_spark_backends.py [dataset] [eps]
"""
import sys
import time

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.amc import amc_er
from repro.core.geer import geer
from repro.core.walks import broadcast_graph
from repro.experiments.harness import load_dataset, random_pairs
from repro.experiments.tables import save_table, to_markdown
from repro.graphs.spark_graph import SparkGraph


def run(spark: SparkSession, dataset: str = "dblp_lite", eps: float = 0.2,
        n_queries: int = 3) -> pd.DataFrame:
    ds = load_dataset(dataset)
    sg = SparkGraph.from_csr(spark, ds.g)
    g_bc = broadcast_graph(spark, ds.g)
    pairs = random_pairs(ds.g, n_queries, seed=0)
    rows = []
    for qi, (s, t) in enumerate(pairs):
        for backend in ("local", "spark"):
            kw = dict(backend=backend)
            if backend == "spark":
                kw.update(spark=spark, g_bc=g_bc)
            t0 = time.perf_counter()
            r_amc, _ = amc_er(ds.g, s, t, eps, ds.lam, seed=qi, **kw)
            t_amc = time.perf_counter() - t0
            if backend == "spark":
                kw["sg"] = sg
            t0 = time.perf_counter()
            res = geer(ds.g, s, t, eps, ds.lam, seed=qi, **kw)
            t_geer = time.perf_counter() - t0
            rows.append(
                {
                    "s": s, "t": t, "backend": backend,
                    "truth": ds.R[s, t],
                    "amc_r": r_amc, "amc_ms": 1e3 * t_amc,
                    "geer_r": res.r, "geer_ms": 1e3 * t_geer,
                    "geer_ell_b": res.ell_b,
                }
            )
    sg.unpersist()
    df = pd.DataFrame(rows)
    assert ((df.amc_r - df.truth).abs() <= eps).all()
    assert ((df.geer_r - df.truth).abs() <= eps).all()
    return df


if __name__ == "__main__":
    spark = SparkSession.builder.appName("repro-spark-backends").getOrCreate()
    dataset = sys.argv[1] if len(sys.argv) > 1 else "dblp_lite"
    eps = float(sys.argv[2]) if len(sys.argv) > 2 else 0.2
    df = run(spark, dataset, eps)
    print(to_markdown(df))
    print("saved:", save_table(df, "spark_backends"))
    spark.stop()
