"""Bench: distributed backends — GEER/AMC over Spark dataflow vs local.

Not a paper figure; it benchmarks the reproduction's distributed half
(DataFrame SpMV + mapInPandas fan-out) against the local kernels on one
query and checks both answer within ε.
"""
import pandas as pd

from repro.core.amc import amc_er
from repro.core.geer import geer
from repro.core.walks import broadcast_graph
from repro.experiments.harness import load_dataset, random_pairs
from repro.experiments.tables import save_table
from repro.graphs.spark_graph import SparkGraph


def test_spark_backends(benchmark, spark):
    ds = load_dataset("dblp_lite")
    sg = SparkGraph.from_csr(spark, ds.g)
    g_bc = broadcast_graph(spark, ds.g)
    (s, t) = random_pairs(ds.g, 1, seed=3)[0]
    eps = 0.2

    def run_spark():
        r_amc, _ = amc_er(ds.g, s, t, eps, ds.lam, seed=0, backend="spark",
                          spark=spark, g_bc=g_bc)
        res = geer(ds.g, s, t, eps, ds.lam, seed=0, backend="spark",
                   spark=spark, sg=sg, g_bc=g_bc)
        return r_amc, res.r

    r_amc, r_geer = benchmark.pedantic(run_spark, rounds=1, iterations=1)
    r_amc_loc, _ = amc_er(ds.g, s, t, eps, ds.lam, seed=0)
    res_loc = geer(ds.g, s, t, eps, ds.lam, seed=0)
    truth = ds.R[s, t]
    df = pd.DataFrame(
        {
            "method": ["AMC-spark", "GEER-spark", "AMC-local", "GEER-local"],
            "r": [r_amc, r_geer, r_amc_loc, res_loc.r],
            "truth": [truth] * 4,
        }
    )
    save_table(df, "spark_backends")
    assert (df.r - df.truth).abs().max() <= eps
    sg.unpersist()
