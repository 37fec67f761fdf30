"""spark-submit entrypoint: Fig. 5 (time vs ε, edge queries) and its
error companion Fig. 7.

Usage: spark-submit jobs/run_fig5.py [n_queries] [budget_s]
"""
import sys

from pyspark.sql import SparkSession

from repro.experiments.tables import (
    fig5_time_edge,
    fig7_error_edge,
    save_table,
    to_markdown,
)


def run(_spark: SparkSession, n_queries: int = 3, budget_s: float = 45.0):
    df5 = fig5_time_edge(n_queries=n_queries, budget_s=budget_s)
    return df5, fig7_error_edge(df5)


if __name__ == "__main__":
    spark = SparkSession.builder.appName("repro-fig5").getOrCreate()
    n_q = int(sys.argv[1]) if len(sys.argv) > 1 else 3
    budget = float(sys.argv[2]) if len(sys.argv) > 2 else 45.0
    df5, df7 = run(spark, n_q, budget)
    print(to_markdown(df5))
    print("saved:", save_table(df5, "fig5"), save_table(df7, "fig7"))
    spark.stop()
