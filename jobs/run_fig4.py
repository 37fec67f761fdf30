"""spark-submit entrypoint: Fig. 4 (time vs ε, random queries) and its
error companion Fig. 6 (same runs, error column).

Usage: spark-submit jobs/run_fig4.py [n_queries] [budget_s]
"""
import sys

from pyspark.sql import SparkSession

from repro.experiments.tables import (
    fig4_time_random,
    fig6_error_random,
    save_table,
    to_markdown,
)


def run(_spark: SparkSession, n_queries: int = 3, budget_s: float = 45.0):
    df4 = fig4_time_random(n_queries=n_queries, budget_s=budget_s)
    return df4, fig6_error_random(df4)


if __name__ == "__main__":
    spark = SparkSession.builder.appName("repro-fig4").getOrCreate()
    n_q = int(sys.argv[1]) if len(sys.argv) > 1 else 3
    budget = float(sys.argv[2]) if len(sys.argv) > 2 else 45.0
    df4, df6 = run(spark, n_q, budget)
    print(to_markdown(df4))
    print("saved:", save_table(df4, "fig4"), save_table(df6, "fig6"))
    spark.stop()
