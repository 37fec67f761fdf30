"""spark-submit entrypoint: Figs. 8–9 (AMC/GEER running time vs τ).

Usage: spark-submit jobs/run_fig8_9.py
"""
from pyspark.sql import SparkSession

from repro.experiments.tables import fig8_9_vary_tau, save_table, to_markdown


def run(_spark: SparkSession, n_queries: int = 3):
    return fig8_9_vary_tau(n_queries=n_queries)


if __name__ == "__main__":
    spark = SparkSession.builder.appName("repro-fig8-9").getOrCreate()
    df = run(spark)
    print(to_markdown(df))
    print("saved:", save_table(df, "fig8_9"))
    spark.stop()
