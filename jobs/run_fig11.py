"""spark-submit entrypoint: Fig. 11 (SMM with our ℓ vs Peng et al.'s ℓ).

Usage: spark-submit jobs/run_fig11.py
"""
from pyspark.sql import SparkSession

from repro.experiments.tables import fig11_ell_compare, save_table, to_markdown


def run(_spark: SparkSession, n_queries: int = 3):
    return fig11_ell_compare(n_queries=n_queries)


if __name__ == "__main__":
    spark = SparkSession.builder.appName("repro-fig11").getOrCreate()
    df = run(spark)
    print(to_markdown(df))
    print("saved:", save_table(df, "fig11"))
    spark.stop()
