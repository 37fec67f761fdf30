"""spark-submit entrypoint: Fig. 10 (GEER time vs forced ℓ_b offsets).

Usage: spark-submit jobs/run_fig10.py
"""
from pyspark.sql import SparkSession

from repro.experiments.tables import fig10_vary_ellb, save_table, to_markdown


def run(_spark: SparkSession, n_queries: int = 3):
    return fig10_vary_ellb(n_queries=n_queries)


if __name__ == "__main__":
    spark = SparkSession.builder.appName("repro-fig10").getOrCreate()
    df = run(spark)
    print(to_markdown(df))
    print("saved:", save_table(df, "fig10"))
    spark.stop()
