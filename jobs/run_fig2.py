"""spark-submit entrypoint: the Fig. 2 running-example table
(#paths from s/t vs AMC's η* as ℓ_f grows).

Usage: spark-submit jobs/run_fig2.py
"""
from pyspark.sql import SparkSession

from repro.experiments.tables import fig2_table, save_table, to_markdown


def run(_spark: SparkSession):
    return fig2_table()


if __name__ == "__main__":
    spark = SparkSession.builder.appName("repro-fig2").getOrCreate()
    df = run(spark)
    print(to_markdown(df))
    print("saved:", save_table(df, "fig2"))
    spark.stop()
