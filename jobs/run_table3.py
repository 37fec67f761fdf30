"""spark-submit entrypoint: Table 3 — lite-dataset statistics.

Computes the stats both locally (generator side) and through the
distributed ``SparkGraph.stats`` dataflow, asserting they agree.

Usage: spark-submit jobs/run_table3.py
"""
from pyspark.sql import SparkSession

from repro.experiments.tables import save_table, table3_datasets, to_markdown
from repro.graphs import generators as gen
from repro.graphs.spark_graph import SparkGraph


def run(spark: SparkSession):
    df = table3_datasets()
    for _, row in df.iterrows():
        sg = SparkGraph.from_csr(spark, gen.dataset_lite_csr(row["dataset"]))
        stats = sg.stats().collect()[0]
        assert stats["n"] == row["n"] and stats["m"] == row["m"]
        sg.unpersist()
    return df


if __name__ == "__main__":
    spark = SparkSession.builder.appName("repro-table3").getOrCreate()
    df = run(spark)
    print(to_markdown(df))
    print("saved:", save_table(df, "table3"))
    spark.stop()
