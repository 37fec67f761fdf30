"""spark-submit entrypoint: regenerate every evaluation artifact.

Usage: spark-submit jobs/run_all.py [n_queries] [budget_s]
Writes results/{table3,fig2,fig4,fig5,fig6,fig7,fig8_9,fig10,fig11,
spark_backends}.{md,csv}.
"""
import sys

from pyspark.sql import SparkSession

import run_fig2
import run_fig4
import run_fig5
import run_fig8_9
import run_fig10
import run_fig11
import run_spark_backends
import run_table3
from repro.experiments.tables import save_table

if __name__ == "__main__":
    spark = SparkSession.builder.appName("repro-all").getOrCreate()
    n_q = int(sys.argv[1]) if len(sys.argv) > 1 else 3
    budget = float(sys.argv[2]) if len(sys.argv) > 2 else 45.0
    save_table(run_table3.run(spark), "table3")
    save_table(run_fig2.run(spark), "fig2")
    df4, df6 = run_fig4.run(spark, n_q, budget)
    save_table(df4, "fig4")
    save_table(df6, "fig6")
    df5, df7 = run_fig5.run(spark, n_q, budget)
    save_table(df5, "fig5")
    save_table(df7, "fig7")
    save_table(run_fig8_9.run(spark, n_q), "fig8_9")
    save_table(run_fig10.run(spark, n_q), "fig10")
    save_table(run_fig11.run(spark, n_q), "fig11")
    save_table(run_spark_backends.run(spark), "spark_backends")
    print("all artifacts written to results/")
    spark.stop()
