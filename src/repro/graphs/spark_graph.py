"""Spark-side graph representation.

``SparkGraph`` keeps the graph as two DataFrames:

* ``edges``   — one row per *directed* arc ``(src, dst)``; every
  undirected edge appears in both orientations, so joins against it
  implement neighborhood aggregation without a union;
* ``degrees`` — ``(node, degree)``.

This is the relational substrate for the DataFrame implementations of
SpMV (``repro.core.smm.spmv_spark``), the power-iteration eigensolver
(``repro.linalg.eigen.lambda_max_spark``), and the DataFrame-join walk
stepper used as a distributional cross-check. The CSR twin
(:class:`repro.graphs.csr.CSRGraph`) is broadcast to executors for the
Monte Carlo fan-out.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.graphs.csr import CSRGraph, csr_from_edges


class SparkGraph:
    """Undirected graph held as Spark DataFrames (see module docstring)."""

    def __init__(self, spark: SparkSession, n: int, edges_pdf: pd.DataFrame):
        """``edges_pdf`` must hold each undirected edge once, columns
        ``src`` < ``dst`` not required — both orientations are derived."""
        self.spark = spark
        self.n = n
        self.m = len(edges_pdf)
        sym = pd.DataFrame(
            {
                "src": np.concatenate([edges_pdf["src"], edges_pdf["dst"]]),
                "dst": np.concatenate([edges_pdf["dst"], edges_pdf["src"]]),
            }
        )
        self._sym_pdf = sym
        self.edges = spark.createDataFrame(sym).cache()
        self.degrees = (
            self.edges.groupBy("src")
            .agg(F.count("*").alias("degree"))
            .withColumnRenamed("src", "node")
            .cache()
        )

    # ------------------------------------------------------------ builders
    @classmethod
    def from_edge_array(
        cls, spark: SparkSession, n: int, edges: np.ndarray
    ) -> "SparkGraph":
        """Build from an (m, 2) undirected edge array (generator output)."""
        pdf = pd.DataFrame({"src": edges[:, 0], "dst": edges[:, 1]})
        return cls(spark, n, pdf)

    @classmethod
    def from_csr(cls, spark: SparkSession, g: CSRGraph) -> "SparkGraph":
        src = np.repeat(np.arange(g.n), g.degrees)
        keep = src < g.indices
        pdf = pd.DataFrame({"src": src[keep], "dst": g.indices[keep]})
        return cls(spark, g.n, pdf)

    # ---------------------------------------------------------- conversions
    def to_csr(self) -> CSRGraph:
        """Collect to a local CSR kernel (graphs here are laptop-scale)."""
        half = self._sym_pdf[self._sym_pdf["src"] < self._sym_pdf["dst"]]
        return csr_from_edges(self.n, half[["src", "dst"]].to_numpy())

    def edges_pdf(self) -> pd.DataFrame:
        """Symmetric (both-orientation) edge list as pandas."""
        return self._sym_pdf.copy()

    # ------------------------------------------------------------- queries
    def degree_of(self, node: int) -> int:
        row = self.degrees.where(F.col("node") == int(node)).collect()
        return int(row[0]["degree"])

    def stats(self) -> DataFrame:
        """(n, m, avg_degree) as a one-row DataFrame — Table 3 input."""
        return self.degrees.agg(
            F.count("*").alias("n"),
            (F.sum("degree") / 2).cast("long").alias("m"),
            F.avg("degree").alias("avg_degree"),
        )

    def unpersist(self) -> None:
        self.edges.unpersist()
        self.degrees.unpersist()


def vector_to_df(spark: SparkSession, x: np.ndarray) -> DataFrame:
    """Dense vector -> sparse (node, val) DataFrame, dropping exact zeros."""
    nz = np.flatnonzero(x)
    return spark.createDataFrame(
        pd.DataFrame({"node": nz, "val": x[nz].astype("float64")})
    )


def df_to_vector(df: DataFrame, n: int) -> np.ndarray:
    """(node, val) DataFrame -> dense numpy vector of length n."""
    pdf = df.toPandas()
    x = np.zeros(n)
    x[pdf["node"].to_numpy(dtype=np.int64)] = pdf["val"].to_numpy()
    return x
