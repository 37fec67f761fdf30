"""Graph substrate: generators, local CSR kernel, Spark representation."""
from repro.graphs.csr import CSRGraph
from repro.graphs.spark_graph import SparkGraph

__all__ = ["CSRGraph", "SparkGraph"]
