"""Tests for the synth_data scaffold and its graph extension, with the
DuckDB oracle checking the relational computations."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.graphs import generators as gen
from repro.oracle import assert_equivalent


def test_graph_edges_deterministic(spark):
    a = synth_data.graph_edges(spark, "dblp_lite").toPandas()
    b = synth_data.graph_edges(spark, "dblp_lite").toPandas()
    assert a.equals(b)
    assert len(a) == gen.dataset_lite_csr("dblp_lite").m


def test_graph_edges_symmetric_doubles(spark):
    half = synth_data.graph_edges(spark, "facebook_lite")
    sym = synth_data.graph_edges_symmetric(spark, "facebook_lite")
    assert sym.count() == 2 * half.count()


def test_degree_table_oracle(spark):
    """Spark degree aggregation over the symmetric edge table == DuckDB."""
    sym = synth_data.graph_edges_symmetric(spark, "youtube_lite")
    got = sym.groupBy("src").agg(F.count("*").alias("degree"))
    assert_equivalent(
        got,
        "SELECT src, count(*) AS degree FROM edges GROUP BY src",
        edges=sym.toPandas(),
    )


def test_degree_distribution_oracle(spark):
    """Degree histogram (graph-analytics staple) matches DuckDB."""
    sym = synth_data.graph_edges_symmetric(spark, "dblp_lite")
    degs = sym.groupBy("src").agg(F.count("*").alias("degree"))
    got = degs.groupBy("degree").agg(F.count("*").alias("n_nodes"))
    assert_equivalent(
        got,
        """
        SELECT degree, count(*) AS n_nodes
        FROM (SELECT src, count(*) AS degree FROM edges GROUP BY src)
        GROUP BY degree
        """,
        edges=sym.toPandas(),
    )


def test_tpch_lite_scaffold_still_works(spark):
    """The provided OLAP generators + oracle keep functioning (guards the
    scaffold contract; the graph tables above extend, not replace, it)."""
    li = synth_data.lineitem(spark, sf=0.001, seed=0)
    got = (
        li.groupBy("l_returnflag")
        .agg(F.sum("l_quantity").alias("sum_qty"))
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, sum(l_quantity) AS sum_qty "
        "FROM lineitem GROUP BY l_returnflag",
        lineitem=li,
    )


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=20000, n_keys=100, alpha=1.3)
    counts = df.groupBy("k").count().toPandas().sort_values("k")
    assert counts["count"].iloc[0] > 10 * counts["count"].iloc[-1]
