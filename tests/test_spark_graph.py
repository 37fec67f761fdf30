"""Tests for the Spark graph representation, oracle-checked via DuckDB."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.graphs import generators as gen
from repro.graphs.csr import csr_from_edges
from repro.graphs.spark_graph import SparkGraph, df_to_vector, vector_to_df
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def sg(spark):
    n, edges = gen.erdos_renyi(120, 6.0, seed=9)
    g = SparkGraph.from_edge_array(spark, n, edges)
    yield g
    g.unpersist()


def test_degrees_match_duckdb(sg):
    assert_equivalent(
        sg.degrees,
        "SELECT src AS node, count(*) AS degree FROM edges GROUP BY src",
        edges=sg.edges_pdf(),
    )


def test_stats_match_duckdb(sg):
    assert_equivalent(
        sg.stats(),
        """
        SELECT count(*) AS n,
               CAST(sum(degree) / 2 AS BIGINT) AS m,
               avg(degree) AS avg_degree
        FROM (SELECT src, count(*) AS degree FROM edges GROUP BY src)
        """,
        edges=sg.edges_pdf(),
    )


def test_stats_match_generator(sg):
    row = sg.stats().collect()[0]
    assert row["n"] == sg.n
    assert row["m"] == sg.m


def test_edges_symmetric(sg):
    fwd = sg.edges
    bwd = sg.edges.select(
        F.col("dst").alias("src"), F.col("src").alias("dst")
    )
    assert fwd.exceptAll(bwd).count() == 0


def test_csr_roundtrip(sg):
    g = sg.to_csr()
    g.validate()
    assert g.n == sg.n and g.m == sg.m
    sg2 = SparkGraph.from_csr(sg.spark, g)
    assert sg2.m == sg.m
    pd.testing.assert_frame_equal(
        sg.edges_pdf().sort_values(["src", "dst"]).reset_index(drop=True),
        sg2.edges_pdf().sort_values(["src", "dst"]).reset_index(drop=True),
    )
    sg2.unpersist()


def test_degree_of(sg):
    g = sg.to_csr()
    for u in [0, 5, sg.n - 1]:
        assert sg.degree_of(u) == g.degree(u)


def test_vector_df_roundtrip(spark):
    x = np.zeros(50)
    x[[3, 7, 20]] = [1.5, -2.0, 0.25]
    df = vector_to_df(spark, x)
    np.testing.assert_allclose(df_to_vector(df, 50), x)
    assert df.count() == 3  # zeros dropped
