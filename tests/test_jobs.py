"""Smoke tests for the spark-submit job entrypoints (lightweight ones;
the heavy sweeps are exercised by benchmarks/)."""
import os
import sys

import pytest

sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "jobs"))

import run_fig2  # noqa: E402
import run_spark_backends  # noqa: E402
import run_table3  # noqa: E402


def test_run_table3_job(spark):
    df = run_table3.run(spark)
    assert len(df) == 6
    assert set(df.columns) >= {"dataset", "n", "m", "avg_degree"}


def test_run_fig2_job(spark):
    df = run_fig2.run(spark)
    assert len(df) == 8


def test_run_spark_backends_job(spark):
    df = run_spark_backends.run(spark, dataset="facebook_lite", eps=0.3,
                                n_queries=1)
    assert set(df.backend) == {"local", "spark"}
    assert ((df.geer_r - df.truth).abs() <= 0.3).all()


def test_all_jobs_importable():
    import importlib

    for mod in ["run_fig4", "run_fig5", "run_fig8_9", "run_fig10",
                "run_fig11", "run_all"]:
        if mod == "run_all":
            # run_all imports sibling job modules; path already set above
            pass
        importlib.import_module(mod)
