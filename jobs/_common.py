"""Shared plumbing for the per-table spark-submit entrypoints.

Each job script wraps one ``repro.experiments.tables.table_*`` function:
it builds (or reuses) a SparkSession, runs the experiment at CLI-chosen
scale/trials, and prints the table the paper's figure plots. Run e.g.::

    spark-submit jobs/fig2_budget_vs_rmse.py --scale 0.1 --trials 200
"""
from __future__ import annotations

import argparse

import pandas as pd
from pyspark.sql import SparkSession


def build_session(app: str) -> SparkSession:
    """SparkSession for a standalone job run (mirrors conftest.py)."""
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.shuffle.partitions", "64")
        .getOrCreate()
    )


def job_args(description: str, **extra_defaults) -> argparse.Namespace:
    """Common CLI: --scale (dataset scale factor) and --trials."""
    p = argparse.ArgumentParser(description=description)
    p.add_argument("--scale", type=float, default=extra_defaults.pop("scale", 0.1))
    p.add_argument("--trials", type=int, default=extra_defaults.pop("trials", 200))
    p.add_argument("--seed", type=int, default=extra_defaults.pop("seed", 0))
    return p.parse_args()


def print_table(df: pd.DataFrame, title: str) -> None:
    """Print the result rows the way the paper's figure reports them."""
    print(f"\n=== {title} ===")
    with pd.option_context("display.width", 200, "display.max_columns", 50):
        print(df.to_string(index=False, float_format=lambda v: f"{v:.4f}"))
