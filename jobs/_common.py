"""Shared helpers for the spark-submit entrypoints.

Each job reproduces one evaluation figure as a table: it builds (or
reuses) a SparkSession, generates the deterministic synthetic corpus,
runs the experiment harness from :mod:`repro.experiments`, prints the
table, and writes ``results/<name>.csv`` for EXPERIMENTS.md.
"""
from __future__ import annotations

import argparse
import os
import sys

import pandas as pd
from pyspark.sql import SparkSession

RESULTS_DIR = os.path.join(os.path.dirname(os.path.dirname(os.path.abspath(__file__))), "results")


def get_spark(app: str) -> SparkSession:
    """The jobs' session: same knobs as the test fixture (broadcast off
    so shuffle paths are exercised), reusing an active session if one
    exists (e.g. when a benchmark drives the job function directly)."""
    active = SparkSession.getActiveSession()
    if active is not None:
        return active
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions",
                os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def base_parser(desc: str, *, n_default: int) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=desc)
    p.add_argument("--n", type=int, default=n_default,
                   help="corpus size (names); paper used 44.4M")
    p.add_argument("--seed", type=int, default=7)
    return p


def emit(name: str, table: pd.DataFrame) -> None:
    """Print the table and persist it under results/."""
    os.makedirs(RESULTS_DIR, exist_ok=True)
    path = os.path.join(RESULTS_DIR, f"{name}.csv")
    table.to_csv(path, index=False)
    with pd.option_context("display.width", 160, "display.max_columns", 50):
        print(f"\n=== {name} ===", file=sys.stderr)
        print(table.to_string(index=False))
    print(f"[saved {path}]", file=sys.stderr)
