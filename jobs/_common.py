"""Shared plumbing for the experiment jobs.

Every job is a spark-submit entrypoint reproducing one table/figure of
the paper's §6 (DESIGN.md §4 maps them). Jobs print the result table to
stdout and write a CSV under ``results/`` so EXPERIMENTS.md can quote
them. ``get_spark`` builds the same session shape as conftest.py when
run standalone (under pytest, pass the fixture session instead).
"""
from __future__ import annotations

import os
import pathlib
import sys
import time

import pandas as pd

RESULTS_DIR = pathlib.Path(__file__).resolve().parent.parent / "results"


def get_spark():
    from pyspark.sql import SparkSession

    return (
        SparkSession.builder.appName("repro-job")
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.enabled", "false")
        .config("spark.driver.host", "127.0.0.1")
        .getOrCreate()
    )


def emit(name: str, df: pd.DataFrame) -> pd.DataFrame:
    """Print a job's result table and persist it to results/<name>.csv."""
    RESULTS_DIR.mkdir(exist_ok=True)
    out = RESULTS_DIR / f"{name}.csv"
    df.to_csv(out, index=False)
    print(f"\n== {name} ==")
    print(df.to_string(index=False))
    print(f"[saved {out}]")
    return df


class Timer:
    def __enter__(self):
        self.t0 = time.monotonic()
        return self

    def __exit__(self, *exc):
        self.seconds = time.monotonic() - self.t0
        return False
