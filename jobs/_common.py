"""Shared spark-submit plumbing for the table jobs.

Each job builds (or reuses) a local SparkSession configured like the test
fixture — broadcast joins disabled so the shuffle paths are exercised —
prints the table, and writes a CSV under ``results/``.
"""
from __future__ import annotations

import os
import sys
from pathlib import Path

import pandas as pd
from pyspark.sql import SparkSession

RESULTS = Path(__file__).resolve().parent.parent / "results"


def get_spark(app: str) -> SparkSession:
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
        f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '24g')} "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    s = (SparkSession.builder.appName(app)
         .config("spark.sql.shuffle.partitions",
                 os.environ.get("SPARK_SHUFFLE_PARTITIONS", "32"))
         .config("spark.sql.execution.arrow.pyspark.enabled", "true")
         .config("spark.sql.autoBroadcastJoinThreshold", -1)
         .getOrCreate())
    s.sparkContext.setLogLevel("ERROR")
    return s


def emit(df: pd.DataFrame, name: str) -> None:
    RESULTS.mkdir(exist_ok=True)
    out = RESULTS / f"{name}.csv"
    df.to_csv(out, index=False)
    pd.set_option("display.width", 200)
    pd.set_option("display.max_columns", 50)
    print(f"== {name} ==", file=sys.stderr)
    print(df.to_string(index=False))
    print(f"[saved {out}]", file=sys.stderr)
