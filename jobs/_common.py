"""Shared plumbing for the table/figure jobs.

Each job exposes ``run(spark=None) -> pandas.DataFrame`` (the table the paper
prints) plus a ``main()`` wrapper so it can be launched either as
``python jobs/<name>.py`` or ``spark-submit jobs/<name>.py``. Results also
land in ``results/<name>.csv`` for EXPERIMENTS.md.
"""
from __future__ import annotations

import os
import sys
from pathlib import Path

import pandas as pd

REPO_ROOT = Path(__file__).resolve().parent.parent
RESULTS_DIR = REPO_ROOT / "results"


def get_spark(app: str):
    """Local SparkSession mirroring the conftest fixture settings."""
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] --driver-memory 8g "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    from pyspark.sql import SparkSession

    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "32")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def save_table(df: pd.DataFrame, name: str, title: str) -> None:
    RESULTS_DIR.mkdir(exist_ok=True)
    df.to_csv(RESULTS_DIR / f"{name}.csv", index=False)
    print(f"== {title} ==", file=sys.stdout)
    print(df.to_string(index=False))
    print(f"[saved results/{name}.csv]")


def env_int(name: str, default: int) -> int:
    return int(os.environ.get(name, default))


def env_flag(name: str, default: bool = False) -> bool:
    return os.environ.get(name, "1" if default else "0") not in ("0", "", "false")
