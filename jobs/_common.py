"""Shared spark-submit bootstrapping for the job entrypoints."""
from __future__ import annotations

import sys
from pathlib import Path

from pyspark.sql import SparkSession

sys.path.insert(0, str(Path(__file__).resolve().parent.parent / "src"))


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def emit(df, name: str) -> None:
    from repro.experiments import save_table

    path = save_table(df, name)
    print(f"\n== {name} -> {path}")
    print(df.to_string(index=False))
