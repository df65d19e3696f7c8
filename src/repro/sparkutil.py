"""SparkSession builder for the spark-submit job entrypoints.

Tests use the ``spark`` fixture from conftest.py; jobs run standalone
and build an equivalent session here (same master/memory/Arrow/
broadcast settings, console progress off for clean table output).
"""
from __future__ import annotations

import os


def get_spark(app_name: str = "repro"):
    """Create (or reuse) the local SparkSession used by jobs."""
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
        f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '16g')} "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false "
        "pyspark-shell",
    )
    from pyspark.sql import SparkSession

    return (
        SparkSession.builder.appName(app_name)
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.ui.showConsoleProgress", "false")
        .getOrCreate()
    )


def default_run_dir() -> str:
    """Where jobs read/write graphs + sweep results."""
    return os.environ.get("REPRO_RUN_DIR", os.path.join(os.getcwd(), "runs", "full"))
