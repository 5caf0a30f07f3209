"""Shared SparkSession bootstrap for the spark-submit job entrypoints.

Jobs are thin wrappers: build/attach a session, call the experiment
function, print the table. Under spark-submit the session already exists;
standalone ``python jobs/figXX.py`` builds a local one with the same
configuration the test fixture uses. ``spark.driver.memory`` is read at
JVM launch, so it must land in ``PYSPARK_SUBMIT_ARGS`` *before* pyspark is
imported — the default 1g heap OOMs the larger sweeps.
"""
from __future__ import annotations

import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__), os.pardir, "src"))

os.environ.setdefault("SPARK_DRIVER_MEM", "24g")
os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
    f"--driver-memory {os.environ['SPARK_DRIVER_MEM']} "
    "--conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false "
    "pyspark-shell",
)

from pyspark.sql import SparkSession  # noqa: E402


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
