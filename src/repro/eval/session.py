"""SparkSession builder for spark-submit entrypoints in ``jobs/``.

Tests use the pytest ``spark`` fixture from conftest.py; jobs run
standalone and build an equivalent session here (same shuffle/broadcast
settings so job results match test results).
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession


def make_session(app: str) -> SparkSession:
    """A local session configured like the test fixture.

    ``spark.driver.memory`` is only honoured at JVM launch, so it must go
    through ``PYSPARK_SUBMIT_ARGS`` before the first ``getOrCreate`` —
    jobs invoked as plain ``python jobs/x.py`` would otherwise run on the
    1g default heap and OOM collecting large match sets.
    """
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '12g')} "
        "pyspark-shell",
    )
    return (
        SparkSession.builder.appName(app)
        .master(os.environ.get("SPARK_MASTER", "local[*]"))
        .config("spark.driver.host", "127.0.0.1")
        .config("spark.ui.enabled", "false")
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "64"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
