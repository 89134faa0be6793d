"""SparkSession factory for the spark-submit job entrypoints.

Tests use the pytest ``spark`` fixture from conftest.py; the jobs in
``jobs/`` run standalone and create their session here with the same
configuration (broadcast joins disabled so shuffle paths are exercised).
"""
from __future__ import annotations

import os

from pyspark.sql import SparkSession


def get_spark(app_name: str) -> SparkSession:
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
        f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '8g')} "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    s = (
        SparkSession.builder.appName(app_name)
        .config(
            "spark.sql.shuffle.partitions",
            os.environ.get("SPARK_SHUFFLE_PARTITIONS", "16"),
        )
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        # The repair dataflow builds very large single expressions (the
        # hash-based corruption CASEs over 20-column frames); janino
        # sporadically fails compiling the fused whole-stage function.
        # Interpreted/per-expression codegen is robust and cheap at our
        # data scale.
        .config("spark.sql.codegen.wholeStage", "false")
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s
