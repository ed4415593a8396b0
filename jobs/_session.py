"""Shared SparkSession bootstrap for the jobs/ entrypoints.

Jobs run standalone (``spark-submit jobs/<name>.py`` or plain
``python jobs/<name>.py``), so they create their own local session with
the same settings as the test fixture in conftest.py.
"""
import os

os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
    "--conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false pyspark-shell",
)

from pyspark.sql import SparkSession  # noqa: E402


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def show_percentiles_via_spark(spark: SparkSession, name: str, latencies_s) -> None:
    """Cross-check harness percentiles with Spark SQL's percentile()."""
    import pandas as pd

    df = spark.createDataFrame(pd.DataFrame({"lat_ms": latencies_s * 1e3}))
    df.selectExpr(
        f"'{name}' AS engine",
        "percentile(lat_ms, 0.5) AS p50",
        "percentile(lat_ms, 0.99) AS p99",
        "percentile(lat_ms, 0.999) AS `p99.9`",
    ).show(truncate=False)
