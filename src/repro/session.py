"""SparkSession helper for the spark-submit job entrypoints.

Tests use the ``spark`` fixture from conftest.py; the ``jobs/`` scripts
use :func:`get_session` so they work both under ``spark-submit`` and as
plain ``python jobs/<name>.py`` (where PYSPARK_SUBMIT_ARGS must be set
before pyspark is imported — this module does that with the same
defaults as conftest).
"""
import os


def get_session(app: str = "hillview-repro"):
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        f"--master {os.environ.get('SPARK_MASTER', 'local[*]')} "
        f"--driver-memory {os.environ.get('SPARK_DRIVER_MEM', '8g')} "
        "--conf spark.driver.host=127.0.0.1 "
        "--conf spark.ui.enabled=false pyspark-shell",
    )
    from pyspark.sql import SparkSession

    s = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )
    s.sparkContext.setLogLevel("ERROR")
    return s
