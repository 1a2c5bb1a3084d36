"""Shared plumbing for the spark-submit job entrypoints.

Each ``jobs/<name>.py`` wraps one function from ``repro.eval.tables``: it
builds a local session (with the sandbox tunings measured in
tests/conftest.py), runs the experiment and prints the table as markdown.
Under pytest, the same functions are driven through the session fixture —
jobs never create a second session in that case because ``getOrCreate``
returns the active one.
"""
import os

from pyspark.sql import SparkSession

from repro.eval.harness import to_markdown  # noqa: F401  (re-exported)


def get_session(app: str) -> SparkSession:
    """Session for standalone job runs (mirrors conftest.py's settings)."""
    os.environ.setdefault(
        "PYSPARK_SUBMIT_ARGS",
        "--master local[*] --driver-memory 16g "
        "--conf spark.driver.host=127.0.0.1 --conf spark.ui.enabled=false "
        "--conf spark.ui.showConsoleProgress=false "
        "--conf spark.driver.maxResultSize=4g pyspark-shell",
    )
    spark = (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", os.environ.get("SPARK_SHUFFLE_PARTITIONS", "8"))
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .config("spark.sql.adaptive.enabled", "false")
        .getOrCreate()
    )
    spark.sparkContext.setLogLevel("ERROR")
    return spark
