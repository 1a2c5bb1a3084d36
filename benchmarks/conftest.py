"""Benchmark-scope Spark tuning — same sandbox adjustments as tests/conftest.py
(8 shuffle partitions, AQE off; see that file for the measurements)."""
import os

import pytest

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")

if "maxResultSize" not in os.environ.get("PYSPARK_SUBMIT_ARGS", ""):
    os.environ["PYSPARK_SUBMIT_ARGS"] = os.environ.get(
        "PYSPARK_SUBMIT_ARGS", "pyspark-shell"
    ).replace(
        "pyspark-shell", "--conf spark.driver.maxResultSize=4g pyspark-shell"
    )


@pytest.fixture(scope="session", autouse=True)
def _spark_sandbox_tuning(spark):
    spark.conf.set("spark.sql.adaptive.enabled", "false")
    spark.sparkContext.setLogLevel("ERROR")
    yield
