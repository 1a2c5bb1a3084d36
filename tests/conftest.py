"""Test-scope Spark tuning.

Two sandbox-specific adjustments, neither of which changes any result:

- 8 shuffle partitions (the synthetic datasets here are tiny, and per-stage
  scheduling overhead dominates in this environment). The env var is read by
  the root conftest when it builds the session.
- Adaptive Query Execution off: AQE's per-stage driver-side replanning is
  pathologically slow under this sandbox's virtualisation (a cached 2.4k-row
  scan takes ~20s with AQE vs ~0.3s without — measured, not guessed). It is
  a dynamic SQL conf, so an autouse fixture flips it on the provided session.
"""
import os

import pytest

os.environ.setdefault("SPARK_SHUFFLE_PARTITIONS", "8")

# Larger driver result cap: preparing the biggest analogs collects a
# multi-million-row feature frame once per dataset. The root conftest has
# already seeded PYSPARK_SUBMIT_ARGS at import time, but the JVM only
# launches when the session fixture is first used, so amending the args
# here (before "pyspark-shell") still takes effect.
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
