"""Table 7 — RCNP vs CNP1 vs CNP2 per dataset (Re/Pr/F1/RT).

One pedantic round: the harness is an end-to-end experiment, and its
wall-clock (reported by pytest-benchmark) is the cost of regenerating the
table from the shared blocking/feature artifacts.
"""
from benchmarks._common import run_and_report
from repro.eval.tables import table7


def test_table7(spark, benchmark):
    df = run_and_report(benchmark, "table7", table7, spark)
    assert len(df) > 0
