"""Table 4 — 255-combination feature sweep for RCNP, top-10 by F1.

One pedantic round: the harness is an end-to-end experiment, and its
wall-clock (reported by pytest-benchmark) is the cost of regenerating the
table from the shared blocking/feature artifacts.
"""
from benchmarks._common import run_and_report
from repro.eval.tables import table4


def test_table4(spark, benchmark):
    df = run_and_report(benchmark, "table4", table4, spark)
    assert len(df) > 0
