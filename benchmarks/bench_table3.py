"""Table 3 — 255-combination feature sweep for BLAST, top-10 by F1.

One pedantic round: the harness is an end-to-end experiment, and its
wall-clock (reported by pytest-benchmark) is the cost of regenerating the
table from the shared blocking/feature artifacts.
"""
from benchmarks._common import run_and_report
from repro.eval.tables import table3


def test_table3(spark, benchmark):
    df = run_and_report(benchmark, "table3", table3, spark)
    assert len(df) > 0
