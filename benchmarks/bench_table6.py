"""Table 6 — BLAST logistic-regression models over D100K.

One pedantic round: the harness is an end-to-end experiment, and its
wall-clock (reported by pytest-benchmark) is the cost of regenerating the
table from the shared blocking/feature artifacts.
"""
from benchmarks._common import run_and_report
from repro.eval.tables import table6


def test_table6(spark, benchmark):
    df = run_and_report(benchmark, "table6", table6, spark)
    assert len(df) > 0
