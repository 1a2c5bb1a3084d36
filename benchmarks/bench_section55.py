"""Figures 17/18 — scalability over the Dirty analogs.

One pedantic round: the harness is an end-to-end experiment, and its
wall-clock (reported by pytest-benchmark) is the cost of regenerating the
table from the shared blocking/feature artifacts.
"""
from benchmarks._common import run_and_report
from repro.eval.tables import section55


def test_section55(spark, benchmark):
    df = run_and_report(benchmark, "section55", section55, spark)
    assert len(df) > 0
