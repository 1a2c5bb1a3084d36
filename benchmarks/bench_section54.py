"""Figures 11/13/14 — training-set size effect.

One pedantic round: the harness is an end-to-end experiment, and its
wall-clock (reported by pytest-benchmark) is the cost of regenerating the
table from the shared blocking/feature artifacts.
"""
from benchmarks._common import run_and_report
from repro.eval.tables import section54


def test_section54(spark, benchmark):
    df = run_and_report(benchmark, "section54", section54, spark)
    assert len(df) > 0
