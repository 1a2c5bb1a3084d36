"""Figures 5/6 — all 8 pruning algorithms, averaged over analogs.

One pedantic round: the harness is an end-to-end experiment, and its
wall-clock (reported by pytest-benchmark) is the cost of regenerating the
table from the shared blocking/feature artifacts.
"""
from benchmarks._common import run_and_report
from repro.eval.tables import section52


def test_section52(spark, benchmark):
    df = run_and_report(benchmark, "section52", section52, spark)
    assert len(df) > 0
