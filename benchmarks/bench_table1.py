"""Table 1 — analog dataset characteristics (|E1|, |E2|, |D|, |C|).

One pedantic round: the harness is an end-to-end experiment, and its
wall-clock (reported by pytest-benchmark) is the cost of regenerating the
table from the shared blocking/feature artifacts.
"""
from benchmarks._common import run_and_report
from repro.eval.tables import table1


def test_table1(spark, benchmark):
    df = run_and_report(benchmark, "table1", table1, spark)
    assert len(df) > 0
