"""Table 2 — input block-collection quality (Re/Pr/F1).

One pedantic round: the harness is an end-to-end experiment, and its
wall-clock (reported by pytest-benchmark) is the cost of regenerating the
table from the shared blocking/feature artifacts.
"""
from benchmarks._common import run_and_report
from repro.eval.tables import table2


def test_table2(spark, benchmark):
    df = run_and_report(benchmark, "table2", table2, spark)
    assert len(df) > 0
