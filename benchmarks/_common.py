"""Shared helper for the per-table benchmarks.

Each ``bench_*`` module times one table harness via pytest-benchmark
(pedantic, a single round — these are end-to-end experiment harnesses, not
microbenchmarks), prints the reproduced rows into the benchmark log and
writes them to ``results/<name>.md`` for EXPERIMENTS.md.
"""
import pathlib

from repro.eval.harness import to_markdown

RESULTS = pathlib.Path(__file__).resolve().parent.parent / "results"


def run_and_report(benchmark, name: str, fn, *args, **kwargs):
    """Time ``fn`` once, print + persist its markdown table, return the df."""
    df = benchmark.pedantic(lambda: fn(*args, **kwargs), rounds=1, iterations=1)
    md = to_markdown(df)
    print(f"\n### {name}\n{md}")
    RESULTS.mkdir(exist_ok=True)
    (RESULTS / f"{name}.md").write_text(md + "\n")
    return df
