"""Paper Figures 5/6 as a table: all 8 pruning algorithms, [21] features, 500 labels.

Run: ``python jobs/section52_algorithms.py`` (or spark-submit). Prints the reproduced
table as markdown and writes it to ``results/section52_algorithms.md``.
"""
import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).parent))
from _common import get_session, to_markdown

from repro.eval.tables import section52


def main() -> None:
    spark = get_session("section52_algorithms")
    df = section52(spark)
    md = to_markdown(df)
    print(md)
    out = pathlib.Path(__file__).resolve().parent.parent / "results" / "section52_algorithms.md"
    out.parent.mkdir(exist_ok=True)
    out.write_text(md + "\n")
    print(f"wrote {out}")


if __name__ == "__main__":
    main()
