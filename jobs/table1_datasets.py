"""Paper Table 1: dataset characteristics of the Clean-Clean analogs (plus Table 1b for the Dirty scalability analogs).

Run: ``python jobs/table1_datasets.py`` (or spark-submit). Prints the reproduced
table as markdown and writes it to ``results/table1_datasets.md``.
"""
import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).parent))
from _common import get_session, to_markdown

from repro.eval.tables import table1, table1b


def main() -> None:
    spark = get_session("table1_datasets")
    md = to_markdown(table1(spark)) + "\n\n" + to_markdown(table1b(spark))
    print(md)
    out = pathlib.Path(__file__).resolve().parent.parent / "results" / "table1_datasets.md"
    out.parent.mkdir(exist_ok=True)
    out.write_text(md + "\n")
    print(f"wrote {out}")


if __name__ == "__main__":
    main()
