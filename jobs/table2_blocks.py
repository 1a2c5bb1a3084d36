"""Paper Table 2: quality of the input block collections.

Run: ``python jobs/table2_blocks.py`` (or spark-submit). Prints the reproduced
table as markdown and writes it to ``results/table2_blocks.md``.
"""
import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).parent))
from _common import get_session, to_markdown

from repro.eval.tables import table2


def main() -> None:
    spark = get_session("table2_blocks")
    df = table2(spark)
    md = to_markdown(df)
    print(md)
    out = pathlib.Path(__file__).resolve().parent.parent / "results" / "table2_blocks.md"
    out.parent.mkdir(exist_ok=True)
    out.write_text(md + "\n")
    print(f"wrote {out}")


if __name__ == "__main__":
    main()
