"""Paper Figures 17/18 as a table: scalability over the Dirty analogs.

Run: ``python jobs/section55_scalability.py`` (or spark-submit). Prints the reproduced
table as markdown and writes it to ``results/section55_scalability.md``.
"""
import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).parent))
from _common import get_session, to_markdown

from repro.eval.tables import section55


def main() -> None:
    spark = get_session("section55_scalability")
    df = section55(spark)
    md = to_markdown(df)
    print(md)
    out = pathlib.Path(__file__).resolve().parent.parent / "results" / "section55_scalability.md"
    out.parent.mkdir(exist_ok=True)
    out.write_text(md + "\n")
    print(f"wrote {out}")


if __name__ == "__main__":
    main()
