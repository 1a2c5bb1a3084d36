"""Paper Table 6: BLAST's logistic-regression models over the D100K analog.

Run: ``python jobs/table6_models.py`` (or spark-submit). Prints the reproduced
table as markdown and writes it to ``results/table6_models.md``.
"""
import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).parent))
from _common import get_session, to_markdown

from repro.eval.tables import table6


def main() -> None:
    spark = get_session("table6_models")
    df = table6(spark)
    md = to_markdown(df)
    print(md)
    out = pathlib.Path(__file__).resolve().parent.parent / "results" / "table6_models.md"
    out.parent.mkdir(exist_ok=True)
    out.write_text(md + "\n")
    print(f"wrote {out}")


if __name__ == "__main__":
    main()
