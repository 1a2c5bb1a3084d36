"""Paper Table 5: BLAST vs BCl1 vs BCl2 per dataset.

Run: ``python jobs/table5_weight_final.py`` (or spark-submit). Prints the reproduced
table as markdown and writes it to ``results/table5_weight_final.md``.
"""
import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).parent))
from _common import get_session, to_markdown

from repro.eval.tables import table5


def main() -> None:
    spark = get_session("table5_weight_final")
    df = table5(spark)
    md = to_markdown(df)
    print(md)
    out = pathlib.Path(__file__).resolve().parent.parent / "results" / "table5_weight_final.md"
    out.parent.mkdir(exist_ok=True)
    out.write_text(md + "\n")
    print(f"wrote {out}")


if __name__ == "__main__":
    main()
