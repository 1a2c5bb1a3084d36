"""Paper Table 7: RCNP vs CNP1 vs CNP2 per dataset.

Run: ``python jobs/table7_cardinality_final.py`` (or spark-submit). Prints the reproduced
table as markdown and writes it to ``results/table7_cardinality_final.md``.
"""
import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).parent))
from _common import get_session, to_markdown

from repro.eval.tables import table7


def main() -> None:
    spark = get_session("table7_cardinality_final")
    df = table7(spark)
    md = to_markdown(df)
    print(md)
    out = pathlib.Path(__file__).resolve().parent.parent / "results" / "table7_cardinality_final.md"
    out.parent.mkdir(exist_ok=True)
    out.write_text(md + "\n")
    print(f"wrote {out}")


if __name__ == "__main__":
    main()
