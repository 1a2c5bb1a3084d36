"""Paper Table 3: top-10 feature sets for BLAST (255-combination sweep).

Run: ``python jobs/table3_sweep_blast.py`` (or spark-submit). Prints the reproduced
table as markdown and writes it to ``results/table3_sweep_blast.md``.
"""
import pathlib
import sys

sys.path.insert(0, str(pathlib.Path(__file__).parent))
from _common import get_session, to_markdown

from repro.eval.tables import table3


def main() -> None:
    spark = get_session("table3_sweep_blast")
    df = table3(spark)
    md = to_markdown(df)
    print(md)
    out = pathlib.Path(__file__).resolve().parent.parent / "results" / "table3_sweep_blast.md"
    out.parent.mkdir(exist_ok=True)
    out.write_text(md + "\n")
    print(f"wrote {out}")


if __name__ == "__main__":
    main()
