"""spark-submit entrypoint: Table 5 — top vs other vs all attributes (AdaMEL-hyb).

Prints the measured rows; paper-vs-measured comparison lives in
EXPERIMENTS.md. Run: `spark-submit jobs/table5_topfeatures.py` or `python jobs/table5_topfeatures.py`.
"""
from _common import get_spark

from repro.experiments.tables import table5_rows, format_rows


def main() -> None:
    spark = get_spark("table5_topfeatures")
    rows = table5_rows(spark)
    print(format_rows(rows, "Table 5 — top vs other vs all attributes (AdaMEL-hyb)"))


if __name__ == "__main__":
    main()
