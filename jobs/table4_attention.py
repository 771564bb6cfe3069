"""spark-submit entrypoint: Table 4 — learned top-5 feature importance (AdaMEL-hyb).

Prints the measured rows; paper-vs-measured comparison lives in
EXPERIMENTS.md. Run: `spark-submit jobs/table4_attention.py` or `python jobs/table4_attention.py`.
"""
from _common import get_spark

from repro.experiments.tables import table4_rows, format_rows


def main() -> None:
    spark = get_spark("table4_attention")
    rows = table4_rows(spark)
    print(format_rows(rows, "Table 4 — learned top-5 feature importance (AdaMEL-hyb)"))


if __name__ == "__main__":
    main()
