"""spark-submit entrypoint: Table 3 — train/support/test sizes.

Prints the measured rows; paper-vs-measured comparison lives in
EXPERIMENTS.md. Run: `spark-submit jobs/table3_splits.py` or `python jobs/table3_splits.py`.
"""
from _common import get_spark

from repro.experiments.tables import table3_rows, format_rows


def main() -> None:
    spark = get_spark("table3_splits")
    rows = table3_rows(spark)
    print(format_rows(rows, "Table 3 — train/support/test sizes"))


if __name__ == "__main__":
    main()
