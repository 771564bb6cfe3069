"""spark-submit entrypoint: Table 8 — Monitor MEL PRAUC.

Prints the measured rows; paper-vs-measured comparison lives in
EXPERIMENTS.md. Run: `spark-submit jobs/table8_monitor.py` or `python jobs/table8_monitor.py`.
"""
from _common import get_spark

from repro.experiments.tables import table8_rows, format_rows


def main() -> None:
    spark = get_spark("table8_monitor")
    rows = table8_rows(spark, n_seeds=3)
    print(format_rows(rows, "Table 8 — Monitor MEL PRAUC"))


if __name__ == "__main__":
    main()
