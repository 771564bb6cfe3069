"""spark-submit entrypoint: Table 2 — data statistics.

Prints the measured rows; paper-vs-measured comparison lives in
EXPERIMENTS.md. Run: `spark-submit jobs/table2_stats.py` or `python jobs/table2_stats.py`.
"""
from _common import get_spark

from repro.experiments.tables import table2_rows, format_rows


def main() -> None:
    spark = get_spark("table2_stats")
    rows = table2_rows(spark)
    print(format_rows(rows, "Table 2 — data statistics"))


if __name__ == "__main__":
    main()
