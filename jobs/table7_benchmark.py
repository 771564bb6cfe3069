"""spark-submit entrypoint: Table 7 — single-domain benchmark F1.

Prints the measured rows; paper-vs-measured comparison lives in
EXPERIMENTS.md. Run: `spark-submit jobs/table7_benchmark.py` or `python jobs/table7_benchmark.py`.
"""
from _common import get_spark

from repro.experiments.tables import table7_rows, format_rows


def main() -> None:
    spark = get_spark("table7_benchmark")
    rows = table7_rows(spark)
    print(format_rows(rows, "Table 7 — single-domain benchmark F1"))


if __name__ == "__main__":
    main()
