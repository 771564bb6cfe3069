"""spark-submit entrypoint: Fig. 10 — PRAUC vs support size (table form).

Prints the measured rows; paper-vs-measured comparison lives in
EXPERIMENTS.md. Run: `spark-submit jobs/fig10_support.py` or `python jobs/fig10_support.py`.
"""
from _common import get_spark

from repro.experiments.tables import fig10_rows, format_rows


def main() -> None:
    spark = get_spark("fig10_support")
    rows = fig10_rows(spark)
    print(format_rows(rows, "Fig. 10 — PRAUC vs support size (table form)"))


if __name__ == "__main__":
    main()
