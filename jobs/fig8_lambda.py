"""spark-submit entrypoint: Fig. 8 — PRAUC vs lambda (table form).

Prints the measured rows; paper-vs-measured comparison lives in
EXPERIMENTS.md. Run: `spark-submit jobs/fig8_lambda.py` or `python jobs/fig8_lambda.py`.
"""
from _common import get_spark

from repro.experiments.tables import fig8_rows, format_rows


def main() -> None:
    spark = get_spark("fig8_lambda")
    rows = fig8_rows(spark)
    print(format_rows(rows, "Fig. 8 — PRAUC vs lambda (table form)"))


if __name__ == "__main__":
    main()
