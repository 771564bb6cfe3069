"""spark-submit entrypoint: Fig. 9 — stability + runtime vs #sources.

Prints the measured rows; paper-vs-measured comparison lives in
EXPERIMENTS.md. Run: `spark-submit jobs/figure9_sources.py` or `python jobs/figure9_sources.py`.
"""
from _common import get_spark

from repro.experiments.tables import figure9_rows, format_rows


def main() -> None:
    spark = get_spark("figure9_sources")
    rows = figure9_rows(spark)
    print(format_rows(rows, "Fig. 9 — stability + runtime vs #sources"))


if __name__ == "__main__":
    main()
