"""spark-submit entrypoint: Table 9 — Music MEL PRAUC (Fig. 6 numbers).

Prints the measured rows; paper-vs-measured comparison lives in
EXPERIMENTS.md. Run: `spark-submit jobs/table9_music.py` or `python jobs/table9_music.py`.
"""
from _common import get_spark

from repro.experiments.tables import table9_rows, format_rows


def main() -> None:
    spark = get_spark("table9_music")
    rows = table9_rows(spark, n_seeds=3)
    print(format_rows(rows, "Table 9 — Music MEL PRAUC (Fig. 6 numbers)"))


if __name__ == "__main__":
    main()
