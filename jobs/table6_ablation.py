"""spark-submit entrypoint: Table 6 — contrastive-feature ablation.

Prints the measured rows; paper-vs-measured comparison lives in
EXPERIMENTS.md. Run: `spark-submit jobs/table6_ablation.py` or `python jobs/table6_ablation.py`.
"""
from _common import get_spark

from repro.experiments.tables import table6_rows, format_rows


def main() -> None:
    spark = get_spark("table6_ablation")
    rows = table6_rows(spark)
    print(format_rows(rows, "Table 6 — contrastive-feature ablation"))


if __name__ == "__main__":
    main()
