"""Collect measured numbers for EXPERIMENTS.md. Usage: collect.py <section>."""
import os, sys, time

sys.path.insert(0, os.path.dirname(os.path.dirname(os.path.abspath(__file__))))
import conftest  # noqa: F401
from pyspark.sql import SparkSession

section = sys.argv[1]
spark = (
    SparkSession.builder.appName(f"collect-{section}")
    .config("spark.sql.shuffle.partitions", "16")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .config("spark.ui.enabled", "false")
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

from repro.experiments import tables as T

t0 = time.time()
out = []
if section == "A":
    out.append(T.format_rows(T.table9_rows(spark, datasets=("Music-3K",), n_seeds=1), "Table 9 Music-3K"))
elif section == "B":
    out.append(T.format_rows(T.table9_rows(spark, datasets=("Music-1M",), n_seeds=1), "Table 9 Music-1M"))
elif section == "C":
    out.append(T.format_rows(T.table8_rows(spark, n_seeds=1), "Table 8 Monitor"))
    out.append(T.format_rows(T.figure9_rows(spark, steps=(7, 15, 24)), "Figure 9"))
elif section == "D":
    out.append(T.format_rows(T.table4_rows(spark), "Table 4"))
    out.append(T.format_rows(T.table5_rows(spark), "Table 5"))
    out.append(T.format_rows(T.table6_rows(spark), "Table 6"))
elif section == "E":
    out.append(T.format_rows(T.table7_rows(spark), "Table 7"))
    out.append(T.format_rows(T.fig8_rows(spark, lambdas=(0.0, 0.5, 0.9, 0.98, 1.0)), "Figure 8"))
elif section == "F":
    out.append(T.format_rows(T.table2_rows(spark), "Table 2"))
    out.append(T.format_rows(T.table3_rows(spark), "Table 3"))
    out.append(T.format_rows(T.fig10_rows(spark, support_sizes=(1, 20, 60, 100, 200, 300)), "Figure 10"))

with open(f"/tmp/collect_{section}.txt", "w") as f:
    f.write("\n".join(out))
    f.write(f"\n[section {section} done in {time.time()-t0:.0f}s]\n")
print(f"section {section} done in {time.time()-t0:.0f}s")
