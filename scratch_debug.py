import os, sys, time

os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    "--master local[*] --driver-memory 8g --conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false pyspark-shell",
)
from pyspark.sql import SparkSession

spark = (
    SparkSession.builder.appName("debug")
    .config("spark.sql.shuffle.partitions", "4")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

from repro.bench import tptr
from repro.core import discovery as disc

bench = tptr.build_tptr(spark, "/tmp/scratch_tptr2", sf=0.001, target_rows=30, seed=0)
s = next(x for x in bench.sources if x.name == "q09")
print("source cols:", list(s.table.columns), flush=True)

stats = disc._column_containments(spark, bench.repo, s.table, None)
stats = stats[stats["overlap"] >= 0.2].copy()
for src_col, grp in stats.groupby("src_col"):
    print(f"\n== {src_col} ==", flush=True)
    for r in grp.sort_values("overlap", ascending=False).itertuples():
        print(f"  {r.table:<22} {r.col:<5} ov={r.overlap:.2f} n={r.n_shared}")

cands = disc.set_similarity(spark, bench.repo, s.table, s.key_cols, tau=0.2)
print("\ncandidates:")
for c in cands:
    print(f"  {c.name:<22} score={c.score:.3f} mapping={c.mapping}")
