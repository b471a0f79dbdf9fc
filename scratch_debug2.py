import os, sys

os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    "--master local[*] --driver-memory 8g --conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false pyspark-shell",
)
from pyspark.sql import SparkSession

spark = (
    SparkSession.builder.appName("debug2")
    .config("spark.sql.shuffle.partitions", "4")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

from repro.bench import tptr
from repro.core import discovery as disc, expand as exp, matrix as mtx

bench = tptr.build_tptr(spark, "/tmp/scratch_tptr", sf=0.001, target_rows=30, seed=0)
qname = sys.argv[1] if len(sys.argv) > 1 else "q11"
s = next(x for x in bench.sources if x.name == qname)
print(f"{qname}: cols={list(s.table.columns)} key={s.key_cols} rows={len(s.table)}", flush=True)
print(s.table.head(5).to_string(), flush=True)

stats = disc._column_containments(spark, bench.repo, s.table, None)
rel = stats[stats["overlap"] >= 0.2]
for src_col, grp in rel.groupby("src_col"):
    top = grp.head(6)
    print(f"== {src_col}: " + ", ".join(f"{r.table}.{r.col}={r.overlap:.2f}" for r in top.itertuples()), flush=True)

cands = disc.set_similarity(spark, bench.repo, s.table, s.key_cols, tau=0.2)
print("\ncandidates:", flush=True)
for c in cands:
    print(f"  {c.name:<22} mapping={c.mapping}", flush=True)

expanded = exp.expand(spark, bench.repo, cands, s.key_cols)
print("\nexpanded:", [c.name for c in expanded], flush=True)
matrices = {c.name: mtx.matrix_for_candidate(spark, c, s.table, s.key_cols) for c in expanded}
for n, m in matrices.items():
    print(f"  {n}: keys={len(m)} eis={mtx.evaluate_similarity(m, s.table, s.key_cols):.3f}", flush=True)
print("traversal:", mtx.matrix_traversal(matrices, s.table, s.key_cols), flush=True)
