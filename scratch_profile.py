import os, sys, time, functools

os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    "--master local[*] --driver-memory 8g --conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false pyspark-shell",
)
from pyspark.sql import SparkSession

spark = (
    SparkSession.builder.appName("profile")
    .config("spark.sql.shuffle.partitions", "4")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

def p(msg):
    print(f"[{time.time()-T0:7.1f}s] {msg}", flush=True)

from repro.bench import tptr
from repro.core import discovery as disc, expand as exp, matrix as mtx, integrate as integ
from repro.core.gent import reclaim_from_candidates
from repro.core import metrics as met

T0 = time.time()
bench = tptr.build_tptr(spark, "/tmp/scratch_tptr2", sf=0.001, target_rows=30, seed=0)
p(f"lake built: {len(bench.repo.names())} tables")

s = next(x for x in bench.sources if x.name == sys.argv[1] if len(sys.argv) > 1) if len(sys.argv) > 1 else next(x for x in bench.sources if x.name == "q09")
p(f"source {s.name}: {s.table.shape}")

t = time.time()
cands = disc.set_similarity(spark, bench.repo, s.table, s.key_cols, tau=0.2)
p(f"set_similarity: {time.time()-t:.1f}s, {len(cands)} candidates: {[c.name for c in cands]}")

t = time.time()
expanded = exp.expand(spark, bench.repo, cands, s.key_cols)
p(f"expand: {time.time()-t:.1f}s -> {[c.name for c in expanded]}")

t = time.time()
matrices = {c.name: mtx.matrix_for_candidate(spark, c.df, s.table, s.key_cols) for c in expanded}
p(f"matrices: {time.time()-t:.1f}s")

t = time.time()
orig = mtx.matrix_traversal(matrices, s.table, s.key_cols)
p(f"traversal: {time.time()-t:.1f}s -> {orig}")

by_name = {c.name: c for c in expanded}
for n in orig:
    cnt = by_name[n].df.count()
    p(f"  originating {n}: {cnt} rows, cols={by_name[n].df.columns}")
t = time.time()
reclaimed = integ.integrate(spark, [by_name[n].df for n in orig], s.table, s.key_cols)
p(f"integrate: {time.time()-t:.1f}s, rows={reclaimed.count()}")

t = time.time()
m = met.evaluate(spark, reclaimed, s.table, s.key_cols)
p(f"evaluate: {time.time()-t:.1f}s -> {m}")
pdf = reclaimed.toPandas()
print(pdf.head(30).to_string(), flush=True)
