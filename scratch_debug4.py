import os, sys

os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    "--master local[*] --driver-memory 8g --conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false pyspark-shell",
)
from pyspark.sql import SparkSession

spark = (
    SparkSession.builder.appName("debug4")
    .config("spark.sql.shuffle.partitions", "4")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

from repro.bench import tptr
from repro.core import discovery as disc
from repro.baselines import alite as al
from repro.core import metrics_core as mc

bench = tptr.build_tptr(spark, "/tmp/scratch_tptr", sf=0.001, target_rows=30, seed=0)
s = next(x for x in bench.sources if x.name == "q09")
cands = disc.set_similarity(spark, bench.repo, s.table, s.key_cols, tau=0.2)
print("cands:", [(c.name, list(c.mapping)) for c in cands], flush=True)

aligned = al._align_unmapped(cands)
for c, df in zip(cands, aligned):
    print(f"{c.name}: {df.columns}", flush=True)

out = al.alite(spark, cands, s.table, s.key_cols)
pdf = out.toPandas()
rec, pre = mc.recall_precision(s.table, pdf)
print(f"ALITE rec={rec:.3f} pre={pre:.3f} rows={len(pdf)}", flush=True)
print(pdf.head(15).to_string(), flush=True)
