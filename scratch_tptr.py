import os, sys, time

os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    "--master local[*] --driver-memory 8g --conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false pyspark-shell",
)
from pyspark.sql import SparkSession

spark = (
    SparkSession.builder.appName("scratch")
    .config("spark.sql.shuffle.partitions", "4")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

from repro.bench import tptr
from repro.harness import runner

methods = sys.argv[1].split(",") if len(sys.argv) > 1 else ["gen_t"]
t0 = time.time()
bench = tptr.build_tptr(spark, "/tmp/scratch_tptr", sf=0.001, target_rows=30, seed=0)
print(f"lake built in {time.time()-t0:.1f}s; {len(bench.repo.names())} tables", flush=True)

cells = []
for s in bench.sources:
    res = runner.run_source(
        spark, bench.repo, s.name, s.table, s.key_cols,
        methods, int_set=bench.int_sets[s.name], budget_s=120,
    )
    cells.extend(res)
    for c in res:
        print(
            f"{s.name} {c.method:<10} rec={c.recall:.3f} pre={c.precision:.3f} "
            f"eis={c.eis:.3f} kl={c.d_kl:.2f} perfect={c.perfect} t={c.runtime_s:.1f}s",
            flush=True,
        )
print(runner.format_table(runner.aggregate(cells), "mini TP-TR Small"), flush=True)
