import os, sys

os.environ.setdefault(
    "PYSPARK_SUBMIT_ARGS",
    "--master local[*] --driver-memory 8g --conf spark.driver.host=127.0.0.1 "
    "--conf spark.ui.enabled=false pyspark-shell",
)
from pyspark.sql import SparkSession

spark = (
    SparkSession.builder.appName("debug3")
    .config("spark.sql.shuffle.partitions", "4")
    .config("spark.sql.execution.arrow.pyspark.enabled", "true")
    .config("spark.sql.autoBroadcastJoinThreshold", -1)
    .getOrCreate()
)
spark.sparkContext.setLogLevel("ERROR")

from repro.bench import tptr
from repro.core import discovery as disc

bench = tptr.build_tptr(spark, "/tmp/scratch_tptr", sf=0.001, target_rows=30, seed=0)
qname = sys.argv[1] if len(sys.argv) > 1 else "q11"
s = next(x for x in bench.sources if x.name == qname)

stats = disc._column_containments(spark, bench.repo, s.table, None)
stats = stats[stats["overlap"] >= 0.2]
options = {}
table_scores = {}
for src_col, grp in stats.groupby("src_col", sort=True):
    for r in grp.itertuples():
        options.setdefault(r.table, {}).setdefault(src_col, []).append(
            (r.col, r.overlap, r.vals, r.jac)
        )
    best = grp.drop_duplicates("table").head(10)
    ranked = [
        {"table": r.table, "col": r.col, "overlap": r.overlap, "vals": r.vals}
        for r in best.itertuples()
    ]
    for d in disc.diversify_candidates(ranked):
        table_scores.setdefault(d["table"], []).append(d["div_score"])

order = sorted(table_scores, key=lambda t: (-(sum(table_scores[t]) / len(table_scores[t])), t))[:25]
print("ranked tables:", order, flush=True)
for name in order:
    if "lineitem" not in name and "orders" not in name:
        continue
    tbl = bench.repo.load_pdf(name)
    m = disc._refine_mapping(name, tbl, options[name], s.table, list(s.key_cols), 0.2)
    print(f"  {name}: mapping={m}", flush=True)
