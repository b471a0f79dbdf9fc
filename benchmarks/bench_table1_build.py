"""Table I benchmark: building the TP-TR Small lake (generation + Parquet
ingest + cells dataset) — the substrate cost behind every other table."""
import shutil

import pytest

from repro.bench import tptr


@pytest.mark.benchmark(group="table1")
def test_bench_build_tptr_small(benchmark, spark, tmp_path):
    def build():
        root = tmp_path / "lake"
        if root.exists():
            shutil.rmtree(root)
        return tptr.build_tptr(spark, root, sf=0.001, target_rows=30, seed=0)

    bench = benchmark.pedantic(build, rounds=1, iterations=1)
    assert len(bench.repo.names()) == 32
    assert len(bench.sources) == 26
