"""Table III benchmark: all-method comparison on a TP-TR Small slice.

The full 26-source harness is ``jobs/table3_small.py``; this bench times a
3-source slice across the method families and asserts the ranking the
paper reports (Gen-T on top).
"""
import pytest

from repro.harness import runner

SLICE = ("q02", "q09", "q20")
METHODS = ["alite_ps", "auto_pipeline", "ver_int", "gen_t"]


@pytest.mark.benchmark(group="table3")
def test_bench_table3_small_slice(benchmark, spark, tptr_small):
    def run():
        cells = []
        for s in tptr_small.sources:
            if s.name not in SLICE:
                continue
            cells.extend(
                runner.run_source(
                    spark, tptr_small.repo, s.name, s.table, s.key_cols, METHODS,
                    int_set=tptr_small.int_sets[s.name], budget_s=120,
                )
            )
        return cells

    cells = benchmark.pedantic(run, rounds=1, iterations=1)
    agg = runner.aggregate(cells).set_index("method")
    assert agg.loc["gen_t", "eis"] >= agg.loc["alite_ps", "eis"]
    assert agg.loc["gen_t", "precision"] >= agg.loc["ver_int", "precision"]
