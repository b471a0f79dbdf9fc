"""Table II benchmark: Gen-T vs ALITE-PS on a TP-TR Med slice.

The full Table II harness is ``jobs/table2_effectiveness.py``; this bench
times a representative slice (3 sources) and asserts the table's headline
shape: Gen-T's EIS ≥ ALITE-PS's and its output stays near source-sized.
"""
import pytest

from repro.harness import runner


def _run(spark, bench, methods, sources):
    cells = []
    for s in bench.sources:
        if s.name not in sources:
            continue
        cells.extend(
            runner.run_source(
                spark, bench.repo, s.name, s.table, s.key_cols, methods,
                int_set=bench.int_sets[s.name], budget_s=420,
            )
        )
    return cells


SLICE = ("q01", "q09", "q19")


@pytest.mark.benchmark(group="table2")
def test_bench_table2_gen_t_med(benchmark, spark, tptr_med):
    cells = benchmark.pedantic(
        lambda: _run(spark, tptr_med, ["gen_t"], SLICE), rounds=1, iterations=1
    )
    agg = runner.aggregate(cells).set_index("method")
    assert agg.loc["gen_t", "recall"] > 0.6


@pytest.mark.benchmark(group="table2")
def test_bench_table2_alite_ps_med(benchmark, spark, tptr_med):
    cells = benchmark.pedantic(
        lambda: _run(spark, tptr_med, ["alite_ps"], SLICE), rounds=1, iterations=1
    )
    agg = runner.aggregate(cells).set_index("method")
    # ALITE-PS integrates erroneous variants too: real but imprecise output
    assert agg.loc["alite_ps", "recall"] > 0.3
    assert agg.loc["alite_ps", "precision"] < 1.0
