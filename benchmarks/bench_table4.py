"""Table IV benchmark: web-table reclamation over the WDC+T2D lake.

Times Gen-T and ALITE-PS on a small set of corpus sources embedded among
1.5K noise web tables; asserts Gen-T's precision dominance (the paper's
Table IV has Gen-T at precision 1.0 vs ALITE's 0.49)."""
import pytest

from repro.harness import runner

SOURCES = ("countries__part1", "films__base", "animals__part0")
METHODS = ["alite_ps", "gen_t"]


@pytest.mark.benchmark(group="table4")
def test_bench_table4_wdc_slice(benchmark, spark, wdc_t2d):
    def run():
        cells = []
        for name in SOURCES:
            source = wdc_t2d.repo.load_pdf(name)
            cells.extend(
                runner.run_source(
                    spark, wdc_t2d.repo, name, source, ["c0"], METHODS,
                    tau=0.35, exclude=[name], budget_s=180,
                )
            )
        return cells

    cells = benchmark.pedantic(run, rounds=1, iterations=1)
    agg = runner.aggregate(cells).set_index("method")
    assert agg.loc["gen_t", "precision"] >= agg.loc["alite_ps", "precision"]
    assert agg.loc["gen_t", "recall"] > 0.5
