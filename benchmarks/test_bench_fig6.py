"""Benchmark + reproduction of the Fig. 6 data (hybrid methods: EmbDI on
all sources, SemProp on the ChEMBL-derived pairs)."""
from benchmarks.conftest import save_table
from repro.suite.experiments import BENCH, fig6_results


def test_bench_fig6(benchmark, spark, results_dir):
    out = benchmark.pedantic(
        lambda: fig6_results(spark, BENCH), rounds=1, iterations=1)
    save_table(results_dir, "fig6", out,
               "Fig. 6 data — hybrid methods: min/median/max Recall@GT "
               "per scenario × noisy")
    assert set(out["method"]) == {"embdi", "semprop"}
    # paper: SemProp is the weakest method overall
    med = out.groupby("method")["median"].median()
    assert med["semprop"] <= med["embdi"]
