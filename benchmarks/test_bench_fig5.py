"""Benchmark + reproduction of the Fig. 5 data (instance-based methods
over all fabricated pairs, verbatim vs noisy instances)."""
from benchmarks.conftest import save_table
from repro.suite.experiments import BENCH, fig5_results


def test_bench_fig5(benchmark, spark, results_dir):
    out = benchmark.pedantic(
        lambda: fig5_results(spark, BENCH), rounds=1, iterations=1)
    save_table(results_dir, "fig5", out,
               "Fig. 5 data — instance-based methods: min/median/max "
               "Recall@GT per scenario × instance-noise")
    assert set(out["method"]) == {"coma_instance", "distribution_based",
                                  "jaccard_levenshtein"}
    # paper: instance methods are very effective on joinable pairs
    j = out[out["scenario"] == "joinable"]
    assert j["median"].median() >= 0.6
