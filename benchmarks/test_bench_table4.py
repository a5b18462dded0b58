"""Benchmark + reproduction of paper Table IV (avg runtime per method).

The per-method wall-clock means are themselves the reproduced artifact;
the pytest-benchmark timing wraps the whole sweep.
"""
from benchmarks.conftest import save_table
from repro.suite.experiments import BENCH, table4_results


def test_bench_table4(benchmark, spark, results_dir):
    out = benchmark.pedantic(
        lambda: table4_results(spark, BENCH), rounds=1, iterations=1)
    save_table(results_dir, "table4", out,
               "Table IV — average runtime per table pair (seconds)")
    r = out.set_index("method")["avg_runtime_s"]
    # paper-shape invariants: schema-based fast, EmbDI slowest tier
    assert min(r["Cupid"], r["COMA Schema-based"]) < r["COMA Instance-based"]
    assert r["EmbDI"] >= r.drop("EmbDI").median()
