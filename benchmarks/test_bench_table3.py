"""Benchmark + reproduction of paper Table III (Magellan / ING#1 / ING#2).

The benchmark times one full Table III sweep; the reproduced table is
written to results/table3.{txt,csv} and its shape invariants asserted.
"""
from benchmarks.conftest import save_table
from repro.suite.experiments import BENCH, table3_results


def test_bench_table3(benchmark, spark, results_dir):
    out = benchmark.pedantic(
        lambda: table3_results(spark, BENCH), rounds=1, iterations=1)
    save_table(results_dir, "table3", out,
               "Table III — Recall@GT on Magellan (mean of 7 pairs), "
               "ING#1, ING#2")
    m = out.set_index("method")
    # paper-shape invariants
    assert m.loc["Cupid", "Magellan"] == 1.0
    assert m.loc["COMA Schema-based", "Magellan"] == 1.0
    assert m.loc["Distribution-based", "Magellan"] == m["Magellan"].min()
    # ING#2: Distribution-based far ahead of every schema-based method
    # (paper 0.879). The paper's COMA-instance scored 0.136 only because
    # of a COMA 3.0 bug with one-to-many matches, which we do not
    # reproduce — so COMA-instance is excluded from the comparison.
    assert m.loc["Distribution-based", "ING#2"] > 0.6
    assert m.loc["Distribution-based", "ING#2"] == \
        m.drop("COMA Instance-based")["ING#2"].max()
