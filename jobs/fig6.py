"""Reproduce the data behind paper Fig. 6: effectiveness of the hybrid
methods — EmbDI over all three fabrication sources, SemProp over the
ChEMBL-derived pairs only (it needs the domain ontology).

Run:  spark-submit jobs/fig6.py
"""
from _session import get_session

from repro.suite.experiments import BENCH, fig6_results


def main() -> None:
    spark = get_session("valentine-fig6")
    out = fig6_results(spark, BENCH)
    print("\nFig. 6 data — hybrid methods: min/median/max Recall@GT "
          "per scenario × noisy(schema-or-instance)\n")
    print(out.to_string(index=False, float_format=lambda v: f"{v:.3f}"))
    spark.stop()


if __name__ == "__main__":
    main()
