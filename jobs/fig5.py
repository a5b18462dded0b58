"""Reproduce the data behind paper Fig. 5: effectiveness of the
instance-based methods (COMA-instance, Distribution-based,
Jaccard-Levenshtein) per scenario, split verbatim vs noisy instances.

Run:  spark-submit jobs/fig5.py
"""
from _session import get_session

from repro.suite.experiments import BENCH, fig5_results


def main() -> None:
    spark = get_session("valentine-fig5")
    out = fig5_results(spark, BENCH)
    print("\nFig. 5 data — instance-based methods: min/median/max "
          "Recall@GT per scenario × instance-noise\n")
    print(out.to_string(index=False, float_format=lambda v: f"{v:.3f}"))
    spark.stop()


if __name__ == "__main__":
    main()
