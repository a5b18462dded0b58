"""Reproduce the data behind paper Fig. 4: effectiveness of the
schema-based methods (Cupid, Similarity Flooding, COMA-schema) per
relatedness scenario, over fabricated pairs with noisy schemata.

Run:  spark-submit jobs/fig4.py
"""
from _session import get_session

from repro.suite.experiments import BENCH, fig4_results


def main() -> None:
    spark = get_session("valentine-fig4")
    out = fig4_results(spark, BENCH)
    print("\nFig. 4 data — schema-based methods, noisy schemata: "
          "min/median/max Recall@GT per scenario\n")
    print(out.to_string(index=False, float_format=lambda v: f"{v:.3f}"))
    spark.stop()


if __name__ == "__main__":
    main()
