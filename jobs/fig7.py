"""Reproduce the data behind paper Fig. 7: Recall@GT of all (non-SemProp)
methods on the four WikiData singer-pair scenario variants.

Run:  spark-submit jobs/fig7.py
"""
from _session import get_session

from repro.suite.experiments import BENCH, fig7_results


def main() -> None:
    spark = get_session("valentine-fig7")
    out = fig7_results(spark, BENCH)
    print("\nFig. 7 data — WikiData pairs: Recall@GT per method × scenario\n")
    print(out.to_string(index=False, float_format=lambda v: f"{v:.3f}"))
    spark.stop()


if __name__ == "__main__":
    main()
