"""Reproduce paper Table IV: average runtime (s) per matching method.

Run:  spark-submit jobs/table4.py   (or: python jobs/table4.py)
"""
from _session import get_session

from repro.suite.experiments import BENCH, table4_results

PAPER = {  # seconds, paper Table IV (2×80-core/320GB testbed)
    "COMA Schema-based": 1.67,
    "Similarity Flooding": 7.09,
    "Cupid": 9.64,
    "Distribution-based": 71.16,
    "COMA Instance-based": 318.07,
    "Jaccard Levenshtein": 522.94,
    "SemProp": 735.25,
    "EmbDI": 4817.87,
}


def main() -> None:
    spark = get_session("valentine-table4")
    ours = table4_results(spark, BENCH).set_index("method")["avg_runtime_s"]
    print("\nTable IV — average runtime per table pair, seconds "
          "(ours vs paper; compare ordering, not absolutes)\n")
    print(f"{'method':24s} {'ours (s)':>9s} {'paper (s)':>10s}")
    for method in ours.sort_values().index:
        print(f"{method:24s} {ours[method]:9.2f} "
              f"{PAPER.get(method, float('nan')):10.2f}")
    spark.stop()


if __name__ == "__main__":
    main()
