"""Reproduce paper Table III: Recall@GroundTruth of the seven matching
methods on the Magellan-style pairs and the two ING-style pairs.

Run:  spark-submit jobs/table3.py   (or: python jobs/table3.py)
"""
from _session import get_session

from repro.suite.experiments import BENCH, table3_results

PAPER = {  # the paper's Table III numbers, for side-by-side diffing
    "Cupid": (1.0, 0.714, 0.5),
    "Similarity Flooding": (1.0, 0.357, 0.439),
    "COMA Schema-based": (1.0, 0.786, 0.121),
    "COMA Instance-based": (1.0, 0.786, 0.136),
    "Distribution-based": (0.54, 0.857, 0.879),
    "Jaccard Levenshtein": (0.787, 0.786, 0.621),
    "EmbDI": (0.818, 0.714, 0.227),
}


def main() -> None:
    spark = get_session("valentine-table3")
    ours = table3_results(spark, BENCH).set_index("method")
    print("\nTable III — Recall@GT (ours vs paper)\n")
    hdr = (f"{'method':24s} {'Magellan':>9s} {'(paper)':>8s} "
           f"{'ING#1':>7s} {'(paper)':>8s} {'ING#2':>7s} {'(paper)':>8s}")
    print(hdr)
    for method, (pm, p1, p2) in PAPER.items():
        r = ours.loc[method]
        print(f"{method:24s} {r['Magellan']:9.3f} {pm:8.3f} "
              f"{r['ING#1']:7.3f} {p1:8.3f} {r['ING#2']:7.3f} {p2:8.3f}")
    spark.stop()


if __name__ == "__main__":
    main()
