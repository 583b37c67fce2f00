"""Table I: the worked summarization example (13 path edges → 6-edge tree).

Usage: python jobs/table1_example.py
"""
from repro.core.steiner import steiner_summaries
from repro.kg.example_fig1 import NAMES, PATHS, build_example, example_request
from repro.runtime import job_session


def run(spark):
    kg = build_example(spark)
    (summary,) = steiner_summaries(spark, kg, [example_request()], lam=1.0, ks=[3], max_hops=5)
    return summary


def main():
    spark = job_session("table1-example")
    spark.sparkContext.setLogLevel("ERROR")
    summary = run(spark)

    print("TABLE I — Summarized explanation paths for User 1")
    print("=" * 70)
    for label, p in zip("ABC", PATHS):
        print(f"Item {label}: " + " -> ".join(NAMES[n] for n in p) + f"   ({len(p)-1} edges)")
    total = sum(len(p) - 1 for p in PATHS)
    print(f"\nOriginal explanations total length: {total} edges (paper: 13)")
    print(f"Summary size: {summary.n_edges()} edges (paper: 6)")
    print("Summary nodes: " + ", ".join(sorted(NAMES[n] for n in summary.nodes)))
    print("Summary edges:")
    for a, b in summary.edges:
        print(f"  {NAMES[a]} -- {NAMES[b]}")
    spark.stop()


if __name__ == "__main__":
    main()
