"""Performance experiments: the data behind Figures 9–11.

Usage:
  python jobs/scalability.py [--scale 0.25] [--graphs 1 2 3 4 5]
                             [--out results/scalability.csv]
"""
import argparse
import os

from repro.experiments import run_scalability
from repro.runtime import job_session


def main():
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=0.25)
    ap.add_argument("--graphs", type=int, nargs="+", default=[1, 2, 3, 4, 5])
    ap.add_argument("--out", default="results/scalability.csv")
    args = ap.parse_args()

    spark = job_session("scalability")
    spark.sparkContext.setLogLevel("ERROR")
    pdf = run_scalability(spark, scale=args.scale, graphs=tuple(args.graphs))
    os.makedirs(os.path.dirname(args.out) or ".", exist_ok=True)
    pdf.to_csv(args.out, index=False)

    for exp in pdf["experiment"].unique():
        sub = pdf[pdf["experiment"] == exp]
        print(f"\n=== {exp} ===")
        print(sub.round(2).to_string(index=False, columns=["graph", "x", "st_seconds", "pcst_seconds"]))
    print(f"\nwrote {args.out}")
    spark.stop()


if __name__ == "__main__":
    main()
