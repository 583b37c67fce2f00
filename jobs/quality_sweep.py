"""Quality-metric sweep: the data behind Figures 2–8, 12–15 and 17.

Usage:
  python jobs/quality_sweep.py [--scale 0.05] [--users 10] [--items 10]
                               [--k 10] [--out results/quality_sweep.csv]
                               [--dataset ml1m|lfm1m]

Prints the per-(scenario, method, k) aggregate metric table and the Fig. 17
popularity-bias comparison; writes the per-summary rows to CSV.
"""
import argparse
import os

from repro.experiments import SweepConfig, run_sweep
from repro.metrics.quality import aggregate_quality
from repro.runtime import job_session


def main():
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=0.05)
    ap.add_argument("--users", type=int, default=10, help="users per gender")
    ap.add_argument("--items", type=int, default=10, help="items per popularity bucket")
    ap.add_argument("--k", type=int, default=10)
    ap.add_argument("--dataset", choices=["ml1m", "lfm1m"], default="ml1m")
    ap.add_argument("--out", default="results/quality_sweep.csv")
    args = ap.parse_args()

    spark = job_session("quality-sweep")
    spark.sparkContext.setLogLevel("ERROR")
    cfg = SweepConfig(
        scale=args.scale,
        n_users_per_gender=args.users,
        n_items_per_pop=args.items,
        k=args.k,
        dataset=args.dataset,
    )
    pdf = run_sweep(spark, cfg)
    os.makedirs(os.path.dirname(args.out) or ".", exist_ok=True)
    pdf.to_csv(args.out, index=False)

    agg = aggregate_quality(pdf)
    for scenario in sorted(agg["scenario"].unique()):
        sub = agg[(agg["scenario"] == scenario) & (agg["k"].isin([1, 5, 10]))]
        print(f"\n=== {scenario} (k in 1,5,10) ===")
        print(
            sub.round(4).to_string(
                index=False,
                columns=[
                    "method", "k", "comprehensibility", "actionability", "diversity",
                    "redundancy", "consistency", "relevance", "privacy", "n_edges",
                ],
            )
        )

    # Fig. 17: comprehensibility for popular vs unpopular items (CAFE input).
    ic = pdf[(pdf["scenario"] == "item-centric") & (pdf["item_pop"] != "") & (pdf["k"] == args.k)]
    if not ic.empty:
        bias = (
            ic.groupby(["method", "item_pop"])["comprehensibility"].mean().unstack().round(4)
        )
        print("\n=== Popularity bias (Fig. 17): comprehensibility at k =", args.k, "===")
        print(bias.to_string())
    print(f"\nwrote {args.out} ({len(pdf)} rows)")
    spark.stop()


if __name__ == "__main__":
    main()
