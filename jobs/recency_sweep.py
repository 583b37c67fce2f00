"""Recency experiment: the data behind Figure 16.

Sweeps (β1, β2) combinations controlling rating-vs-recency balance in
``w_M = β1·r + β2·exp(−γ(t0−t))``, summarizes PGPR paths with ST at k=10
(user-centric and user-group), and reports comprehensibility and diversity.

Usage: python jobs/recency_sweep.py [--scale 0.05] [--users 10]
"""
import argparse

from repro.core import steiner_summaries, user_centric_requests, user_group_requests
from repro.experiments.sweep import sample_users
from repro.kg.datasets import dataset_kg, ml1m
from repro.metrics.quality import aggregate_quality, compute_quality
from repro.recommenders import pgpr
from repro.runtime import job_session

# (β1, β2) combinations as in Fig. 16: rating-dominant → recency-dominant.
BETAS = [(1.0, 0.0), (0.75, 0.25), (0.5, 0.5), (0.25, 0.75), (0.0, 1.0)]
GAMMA = 5e-8  # ~e-fold over half the 3-year rating window


def run(spark, *, scale=0.05, users_per_gender=10, k=10, seed=11):
    ds = ml1m(scale=scale, seed=seed)
    genders = sample_users(ds, users_per_gender, seed)
    users = sorted(set(genders["M"]) | set(genders["F"]))
    rows = []
    for b1, b2 in BETAS:
        kg = dataset_kg(spark, ds, beta1=b1, beta2=b2, gamma=GAMMA)
        kg.edges.cache().count()
        paths = pgpr(spark, kg, ds.ids, users, k=k, seed=seed)
        reqs = user_centric_requests(paths) + user_group_requests(paths, genders)
        summaries = steiner_summaries(spark, kg, reqs, lam=1.0, ks=[k], method="st")
        pdf = compute_quality(spark, kg, summaries)
        agg = aggregate_quality(pdf)
        agg["beta1"], agg["beta2"] = b1, b2
        rows.append(agg)
        kg.edges.unpersist()
    import pandas as pd

    return pd.concat(rows, ignore_index=True)


def main():
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=0.05)
    ap.add_argument("--users", type=int, default=10)
    args = ap.parse_args()
    spark = job_session("recency-sweep")
    spark.sparkContext.setLogLevel("ERROR")
    pdf = run(spark, scale=args.scale, users_per_gender=args.users)
    print("=== Fig. 16: ST comprehensibility & diversity vs (β1, β2), k=10 ===")
    print(
        pdf.round(4).to_string(
            index=False,
            columns=["scenario", "beta1", "beta2", "comprehensibility", "diversity", "n_edges"],
        )
    )
    spark.stop()


if __name__ == "__main__":
    main()
