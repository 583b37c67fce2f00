"""Table III: synthetic random graph statistics (graphs 1–5).

Usage: python jobs/table3_synth_stats.py [--scale 1.0]
"""
import argparse

from repro.graph.stats import graph_stats
from repro.kg.synth_graphs import TABLE3_GRAPHS, synth_graph
from repro.runtime import job_session


def run(spark, *, scale=1.0, seed=29):
    out = {}
    for which in TABLE3_GRAPHS:
        g = synth_graph(spark, which, scale=scale, seed=seed)
        out[which] = graph_stats(g.kg)
    return out


def main():
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    args = ap.parse_args()
    spark = job_session("table3-synth-stats")
    spark.sparkContext.setLogLevel("ERROR")
    stats = run(spark, scale=args.scale)

    print(f"TABLE III — Synthetic Graph Statistics (scale={args.scale})")
    hdr = f"{'Property':28s}" + "".join(f"{'Graph '+str(i):>14s}" for i in TABLE3_GRAPHS)
    print(hdr)
    rows = [
        ("Number of users", lambda s: s.n_users, lambda t: t[0]),
        ("Number of items", lambda s: s.n_items, lambda t: t[1]),
        ("Number of external entities", lambda s: s.n_ext, lambda t: t[2]),
        ("Total number of nodes", lambda s: s.n_nodes, lambda t: t[0] + t[1] + t[2]),
        ("Total edges", lambda s: s.n_edges, lambda t: t[3]),
    ]
    for name, get, paper_get in rows:
        print(f"{name:28s}" + "".join(f"{get(stats[i]):>14,d}" for i in TABLE3_GRAPHS))
        print(f"{'  (paper)':28s}" + "".join(f"{paper_get(TABLE3_GRAPHS[i]):>14,d}" for i in TABLE3_GRAPHS))
    spark.stop()


if __name__ == "__main__":
    main()
