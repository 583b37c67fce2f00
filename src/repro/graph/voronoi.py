"""Nearest-terminal BFS (graph Voronoi partition) on Spark DataFrames.

The PCST primitive. Unlike :mod:`repro.graph.sssp`, the state is keyed by
``(sid, node)`` only — each node remembers just its *nearest* terminal (the
root of its Voronoi cell), its distance, and the path back to that terminal.
One relaxation pass therefore costs the same regardless of how many terminals
a summary has, which is exactly the |T|-independence the paper credits PCST
with (Figs. 9–11).
"""
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

_KEY = ["sid", "node"]
_EPS = 1e-9


def _best_of(df: DataFrame) -> DataFrame:
    # Tie-break on (dist, root, path) so the partition is deterministic.
    return (
        df.groupBy(*_KEY)
        .agg(F.min(F.struct("dist", "root", "path")).alias("_s"))
        .select(
            *_KEY,
            F.col("_s.dist").alias("dist"),
            F.col("_s.root").alias("root"),
            F.col("_s.path").alias("path"),
        )
    )


def voronoi_partition(
    spark: SparkSession,
    edges: DataFrame,
    terminals: DataFrame,
    *,
    max_hops: int,
) -> DataFrame:
    """Assign every reachable node to its nearest terminal.

    Args:
        edges: symmetrized ``(src, dst, cost)`` with ``cost > 0``.
        terminals: ``(sid, terminal)`` — the prize-bearing nodes per summary.
        max_hops: exploration radius in edges.

    Returns:
        ``(sid, node, root, dist, path)`` — ``root`` is the nearest terminal,
        ``path`` the node array from ``root`` to ``node`` inclusive.
    """
    base = edges.select("src", "dst", F.col("cost").alias("_c"))
    best = terminals.select(
        "sid",
        F.col("terminal").alias("node"),
        F.col("terminal").alias("root"),
        F.lit(0.0).alias("dist"),
        F.array(F.col("terminal")).alias("path"),
    ).localCheckpoint(eager=True)
    frontier = best

    for _ in range(max_hops):
        cand = (
            frontier.alias("f")
            .join(base.alias("e"), F.col("f.node") == F.col("e.src"))
            .select(
                F.col("f.sid").alias("sid"),
                F.col("e.dst").alias("node"),
                (F.col("f.dist") + F.col("_c")).alias("dist"),
                F.col("f.root").alias("root"),
                F.concat(F.col("f.path"), F.array(F.col("e.dst"))).alias("path"),
            )
        )
        merged = _best_of(best.unionByName(cand)).localCheckpoint(eager=True)
        old = best.select(*_KEY, F.col("dist").alias("_old"))
        frontier = (
            merged.join(old, _KEY, "left")
            .where(F.col("_old").isNull() | (F.col("dist") < F.col("_old") - _EPS))
            .drop("_old")
            .localCheckpoint(eager=True)
        )
        best = merged
        if frontier.isEmpty():
            break
    return best
