"""Batched multi-landmark shortest paths vs networkx Dijkstra."""
import networkx as nx
import pytest
from pyspark.sql import functions as F

from repro.graph.sssp import multi_landmark_paths
from tests.conftest import nx_of, random_kg


def _cost_edges(kg):
    # Unit-offset cost so Dijkstra has strictly positive weights.
    return kg.undirected().select("src", "dst", (F.lit(1.0) + F.col("weight") / 10.0).alias("cost"))


def _nx_cost(g):
    h = nx.Graph()
    for a, b, d in g.edges(data=True):
        h.add_edge(a, b, weight=1.0 + d["weight"] / 10.0)
    return h


@pytest.mark.parametrize("seed", [0, 1, 2, 3])
def test_distances_match_networkx(spark, seed):
    kg = random_kg(spark, n=12, m=22, seed=seed)
    h = _nx_cost(nx_of(kg))
    landmarks = sorted(h.nodes)[:3]
    sources = spark.createDataFrame([(0, l) for l in landmarks], "sid: int, landmark: long")
    res = multi_landmark_paths(spark, _cost_edges(kg), sources, max_hops=12)
    got = {(r["landmark"], r["node"]): r["dist"] for r in res.collect()}
    for l in landmarks:
        expect = nx.single_source_dijkstra_path_length(h, l)
        for node, d in expect.items():
            assert got[(l, node)] == pytest.approx(d, abs=1e-9), (l, node)
        # no spurious reachability
        assert {n for (ll, n) in got if ll == l} == set(expect)


@pytest.mark.parametrize("seed", [5, 6])
def test_paths_are_valid_walks_with_matching_cost(spark, seed):
    kg = random_kg(spark, n=10, m=18, seed=seed)
    cost = {
        (min(r["src"], r["dst"]), max(r["src"], r["dst"])): 1.0 + r["weight"] / 10.0
        for r in kg.edges.collect()
    }
    sources = spark.createDataFrame([(0, 0)], "sid: int, landmark: long")
    res = multi_landmark_paths(spark, _cost_edges(kg), sources, max_hops=12)
    for r in res.collect():
        p = list(r["path"])
        assert p[0] == 0 and p[-1] == r["node"]
        total = 0.0
        for a, b in zip(p, p[1:]):
            key = (min(a, b), max(a, b))
            assert key in cost, f"edge {key} not in graph"
            total += cost[key]
        assert total == pytest.approx(r["dist"], abs=1e-9)


def test_hop_limit_restricts_reach(spark):
    # Path graph 0-1-2-3-4: with max_hops=2 node 4 is unreachable from 0.
    from tests.conftest import make_kg

    kg = make_kg(spark, [(i, i + 1, 1.0, "ui") for i in range(4)])
    edges = kg.undirected().select("src", "dst", F.lit(1.0).alias("cost"))
    sources = spark.createDataFrame([(0, 0)], "sid: int, landmark: long")
    res = multi_landmark_paths(spark, edges, sources, max_hops=2)
    reached = {r["node"] for r in res.collect()}
    assert reached == {0, 1, 2}


def test_multiple_sids_are_independent(spark):
    from tests.conftest import make_kg

    kg = make_kg(spark, [(0, 1, 1.0, "ui"), (1, 2, 1.0, "ui")])
    edges = kg.undirected().select("src", "dst", F.lit(1.0).alias("cost"))
    sources = spark.createDataFrame(
        [("a", 0), ("b", 2)], "sid: string, landmark: long"
    )
    res = multi_landmark_paths(spark, edges, sources, max_hops=4)
    rows = {(r["sid"], r["node"]): r["dist"] for r in res.collect()}
    assert rows[("a", 2)] == 2.0 and rows[("b", 0)] == 2.0
    assert ("a", 0) in rows and ("b", 2) in rows


def test_boost_reroutes_shortest_path(spark):
    # Triangle: 0-1 (cost 2.5 direct) vs 0-2-1 (cost 1+1); boosting 0-1 to
    # 0.5 for sid "x" flips the choice for that sid only.
    from tests.conftest import make_kg

    kg = make_kg(spark, [(0, 1, 1.0, "ui"), (0, 2, 1.0, "ui"), (2, 1, 1.0, "ui")])
    edges = kg.undirected().select(
        "src",
        "dst",
        F.when((F.col("src") + F.col("dst")) == 1, 2.5).otherwise(1.0).alias("cost"),
    )
    sources = spark.createDataFrame([("x", 0), ("y", 0)], "sid: string, landmark: long")
    boosts = spark.createDataFrame(
        [("x", 0, 1, 0.5), ("x", 1, 0, 0.5)], "sid: string, src: long, dst: long, cost: double"
    )
    res = multi_landmark_paths(spark, edges, sources, max_hops=4, boosts=boosts)
    rows = {(r["sid"], r["node"]): (r["dist"], list(r["path"])) for r in res.collect()}
    assert rows[("x", 1)] == (0.5, [0, 1])
    assert rows[("y", 1)] == (2.0, [0, 2, 1])


def test_deterministic_tie_break(spark):
    # Two equal-cost paths 0-1-3 and 0-2-3: min struct picks the lexically
    # smaller path, stable across runs.
    from tests.conftest import make_kg

    kg = make_kg(spark, [(0, 1, 1.0, "ui"), (0, 2, 1.0, "ui"), (1, 3, 1.0, "ui"), (2, 3, 1.0, "ui")])
    edges = kg.undirected().select("src", "dst", F.lit(1.0).alias("cost"))
    sources = spark.createDataFrame([(0, 0)], "sid: int, landmark: long")
    for _ in range(2):
        res = multi_landmark_paths(spark, edges, sources, max_hops=4)
        row = [r for r in res.collect() if r["node"] == 3][0]
        assert list(row["path"]) == [0, 1, 3]
