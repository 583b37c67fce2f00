"""Algorithm 1 (ST summaries): tree validity, 2-approximation, λ behaviour."""
from itertools import chain, combinations

import networkx as nx
import pytest

from repro.core.scenarios import SummaryRequest
from repro.core.steiner import steiner_summaries
from repro.core.weights import COST_EPS, w_cap_for
from repro.graph.model import ETYPE_UI
from tests.conftest import make_kg, nx_of, random_kg


def _req(terminals, paths=(), sid="user:0", scenario="user-centric"):
    return SummaryRequest(
        sid=sid,
        scenario=scenario,
        centers=(terminals[0],),
        targets=tuple((1, t) for t in terminals[1:]),
        paths=tuple((1, tuple(p)) for p in paths),
    )


def _edge_costs(kg, lam=0.0):
    w_cap = w_cap_for(kg, lam)
    return {
        (min(r["src"], r["dst"]), max(r["src"], r["dst"])): 1.0
        + COST_EPS * (1.0 - min(max(r["weight"] / w_cap, 0.0), 1.0))
        for r in kg.edges.collect()
    }


def _brute_force_steiner_cost(g: nx.Graph, terminals, costs) -> float:
    """Exact minimum Steiner tree cost by Steiner-node subset enumeration."""
    for a, b in g.edges:
        g[a][b]["cost"] = costs[(min(a, b), max(a, b))]
    others = [n for n in g.nodes if n not in terminals]
    best = float("inf")
    for r in range(len(others) + 1):
        for extra in combinations(others, r):
            sub = g.subgraph(set(terminals) | set(extra))
            if sub.number_of_nodes() == 0 or not nx.is_connected(sub):
                continue
            t = nx.minimum_spanning_tree(sub, weight="cost")
            best = min(best, sum(d["cost"] for _, _, d in t.edges(data=True)))
    return best


def _tree_checks(s, terminals_reachable):
    g = nx.Graph(list(s.edges))
    if s.edges:
        assert nx.is_connected(g), "summary must be weakly connected"
        assert g.number_of_edges() == g.number_of_nodes() - 1, "summary must be a tree"
    for t in terminals_reachable:
        assert t in s.nodes


@pytest.mark.parametrize("seed", [0, 1, 2, 3])
def test_two_approximation_vs_brute_force(spark, seed):
    kg = random_kg(spark, n=9, m=14, seed=seed)
    g = nx_of(kg)
    comp = max(nx.connected_components(g), key=len)
    terminals = sorted(comp)[:3]
    if len(terminals) < 3:
        pytest.skip("component too small")
    costs = _edge_costs(kg)
    opt = _brute_force_steiner_cost(g, terminals, costs)
    (s,) = steiner_summaries(spark, kg, [_req(terminals)], lam=0.0, max_hops=10)
    got = sum(costs[e] for e in s.edges)
    assert got <= 2.0 * opt + 1e-9
    _tree_checks(s, terminals)


@pytest.mark.parametrize("seed", [4, 5])
def test_tree_has_no_nonterminal_leaves(spark, seed):
    kg = random_kg(spark, n=12, m=20, seed=seed)
    g = nx_of(kg)
    comp = max(nx.connected_components(g), key=len)
    terminals = sorted(comp)[:4]
    (s,) = steiner_summaries(spark, kg, [_req(terminals)], lam=0.0, max_hops=10)
    t = nx.Graph(list(s.edges))
    for node in t.nodes:
        if t.degree(node) == 1:
            assert node in terminals


def test_two_terminals_is_shortest_path(spark):
    kg = make_kg(
        spark,
        [(0, 1, 1.0, ETYPE_UI), (1, 2, 1.0, ETYPE_UI), (0, 3, 1.0, ETYPE_UI), (3, 4, 1.0, ETYPE_UI), (4, 2, 1.0, ETYPE_UI)],
    )
    (s,) = steiner_summaries(spark, kg, [_req([0, 2])], lam=0.0, max_hops=6)
    assert set(s.edges) == {(0, 1), (1, 2)}


def test_high_lambda_reuses_explanation_path(spark):
    # Direct edge 0-3 (high weight) vs explanation path 0-1-2-3 (low weights).
    # λ=0 summarizes fresh (direct edge wins on cost); λ large makes the
    # boosted path edges cost ~1 each but 3 hops still > 1 hop, so use equal
    # weights: direct edge weight 1 low, path edges weight 1 — with 3 edges vs
    # 1, edge count dominates. Instead verify edge-level preference: two
    # 2-hop routes 0-1-3 (on path) and 0-2-3 (off path), equal weights; high
    # λ must pick the on-path route.
    kg = make_kg(
        spark,
        [(0, 1, 1.0, ETYPE_UI), (1, 3, 1.0, ETYPE_UI), (0, 2, 1.0, ETYPE_UI), (2, 3, 1.0, ETYPE_UI)],
    )
    req = _req([0, 3], paths=[[0, 1, 3]])
    (s_hi,) = steiner_summaries(spark, kg, [req], lam=100.0, max_hops=4)
    assert set(s_hi.edges) == {(0, 1), (1, 3)}


def test_lambda_zero_ignores_explanation_path(spark):
    # Off-path route has higher weight; λ=0 must take it despite the path.
    kg = make_kg(
        spark,
        [(0, 1, 1.0, ETYPE_UI), (1, 3, 1.0, ETYPE_UI), (0, 2, 5.0, ETYPE_UI), (2, 3, 5.0, ETYPE_UI)],
    )
    req = _req([0, 3], paths=[[0, 1, 3]])
    (s_lo,) = steiner_summaries(spark, kg, [req], lam=0.0, max_hops=4)
    assert set(s_lo.edges) == {(0, 2), (2, 3)}


def test_unreachable_terminal_is_dropped(spark):
    kg = make_kg(spark, [(0, 1, 1.0, ETYPE_UI), (5, 6, 1.0, ETYPE_UI)])
    (s,) = steiner_summaries(spark, kg, [_req([0, 1, 6])], lam=0.0, max_hops=6)
    assert set(s.edges) == {(0, 1)}
    assert 6 not in s.nodes


def test_incremental_k_series(spark):
    kg = make_kg(
        spark,
        [(0, 1, 1.0, ETYPE_UI), (0, 2, 1.0, ETYPE_UI), (0, 3, 1.0, ETYPE_UI)],
    )
    req = SummaryRequest(
        sid="user:0",
        scenario="user-centric",
        centers=(0,),
        targets=((1, 1), (2, 2), (3, 3)),
        paths=((1, (0, 1)), (2, (0, 2)), (3, (0, 3))),
    )
    out = steiner_summaries(spark, kg, [req], lam=1.0, ks=[1, 2, 3])
    sizes = {s.k: s.n_edges() for s in out}
    assert sizes == {1: 1, 2: 2, 3: 3}
    nodes_by_k = {s.k: s.nodes for s in out}
    assert nodes_by_k[1] <= nodes_by_k[2] <= nodes_by_k[3]


def test_batching_matches_individual_runs(spark):
    kg = random_kg(spark, n=10, m=18, seed=7)
    g = nx_of(kg)
    comp = sorted(max(nx.connected_components(g), key=len))
    r1 = _req(comp[:3], sid="a")
    r2 = _req(comp[1:4], sid="b")
    both = steiner_summaries(spark, kg, [r1, r2], lam=0.0, max_hops=8)
    solo1 = steiner_summaries(spark, kg, [r1], lam=0.0, max_hops=8)
    solo2 = steiner_summaries(spark, kg, [r2], lam=0.0, max_hops=8)
    assert {s.sid: s.edges for s in both} == {
        solo1[0].sid: solo1[0].edges,
        solo2[0].sid: solo2[0].edges,
    }


def test_singleton_terminal_gives_empty_tree(spark):
    kg = make_kg(spark, [(0, 1, 1.0, ETYPE_UI)])
    (s,) = steiner_summaries(spark, kg, [_req([0])], lam=0.0)
    assert s.edges == () and s.nodes == frozenset({0})


def test_summary_metadata(spark, ml1m_lite, lite_requests, lite_summaries):
    for s in lite_summaries["st"]:
        assert s.method == "st(lam=1)"
        assert s.scenario == "user-centric"
        assert 1 <= s.k <= 5
        assert s.sid.startswith("user:")
