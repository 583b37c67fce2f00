"""Algorithm 2 (PCST summaries): connectivity, prize trade-off, scaling shape."""
import networkx as nx
import pytest

from repro.core.pcst import pcst_summaries
from repro.core.scenarios import SummaryRequest
from repro.graph.model import ETYPE_UI
from tests.conftest import make_kg, nx_of, random_kg


def _req(terminals, sid="user:0", scenario="user-centric"):
    return SummaryRequest(
        sid=sid,
        scenario=scenario,
        centers=(terminals[0],),
        targets=tuple((1, t) for t in terminals[1:]),
        paths=(),
    )


def test_summary_is_weakly_connected(spark):
    kg = random_kg(spark, n=12, m=22, seed=0)
    g = nx_of(kg)
    comp = sorted(max(nx.connected_components(g), key=len))
    (s,) = pcst_summaries(spark, kg, [_req(comp[:4])], max_hops=6)
    if s.edges:
        assert nx.is_connected(nx.Graph(list(s.edges)))


def test_nearby_terminals_all_connected(spark):
    # A path of 5 nodes, terminals at both ends and middle: all within prize
    # budget at edge_cost 0.25 → one component containing every terminal.
    kg = make_kg(spark, [(i, i + 1, 1.0, ETYPE_UI) for i in range(4)])
    (s,) = pcst_summaries(spark, kg, [_req([0, 2, 4])], max_hops=6)
    assert {0, 2, 4} <= s.nodes
    assert set(s.edges) == {(0, 1), (1, 2), (2, 3), (3, 4)}


def test_expensive_terminal_is_forgone(spark):
    # Terminals 0 and 13 joined by a 13-edge chain: connection cost
    # 13·0.25 = 3.25 > combined prize 2 → prize forgone, summary stays local.
    kg = make_kg(spark, [(i, i + 1, 1.0, ETYPE_UI) for i in range(13)])
    (s,) = pcst_summaries(spark, kg, [_req([0, 13])], max_hops=7)
    assert not ({0, 13} <= s.nodes)


def test_prize_scales_inclusion(spark):
    # Same chain, bigger prizes: now the far terminal is worth connecting.
    kg = make_kg(spark, [(i, i + 1, 1.0, ETYPE_UI) for i in range(13)])
    (s,) = pcst_summaries(spark, kg, [_req([0, 13])], max_hops=7, prize=2.0)
    assert {0, 13} <= s.nodes


def test_edge_cost_scales_exclusion(spark):
    kg = make_kg(spark, [(i, i + 1, 1.0, ETYPE_UI) for i in range(4)])
    (s,) = pcst_summaries(spark, kg, [_req([0, 4])], max_hops=6, edge_cost=1.0)
    assert not ({0, 4} <= s.nodes)  # 4 edges × 1.0 > prizes 2
    (s2,) = pcst_summaries(spark, kg, [_req([0, 4])], max_hops=6, edge_cost=0.25)
    assert {0, 4} <= s2.nodes


def test_excluded_k_terminals_act_as_relays_only(spark):
    # Star: terminals 1..3 around hub 0. At k=1 only target 1 is prized.
    kg = make_kg(spark, [(0, i, 1.0, ETYPE_UI) for i in (1, 2, 3)])
    req = SummaryRequest(
        sid="user:1",
        scenario="user-centric",
        centers=(1,),
        targets=((1, 2), (2, 3)),
        paths=(),
    )
    out = {s.k: s for s in pcst_summaries(spark, kg, [req], ks=[1, 2], max_hops=4)}
    assert 3 not in out[1].nodes or 3 in out[2].nodes
    assert {1, 2} <= out[1].nodes
    assert {1, 2, 3} <= out[2].nodes


def test_batching_matches_individual_runs(spark):
    kg = random_kg(spark, n=10, m=18, seed=3)
    g = nx_of(kg)
    comp = sorted(max(nx.connected_components(g), key=len))
    r1, r2 = _req(comp[:3], sid="a"), _req(comp[1:4], sid="b")
    both = pcst_summaries(spark, kg, [r1, r2], max_hops=6)
    solo = pcst_summaries(spark, kg, [r1], max_hops=6) + pcst_summaries(
        spark, kg, [r2], max_hops=6
    )
    assert {s.sid: s.edges for s in both} == {s.sid: s.edges for s in solo}


def test_deterministic(spark):
    kg = random_kg(spark, n=12, m=20, seed=5)
    g = nx_of(kg)
    comp = sorted(max(nx.connected_components(g), key=len))
    a = pcst_summaries(spark, kg, [_req(comp[:4])], max_hops=6)
    b = pcst_summaries(spark, kg, [_req(comp[:4])], max_hops=6)
    assert a[0].edges == b[0].edges and a[0].nodes == b[0].nodes


def test_terminals_recorded_on_summary(spark):
    kg = make_kg(spark, [(0, 1, 1.0, ETYPE_UI), (1, 2, 1.0, ETYPE_UI)])
    (s,) = pcst_summaries(spark, kg, [_req([0, 2])], max_hops=4)
    assert set(s.terminals) == {0, 2}


def test_pcst_larger_or_equal_than_steiner_on_lite(lite_summaries):
    # The paper's observed shape: PCST summaries are at least as large as ST.
    st = {(s.sid, s.k): s.n_edges() for s in lite_summaries["st"]}
    pc = {(s.sid, s.k): s.n_edges() for s in lite_summaries["pcst"]}
    bigger = sum(1 for key in st if pc.get(key, 0) >= st[key])
    assert bigger >= 0.6 * len(st)
