"""Connected components vs networkx."""
import networkx as nx
import pytest

from repro.graph.components import connected_components, is_weakly_connected
from tests.conftest import make_kg, nx_of, random_kg


@pytest.mark.parametrize("seed,n,m", [(0, 12, 8), (1, 15, 10), (2, 20, 12)])
def test_components_match_networkx(spark, seed, n, m):
    kg = random_kg(spark, n=n, m=m, seed=seed)
    comps = connected_components(spark, kg.nodes, kg.edges)
    got = {}
    for r in comps.collect():
        got.setdefault(r["component"], set()).add(r["id"])
    expect = [set(c) for c in nx.connected_components(nx_of(kg))]
    assert sorted(map(sorted, got.values())) == sorted(map(sorted, expect))


def test_component_label_is_min_member(spark):
    kg = make_kg(spark, [(5, 7, 1.0, "ui"), (7, 9, 1.0, "ui"), (1, 2, 1.0, "ui")])
    comps = {r["id"]: r["component"] for r in connected_components(spark, kg.nodes, kg.edges).collect()}
    assert comps[5] == comps[7] == comps[9] == 5
    assert comps[1] == comps[2] == 1


def test_is_weakly_connected(spark):
    path = make_kg(spark, [(i, i + 1, 1.0, "ui") for i in range(4)])
    assert is_weakly_connected(spark, path.nodes, path.edges)
    split = make_kg(spark, [(0, 1, 1.0, "ui"), (2, 3, 1.0, "ui")])
    assert not is_weakly_connected(spark, split.nodes, split.edges)


def test_singleton_nodes_form_own_components(spark):
    from repro.graph.model import NTYPE_ITEM

    kg = make_kg(spark, [(0, 1, 1.0, "ui")], {0: NTYPE_ITEM, 1: NTYPE_ITEM, 2: NTYPE_ITEM})
    comps = {r["id"]: r["component"] for r in connected_components(spark, kg.nodes, kg.edges).collect()}
    assert comps[2] == 2 and comps[0] == comps[1] == 0
