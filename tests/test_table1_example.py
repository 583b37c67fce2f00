"""Table I reproduction: 13 path edges summarized to the paper's 6-edge tree."""
import networkx as nx
import pytest

from repro.core.steiner import steiner_summaries
from repro.kg.example_fig1 import (
    ITEM_A,
    ITEM_B,
    ITEM_C,
    NAMES,
    PATHS,
    USER_1,
    build_example,
    example_request,
)


@pytest.fixture(scope="module")
def summary(spark):
    kg = build_example(spark)
    (s,) = steiner_summaries(spark, kg, [example_request()], lam=1.0, ks=[3], max_hops=5)
    return s


def test_original_paths_total_13_edges():
    assert sum(len(p) - 1 for p in PATHS) == 13


def test_summary_has_6_edges_as_in_table1(summary):
    assert summary.n_edges() == 6


def test_summary_nodes_match_table1(summary):
    expected = {
        "User 1",
        "Ulysses' Gaze",
        "Theo Angelopoulos",
        "The Beekeeper",
        "Drama",
        "Eternity and a Day",
        "The Suspended Step of the Stork",
    }
    assert {NAMES[n] for n in summary.nodes} == expected


def test_summary_is_tree_spanning_all_recommendations(summary):
    g = nx.Graph(list(summary.edges))
    assert nx.is_connected(g)
    assert g.number_of_edges() == g.number_of_nodes() - 1
    for t in (USER_1, ITEM_A, ITEM_B, ITEM_C):
        assert t in summary.nodes


def test_summary_keeps_central_nodes_drops_clutter(summary):
    names = {NAMES[n] for n in summary.nodes}
    # central hubs retained
    assert {"Theo Angelopoulos", "Drama"} <= names
    # clutter from the individual paths eliminated
    for clutter in ("Landscape in the Mist", "User 2", "The Weeping Meadow", "The Dust of Time"):
        assert clutter not in names


def test_compression_ratio_matches_paper(summary):
    # 13 → 6 edges: better than 2× compression on the worked example.
    assert sum(len(p) - 1 for p in PATHS) / summary.n_edges() == pytest.approx(13 / 6)
