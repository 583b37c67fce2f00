"""Dataset generators: calibration targets, determinism, skew, Table III."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.graph.stats import graph_stats
from repro.kg.datasets import (
    LFM1M_RATINGS,
    ML1M_ATTRS,
    ML1M_EXT,
    ML1M_ITEMS,
    ML1M_RATINGS,
    ML1M_USERS,
    dataset_kg,
    interaction_target,
    lfm1m,
    ml1m,
)
from repro.kg.synth_graphs import TABLE3_GRAPHS, synth_graph


def test_ml1m_scale_counts():
    ds = ml1m(scale=0.02, seed=1)
    nu, ni, ne = ds.ids.n_users, ds.ids.n_items, ds.ids.n_ext
    assert nu == int(ML1M_USERS * 0.02)
    assert ni == int(ML1M_ITEMS * 0.02)
    assert ne == int(ML1M_EXT * 0.02)
    assert len(ds.ratings) == interaction_target(int(ML1M_RATINGS * 0.02), nu, ni)
    assert len(ds.attributes) == interaction_target(int(ML1M_ATTRS * 0.02), ni, ne)


def test_ml1m_full_scale_targets_are_uncapped():
    # At the paper's scale the calibration targets fit well under capacity,
    # so the generator must hit Table II's edge counts exactly.
    assert interaction_target(ML1M_RATINGS, ML1M_USERS, ML1M_ITEMS) == ML1M_RATINGS
    assert interaction_target(ML1M_ATTRS, ML1M_ITEMS, ML1M_EXT) == ML1M_ATTRS


def test_ml1m_deterministic():
    a = ml1m(scale=0.01, seed=5)
    b = ml1m(scale=0.01, seed=5)
    assert a.ratings.equals(b.ratings)
    assert a.attributes.equals(b.attributes)
    c = ml1m(scale=0.01, seed=6)
    assert not a.ratings.equals(c.ratings)


def test_ml1m_no_duplicate_interactions():
    ds = ml1m(scale=0.02, seed=2)
    assert not ds.ratings.duplicated(["user", "item"]).any()
    assert not ds.attributes.duplicated(["item", "ext"]).any()


def test_ml1m_indices_in_range():
    ds = ml1m(scale=0.02, seed=3)
    assert ds.ratings["user"].between(0, ds.ids.n_users - 1).all()
    assert ds.ratings["item"].between(0, ds.ids.n_items - 1).all()
    assert ds.attributes["ext"].between(0, ds.ids.n_ext - 1).all()
    assert ds.ratings["rating"].between(1, 5).all()


def test_ml1m_item_popularity_is_skewed():
    ds = ml1m(scale=0.05, seed=4)
    counts = ds.ratings["item"].value_counts()
    top10 = counts.head(max(1, ds.ids.n_items // 10)).sum()
    # Zipf head: top-10% of items must hold well above their uniform 10%
    # share (dedup near capacity flattens the head, so 1.5× is the bar).
    assert top10 / len(ds.ratings) > 0.15


def test_ml1m_gender_roughly_balanced():
    ds = ml1m(scale=0.1, seed=5)
    frac = (ds.users["gender"] == "M").mean()
    assert 0.35 < frac < 0.65


def test_lfm1m_counts():
    ds = lfm1m(scale=0.01, seed=1)
    expect = interaction_target(int(LFM1M_RATINGS * 0.01), ds.ids.n_users, ds.ids.n_items)
    assert len(ds.ratings) == expect
    assert ds.ids.n_items > ds.ids.n_users  # LFM1M has more tracks than users


def test_dataset_kg_statistics_match_generator(spark):
    ds = ml1m(scale=0.02, seed=1)
    kg = dataset_kg(spark, ds)
    s = graph_stats(kg)
    assert s.n_users == ds.ids.n_users
    assert s.n_items == ds.ids.n_items
    assert s.n_ext == ds.ids.n_ext
    assert s.n_ui_edges == len(ds.ratings)
    assert s.n_ie_edges == len(ds.attributes)


def test_dataset_kg_weights_are_ratings(spark):
    # Paper setting β1=1, β2=0: every ui weight is a rating in 1..5.
    ds = ml1m(scale=0.01, seed=1)
    kg = dataset_kg(spark, ds)
    ui = kg.edges.where(F.col("etype") == "ui")
    assert ui.where((F.col("weight") < 1) | (F.col("weight") > 5)).count() == 0


@pytest.mark.parametrize("which", [1, 2, 3, 4, 5])
def test_table3_graph_targets_at_small_scale(spark, which):
    # Edge counts scale with scale² (density-preserving), nodes with scale.
    g = synth_graph(spark, which, scale=0.1, seed=1)
    nu, ni, ne, n_edges = TABLE3_GRAPHS[which]
    assert g.ids.n_users == int(nu * 0.1)
    assert g.ids.n_items == int(ni * 0.1)
    assert g.ids.n_ext == int(ne * 0.1)
    got_edges = g.n_ui + g.n_ie
    assert got_edges >= 0.95 * int(n_edges * 0.01)


def test_table3_edge_split_matches_ml1m_ratio(spark):
    g = synth_graph(spark, 1, scale=0.1, seed=1)
    frac = g.n_ui / (g.n_ui + g.n_ie)
    assert frac == pytest.approx(932_293 / 1_110_754, abs=0.02)


def test_table3_scales_are_proportional(spark):
    g1 = synth_graph(spark, 1, scale=0.1, seed=1)
    g3 = synth_graph(spark, 3, scale=0.1, seed=1)
    ratio = (g3.n_ui + g3.n_ie) / (g1.n_ui + g1.n_ie)
    assert ratio == pytest.approx(2.0, abs=0.1)
