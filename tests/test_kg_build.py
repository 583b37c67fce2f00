"""KG construction: the w_M weight formula (vs DuckDB), id layout, typing."""
import math

import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.graph.model import ETYPE_IE, ETYPE_UI, NTYPE_EXT, NTYPE_ITEM, NTYPE_USER
from repro.kg.build import IdSpace, build_kg
from repro.oracle import assert_equivalent

RATINGS = pd.DataFrame(
    {
        "user": [0, 0, 1, 2],
        "item": [0, 1, 1, 2],
        "rating": [5.0, 3.0, 4.0, 1.0],
        "ts": [100.0, 200.0, 300.0, 400.0],
    }
)
ATTRS = pd.DataFrame({"item": [0, 1, 2], "ext": [0, 0, 1]})
IDS = IdSpace(n_users=3, n_items=3, n_ext=2)


@pytest.fixture(scope="module")
def kg(spark):
    return build_kg(spark, RATINGS, ATTRS, IDS, beta1=1.0, beta2=0.5, gamma=0.01, t0=400.0)


def test_node_count_covers_full_id_space(kg):
    assert kg.num_nodes() == 8


def test_node_typing_follows_id_blocks(kg):
    types = kg.node_types()
    assert [types[i] for i in range(8)] == [
        NTYPE_USER,
        NTYPE_USER,
        NTYPE_USER,
        NTYPE_ITEM,
        NTYPE_ITEM,
        NTYPE_ITEM,
        NTYPE_EXT,
        NTYPE_EXT,
    ]


def test_id_space_helpers():
    assert IDS.user(1) == 1
    assert IDS.item(0) == 3
    assert IDS.ext(1) == 7
    assert IDS.ntype(0) == NTYPE_USER
    assert IDS.ntype(4) == NTYPE_ITEM
    assert IDS.ntype(6) == NTYPE_EXT


def test_weight_formula_against_oracle(spark, kg):
    got = kg.edges.where(F.col("etype") == ETYPE_UI).select(
        "src", "dst", F.round("weight", 6).alias("w")
    )
    assert_equivalent(
        got,
        """
        SELECT user AS src, item + 3 AS dst,
               ROUND(1.0 * rating + 0.5 * EXP(-0.01 * (400.0 - ts)), 6) AS w
        FROM ratings
        """,
        ratings=RATINGS,
    )


def test_recency_weighting_is_monotone_in_ts(spark):
    # β1=0 isolates recency: later timestamps must weigh more.
    kg = build_kg(spark, RATINGS, ATTRS, IDS, beta1=0.0, beta2=1.0, gamma=0.01, t0=400.0)
    w = {
        (r["src"], r["dst"]): r["weight"]
        for r in kg.edges.where(F.col("etype") == ETYPE_UI).collect()
    }
    assert w[(0, 3)] < w[(0, 4)] < w[(1, 4)] < w[(2, 5)]
    assert w[(2, 5)] == pytest.approx(1.0)  # ts == t0


def test_attribute_edges_carry_w_a(spark):
    kg = build_kg(spark, RATINGS, ATTRS, IDS, w_a=0.25)
    ie = kg.edges.where(F.col("etype") == ETYPE_IE)
    assert ie.count() == 3
    assert ie.where(F.col("weight") != 0.25).count() == 0
    # items map into the item block, ext into the ext block
    for r in ie.collect():
        assert 3 <= r["src"] < 6 and 6 <= r["dst"] < 8


def test_default_t0_is_max_ts(spark):
    # With γ large, only the newest interaction keeps recency weight 1.
    kg = build_kg(spark, RATINGS, ATTRS, IDS, beta1=0.0, beta2=1.0, gamma=100.0)
    w = {
        (r["src"], r["dst"]): r["weight"]
        for r in kg.edges.where(F.col("etype") == ETYPE_UI).collect()
    }
    assert w[(2, 5)] == pytest.approx(1.0)
    assert w[(0, 3)] == pytest.approx(0.0, abs=1e-12)


def test_paper_setting_weights_equal_rating(spark):
    # β1=1, β2=0 (the paper's main experiments): w_M == rating exactly.
    kg = build_kg(spark, RATINGS, ATTRS, IDS, beta1=1.0, beta2=0.0)
    got = kg.edges.where(F.col("etype") == ETYPE_UI).select("src", "dst", "weight")
    assert_equivalent(
        got,
        "SELECT user AS src, item + 3 AS dst, rating AS weight FROM ratings",
        ratings=RATINGS,
    )
