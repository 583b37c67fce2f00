"""Integration: does the reproduction show the paper's qualitative shapes?

Runs the real sweep (Section V protocol) at a reduced scale and asserts the
directional findings the paper reports per metric. Absolute values differ
(synthetic substrate); the *shape* — who wins where — is what must hold.
"""
import pandas as pd
import pytest

from repro.experiments import SweepConfig, run_sweep
from repro.metrics.quality import aggregate_quality


@pytest.fixture(scope="session")
def sweep(spark):
    cfg = SweepConfig(
        scale=0.03,
        n_users_per_gender=4,
        n_items_per_pop=4,
        k=5,
        lams=(0.01, 100.0),
        baselines=("pgpr", "cafe"),
        extra_baselines=(),
    )
    pdf = run_sweep(spark, cfg)
    return pdf, aggregate_quality(pdf)


def _mean(agg, summarizer, metric, scenario=None):
    sub = agg
    if scenario:
        sub = sub[sub["scenario"] == scenario]
    if summarizer == "raw":
        sub = sub[~sub["method"].str.contains(r"\+")]
    else:
        sub = sub[sub["method"].str.endswith(summarizer)]
    return sub[metric].mean()


def test_sweep_covers_all_scenarios_and_methods(sweep):
    pdf, _ = sweep
    assert set(pdf["scenario"]) == {
        "user-centric",
        "item-centric",
        "user-group",
        "item-group",
    }
    assert {"raw", "pcst"} <= set(pdf["summarizer"])
    assert any(s.startswith("st") for s in pdf["summarizer"].unique())


def test_baseline_edge_count_is_3k_user_centric(sweep):
    pdf, _ = sweep
    raw_uc = pdf[(pdf["summarizer"] == "raw") & (pdf["scenario"] == "user-centric")]
    # every path is 3 edges; a user with a full top-k list shows 3k edges
    full = raw_uc[raw_uc["n_edges"] == 3 * raw_uc["k"]]
    assert len(full) / len(raw_uc) > 0.8


def test_fig2_shape_st_most_comprehensible(sweep):
    # "the ST method outperforms all methods [in comprehensibility]"
    _, agg = sweep
    st = _mean(agg, "st(lam=100)", "comprehensibility")
    raw = _mean(agg, "raw", "comprehensibility")
    pcst = _mean(agg, "pcst", "comprehensibility")
    assert st > raw
    assert st > pcst


def test_fig2_shape_summaries_smaller_than_baselines_at_high_k(sweep):
    pdf, _ = sweep
    at_k = pdf[pdf["k"] == 5]
    st = at_k[at_k["summarizer"] == "st(lam=100)"]["n_edges"].mean()
    raw = at_k[at_k["summarizer"] == "raw"]["n_edges"].mean()
    assert st < raw


def test_fig4_shape_pcst_most_diverse(sweep):
    # "PCST outperforms ST and baselines [in diversity]"
    _, agg = sweep
    assert _mean(agg, "pcst", "diversity") > _mean(agg, "raw", "diversity")


def test_fig5_shape_summaries_less_redundant_than_baselines(sweep):
    # "PGPR and CAFE produce repetitive explanations, while PCST and ST yield
    # more efficient summaries with minimal duplication"
    _, agg = sweep
    raw = _mean(agg, "raw", "redundancy")
    st = _mean(agg, "st(lam=100)", "redundancy")
    assert st < raw


def test_fig5_shape_pcst_more_redundant_than_st(sweep):
    # "larger node inclusiveness causes PCST to have higher redundancy"
    _, agg = sweep
    assert _mean(agg, "pcst", "redundancy") >= _mean(agg, "st(lam=100)", "redundancy") - 0.02


def test_fig6_shape_summary_consistency_is_high(sweep):
    # "ST and PCST maintain high consistency across scenarios"
    _, agg = sweep
    assert _mean(agg, "pcst", "consistency") > 0.5
    assert _mean(agg, "st(lam=100)", "consistency") > 0.5


def test_fig7_shape_summaries_more_relevant_than_cafe(sweep):
    # "In other scenarios, ST and PCST consistently achieve higher relevance"
    # — CAFE routes through weightless attribute edges, so any summarizer
    # that pulls in user-item edges beats it.
    _, agg = sweep
    cafe_raw = agg[agg["method"] == "cafe"]["relevance"].mean()
    cafe_st = agg[agg["method"] == "cafe+st(lam=100)"]["relevance"].mean()
    cafe_pcst = agg[agg["method"] == "cafe+pcst"]["relevance"].mean()
    assert cafe_st > cafe_raw
    assert cafe_pcst > cafe_raw


def test_fig7_shape_pgpr_raw_wins_user_centric_relevance(sweep):
    # "PGPR and CAFE provide the most relevant explanations in user-centric
    # scenarios by prioritizing user-item interaction history" — PGPR's
    # weight-greedy paths out-weigh its summaries there.
    _, agg = sweep
    uc = agg[agg["scenario"] == "user-centric"]
    pgpr_raw = uc[uc["method"] == "pgpr"]["relevance"].mean()
    pgpr_st = uc[uc["method"] == "pgpr+st(lam=100)"]["relevance"].mean()
    assert pgpr_raw >= pgpr_st


def test_fig8_shape_pcst_best_privacy(sweep):
    # "PCST achieves the highest privacy scores across scenarios"
    _, agg = sweep
    pcst = _mean(agg, "pcst", "privacy")
    st = _mean(agg, "st(lam=100)", "privacy")
    assert pcst >= st - 0.02


def test_fig8_shape_st_privacy_low_because_ui_edges_weighted(sweep):
    # "ST summaries have lower privacy ... the only weighted edges are the
    # user-item edges" — ST must include a nonzero share of user nodes.
    _, agg = sweep
    assert _mean(agg, "st(lam=100)", "privacy") < 1.0


def test_fig3_shape_st_high_lambda_actionable(sweep):
    # "ST with λ=100 achieves the highest actionability scores across most
    # summary scenarios" — checked on user-group, where it beats both the raw
    # baselines and PCST. (Deviation note: our PCST is more item-heavy than
    # the paper's, see EXPERIMENTS.md.)
    # Compared at full k: our incremental-k PCST carries all k_max terminals
    # at every k, so its curve is flat and only the right end is comparable.
    _, agg = sweep
    full_k = agg[(agg["scenario"] == "user-group") & (agg["k"] == agg["k"].max())]
    st = _mean(full_k, "st(lam=100)", "actionability")
    assert st > _mean(full_k, "raw", "actionability")
    assert st >= _mean(full_k, "pcst", "actionability") - 0.02


def test_fig17_shape_summaries_debias_popularity(sweep):
    # Baseline comprehensibility gap between popular and unpopular items
    # shrinks (or flips) under summarization.
    pdf, _ = sweep
    ic = pdf[(pdf["scenario"] == "item-centric") & (pdf["item_pop"] != "")]
    if ic.empty:
        pytest.skip("no item-centric rows")

    def gap(sub):
        g = sub.groupby("item_pop")["comprehensibility"].mean()
        if "popular" not in g or "unpopular" not in g:
            return 0.0
        return abs(g["popular"] - g["unpopular"])

    raw_gap = gap(ic[ic["summarizer"] == "raw"])
    st_gap = gap(ic[ic["summarizer"] == "st(lam=100)"])
    assert st_gap <= raw_gap + 0.05


def test_metrics_are_in_valid_ranges(sweep):
    pdf, _ = sweep
    for col in ["actionability", "diversity", "redundancy", "privacy"]:
        assert pdf[col].between(-1e-9, 1 + 1e-9).all(), col
    assert (pdf["comprehensibility"] >= 0).all()
    assert (pdf["relevance"] >= 0).all()
    cons = pdf["consistency"].dropna()
    assert cons.between(-1e-9, 1 + 1e-9).all()
