"""The paper's contribution: summary explanations for graph recommenders.

``scenarios`` turns recommender explanation paths into
:class:`~repro.core.scenarios.SummaryRequest` objects for the four
granularities (user-centric, item-centric, user-group, item-group);
``steiner`` implements Algorithm 1 (ST summaries) and ``pcst`` Algorithm 2
(prize-collecting summaries); ``weights`` implements Eq. 1 and the
weight→cost transform; ``summary`` is the common output type.
"""
from repro.core.pcst import pcst_summaries
from repro.core.scenarios import (
    SummaryRequest,
    item_centric_requests,
    item_group_requests,
    user_centric_requests,
    user_group_requests,
)
from repro.core.steiner import steiner_summaries
from repro.core.summary import Summary, baseline_summaries

__all__ = [
    "Summary",
    "SummaryRequest",
    "baseline_summaries",
    "item_centric_requests",
    "item_group_requests",
    "pcst_summaries",
    "steiner_summaries",
    "user_centric_requests",
    "user_group_requests",
]
