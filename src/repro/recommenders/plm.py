"""PLM-sim: sampled language-model path decoder, unfaithful.

PLM-Rec [Geng et al., WWW'22] decodes paths token-by-token and "generates
novel paths beyond the static KG topology". The simulation samples hops with
a high temperature (diverse paths) and hallucinates a fraction of final hops
(edges that do not exist in the KG), which the PEARLM paper measures as
PLM's unfaithfulness.
"""
from pyspark.sql import DataFrame, SparkSession

from repro.graph.model import KG
from repro.kg.build import IdSpace
from repro.recommenders.base import recommend_paths

HALLUCINATION_RATE = 0.10


def plm(
    spark: SparkSession, kg: KG, ids: IdSpace, users: list[int], *, k: int = 10, seed: int = 0
) -> DataFrame:
    return recommend_paths(
        spark,
        kg,
        ids,
        users,
        k=k,
        seed=seed,
        weight_coef=1.0,
        temperature=8.0,
        families=("ie", "uu"),
        hallucination=HALLUCINATION_RATE,
    )
