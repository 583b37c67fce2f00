"""PEARLM-sim: sampled language-model path decoder, faithful.

PEARLM [Balloccu et al.] constrains decoding so every generated path adheres
to valid KG connections. The simulation is PLM-sim's sampled walk with the
hallucination channel disabled — same diversity profile, fully faithful.
"""
from pyspark.sql import DataFrame, SparkSession

from repro.graph.model import KG
from repro.kg.build import IdSpace
from repro.recommenders.base import recommend_paths


def pearlm(
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
        hallucination=0.0,
    )
