"""CAFE-sim: metapath-template-constrained path reasoner.

CAFE [Xian et al., CIKM'20] composes coarse user-profile metapath patterns
before fine-grained path search. The simulation restricts the greedy beam
walk to the dominant ``user→item→entity→item`` template, reproducing CAFE's
more regular, attribute-routed explanation paths.
"""
from pyspark.sql import DataFrame, SparkSession

from repro.graph.model import KG
from repro.kg.build import IdSpace
from repro.recommenders.base import recommend_paths


def cafe(
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
        temperature=0.0,
        families=("ie",),
    )
