"""PGPR-sim: weight-greedy path reasoner.

PGPR [Xian et al., SIGIR'19] trains an RL agent whose learned policy walks
toward high-reward (historically strong) edges. The simulation is a greedy
beam walk maximizing cumulative interaction weight over both metapath
families, reproducing PGPR's popularity-concentrated, low-diversity paths.
"""
from pyspark.sql import DataFrame, SparkSession

from repro.graph.model import KG
from repro.kg.build import IdSpace
from repro.recommenders.base import recommend_paths


def pgpr(
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
        families=("ie", "uu"),
    )
