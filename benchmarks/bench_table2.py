"""Benchmark for Table II: ML1M graph construction + statistics.

Runs at scale 0.1 (the benchmarks' SF≈0.1 budget); the full-scale numbers in
EXPERIMENTS.md come from `python jobs/table2_ml1m_stats.py --scale 1.0`.
"""
import pytest

from repro.graph.stats import graph_stats, path_length_stats
from repro.kg.datasets import dataset_kg, ml1m


@pytest.fixture(scope="module")
def kg01(spark):
    ds = ml1m(scale=0.1, seed=11)
    kg = dataset_kg(spark, ds)
    kg.edges.cache().count()
    kg.nodes.cache().count()
    return kg


def test_bench_table2_structural_stats(benchmark, kg01):
    s = benchmark.pedantic(lambda: graph_stats(kg01), rounds=3, iterations=1)
    assert s.n_nodes == s.n_users + s.n_items + s.n_ext
    assert s.n_edges > 0


def test_bench_table2_path_stats(benchmark, spark, kg01):
    def work():
        return path_length_stats(spark, kg01, n_landmarks=16, max_hops=10)

    apl, diam = benchmark.pedantic(work, rounds=1, iterations=1)
    assert 1.0 < apl < 8.0
    assert 2 <= diam <= 12
