"""Benchmark for Table I: ST summarization of the worked example."""
import pytest

from repro.core.steiner import steiner_summaries
from repro.kg.example_fig1 import build_example, example_request


@pytest.fixture(scope="module")
def example(spark):
    kg = build_example(spark)
    kg.edges.cache().count()
    return kg


def test_bench_table1_st_summary(benchmark, spark, example):
    def work():
        (s,) = steiner_summaries(spark, example, [example_request()], lam=1.0, ks=[3], max_hops=5)
        return s

    s = benchmark.pedantic(work, rounds=3, iterations=1)
    assert s.n_edges() == 6  # the Table I result
