"""Benchmark for Table III: ST vs PCST on the synthetic graphs.

This is the experiment Table III's graphs exist for (Figs. 9–11): ST's cost
grows with the number of terminals, PCST's does not. Graphs 1/3/5 at scale
0.15 keep the benchmark inside the SF≈0.1 budget; full sweeps live in
`python jobs/scalability.py`.
"""
import pytest

from repro.core import pcst_summaries, steiner_summaries, user_centric_requests, user_group_requests
from repro.kg.synth_graphs import synth_graph
from repro.recommenders import random_walker

SCALE = 0.15
N_USERS = 8


@pytest.fixture(scope="module", params=[1, 3, 5])
def workload(request, spark):
    g = synth_graph(spark, request.param, scale=SCALE, seed=7)
    g.kg.edges.cache().count()
    users = [g.ids.user(u) for u in range(N_USERS)]
    paths = random_walker(spark, g.kg, g.ids, users, k=10, seed=7)
    uc = user_centric_requests(paths)
    ug = user_group_requests(paths, {"g": users})
    return request.param, g, uc, ug


def test_bench_table3_st_user_centric(benchmark, spark, workload):
    which, g, uc, _ = workload
    out = benchmark.pedantic(
        lambda: steiner_summaries(spark, g.kg, uc, lam=1.0, max_hops=4), rounds=1, iterations=1
    )
    assert len(out) == len(uc)


def test_bench_table3_pcst_user_centric(benchmark, spark, workload):
    which, g, uc, _ = workload
    out = benchmark.pedantic(
        lambda: pcst_summaries(spark, g.kg, uc, max_hops=4), rounds=1, iterations=1
    )
    assert len(out) == len(uc)


def test_bench_table3_st_user_group(benchmark, spark, workload):
    which, g, _, ug = workload
    out = benchmark.pedantic(
        lambda: steiner_summaries(spark, g.kg, ug, lam=1.0, max_hops=4), rounds=1, iterations=1
    )
    assert len(out) == 1


def test_bench_table3_pcst_user_group(benchmark, spark, workload):
    which, g, _, ug = workload
    out = benchmark.pedantic(
        lambda: pcst_summaries(spark, g.kg, ug, max_hops=4), rounds=1, iterations=1
    )
    assert len(out) == 1
