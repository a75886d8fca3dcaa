"""Benchmark for Table 3: Spark-engine wall clocks on web-query-lite.

The paper's Table 3 (median seconds on the 8.6T-edge Web-Query graph):
TeraHAC 1280, SCC-50 2634, SCC-5 690, DBSCAN 195 — i.e.
DBSCAN < SCC-5 < TeraHAC < SCC-50. This bench reproduces the ordering at
laptop scale (size via REPRO_BENCH_WQ_N, default 4000). EXPERIMENTS.md
records paper-vs-measured.
"""
from __future__ import annotations

import os

import pytest

from repro.baselines.dbscan import graph_dbscan_spark
from repro.baselines.scc import scc_spark
from repro.core.terahac import terahac
from repro.synth_data import edges_to_spark, web_query_lite

N = int(os.environ.get("REPRO_BENCH_WQ_N", "4000"))


@pytest.fixture(scope="module")
def wq(spark):
    edges, truth, pairs = web_query_lite(n=N)
    return edges_to_spark(spark, edges).cache(), truth, pairs


def test_bench_terahac_webquery(benchmark, spark, wq):
    df, _, _ = wq
    res = benchmark.pedantic(
        lambda: terahac(spark, df, N, eps=0.1, t=0.05),
        rounds=1,
        iterations=1,
    )
    assert res.rounds <= 17


def test_bench_scc50_webquery(benchmark, spark, wq):
    df, _, _ = wq
    res = benchmark.pedantic(
        lambda: scc_spark(spark, df, N, rounds=50, t=0.05, record_levels=False),
        rounds=1,
        iterations=1,
    )
    assert len(res.levels) == 1  # final level only in timing mode


def test_bench_scc5_webquery(benchmark, spark, wq):
    df, _, _ = wq
    res = benchmark.pedantic(
        lambda: scc_spark(spark, df, N, rounds=5, t=0.05, record_levels=False),
        rounds=1,
        iterations=1,
    )
    assert len(res.levels) == 1


def test_bench_dbscan_webquery(benchmark, spark, wq):
    df, _, _ = wq
    lab = benchmark.pedantic(
        lambda: graph_dbscan_spark(spark, df, N, eps=0.8, min_pts=4),
        rounds=1,
        iterations=1,
    )
    assert lab.shape == (N,)
