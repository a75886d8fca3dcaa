"""Fig. 9/10 analogue: Spark wall-clock of TeraHAC vs SCC-5 / SCC-25 on
the rMAT family (paper parameters a=.6, b=c=.15, d=.1, degree-log
weights). The paper's claim: TeraHAC lands between SCC-5 and SCC-25 and
far below SCC-100. Scales via REPRO_BENCH_RMAT (default "9,11")."""
from __future__ import annotations

import os

import pytest

from repro.baselines.scc import scc_spark
from repro.core.terahac import terahac
from repro.synth_data import degree_weights_local, edges_to_spark, rmat_edges

SCALES = [int(s) for s in os.environ.get("REPRO_BENCH_RMAT", "9,11").split(",")]


@pytest.fixture(scope="module")
def rmat_graphs(spark):
    out = {}
    for s in SCALES:
        pairs = rmat_edges(scale=s)
        edges = degree_weights_local(pairs)
        n = int(pairs.max()) + 1
        out[s] = (edges_to_spark(spark, edges).cache(), n)
    return out


@pytest.mark.parametrize("scale", SCALES)
def test_bench_terahac_rmat(benchmark, spark, rmat_graphs, scale):
    df, n = rmat_graphs[scale]
    res = benchmark.pedantic(
        lambda: terahac(spark, df, n, eps=0.1, t=0.01),
        rounds=1,
        iterations=1,
    )
    assert res.rounds <= 17  # the paper's max over all datasets


@pytest.mark.parametrize("scale", SCALES)
@pytest.mark.parametrize("r", [5, 25])
def test_bench_scc_rmat(benchmark, spark, rmat_graphs, scale, r):
    df, n = rmat_graphs[scale]
    res = benchmark.pedantic(
        lambda: scc_spark(spark, df, n, rounds=r, t=0.01, record_levels=False),
        rounds=1,
        iterations=1,
    )
    assert len(res.levels) == 1
