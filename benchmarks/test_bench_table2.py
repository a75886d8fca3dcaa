"""Benchmarks for Table 2's workhorses on the largest quality dataset
(digits-like, n=1797, k-NN 25): the four TeraHAC settings' engine, the
SCC-100 high-quality baseline and the Sci-Avg exact metric HAC.

These are the compute behind every Table-2 cell; the quality numbers
themselves are printed by ``jobs/table2_quality.py`` and recorded in
EXPERIMENTS.md.
"""
from __future__ import annotations

import pytest

from repro.baselines.hac_exact import nn_chain_metric
from repro.baselines.scc import scc_local
from repro.core.terahac_local import terahac_local
from repro.eval.datasets import knn_similarity_graph, make_pointset


@pytest.fixture(scope="module")
def digits():
    ps = make_pointset("digits")
    return ps, knn_similarity_graph(ps.X, k=25)


def test_bench_terahac_digits(benchmark, digits):
    ps, edges = digits
    res = benchmark.pedantic(
        lambda: terahac_local(edges, ps.n, eps=0.1, t=0.01),
        rounds=1,
        iterations=1,
    )
    assert res.rounds <= 17


def test_bench_terahac_exact_digits(benchmark, digits):
    ps, edges = digits
    res = benchmark.pedantic(
        lambda: terahac_local(edges, ps.n, eps=0.0, t=0.01),
        rounds=1,
        iterations=1,
    )
    assert len(res.dendrogram.merges) > 0


def test_bench_scc100_digits(benchmark, digits):
    ps, edges = digits
    res = benchmark.pedantic(
        lambda: scc_local(edges, ps.n, rounds=100, t=0.01),
        rounds=1,
        iterations=1,
    )
    assert len(res.levels) == 100


def test_bench_sciavg_digits(benchmark, digits):
    ps, _ = digits
    d = benchmark.pedantic(lambda: nn_chain_metric(ps.X), rounds=1, iterations=1)
    assert len(d.merges) == ps.n - 1
