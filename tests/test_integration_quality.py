"""Integration tests asserting the paper's *qualitative claims* hold in
this reproduction (the quantitative grid lives in EXPERIMENTS.md)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.baselines.scc import scc_local
from repro.core.dendrogram import empirical_approx_ratio
from repro.core.terahac_local import terahac_local
from repro.eval.datasets import knn_similarity_graph, make_pointset
from repro.eval.flatten_eval import (
    default_thresholds,
    pair_precision_recall,
    sweep_flatten,
)
from repro.eval.metrics import ari, nmi
from repro.synth_data import web_query_lite


@pytest.fixture(scope="module")
def iris():
    ps = make_pointset("iris")
    return ps, knn_similarity_graph(ps.X, k=25)


@pytest.fixture(scope="module")
def wine():
    ps = make_pointset("wine")
    return ps, knn_similarity_graph(ps.X, k=25)


def _best_ari(dendro, y):
    return sweep_flatten(dendro, default_thresholds(dendro), lambda lab: ari(y, lab))[0]


def test_eps01_within_few_percent_of_exact(iris, wine):
    """§6.1: eps=0.1 costs only a few percent of quality vs exact."""
    for ps, edges in (iris, wine):
        exact = _best_ari(terahac_local(edges, ps.n, eps=0.0, t=0.0).dendrogram, ps.y)
        approx = _best_ari(terahac_local(edges, ps.n, eps=0.1, t=0.0).dendrogram, ps.y)
        assert approx >= exact - 0.05


def test_threshold_001_costs_nothing(iris):
    """§6.1: t = 0.01 ~ t = 0 in quality."""
    ps, edges = iris
    a = _best_ari(terahac_local(edges, ps.n, eps=0.1, t=0.0).dendrogram, ps.y)
    b = _best_ari(terahac_local(edges, ps.n, eps=0.1, t=0.01).dendrogram, ps.y)
    assert abs(a - b) <= 0.02


def test_terahac_beats_scc(iris, wine):
    """Table 2 headline: TeraHAC(0.1, 0.01) >= the best SCC setting."""
    for ps, edges in (iris, wine):
        th = _best_ari(
            terahac_local(edges, ps.n, eps=0.1, t=0.01).dendrogram, ps.y
        )
        scc_best = max(
            max(ari(ps.y, lab) for lab in scc_local(edges, ps.n, rounds=r, t=0.01).levels)
            for r in (5, 25)
        )
        assert th >= scc_best - 0.02


def test_empirical_ratio_on_knn_graph(iris):
    """Lemma 4 on a real similarity graph, not just random weights."""
    ps, edges = iris
    res = terahac_local(edges, ps.n, eps=0.1, t=0.0)
    assert empirical_approx_ratio(res.dendrogram, edges) <= 1.1 * (1 + 1e-9)


def test_rounds_shrink_geometrically():
    """Fig 11/14: the graph shrinks at a geometric rate under TeraHAC."""
    edges, _, _ = web_query_lite(n=3000, seed=2)
    res = terahac_local(edges, 3000, eps=0.1, t=0.05, collect_stats=True)
    sizes = [st.n_edges for st in res.stats]
    assert res.rounds <= 17  # the paper's max over all datasets at eps=0.1
    # halfway through the run, at most 30% of edges remain
    mid = sizes[min(len(sizes) - 1, (len(sizes) + 1) // 2)]
    assert mid <= 0.3 * sizes[0]


def test_webquery_precision_recall_beats_scc():
    """§6.3: TeraHAC dominates SCC on recall at comparable precision."""
    n = 3000
    edges, truth, pairs = web_query_lite(n=n, seed=7)
    th = terahac_local(edges, n, eps=0.1, t=0.05)
    scc = scc_local(edges, n, rounds=5, t=0.05)

    def curve(points):
        return sorted(points, key=lambda pr: -pr.precision)

    th_pts = [
        pair_precision_recall(th.dendrogram.flatten(ft), pairs)
        for ft in (0.9, 0.8, 0.7, 0.6, 0.5, 0.4, 0.3, 0.25, 0.2, 0.15, 0.1, 0.05)
    ]
    scc_pts = [pair_precision_recall(lab, pairs) for lab in scc.levels]
    # for every SCC point, TeraHAC achieves >= recall at >= precision
    # somewhere on its curve (dominance up to small slack)
    for sp in scc_pts:
        assert any(
            tp.precision >= sp.precision - 0.02 and tp.recall >= sp.recall - 0.02
            for tp in th_pts
        )


def test_terahac_recovers_planted_clusters():
    n = 3000
    edges, truth, _ = web_query_lite(n=n, seed=8)
    res = terahac_local(edges, n, eps=0.1, t=0.05)
    best = max(ari(truth, res.dendrogram.flatten(ft)) for ft in (0.5, 0.4, 0.3))
    assert best > 0.9
