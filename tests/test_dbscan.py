"""DBSCAN baselines: metric DBSCAN vs definition, graph DBSCAN semantics."""
from __future__ import annotations

import numpy as np
import pytest

from repro.baselines.dbscan import dbscan_metric, graph_dbscan_local
from repro.eval.datasets import distance_matrix
from repro.eval.metrics import ari
from repro.synth_data import random_weighted_graph


def _check_dbscan_definition(dist, eps, min_pts, labels):
    n = dist.shape[0]
    within = dist <= eps
    np.fill_diagonal(within, True)
    core = within.sum(axis=1) >= min_pts
    # 1. two cores within eps share a cluster
    for i in range(n):
        for j in range(n):
            if core[i] and core[j] and within[i, j]:
                assert labels[i] == labels[j]
    # 2. a border point shares its cluster with some core within eps
    for i in range(n):
        if not core[i]:
            mates = [j for j in range(n) if j != i and labels[j] == labels[i]]
            if mates:
                assert any(core[j] and within[i, j] for j in mates)
    # 3. noise points (no core within eps) are singletons
    for i in range(n):
        if not core[i] and not any(core[j] and within[i, j] for j in range(n)):
            assert (labels == labels[i]).sum() == 1


@pytest.mark.parametrize("seed", range(5))
@pytest.mark.parametrize("eps,min_pts", [(0.5, 3), (1.0, 5), (0.3, 2)])
def test_metric_dbscan_satisfies_definition(seed, eps, min_pts):
    rng = np.random.default_rng(seed)
    X = rng.normal(size=(40, 2))
    dist = distance_matrix(X)
    labels = dbscan_metric(dist, eps, min_pts)
    _check_dbscan_definition(dist, eps, min_pts, labels)


def test_metric_dbscan_two_blobs():
    rng = np.random.default_rng(0)
    X = np.vstack([rng.normal(0, 0.05, (15, 2)), rng.normal(8, 0.05, (15, 2))])
    lab = dbscan_metric(distance_matrix(X), eps=0.5, min_pts=3)
    assert ari(np.repeat([0, 1], 15), lab) == pytest.approx(1.0)


def test_metric_dbscan_all_noise():
    rng = np.random.default_rng(1)
    X = rng.normal(size=(10, 2)) * 100
    lab = dbscan_metric(distance_matrix(X), eps=0.01, min_pts=3)
    assert len(set(lab.tolist())) == 10


def test_graph_dbscan_semantics():
    """§6.3 semantics on a hand graph: 0-1-2 heavy triangle (cores at
    minPts=2), 3 hangs off 2 with weight above eps (border), 4 isolated."""
    n = 5
    edges = [(0, 1, 0.9), (1, 2, 0.95), (0, 2, 0.85), (2, 3, 0.8), (3, 4, 0.1)]
    lab = graph_dbscan_local(edges, n, eps=0.5, min_pts=2)
    assert lab[0] == lab[1] == lab[2] == lab[3]
    assert lab[4] != lab[0]


def test_graph_dbscan_border_attaches_to_most_similar_core():
    """Two 4-cliques of cores (minPts=3); a border vertex with one heavy
    edge into each clique attaches to the *most similar* core (§6.3)."""
    n = 9
    cliqueA, cliqueB = [0, 1, 2, 3], [5, 6, 7, 8]
    edges = []
    for grp in (cliqueA, cliqueB):
        edges += [(a, b, 0.9) for i, a in enumerate(grp) for b in grp[i + 1:]]
    edges += [(4, 0, 0.6), (4, 5, 0.8)]  # border: 2 heavy edges < minPts=3
    lab = graph_dbscan_local(edges, n, eps=0.5, min_pts=3)
    assert len({lab[i] for i in cliqueA}) == 1
    assert len({lab[i] for i in cliqueB}) == 1
    assert lab[0] != lab[5]
    assert lab[4] == lab[5]  # attached to the 0.8 side


def test_graph_dbscan_min_pts_boundary():
    n = 3
    edges = [(0, 1, 0.9), (1, 2, 0.9)]
    # vertex 1 has two heavy edges, 0 and 2 have one
    lab3 = graph_dbscan_local(edges, n, eps=0.5, min_pts=2)
    assert lab3[0] == lab3[1] == lab3[2]  # 1 is core, 0/2 attach
    lab4 = graph_dbscan_local(edges, n, eps=0.5, min_pts=3)
    assert len(set(lab4.tolist())) == 3   # nobody is core


@pytest.mark.parametrize("seed", range(3))
def test_graph_dbscan_core_components_agree_with_brute(seed):
    n = 60
    edges = random_weighted_graph(n=n, avg_deg=5, seed=seed)
    eps, mp = 0.5, 3
    lab = graph_dbscan_local(edges, n, eps=eps, min_pts=mp)
    heavy = {}
    for u, v, w in edges:
        if w >= eps:
            heavy.setdefault(u, {})[v] = max(heavy.setdefault(u, {}).get(v, 0), w)
            heavy.setdefault(v, {})[u] = heavy[u][v]
    core = {u for u in range(n) if len(heavy.get(u, {})) >= mp}
    from tests.util import brute_components

    comp = brute_components(
        [(u, v) for u in core for v in heavy.get(u, {}) if v in core], sorted(core)
    )
    for u in core:
        for v in core:
            assert (lab[u] == lab[v]) == (comp[u] == comp[v])
