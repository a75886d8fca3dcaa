"""Exact-HAC baselines vs O(n^3) brute force."""
from __future__ import annotations

import itertools

import numpy as np
import pytest

from repro.baselines.hac_exact import exact_hac_graph, nn_chain_metric
from repro.eval.datasets import distance_matrix
from repro.synth_data import random_weighted_graph
from tests.util import brute_exact_hac


@pytest.mark.parametrize("seed", range(8))
def test_graph_hac_matches_brute_force(seed):
    n = 30
    edges = random_weighted_graph(n=n, avg_deg=4, seed=seed)
    assert exact_hac_graph(edges, n).internal_cluster_sets() == brute_exact_hac(
        edges, n
    )


@pytest.mark.parametrize("seed", range(4))
@pytest.mark.parametrize("t", [0.3, 0.6])
def test_graph_hac_threshold(seed, t):
    n = 30
    edges = random_weighted_graph(n=n, avg_deg=4, seed=seed)
    assert exact_hac_graph(edges, n, t=t).internal_cluster_sets() == brute_exact_hac(
        edges, n, t=t
    )


def test_graph_hac_merge_similarities_monotone():
    """Reducible linkage => exact HAC merge similarities non-increasing."""
    edges = random_weighted_graph(n=60, avg_deg=5, seed=1)
    d = exact_hac_graph(edges, 60)
    sims = [mg.similarity for mg in d.merges]
    assert all(a >= b - 1e-12 for a, b in zip(sims, sims[1:]))


def _brute_upgma_sets(X):
    n = X.shape[0]
    D = distance_matrix(X)
    clusters = {i: frozenset([i]) for i in range(n)}
    out = set()
    nxt = n
    while len(clusters) > 1:
        best = None
        for a, b in itertools.combinations(clusters, 2):
            dd = float(
                np.mean([D[x, y] for x in clusters[a] for y in clusters[b]])
            )
            if best is None or dd < best[0]:
                best = (dd, a, b)
        _, a, b = best
        clusters[nxt] = clusters.pop(a) | clusters.pop(b)
        out.add(clusters[nxt])
        nxt += 1
    return out


@pytest.mark.parametrize("seed", range(5))
def test_nn_chain_matches_brute_upgma(seed):
    rng = np.random.default_rng(seed)
    X = rng.normal(size=(14, 3))
    assert nn_chain_metric(X).internal_cluster_sets() == _brute_upgma_sets(X)


@pytest.mark.parametrize("k", [1, 2, 5])
def test_nn_chain_cut_by_order(k):
    rng = np.random.default_rng(3)
    X = np.vstack([rng.normal(c * 10, 0.1, size=(6, 2)) for c in range(5)])
    d = nn_chain_metric(X)
    lab = d.cut_by_order(k)
    assert len(set(lab.tolist())) == k
    if k == 5:
        # well-separated blobs: the 5-cut is exactly the blobs
        truth = np.repeat(np.arange(5), 6)
        from repro.eval.metrics import ari

        assert ari(truth, lab) == pytest.approx(1.0)
