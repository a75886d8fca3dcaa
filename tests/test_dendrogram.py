"""Dendrogram structure, Flatten (Algorithm 3), greedy replay tests."""
from __future__ import annotations

import numpy as np
import pytest

from repro.baselines.hac_exact import exact_hac_graph
from repro.core.dendrogram import Dendrogram, empirical_approx_ratio
from repro.core.goodness import encode_leaf, merge_id
from repro.core.subgraph_hac import Merge
from repro.synth_data import random_weighted_graph


def _chain_dendrogram():
    """0-1 merged at 0.9, then +2 at 0.5, vertex 3 never merged. n=4."""
    n = 4
    a, b, c = encode_leaf(0, n), encode_leaf(1, n), encode_leaf(2, n)
    p1 = merge_id(a, b, n)
    p2 = merge_id(p1, c, n)
    return Dendrogram(
        n_base=n,
        merges=[Merge(p1, a, b, 0.9), Merge(p2, p1, c, 0.5)],
    )


def test_roots_and_children():
    d = _chain_dendrogram()
    ch = d.children()
    assert len(ch) == 2
    roots = set(d.roots())
    assert encode_leaf(3, 4) in roots
    assert len(roots) == 2


@pytest.mark.parametrize(
    "t,expected_clusters",
    [
        (0.95, 4),         # nothing qualifies: all singletons
        (0.7, 3),          # {0,1}, {2}, {3}
        (0.4, 2),          # {0,1,2}, {3}
        (0.0, 2),
    ],
)
def test_flatten_thresholds(t, expected_clusters):
    d = _chain_dendrogram()
    labels = d.flatten(t)
    assert len(set(labels.tolist())) == expected_clusters


def test_flatten_takes_topmost_qualifying_node():
    """Non-monotone sims: parent above threshold, child below — the parent
    (topmost node with sim >= t) wins, per Algorithm 3."""
    n = 3
    a, b, c = (encode_leaf(i, n) for i in range(3))
    p1 = merge_id(a, b, n)
    p2 = merge_id(p1, c, n)
    d = Dendrogram(
        n_base=n, merges=[Merge(p1, a, b, 0.2), Merge(p2, p1, c, 0.5)]
    )
    labels = d.flatten(0.4)
    assert len(set(labels.tolist())) == 1  # whole tree is one cluster


def test_flat_cluster_min_merge():
    d = _chain_dendrogram()
    mins = d.flat_cluster_min_merge(0.4)
    # cluster {0,1,2} has min merge 0.5; singleton {3} reports inf
    assert sorted(mins) == [0.5, float("inf")]


def test_cut_by_order():
    d = _chain_dendrogram()
    lab2 = d.cut_by_order(3)
    assert len(set(lab2.tolist())) == 3
    lab1 = d.cut_by_order(2)
    assert len(set(lab1.tolist())) == 2


def test_internal_cluster_sets():
    d = _chain_dendrogram()
    assert d.internal_cluster_sets() == {
        frozenset({0, 1}),
        frozenset({0, 1, 2}),
    }


def test_empirical_ratio_exact_is_one():
    """Exact HAC replays greedily with ratio exactly 1 (Lemma 3)."""
    for seed in range(5):
        edges = random_weighted_graph(n=80, avg_deg=4, seed=seed)
        d = exact_hac_graph(edges, 80)
        assert empirical_approx_ratio(d, edges) == pytest.approx(1.0)


def test_empirical_ratio_detects_bad_dendrogram():
    """Merging the *lightest* edge first on a path must show ratio > 1."""
    n = 3
    edges = [(0, 1, 1.0), (1, 2, 0.5)]
    a, b, c = (encode_leaf(i, n) for i in range(3))
    p1 = merge_id(b, c, n)
    p2 = merge_id(p1, a, n)
    bad = Dendrogram(n_base=n, merges=[Merge(p1, b, c, 0.5), Merge(p2, p1, a, 0.5)])
    assert empirical_approx_ratio(bad, edges) == pytest.approx(2.0)


def test_empirical_ratio_rejects_inconsistent_tree():
    n = 3
    edges = [(0, 1, 1.0)]
    a, b, c = (encode_leaf(i, n) for i in range(3))
    p1 = merge_id(a, b, n)
    # merge references a child that is never produced
    ghost = merge_id(p1, c, n)
    d = Dendrogram(n_base=n, merges=[Merge(ghost, merge_id(b, c, n), a, 1.0)])
    with pytest.raises((ValueError, KeyError)):
        empirical_approx_ratio(d, edges)
