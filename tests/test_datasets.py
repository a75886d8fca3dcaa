"""UCI stand-in pointsets and k-NN similarity graph construction (§6)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.eval.datasets import (
    _CONFIGS,
    distance_matrix,
    knn_similarity_graph,
    make_pointset,
    similarity_matrix,
)

SHAPES = {  # (n, dim, classes) of the real UCI datasets being stood in for
    "iris": (150, 4, 3),
    "wine": (178, 13, 3),
    "digits": (1797, 64, 10),
    "faces": (400, 64, 40),
}


@pytest.mark.parametrize("name", list(SHAPES))
def test_pointset_shapes_match_uci(name):
    ps = make_pointset(name)
    n, dim, k = SHAPES[name]
    assert ps.X.shape == (n, dim)
    assert ps.y.shape == (n,)
    assert ps.n_classes == k


@pytest.mark.parametrize("name", ["iris", "wine"])
def test_pointset_deterministic(name):
    a, b = make_pointset(name), make_pointset(name)
    assert np.array_equal(a.X, b.X) and np.array_equal(a.y, b.y)


def test_distance_matrix_properties():
    rng = np.random.default_rng(0)
    X = rng.normal(size=(20, 3))
    d = distance_matrix(X)
    assert np.allclose(d, d.T)
    assert np.allclose(np.diag(d), 0.0)
    assert (d >= 0).all()
    # spot-check one entry
    assert d[3, 7] == pytest.approx(np.linalg.norm(X[3] - X[7]))


def test_similarity_matrix_properties():
    rng = np.random.default_rng(1)
    s = similarity_matrix(rng.normal(size=(15, 4)))
    assert np.allclose(s, s.T)
    assert np.allclose(np.diag(s), 0.0)
    assert s.max() == pytest.approx(1.0)
    assert (s >= 0).all()


@pytest.mark.parametrize("k", [5, 25])
def test_knn_graph_properties(k):
    rng = np.random.default_rng(2)
    X = rng.normal(size=(60, 4))
    edges = knn_similarity_graph(X, k=k)
    assert all(u < v for u, v, _ in edges)
    assert len({(u, v) for u, v, _ in edges}) == len(edges)  # dedup
    ws = [w for _, _, w in edges]
    assert max(ws) == pytest.approx(1.0)  # rescaled so max sim = 1 (§6)
    assert min(ws) > 0
    # every vertex has degree >= k (its own kNN edges, plus inbound ones)
    deg = np.zeros(60)
    for u, v, _ in edges:
        deg[u] += 1
        deg[v] += 1
    assert (deg >= k).all()


def test_knn_weights_are_transformed_distances():
    rng = np.random.default_rng(3)
    X = rng.normal(size=(30, 3))
    edges = knn_similarity_graph(X, k=5)
    d = distance_matrix(X)
    raw = {(u, v): 1.0 / (1.0 + d[u, v]) for u, v, _ in edges}
    top = max(raw.values())
    for u, v, w in edges:
        assert w == pytest.approx(raw[(u, v)] / top)


def test_config_seeds_fixed():
    """Changing these silently would invalidate EXPERIMENTS.md."""
    assert {n: c["n"] for n, c in _CONFIGS.items()} == {
        "iris": 150, "wine": 178, "digits": 1797, "faces": 400
    }
