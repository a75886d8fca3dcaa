"""UCI dataset stand-ins and similarity-graph construction (§6, §6.1).

The paper's quality study uses iris/wine/digits/faces from
``sklearn.datasets``; this container has neither sklearn nor network
access, so we generate deterministic Gaussian-blob pointsets with the
same (n, dim, #classes) shape and qualitatively matched difficulty
(separation tuned so the exact-HAC ARI lands near the paper's Table 2
column 2 value: iris≈0.9 easy, wine≈0.4 heavily overlapped, digits≈0.88
many well-separated classes, faces≈0.57 many small classes with
overlap). The substitution is documented in DESIGN.md §2.4 — the tables
compare *algorithms against each other on identical inputs*, which is
the property the paper's Table 2 establishes.

Similarity graphs follow §6 exactly: symmetric k-NN graph (k=25) with
``sim(u,v) = 1/(1 + dist(u,v))``, rescaled so the max similarity is 1.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

_CONFIGS: dict[str, dict] = {
    # name: n, dim, classes, center spread (sep), within-class std.
    # sep is tuned so exact graph HAC's best-flatten ARI lands near the
    # paper's Table 2 column 2 (iris .92, wine .37, digits .88, faces .57).
    "iris": dict(n=150, dim=4, k=3, sep=1.95, std=1.0, seed=11),
    "wine": dict(n=178, dim=13, k=3, sep=0.60, std=1.0, seed=11),
    "digits": dict(n=1797, dim=64, k=10, sep=0.60, std=1.0, seed=11),
    "faces": dict(n=400, dim=64, k=40, sep=0.60, std=1.0, seed=11),
}


@dataclass
class Pointset:
    """A labelled pointset stand-in for one UCI dataset."""

    name: str
    X: np.ndarray
    y: np.ndarray

    @property
    def n(self) -> int:
        return self.X.shape[0]

    @property
    def n_classes(self) -> int:
        return int(len(np.unique(self.y)))


def make_pointset(name: str) -> Pointset:
    """Deterministic Gaussian-blob stand-in for a UCI dataset."""
    cfg = _CONFIGS[name]
    rng = np.random.default_rng(cfg["seed"])
    n, dim, k = cfg["n"], cfg["dim"], cfg["k"]
    centers = rng.normal(0.0, cfg["sep"], size=(k, dim))
    # Class sizes as equal as possible (mirrors the roughly balanced UCI sets).
    sizes = np.full(k, n // k)
    sizes[: n % k] += 1
    X = np.vstack(
        [
            centers[c] + rng.normal(0.0, cfg["std"], size=(sizes[c], dim))
            for c in range(k)
        ]
    )
    y = np.repeat(np.arange(k), sizes)
    perm = rng.permutation(n)
    return Pointset(name=name, X=X[perm], y=y[perm])


def distance_matrix(X: np.ndarray) -> np.ndarray:
    """Full Euclidean distance matrix (zero diagonal)."""
    sq = (X**2).sum(axis=1)
    d2 = sq[:, None] + sq[None, :] - 2.0 * (X @ X.T)
    d = np.sqrt(np.maximum(d2, 0.0))
    np.fill_diagonal(d, 0.0)
    return d


def similarity_matrix(X: np.ndarray) -> np.ndarray:
    """Complete similarity graph ``1/(1+dist)`` scaled to max 1, zero
    diagonal — the graph Dasgupta cost is computed over (§6.1)."""
    d = distance_matrix(X)
    s = 1.0 / (1.0 + d)
    np.fill_diagonal(s, 0.0)
    s /= s.max()
    return s


def knn_similarity_graph(
    X: np.ndarray, k: int = 25
) -> list[tuple[int, int, float]]:
    """Symmetric k-NN similarity graph of §6: for each point, edges to its
    k nearest neighbours, sims ``1/(1+dist)`` rescaled so max sim = 1.
    Returns undirected edges ``(u, v, w)`` with u < v, deduplicated."""
    n = X.shape[0]
    d = distance_matrix(X)
    np.fill_diagonal(d, np.inf)
    nn = np.argsort(d, axis=1)[:, :k]
    pairs: dict[tuple[int, int], float] = {}
    for u in range(n):
        for v in nn[u]:
            a, b = (u, int(v)) if u < v else (int(v), u)
            pairs[(a, b)] = 1.0 / (1.0 + d[u, v])
    top = max(pairs.values())
    return [(a, b, w / top) for (a, b), w in sorted(pairs.items())]
