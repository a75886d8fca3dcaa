"""Clustering quality measures used in Table 2 / §6.1.

* ARI — Adjusted Rand Index (Hubert–Arabie).
* NMI — Normalized Mutual Information with arithmetic-mean
  normalization (the sklearn default the paper uses).
* Dendrogram Purity — Heller–Ghahramani, exactly the formula in §6.1.
* Dasgupta cost — over the *complete* similarity graph (all pairwise
  similarities of the pointset), as §6.1 specifies.

Purity and Dasgupta operate on the shared ``Dendrogram`` structure. A
thresholded TeraHAC run yields a forest; the paper only reports these
two measures for full dendrograms, but to score partial ones
consistently we join all roots under a virtual root (pairs split across
trees get the whole leaf set as their LCA).
"""
from __future__ import annotations

import numpy as np

from repro.core.dendrogram import Dendrogram
from repro.core.goodness import decode_rep, decode_size


def _contingency(a: np.ndarray, b: np.ndarray) -> np.ndarray:
    _, ai = np.unique(a, return_inverse=True)
    _, bi = np.unique(b, return_inverse=True)
    cm = np.zeros((ai.max() + 1, bi.max() + 1), dtype=np.int64)
    np.add.at(cm, (ai, bi), 1)
    return cm


def ari(labels_true: np.ndarray, labels_pred: np.ndarray) -> float:
    """Adjusted Rand Index in [-1, 1]; 1 = identical partitions."""
    cm = _contingency(labels_true, labels_pred)
    n = cm.sum()
    sum_comb = (cm * (cm - 1) // 2).sum()
    a = cm.sum(axis=1)
    b = cm.sum(axis=0)
    sum_a = (a * (a - 1) // 2).sum()
    sum_b = (b * (b - 1) // 2).sum()
    total = n * (n - 1) // 2
    expected = sum_a * sum_b / total if total else 0.0
    max_index = (sum_a + sum_b) / 2.0
    if max_index == expected:
        return 1.0
    return float((sum_comb - expected) / (max_index - expected))


def nmi(labels_true: np.ndarray, labels_pred: np.ndarray) -> float:
    """Normalized Mutual Information, arithmetic normalization."""
    cm = _contingency(labels_true, labels_pred).astype(np.float64)
    n = cm.sum()
    pij = cm / n
    pi = pij.sum(axis=1)
    pj = pij.sum(axis=0)
    nz = pij > 0
    mi = (pij[nz] * np.log(pij[nz] / (np.outer(pi, pj)[nz]))).sum()
    hi = -(pi[pi > 0] * np.log(pi[pi > 0])).sum()
    hj = -(pj[pj > 0] * np.log(pj[pj > 0])).sum()
    denom = (hi + hj) / 2.0
    if denom <= 0:
        return 1.0 if mi == 0 else 0.0
    return float(mi / denom)


def _ordered_merges(dendro: Dendrogram):
    """Merges sorted children-before-parents (parent size strictly larger)."""
    return sorted(dendro.merges, key=lambda mg: decode_size(mg.parent, dendro.n_base))


def _leaf_indices(dendro: Dendrogram) -> dict[int, np.ndarray]:
    """node id -> sorted array of original leaf indices, bottom-up."""
    n = dendro.n_base
    out: dict[int, np.ndarray] = {}
    for mg in _ordered_merges(dendro):
        def leaves(x: int) -> np.ndarray:
            if x in out:
                return out[x]
            assert decode_size(x, n) == 1, f"child {x} missing"
            arr = np.array([decode_rep(x, n)], dtype=np.int64)
            out[x] = arr
            return arr

        out[mg.parent] = np.concatenate([leaves(mg.left), leaves(mg.right)])
    return out


def dendrogram_purity(dendro: Dendrogram, labels_true: np.ndarray) -> float:
    """Heller–Ghahramani dendrogram purity (§6.1), virtual-rooted forests."""
    n = dendro.n_base
    classes, yi = np.unique(labels_true, return_inverse=True)
    k = len(classes)
    counts: dict[int, np.ndarray] = {}

    def class_counts(x: int) -> np.ndarray:
        if x in counts:
            return counts[x]
        assert decode_size(x, n) == 1
        c = np.zeros(k, dtype=np.int64)
        c[yi[decode_rep(x, n)]] = 1
        counts[x] = c
        return c

    total = 0.0
    for mg in _ordered_merges(dendro):
        cl, cr = class_counts(mg.left), class_counts(mg.right)
        node = cl + cr
        counts[mg.parent] = node
        sz = node.sum()
        # pairs (x, y) in the same class whose LCA is this node
        total += float((cl * cr * node / sz).sum())
    # virtual root over all trees
    root_counts = np.stack(
        [class_counts(r) for r in dendro.roots()]
    )
    tot_per_class = root_counts.sum(axis=0)
    cross_pairs = (tot_per_class**2 - (root_counts**2).sum(axis=0)) / 2.0
    total += float((cross_pairs * tot_per_class / n).sum())
    n_pairs = float((tot_per_class * (tot_per_class - 1) / 2).sum())
    return total / n_pairs if n_pairs else 1.0


def dasgupta_cost(dendro: Dendrogram, sim: np.ndarray) -> float:
    """Dasgupta cost over the complete similarity graph ``sim`` (n x n,
    symmetric, zero diagonal): sum over pairs of |lca leaves| * sim."""
    n = dendro.n_base
    idx = _leaf_indices(dendro)
    cost = 0.0
    for mg in dendro.merges:
        a = idx[mg.left] if mg.left in idx else np.array(
            [decode_rep(mg.left, n)], dtype=np.int64
        )
        b = idx[mg.right] if mg.right in idx else np.array(
            [decode_rep(mg.right, n)], dtype=np.int64
        )
        cost += (len(a) + len(b)) * float(sim[np.ix_(a, b)].sum())
    # pairs split across roots: LCA = virtual root = all n leaves
    full = float(sim.sum()) / 2.0
    within = 0.0
    for r in dendro.roots():
        a = idx.get(r)
        if a is None or len(a) == 1:
            continue
        within += float(sim[np.ix_(a, a)].sum()) / 2.0
    cost += n * (full - within)
    return cost
