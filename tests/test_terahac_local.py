"""End-to-end tests of the shared-memory TeraHAC engine against the
paper's theorems: exactness at eps=0 (OptimizedRAC == HAC), Lemma 4
(approximation ratio), Lemma 8 (flatten min-merge), Lemma 9 (pruning
invariance) and round-count behaviour."""
from __future__ import annotations

import numpy as np
import pytest

from repro.baselines.hac_exact import exact_hac_graph
from repro.baselines.rac import rac
from repro.core.dendrogram import empirical_approx_ratio
from repro.core.terahac_local import terahac_local
from repro.synth_data import random_weighted_graph
from tests.util import validate_good_merges


@pytest.mark.parametrize("seed", range(6))
@pytest.mark.parametrize("n,avg_deg", [(60, 4), (150, 6)])
def test_eps0_t0_equals_exact_hac(seed, n, avg_deg):
    """TeraHAC(eps=0, t=0) computes the exact HAC dendrogram (§6:
    "setting eps=0 yields the exact HAC algorithm"). Weights are random
    uniforms, so ties have measure zero and the dendrogram is unique."""
    edges = random_weighted_graph(n=n, avg_deg=avg_deg, seed=seed)
    ex = exact_hac_graph(edges, n)
    res = terahac_local(edges, n, eps=0.0, t=0.0)
    assert res.dendrogram.internal_cluster_sets() == ex.internal_cluster_sets()


@pytest.mark.parametrize("seed", range(5))
@pytest.mark.parametrize("eps", [0.05, 0.1, 0.3, 1.0])
def test_approximation_ratio_bounded(seed, eps):
    """Lemma 4: the dendrogram is (1+eps)-approximate."""
    n = 100
    edges = random_weighted_graph(n=n, avg_deg=5, seed=seed)
    res = terahac_local(edges, n, eps=eps, t=0.0)
    assert empirical_approx_ratio(res.dendrogram, edges) <= (1 + eps) * (1 + 1e-9)


@pytest.mark.parametrize("seed", range(3))
@pytest.mark.parametrize("eps", [0.0, 0.1])
def test_every_merge_is_good_in_emission_order(seed, eps):
    """Definition 2 holds for every merge at its position (Lemmas 5-7),
    including the M(.) bookkeeping and the id encoding."""
    n = 80
    edges = random_weighted_graph(n=n, avg_deg=5, seed=seed)
    res = terahac_local(edges, n, eps=eps, t=0.0)
    validate_good_merges(edges, res.dendrogram, eps)


@pytest.mark.parametrize("seed", range(3))
def test_lemma9_pruning_invariance(seed):
    """Running with any pruning threshold t' in [0, t] then flattening at
    t gives the identical flat clustering (Lemma 9)."""
    n = 120
    t = 0.05
    edges = random_weighted_graph(n=n, avg_deg=5, seed=seed)
    ref = None
    for t_prime in (0.0, t / 2, t):
        res = terahac_local(edges, n, eps=0.1, t=t_prime)
        labels = res.dendrogram.flatten(t)
        canon = tuple(
            tuple(sorted(np.flatnonzero(labels == c).tolist()))
            for c in sorted(set(labels.tolist()), key=lambda c: min(np.flatnonzero(labels == c)))
        )
        if ref is None:
            ref = canon
        else:
            assert canon == ref


@pytest.mark.parametrize("seed", range(3))
def test_lemma8_flatten_min_merge(seed):
    """Every flattened cluster was built from merges of similarity
    >= t/(1+eps) (Lemma 8)."""
    n, eps, t = 100, 0.1, 0.2
    edges = random_weighted_graph(n=n, avg_deg=5, seed=seed)
    res = terahac_local(edges, n, eps=eps, t=t)
    for mn in res.dendrogram.flat_cluster_min_merge(t):
        assert mn >= t / (1 + eps) * (1 - 1e-9)


@pytest.mark.parametrize("seed", range(4))
def test_fewer_rounds_than_rac(seed):
    """The headline claim: TeraHAC needs (far) fewer rounds than RAC."""
    n = 150
    edges = random_weighted_graph(n=n, avg_deg=6, seed=seed)
    res = terahac_local(edges, n, eps=0.1, t=0.01)
    _, rac_stats = rac(edges, n, t=0.01)
    assert res.rounds < len(rac_stats)


def test_stats_consistency():
    n = 100
    edges = random_weighted_graph(n=n, avg_deg=5, seed=1)
    res = terahac_local(edges, n, eps=0.1, t=0.0, collect_stats=True)
    assert sum(st.n_merges for st in res.stats) == len(res.dendrogram.merges)
    assert len(res.stats) == res.rounds
    # graph shrinks monotonically (Fig. 11 behaviour)
    verts = [st.n_vertices for st in res.stats]
    assert verts == sorted(verts, reverse=True)


def test_good_edges_more_with_eps(synthetic_seed=2):
    """Fig. 15: eps=0.1 makes many more edges mergeable than eps=0."""
    n = 200
    edges = random_weighted_graph(n=n, avg_deg=6, seed=synthetic_seed)
    g0 = terahac_local(edges, n, eps=0.0, t=0.0, collect_stats=True)
    g1 = terahac_local(edges, n, eps=0.1, t=0.0, collect_stats=True)
    assert g1.stats[0].n_good > g0.stats[0].n_good


@pytest.mark.parametrize("cap", [40, 200])
def test_size_constrained_partitions_still_correct(cap):
    """Lemma 7: any partition is correct — force tiny subgraph caps and
    check the approximation ratio still holds (the stall fallback may
    fire; that is fine as long as the output is a valid dendrogram)."""
    n, eps = 100, 0.1
    edges = random_weighted_graph(n=n, avg_deg=5, seed=7)
    res = terahac_local(edges, n, eps=eps, t=0.0, max_subgraph_edges=cap)
    assert empirical_approx_ratio(res.dendrogram, edges) <= (1 + eps) * (1 + 1e-9)


def test_full_dendrogram_at_t0():
    """t=0 merges every connected component down to a single root."""
    n = 80
    edges = random_weighted_graph(n=n, avg_deg=5, seed=3)
    from tests.util import brute_components

    comp = brute_components([(u, v) for u, v, _ in edges], list(range(n)))
    n_components = len(set(comp.values()))
    res = terahac_local(edges, n, eps=0.1, t=0.0)
    assert len(res.dendrogram.merges) == n - n_components


def test_threshold_stops_early():
    n = 80
    edges = random_weighted_graph(n=n, avg_deg=5, seed=4)
    full = terahac_local(edges, n, eps=0.1, t=0.0)
    part = terahac_local(edges, n, eps=0.1, t=0.3)
    assert len(part.dendrogram.merges) < len(full.dendrogram.merges)
    # no merge below t/(1+eps) similarity is required by Lemma 8 only for
    # flattened clusters; but the loop must have stopped: every remaining
    # heavy edge was exhausted.
    assert part.rounds <= full.rounds


def test_deterministic():
    n = 60
    edges = random_weighted_graph(n=n, avg_deg=5, seed=9)
    a = terahac_local(edges, n, eps=0.1, t=0.01)
    b = terahac_local(edges, n, eps=0.1, t=0.01)
    assert a.dendrogram.merges == b.dendrogram.merges
