"""RAC and (simplified) ParHAC baseline tests."""
from __future__ import annotations

import pytest

from repro.baselines.hac_exact import exact_hac_graph
from repro.baselines.parhac import parhac
from repro.baselines.rac import rac
from repro.core.dendrogram import empirical_approx_ratio
from repro.core.terahac_local import terahac_local
from repro.synth_data import random_weighted_graph


@pytest.mark.parametrize("seed", range(6))
def test_rac_equals_exact_hac(seed):
    """The RAC theorem: reciprocal-NN merges give the exact dendrogram."""
    n = 80
    edges = random_weighted_graph(n=n, avg_deg=5, seed=seed)
    assert rac(edges, n)[0].internal_cluster_sets() == exact_hac_graph(
        edges, n
    ).internal_cluster_sets()


@pytest.mark.parametrize("seed", range(3))
def test_rac_approx_ratio_is_one(seed):
    n = 60
    edges = random_weighted_graph(n=n, avg_deg=5, seed=seed)
    d, _ = rac(edges, n)
    assert empirical_approx_ratio(d, edges) == pytest.approx(1.0)


def test_rac_rounds_merge_counts():
    n = 100
    edges = random_weighted_graph(n=n, avg_deg=5, seed=0)
    d, stats = rac(edges, n)
    assert sum(s.n_merges for s in stats) == len(d.merges)
    assert all(s.n_merges >= 1 for s in stats)


def test_rac_single_edge():
    d, stats = rac([(0, 1, 0.5)], 2)
    assert len(d.merges) == 1 and len(stats) == 1


@pytest.mark.parametrize("seed", range(4))
def test_terahac_eps0_rounds_leq_rac(seed):
    """TeraHAC eps=0 is *Optimized*RAC: it chains merges within a round,
    so it never needs more rounds than RAC."""
    n = 120
    edges = random_weighted_graph(n=n, avg_deg=5, seed=seed)
    opt = terahac_local(edges, n, eps=0.0, t=0.01)
    _, rstats = rac(edges, n, t=0.01)
    assert opt.rounds <= len(rstats)


@pytest.mark.parametrize("seed", range(3))
def test_parhac_merges_everything_at_t0(seed):
    n = 60
    edges = random_weighted_graph(n=n, avg_deg=5, seed=seed)
    from tests.util import brute_components

    comp = brute_components([(u, v) for u, v, _ in edges], list(range(n)))
    d, stats = parhac(edges, n, eps=0.1, t=0.0)
    assert len(d.merges) == n - len(set(comp.values()))
    assert sum(s.n_merges for s in stats) == len(d.merges)


def test_parhac_round_counts_between_terahac_and_rac_on_rmat():
    """Fig. 2 ordering on a degree-weighted rMAT graph."""
    from repro.synth_data import degree_weights_local, rmat_edges

    pairs = rmat_edges(scale=9, seed=5)
    edges = degree_weights_local(pairs)
    n = int(pairs.max()) + 1
    th = terahac_local(edges, n, eps=0.1, t=0.01)
    _, ph = parhac(edges, n, eps=0.1, t=0.01)
    _, rc = rac(edges, n, t=0.01)
    assert th.rounds < len(ph) < len(rc)
