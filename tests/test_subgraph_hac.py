"""SubgraphHAC kernel tests: every merge good, result maximal, active /
inactive contract honoured (Algorithms 2/4, Lemmas 2/5)."""
from __future__ import annotations

import numpy as np
import pytest

from repro.core.goodness import INF, encode_leaf, goodness
from repro.core.subgraph_hac import subgraph_hac
from repro.synth_data import random_weighted_graph


def _rows_all_active(edges, n):
    return [
        (encode_leaf(u, n), encode_leaf(v, n), w, 1, 1, INF, INF, True, True)
        for u, v, w in edges
    ]


def _replay_state(rows):
    """Current graph state (adj, size, m, active) after applying no merges."""
    size, m, adj, active = {}, {}, {}, set()
    for u, v, raw, su, sv, mu, mv, au, av in rows:
        size[u], size[v], m[u], m[v] = su, sv, mu, mv
        adj.setdefault(u, {})[v] = adj.setdefault(u, {}).get(v, 0) + raw
        adj.setdefault(v, {})[u] = adj.setdefault(v, {}).get(u, 0) + raw
        if au:
            active.add(u)
        if av:
            active.add(v)
    return adj, size, m, active


def _apply(adj, size, m, mg):
    u, v = mg.left, mg.right
    w_uv = adj[u][v] / (size[u] * size[v])
    nbrs = {}
    for x, r in adj.pop(u).items():
        if x != v:
            nbrs[x] = nbrs.get(x, 0.0) + r
    for x, r in adj.pop(v).items():
        if x != u:
            nbrs[x] = nbrs.get(x, 0.0) + r
    for x, r in nbrs.items():
        adj[x].pop(u, None)
        adj[x].pop(v, None)
        adj[x][mg.parent] = r
    adj[mg.parent] = nbrs
    size[mg.parent] = size[u] + size[v]
    m[mg.parent] = min(m[u], m[v], w_uv)
    return w_uv


def _wmax(adj, size, x):
    return max((r / (size[x] * size[y]) for y, r in adj[x].items()), default=0.0)


@pytest.mark.parametrize("seed", range(8))
@pytest.mark.parametrize("eps", [0.0, 0.1, 0.5])
def test_all_merges_are_good_and_result_is_maximal(seed, eps):
    n = 60
    edges = random_weighted_graph(n=n, avg_deg=4, seed=seed)
    rows = _rows_all_active(edges, n)
    res = subgraph_hac(rows, eps, n)
    adj, size, m, active = _replay_state(rows)
    merged_away = set()
    for mg in res.merges:
        assert mg.left in active and mg.right in active
        assert mg.left not in merged_away and mg.right not in merged_away
        g = goodness(
            _wmax(adj, size, mg.left),
            _wmax(adj, size, mg.right),
            m[mg.left],
            m[mg.right],
            adj[mg.left][mg.right] / (size[mg.left] * size[mg.right]),
        )
        assert g <= (1 + eps) * (1 + 1e-9), f"merge not good: {g}"
        w = _apply(adj, size, m, mg)
        assert abs(w - mg.similarity) < 1e-9
        merged_away |= {mg.left, mg.right}
        active.add(mg.parent)
    active -= merged_away
    # maximality: no remaining active-active edge is (1+eps)-good
    for x in active:
        for y, r in adj[x].items():
            if y in active and x < y:
                g = goodness(
                    _wmax(adj, size, x),
                    _wmax(adj, size, y),
                    m[x],
                    m[y],
                    r / (size[x] * size[y]),
                )
                assert g > (1 + eps) * (1 - 1e-9), "good merge left behind"


@pytest.mark.parametrize("seed", range(4))
def test_inactive_vertices_never_merge(seed):
    n = 40
    edges = random_weighted_graph(n=n, avg_deg=4, seed=seed)
    rng = np.random.default_rng(seed)
    act = set(int(x) for x in rng.choice(n, n // 2, replace=False))
    rows = []
    for u, v, w in edges:
        au, av = u in act, v in act
        if not (au or av):
            continue
        rows.append(
            (encode_leaf(u, n), encode_leaf(v, n), w, 1, 1, INF, INF, au, av)
        )
    res = subgraph_hac(rows, 0.2, n)
    inact = {encode_leaf(v, n) for v in range(n) if v not in act}
    for mg in res.merges:
        assert mg.left not in inact and mg.right not in inact
    # mapping covers exactly the active vertices present in the subgraph
    present_active = {r[0] for r in rows if r[7]} | {r[1] for r in rows if r[8]}
    assert set(res.mapping) == present_active


def test_mapping_identity_for_unmerged():
    """An active vertex whose only edge goes to an inactive neighbour can
    never merge; it must map to itself with unchanged metadata."""
    n = 4
    rows = [
        (encode_leaf(0, n), encode_leaf(1, n), 1.0, 1, 1, INF, INF, True, True),
        (encode_leaf(2, n), encode_leaf(3, n), 0.9, 1, 1, 0.7, INF, True, False),
    ]
    res = subgraph_hac(rows, 0.0, n)
    assert len(res.merges) == 1  # only 0-1 can merge
    assert res.mapping[encode_leaf(2, n)] == (encode_leaf(2, n), 1, 0.7)


def test_eps0_merges_only_reciprocal_pairs_initially():
    """Observation 1: with eps=0, the first merge must satisfy
    w(uv) = wmax(u) = wmax(v)."""
    n = 3
    rows = [
        (encode_leaf(0, n), encode_leaf(1, n), 1.0, 1, 1, INF, INF, True, True),
        (encode_leaf(1, n), encode_leaf(2, n), 0.8, 1, 1, INF, INF, True, True),
    ]
    res = subgraph_hac(rows, 0.0, n)
    first = res.merges[0]
    assert {first.left, first.right} == {encode_leaf(0, n), encode_leaf(1, n)}


def test_inactive_inactive_edge_rejected():
    n = 2
    rows = [(encode_leaf(0, n), encode_leaf(1, n), 1.0, 1, 1, INF, INF, False, False)]
    with pytest.raises(ValueError):
        subgraph_hac(rows, 0.1, n)


@pytest.mark.parametrize("seed", range(3))
def test_lemma2_invariant_after_run(seed):
    """After a run, every active cluster satisfies wmax(v)/M(v) <= 1+eps."""
    eps = 0.15
    n = 50
    edges = random_weighted_graph(n=n, avg_deg=5, seed=seed)
    rows = _rows_all_active(edges, n)
    res = subgraph_hac(rows, eps, n)
    adj, size, m, active = _replay_state(rows)
    for mg in res.merges:
        _apply(adj, size, m, mg)
        active -= {mg.left, mg.right}
        active.add(mg.parent)
    for x in active:
        if m[x] < INF:
            assert _wmax(adj, size, x) <= (1 + eps) * m[x] * (1 + 1e-9)


def test_carries_prior_m_values():
    """A vertex arriving with small M blocks otherwise-plausible merges
    (the Fig. 4 mechanism across rounds)."""
    n = 10
    eps = 0.1
    # vertex 0 carries M = 0.5 from earlier rounds; edge weight 0.8 with
    # wmax 0.8 would be good on weights alone, but 0.8/0.5 > 1.1.
    rows = [(encode_leaf(0, n), encode_leaf(1, n), 0.8, 1, 1, 0.5, INF, True, True)]
    res = subgraph_hac(rows, eps, n)
    assert res.merges == []
    # with a benign M it merges
    rows2 = [(encode_leaf(0, n), encode_leaf(1, n), 0.8, 1, 1, INF, INF, True, True)]
    assert len(subgraph_hac(rows2, eps, n).merges) == 1
