"""Hypothesis property tests over arbitrary small weighted graphs."""
from __future__ import annotations

import numpy as np
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.baselines.hac_exact import exact_hac_graph
from repro.core.dendrogram import empirical_approx_ratio
from repro.core.terahac_local import terahac_local
from repro.eval.metrics import ari, nmi
from tests.util import brute_exact_hac, validate_good_merges


@st.composite
def weighted_graphs(draw, max_n=24):
    n = draw(st.integers(min_value=2, max_value=max_n))
    m = draw(st.integers(min_value=1, max_value=min(40, n * (n - 1) // 2)))
    seen = set()
    edges = []
    for _ in range(m):
        u = draw(st.integers(min_value=0, max_value=n - 1))
        v = draw(st.integers(min_value=0, max_value=n - 1))
        if u == v:
            continue
        k = (min(u, v), max(u, v))
        if k in seen:
            continue
        seen.add(k)
        w = draw(
            st.floats(
                min_value=1e-3, max_value=1.0, allow_nan=False, allow_infinity=False
            )
        )
        edges.append((k[0], k[1], w))
    return edges, n


@given(weighted_graphs(), st.sampled_from([0.0, 0.1, 0.5]))
@settings(max_examples=40, deadline=None)
def test_terahac_merges_always_good(graph, eps):
    edges, n = graph
    if not edges:
        return
    res = terahac_local(edges, n, eps=eps, t=0.0)
    validate_good_merges(edges, res.dendrogram, eps)


@given(weighted_graphs(), st.sampled_from([0.1, 0.3]))
@settings(max_examples=40, deadline=None)
def test_terahac_ratio_bound(graph, eps):
    edges, n = graph
    if not edges:
        return
    res = terahac_local(edges, n, eps=eps, t=0.0)
    assert empirical_approx_ratio(res.dendrogram, edges) <= (1 + eps) * (1 + 1e-9)


@given(weighted_graphs(max_n=14))
@settings(max_examples=30, deadline=None)
def test_exact_hac_matches_brute(graph):
    edges, n = graph
    if not edges:
        return
    # brute force compares merge *sets*; equality requires unique argmax,
    # so skip graphs with tied weights (hypothesis loves duplicates).
    ws = [w for _, _, w in edges]
    if len(set(ws)) != len(ws):
        return
    assert exact_hac_graph(edges, n).internal_cluster_sets() == brute_exact_hac(
        edges, n
    )


@given(weighted_graphs(), st.sampled_from([0.0, 0.3, 0.8]))
@settings(max_examples=30, deadline=None)
def test_flatten_is_a_partition(graph, t):
    edges, n = graph
    if not edges:
        return
    res = terahac_local(edges, n, eps=0.1, t=0.0)
    labels = res.dendrogram.flatten(t)
    assert labels.shape == (n,)
    assert (labels >= 0).all()


@given(
    st.lists(st.integers(min_value=0, max_value=4), min_size=2, max_size=60),
    st.lists(st.integers(min_value=0, max_value=4), min_size=2, max_size=60),
)
@settings(max_examples=50, deadline=None)
def test_metric_bounds(a, b):
    m = min(len(a), len(b))
    ya, yb = np.array(a[:m]), np.array(b[:m])
    assert -1.0 - 1e-9 <= ari(ya, yb) <= 1.0 + 1e-9
    assert -1e-9 <= nmi(ya, yb) <= 1.0 + 1e-9
    assert ari(ya, ya) == 1.0
