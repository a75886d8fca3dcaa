"""Affinity clustering (Bateni et al.) and its size-constrained variant."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.graphs.affinity import affinity_clusters, best_edges, size_constrained_affinity
from repro.graphs.edges import canonicalize, init_vertices, with_weights
from repro.oracle import assert_equivalent
from repro.synth_data import edges_to_spark, random_weighted_graph
from tests.util import brute_components


@pytest.fixture(scope="module")
def graph(spark):
    edges = random_weighted_graph(n=70, avg_deg=5, seed=13)
    e = canonicalize(
        edges_to_spark(spark, edges).select("u", "v", F.col("w").alias("raw"))
    )
    v = init_vertices(spark, e)
    ew = with_weights(e, v).select("u", "v", "w")
    return edges, ew, v


def test_best_edges_oracle(spark, graph):
    _, ew, _ = graph
    assert_equivalent(
        best_edges(ew),
        """
        WITH sym AS (
          SELECT u AS src, v AS dst, w FROM ew
          UNION ALL SELECT v AS src, u AS dst, w FROM ew
        ),
        ranked AS (
          SELECT src, dst,
                 row_number() OVER (PARTITION BY src ORDER BY w DESC, dst DESC) rn
          FROM sym
        )
        SELECT src, dst FROM ranked WHERE rn = 1
        """,
        ew=ew,
    )


def test_affinity_clusters_match_local_reference(spark, graph):
    edges, ew, v = graph
    got = {r.id: r.cluster for r in affinity_clusters(ew, v).collect()}
    # local reference: mark best edge per vertex, components of marked
    best = {}
    adj = {}
    for u, vv, w in edges:
        adj.setdefault(u, []).append((w, vv))
        adj.setdefault(vv, []).append((w, u))
    marked = []
    for x, cands in adj.items():
        best_w, best_y = max(cands)
        marked.append((x, best_y))
    comp = brute_components([(a, b) for a, b in marked], list(adj))
    assert got == {x: comp[x] for x in adj}


def test_affinity_each_best_edge_intra_cluster(spark, graph):
    """The paper's §5 motivation: every vertex's best edge is
    intra-cluster in (unconstrained) affinity clustering."""
    edges, ew, v = graph
    cl = {r.id: r.cluster for r in affinity_clusters(ew, v).collect()}
    adj = {}
    for u, vv, w in edges:
        adj.setdefault(u, []).append((w, vv))
        adj.setdefault(vv, []).append((w, u))
    for x, cands in adj.items():
        _, y = max(cands)
        assert cl[x] == cl[y]


def test_size_constraint_splits_big_clusters(spark, graph):
    edges, ew, v = graph
    unconstrained = size_constrained_affinity(ew, v, max_load=1 << 30)
    tiny = size_constrained_affinity(ew, v, max_load=20)
    n_unc = unconstrained.select("cluster").distinct().count()
    n_tiny = tiny.select("cluster").distinct().count()
    assert n_tiny >= n_unc
    # with the tiny cap, every cluster's shipped load stays bounded-ish
    deg = {}
    for u, vv, _ in edges:
        deg[u] = deg.get(u, 0) + 1
        deg[vv] = deg.get(vv, 0) + 1
    cl = {r.id: r.cluster for r in tiny.collect()}
    loads = {}
    for x, c in cl.items():
        loads[c] = loads.get(c, 0) + deg.get(x, 0)
    # hash splitting is approximate; allow 3x slack over the cap
    assert max(loads.values()) <= 3 * 20


def test_size_constraint_noop_below_cap(spark, graph):
    _, ew, v = graph
    a = {r.id: r.cluster for r in size_constrained_affinity(ew, v, 1 << 30).collect()}
    b = {r.id: r.cluster for r in affinity_clusters(ew, v).collect()}
    assert a == b


def test_refines_affinity_partition(spark, graph):
    """Size splitting only refines: two vertices in different affinity
    clusters never land in the same split cluster (up to the documented
    xxhash collision caveat, absent at this scale)."""
    _, ew, v = graph
    base = {r.id: r.cluster for r in affinity_clusters(ew, v).collect()}
    split = {r.id: r.cluster for r in size_constrained_affinity(ew, v, 20).collect()}
    seen = {}
    for x, c in split.items():
        assert seen.setdefault(c, base[x]) == base[x]
