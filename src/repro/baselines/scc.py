"""SCC (Monath et al. [40]): sub-cluster component hierarchical clustering.

The state-of-the-art distributed baseline the paper compares against.
SCC runs ``r`` rounds over a geometrically decreasing threshold schedule
tau_1 > ... > tau_r = t (from the max weight down to the weight
threshold). In round i every current cluster selects its highest-weight
incident edge of weight >= tau_i (if any); the connected components
spanned by the selected edges are contracted (average linkage on the
contracted weights). Each round's assignment of original vertices to
clusters is one level of the output hierarchy — the paper evaluates SCC
by scoring *every* level and taking the best.

Two engines with identical semantics: a Spark engine (timing studies,
Tables 3 / Fig 9-10 analogues) and a local engine (Table 2 quality grid).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.graphs.components import connected_components
from repro.graphs.edges import canonicalize, contract, init_vertices, with_weights
from repro.graphs.io import materialize


def threshold_schedule(w_upper: float, t: float, rounds: int) -> list[float]:
    """Geometric schedule tau_i = w_upper * (t/w_upper)^(i/r), i=1..r.

    Ends exactly at ``t``; requires 0 < t <= w_upper.
    """
    if not (0 < t <= w_upper):
        raise ValueError(f"need 0 < t <= w_upper, got t={t}, w_upper={w_upper}")
    return [w_upper * (t / w_upper) ** (i / rounds) for i in range(1, rounds + 1)]


@dataclass
class SCCResult:
    """Per-level flat clusterings (labels over original vertices) and
    per-level cluster counts."""

    levels: list[np.ndarray] = field(default_factory=list)
    n_clusters: list[int] = field(default_factory=list)
    edges_per_round: list[int] = field(default_factory=list)
    nodes_per_round: list[int] = field(default_factory=list)


# --------------------------------------------------------------------- #
# Local engine
# --------------------------------------------------------------------- #
class _DSU:
    def __init__(self) -> None:
        self.parent: dict[int, int] = {}

    def find(self, x: int) -> int:
        p = self.parent
        root = x
        while p.get(root, root) != root:
            root = p[root]
        while p.get(x, x) != x:
            p[x], x = root, p[x]
        return root

    def union(self, a: int, b: int) -> None:
        ra, rb = self.find(a), self.find(b)
        if ra != rb:
            if rb < ra:
                ra, rb = rb, ra
            self.parent[rb] = ra


def scc_local(
    edges: list[tuple[int, int, float]],
    n_base: int,
    rounds: int,
    t: float,
) -> SCCResult:
    """Run SCC in-process. ``edges`` are ``(u, v, w)`` over 0..n_base-1."""
    size: dict[int, int] = {v: 1 for v in range(n_base)}
    adj: dict[int, dict[int, float]] = {v: {} for v in range(n_base)}
    for u, v, w in edges:
        if u == v:
            continue
        adj[u][v] = adj[u].get(v, 0.0) + w
        adj[v][u] = adj[u][v]

    assign = np.arange(n_base, dtype=np.int64)  # original vertex -> cluster

    def wfn(a: int, b: int) -> float:
        return adj[a][b] / (size[a] * size[b])

    w_upper = max(
        (wfn(a, b) for a in adj for b in adj[a] if a < b), default=0.0
    )
    result = SCCResult()
    if w_upper <= 0:
        for _ in range(rounds):
            result.levels.append(assign.copy())
            result.n_clusters.append(n_base)
        return result
    taus = threshold_schedule(max(w_upper, t), t, rounds)

    for tau in taus:
        result.nodes_per_round.append(len(adj))
        result.edges_per_round.append(sum(len(nb) for nb in adj.values()) // 2)
        dsu = _DSU()
        for a in adj:
            cands = [(wfn(a, b), b) for b in adj[a] if wfn(a, b) >= tau]
            if cands:
                dsu.union(a, max(cands)[1])
                dsu.parent.setdefault(a, dsu.find(a))
        relabel = {a: dsu.find(a) for a in adj}
        # contract: group-sum of raw weights, sizes add up
        new_adj: dict[int, dict[int, float]] = {}
        new_size: dict[int, int] = {}
        for a in adj:
            na = relabel[a]
            new_adj.setdefault(na, {})
            new_size[na] = new_size.get(na, 0) + size[a]
        for a in adj:
            na = relabel[a]
            for b, raw in adj[a].items():
                nb = relabel[b]
                if na != nb:
                    new_adj[na][nb] = new_adj[na].get(nb, 0.0) + raw
        adj, size = new_adj, new_size
        assign = np.array([relabel[c] for c in assign], dtype=np.int64)
        result.levels.append(assign.copy())
        result.n_clusters.append(len(adj))
    return result


# --------------------------------------------------------------------- #
# Spark engine
# --------------------------------------------------------------------- #
def scc_spark(
    spark: SparkSession,
    edges: DataFrame,
    n_base: int,
    rounds: int,
    t: float,
    record_levels: bool = True,
    collect_stats: bool = False,
    shuffle_partitions: int | None = 8,
) -> SCCResult:
    """Run SCC on Spark DataFrames. ``edges`` is ``(u, v, w)``.

    When ``record_levels`` is False only the final level is collected
    (pure-timing mode); per-round node/edge counts (Fig. 14 analogue)
    cost two extra jobs per round and are gated by ``collect_stats``.
    """
    prev_sp = spark.conf.get("spark.sql.shuffle.partitions")
    if shuffle_partitions is not None:
        spark.conf.set("spark.sql.shuffle.partitions", str(shuffle_partitions))
    try:
        return _scc_spark_impl(
            spark, edges, n_base, rounds, t, record_levels, collect_stats
        )
    finally:
        spark.conf.set("spark.sql.shuffle.partitions", prev_sp)


def _scc_spark_impl(
    spark: SparkSession,
    edges: DataFrame,
    n_base: int,
    rounds: int,
    t: float,
    record_levels: bool,
    collect_stats: bool,
) -> SCCResult:
    e = materialize(
        canonicalize(edges.select("u", "v", F.col("w").alias("raw"))), "scc-edges"
    )
    v = materialize(init_vertices(spark, e), "scc-vertices")

    w_upper = with_weights(e, v).agg(F.max("w")).collect()[0][0]
    result = SCCResult()
    if w_upper is None or w_upper <= 0:
        lab = np.arange(n_base, dtype=np.int64)
        for _ in range(rounds):
            result.levels.append(lab.copy())
            result.n_clusters.append(n_base)
        return result
    taus = threshold_schedule(max(w_upper, t), t, rounds)

    # original vertex -> current cluster id
    assign = materialize(
        e.sparkSession.range(n_base).select(
            F.col("id").alias("orig"), F.col("id").alias("cur")
        ),
        "scc-assign",
    )

    for i, tau in enumerate(taus):
        ew = with_weights(e, v)
        if collect_stats:
            result.nodes_per_round.append(v.count())
            result.edges_per_round.append(e.count())
        sym = ew.select(F.col("u").alias("src"), F.col("v").alias("dst"), "w").unionByName(
            ew.select(F.col("v").alias("src"), F.col("u").alias("dst"), "w")
        ).filter(F.col("w") >= tau)
        marked = (
            sym.groupBy("src")
            .agg(F.max(F.struct("w", "dst")).alias("b"))
            .select("src", F.col("b.dst").alias("dst"))
        )
        msym = marked.unionByName(
            marked.select(F.col("dst").alias("src"), F.col("src").alias("dst"))
        ).distinct()
        comp = connected_components(msym, v.select("id"))
        mapping = comp.select(
            F.col("id").alias("old_id"), F.col("component").alias("new_id")
        )
        e = materialize(contract(e, mapping), "scc-edges")
        v = materialize(
            v.join(mapping, v.id == mapping.old_id)
            .groupBy(F.col("new_id").alias("id"))
            .agg(F.sum("size").alias("size"), F.lit(float("inf")).alias("m")),
            "scc-vertices",
        )
        assign = materialize(
            assign.join(mapping, assign.cur == mapping.old_id, "left")
            .select("orig", F.coalesce("new_id", "cur").alias("cur")),
            "scc-assign",
        )
        if record_levels or i == len(taus) - 1:
            rows = assign.collect()
            lab = np.zeros(n_base, dtype=np.int64)
            for r in rows:
                lab[r.orig] = r.cur
            result.levels.append(lab)
            result.n_clusters.append(v.count())
    return result
