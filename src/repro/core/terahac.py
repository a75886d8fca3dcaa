"""TeraHAC distributed engine (Algorithm 1 / Fig. 5) on Spark DataFrames.

The paper's Flume-C++ KVTable pipeline maps 1:1 onto Catalyst:

* ``AffinityClustering``   -> :func:`repro.graphs.affinity.size_constrained_affinity`
* ``KeyByClusterId`` + ``GroupByKey`` + per-machine ``SubgraphHac``
                           -> joins + ``groupBy(cluster).applyInPandas``
                              around :func:`repro.core.subgraph_hac.subgraph_hac`
* ``Contract``             -> two mapping joins + group-by SUM of raw weights
                              (:func:`repro.graphs.edges.contract`)
* ``Prune`` / ``RemoveIsolatedVertices``
                           -> :func:`repro.graphs.edges.prune_vertices`

Each inter-cluster edge is shipped to both of its clusters (so every
active vertex sees its full neighbourhood, as required for w_max), each
intra-cluster edge to exactly one. Dendrogram nodes are collected on the
driver each round; the graph itself never leaves the cluster. Rounds are
separated by parquet materialization barriers (see
:mod:`repro.graphs.io` for why ``localCheckpoint`` is not enough).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.dendrogram import Dendrogram
from repro.core.goodness import merge_id, merged_m
from repro.core.stats import RoundStats, TeraHACResult
from repro.core.subgraph_hac import Merge, subgraph_hac
from repro.graphs.affinity import size_constrained_affinity
from repro.graphs.edges import (
    canonicalize,
    contract,
    good_edge_count,
    init_vertices,
    num_heavy_edges,
    prune_vertices,
    with_weights,
)
from repro.graphs.io import materialize

_RESULT_SCHEMA = (
    "tag int, id1 long, id2 long, id3 long, val1 double"
)


def _make_subgraph_fn(eps: float, n_base: int):
    """Build the per-partition pandas UDF: one SubgraphHAC call per group."""

    def fn(pdf: pd.DataFrame) -> pd.DataFrame:
        cluster = int(pdf["cluster"].iloc[0])
        rows = [
            (
                int(r.u),
                int(r.v),
                float(r.raw),
                int(r.su),
                int(r.sv),
                float(r.mu),
                float(r.mv),
                int(r.cu) == cluster,
                int(r.cv) == cluster,
            )
            for r in pdf.itertuples()
        ]
        res = subgraph_hac(rows, eps, n_base)
        out = [
            (0, old, new, s, mm) for old, (new, s, mm) in res.mapping.items()
        ] + [
            (1, mg.parent, mg.left, mg.right, mg.similarity) for mg in res.merges
        ]
        return pd.DataFrame(out, columns=["tag", "id1", "id2", "id3", "val1"])

    return fn


def terahac(
    spark: SparkSession,
    edges: DataFrame,
    n_base: int,
    eps: float = 0.1,
    t: float = 0.01,
    max_subgraph_edges: int = 200_000,
    max_rounds: int = 100,
    collect_stats: bool = False,
    shuffle_partitions: int | None = 8,
    verbose: bool = False,
) -> TeraHACResult:
    """Run distributed TeraHAC.

    ``edges``: DataFrame ``(u, v, w)`` — undirected weighted graph over
    original vertex ids ``0..n_base-1``, positive weights. Returns the
    same :class:`TeraHACResult` as the local engine; dendrogram node ids
    use the shared ``(rep, size)`` encoding.

    ``shuffle_partitions`` temporarily overrides
    ``spark.sql.shuffle.partitions`` for the run — iterative graph
    rounds on a single box are scheduler-latency-bound, so small graphs
    want few partitions (None leaves the session setting untouched).
    """
    import time

    prev_sp = spark.conf.get("spark.sql.shuffle.partitions")
    if shuffle_partitions is not None:
        spark.conf.set("spark.sql.shuffle.partitions", str(shuffle_partitions))
    try:
        return _terahac_impl(
            spark, edges, n_base, eps, t, max_subgraph_edges, max_rounds,
            collect_stats, verbose, time,
        )
    finally:
        spark.conf.set("spark.sql.shuffle.partitions", prev_sp)


def _terahac_impl(
    spark: SparkSession,
    edges: DataFrame,
    n_base: int,
    eps: float,
    t: float,
    max_subgraph_edges: int,
    max_rounds: int,
    collect_stats: bool,
    verbose: bool,
    time,
) -> TeraHACResult:
    enc = n_base + 1
    e = materialize(
        canonicalize(
            edges.select(
                (F.col("u").cast("long") * enc).alias("u"),
                (F.col("v").cast("long") * enc).alias("v"),
                F.col("w").cast("double").alias("raw"),
            )
        ),
        "edges",
    )
    v = materialize(init_vertices(spark, e), "vertices")

    fn = _make_subgraph_fn(eps, n_base)
    merges: list[Merge] = []
    stats: list[RoundStats] = []
    forced = 0
    prune_at = t / (1.0 + eps)

    rounds = 0
    for rounds in range(1, max_rounds + 1):
        t_round = time.time()
        ew = with_weights(e, v)
        n_heavy = num_heavy_edges(ew, t)
        if n_heavy == 0:
            rounds -= 1
            break
        n_good = None
        if collect_stats:
            n_good = good_edge_count(ew, eps)
            n_vertices, n_edges = v.count(), e.count()
        else:
            n_vertices = n_edges = -1

        clusters = size_constrained_affinity(
            ew.select("u", "v", "w"), v, max_subgraph_edges
        )
        cu = clusters.select(F.col("id").alias("u"), F.col("cluster").alias("cu"))
        cv = clusters.select(F.col("id").alias("v"), F.col("cluster").alias("cv"))
        sub = (
            ew.join(cu, "u")
            .join(cv, "v")
            .withColumn("cluster", F.explode(F.array_distinct(F.array("cu", "cv"))))
            .select("cluster", "u", "v", "raw", "su", "sv", "mu", "mv", "cu", "cv")
        )
        result = materialize(
            sub.groupBy("cluster").applyInPandas(fn, _RESULT_SCHEMA),
            "subgraphhac",
        )
        round_merges = [
            Merge(parent=r.id1, left=r.id2, right=r.id3, similarity=r.val1)
            for r in result.filter(F.col("tag") == 1).collect()
        ]
        mapping = result.filter(F.col("tag") == 0).select(
            F.col("id1").alias("old_id"),
            F.col("id2").alias("new_id"),
            F.col("id3").alias("size"),
            F.col("val1").alias("m"),
        )

        fallback = not round_merges
        if fallback:
            # Stall fallback: merge the globally heaviest edge, which is
            # always (1+eps)-good (Lemma 2) but may have been separated by
            # a size split. Driver-side, O(1) data.
            top = ew.orderBy(F.desc("w"), F.desc("v")).limit(1).collect()[0]
            pid = merge_id(top.u, top.v, n_base)
            nm = merged_m(top.mu, top.mv, top.w)
            round_merges = [Merge(pid, top.u, top.v, top.w)]
            mapping = spark.createDataFrame(
                pd.DataFrame(
                    {
                        "old_id": [int(top.u), int(top.v)],
                        "new_id": [pid, pid],
                        "size": [int(top.su + top.sv)] * 2,
                        "m": [nm] * 2,
                    }
                )
            )
            forced += 1

        merges.extend(round_merges)
        stats.append(
            RoundStats(
                round=rounds,
                n_vertices=n_vertices,
                n_edges=n_edges,
                n_heavy=n_heavy,
                n_merges=len(round_merges),
                n_good=n_good,
            )
        )

        e2 = contract(e, mapping.select("old_id", "new_id"))
        v2 = mapping.select(
            F.col("new_id").alias("id"), "size", "m"
        ).distinct()
        if fallback:
            # The fallback mapping covers only the two merged vertices;
            # every other vertex keeps its row.
            v2 = v.join(
                mapping.select(F.col("old_id").alias("id")), "id", "left_anti"
            ).unionByName(v2)
        ew2 = with_weights(e2, v2)
        e, v = prune_vertices(ew2, v2, prune_at)
        # Round barrier: parquet round-trip, not localCheckpoint — see
        # repro.graphs.io.materialize for why (originStats compounding).
        e = materialize(e, "edges")
        v = materialize(v, "vertices")
        if verbose:
            print(
                f"[terahac] round {rounds}: heavy={n_heavy} "
                f"merges={len(round_merges)} {time.time() - t_round:.1f}s",
                flush=True,
            )
    else:
        raise RuntimeError(f"TeraHAC did not finish within {max_rounds} rounds")

    return TeraHACResult(
        dendrogram=Dendrogram(n_base=n_base, merges=merges),
        rounds=rounds,
        stats=stats,
        forced_merges=forced,
    )
