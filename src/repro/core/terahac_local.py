"""Shared-memory TeraHAC engine (paper §5, "Shared-Memory Implementation").

The exact round structure of Algorithm 1 — size-constrained affinity
partitioning, SubgraphHAC per partition, contraction, vertex pruning —
executed in-process. Semantics are identical to the Spark engine
(:mod:`repro.core.terahac`): both call the same
:func:`repro.core.subgraph_hac.subgraph_hac` kernel and the same
partitioning rule (best-edge = max (w, neighbour-id) lexicographically;
component label = min member id), which the test suite exploits to check
engine equivalence. Used for the Table 2 quality grid and the round-count
studies, where a 1.8k-vertex graph through 100 Spark rounds would only
measure scheduler latency.
"""
from __future__ import annotations

from repro.core.dendrogram import Dendrogram
from repro.core.goodness import encode_leaf, goodness
from repro.core.stats import RoundStats, TeraHACResult
from repro.core.subgraph_hac import Merge, subgraph_hac

INF = float("inf")


class _DSU:
    """Union-find with min-id representatives (affinity component labels)."""

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
            self.parent.setdefault(ra, ra)


def _affinity_partition(
    adj: dict[int, dict[int, float]],
    size: dict[int, int],
    max_subgraph_edges: int,
) -> dict[int, int]:
    """Size-constrained affinity clustering on the local graph.

    Returns vertex -> cluster id. Mirrors
    :func:`repro.graphs.affinity.size_constrained_affinity`: per-vertex
    best edge by max (w, neighbour-id), components by min id, clusters
    whose shipped load (sum of member degrees) exceeds the cap are split
    deterministically.
    """
    dsu = _DSU()
    for u, nb in adj.items():
        if not nb:
            continue
        su = size[u]
        best = max(nb.items(), key=lambda kv: (kv[1] / (su * size[kv[0]]), kv[0]))
        dsu.union(u, best[0])
    comp = {u: dsu.find(u) for u in adj}
    load: dict[int, int] = {}
    for u in adj:
        load[comp[u]] = load.get(comp[u], 0) + len(adj[u])
    out: dict[int, int] = {}
    for u in adj:
        c = comp[u]
        nparts = max(1, -(-load[c] // max_subgraph_edges))
        if nparts <= 1:
            out[u] = c
        else:
            # Deterministic split; any partition is correct (Lemma 7).
            out[u] = -(c * nparts + (hash(u) % nparts)) - 1
    return out


def terahac_local(
    edges: list[tuple[int, int, float]],
    n_base: int,
    eps: float = 0.1,
    t: float = 0.01,
    max_subgraph_edges: int = 1 << 30,
    max_rounds: int = 200,
    collect_stats: bool = False,
) -> TeraHACResult:
    """Run TeraHAC on ``edges`` = ``(u, v, w)`` over vertices 0..n_base-1.

    ``t`` is the weight threshold (Algorithm 1): the loop stops once no
    edge of weight >= t remains, and each round prunes vertices whose max
    incident weight is < t/(1+eps). ``t=0`` computes the full
    (1+eps)-approximate dendrogram.
    """
    size: dict[int, int] = {}
    m: dict[int, float] = {}
    adj: dict[int, dict[int, float]] = {}
    for u, v, w in edges:
        if u == v:
            continue
        eu, ev = encode_leaf(u, n_base), encode_leaf(v, n_base)
        for x in (eu, ev):
            size.setdefault(x, 1)
            m.setdefault(x, INF)
            adj.setdefault(x, {})
        adj[eu][ev] = adj[eu].get(ev, 0.0) + w
        adj[ev][eu] = adj[ev].get(eu, 0.0) + w

    merges: list[Merge] = []
    stats: list[RoundStats] = []
    forced = 0
    prune_at = t / (1.0 + eps)

    def wfn(a: int, b: int) -> float:
        return adj[a][b] / (size[a] * size[b])

    rounds = 0
    for rounds in range(1, max_rounds + 1):
        n_edges = sum(len(nb) for nb in adj.values()) // 2
        heavy = sum(
            1 for a in adj for b in adj[a] if a < b and wfn(a, b) >= t
        )
        if heavy == 0:
            rounds -= 1
            break

        n_good = None
        if collect_stats:
            wmax = {a: max((wfn(a, b) for b in adj[a]), default=0.0) for a in adj}
            n_good = sum(
                1
                for a in adj
                for b in adj[a]
                if a < b
                and goodness(wmax[a], wmax[b], m[a], m[b], wfn(a, b)) <= 1 + eps
            )

        clusters = _affinity_partition(adj, size, max_subgraph_edges)
        groups: dict[int, list] = {}
        for a in adj:
            for b, raw in adj[a].items():
                if a < b:
                    ca, cb = clusters[a], clusters[b]
                    row_a = (a, b, raw, size[a], size[b], m[a], m[b], True, ca == cb)
                    groups.setdefault(ca, []).append(row_a)
                    if cb != ca:
                        groups.setdefault(cb, []).append(
                            (a, b, raw, size[a], size[b], m[a], m[b], False, True)
                        )

        round_merges: list[Merge] = []
        mapping: dict[int, tuple[int, int, float]] = {}
        for rows in groups.values():
            res = subgraph_hac(rows, eps, n_base)
            round_merges.extend(res.merges)
            mapping.update(res.mapping)

        if not round_merges:
            # Stall fallback: the globally heaviest edge is always
            # (1+eps)-good (Lemma 2), but size-splitting may have separated
            # its endpoints. Merge it directly to guarantee progress.
            best = max(
                ((a, b) for a in adj for b in adj[a] if a < b),
                key=lambda ab: (wfn(*ab), ab[1]),
            )
            rows = [
                (
                    best[0],
                    best[1],
                    adj[best[0]][best[1]],
                    size[best[0]],
                    size[best[1]],
                    m[best[0]],
                    m[best[1]],
                    True,
                    True,
                )
            ]
            # Include all incident edges so goodness is computed correctly.
            for a in best:
                o = best[1] if a == best[0] else best[0]
                for b, raw in adj[a].items():
                    if b != o:
                        rows.append(
                            (a, b, raw, size[a], size[b], m[a], m[b], True, False)
                        )
            res = subgraph_hac(rows, eps, n_base)
            if not res.merges:
                raise RuntimeError("global max edge is not good — invariant broken")
            round_merges.extend(res.merges)
            mapping = {v: res.mapping.get(v, (v, size[v], m[v])) for v in adj}
            forced += 1

        merges.extend(round_merges)
        stats.append(
            RoundStats(
                round=rounds,
                n_vertices=len(adj),
                n_edges=n_edges,
                n_heavy=heavy,
                n_merges=len(round_merges),
                n_good=n_good,
            )
        )

        # --- contraction ---
        new_adj: dict[int, dict[int, float]] = {}
        new_size: dict[int, int] = {}
        new_m: dict[int, float] = {}
        relabel = {old: new for old, (new, _, _) in mapping.items()}
        for old, (new, s, mm) in mapping.items():
            new_size[new] = s
            new_m[new] = mm
            new_adj.setdefault(new, {})
        for a in adj:
            na = relabel.get(a, a)
            new_size.setdefault(na, size[a])
            new_m.setdefault(na, m[a])
            new_adj.setdefault(na, {})
            for b, raw in adj[a].items():
                nb = relabel.get(b, b)
                if na != nb:
                    # Each undirected old edge contributes once per
                    # orientation, so both directed entries end up with the
                    # same exact raw sum — no double counting.
                    new_adj[na][nb] = new_adj[na].get(nb, 0.0) + raw
        adj, size, m = new_adj, new_size, new_m

        # --- vertex pruning + isolated removal ---
        drop = [
            a
            for a in adj
            if not adj[a]
            or max(wfn(a, b) for b in adj[a]) < prune_at
        ]
        for a in drop:
            for b in adj[a]:
                del adj[b][a]
            del adj[a]
    else:
        raise RuntimeError(f"TeraHAC did not finish within {max_rounds} rounds")

    return TeraHACResult(
        dendrogram=Dendrogram(n_base=n_base, merges=merges),
        rounds=rounds,
        stats=stats,
        forced_merges=forced,
    )
