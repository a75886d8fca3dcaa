"""Table 1 — graph inputs: vertices, directed edges, average degree.

The paper's Table 1 lists its input graphs (com-Orkut .. Web-Query).
Those graphs need terabytes and a crawl pipeline; our laptop-scale
stand-ins are rMAT graphs with the paper's own rMAT parameters
(a=0.6, b=c=0.15, d=0.1, 50 edges/vertex — §6 uses exactly this family
for its scaling study), the planted web-query-lite similarity graph
(§6.3 stand-in) and the k-NN similarity graphs of the four UCI stand-ins.
Edge counts are reported *directed* (2x undirected) to match the paper's
convention.
"""
from __future__ import annotations

import numpy as np

from repro.eval.datasets import knn_similarity_graph, make_pointset
from repro.synth_data import rmat_edges, web_query_lite


def table1_rows(
    rmat_scales: tuple[int, ...] = (10, 12, 14), wq_n: int = 20_000
) -> list[dict]:
    """Compute the Table-1 statistics for every stand-in graph."""
    rows = []
    for scale in rmat_scales:
        pairs = rmat_edges(scale=scale)
        n = int(max(pairs.max() + 1, 1))
        m = 2 * len(pairs)
        rows.append(
            dict(name=f"rMAT-{scale}", n=n, m=m, avg_deg=round(m / n, 1))
        )
    edges, _, _ = web_query_lite(n=wq_n)
    rows.append(
        dict(
            name=f"web-query-lite ({wq_n})",
            n=wq_n,
            m=2 * len(edges),
            avg_deg=round(2 * len(edges) / wq_n, 1),
        )
    )
    for ds in ("iris", "wine", "digits", "faces"):
        ps = make_pointset(ds)
        g = knn_similarity_graph(ps.X, k=25)
        rows.append(
            dict(
                name=f"{ds}-knn25",
                n=ps.n,
                m=2 * len(g),
                avg_deg=round(2 * len(g) / ps.n, 1),
            )
        )
    return rows


def main() -> None:
    rows = table1_rows()
    print(f"{'Graph':24s} {'Vertices':>12s} {'Dir. edges':>14s} {'Avg deg':>8s}")
    for r in rows:
        print(f"{r['name']:24s} {r['n']:>12,d} {r['m']:>14,d} {r['avg_deg']:>8.1f}")


if __name__ == "__main__":
    main()
