"""Table 2 — quality grid: ARI / NMI / Dendrogram Purity / Dasgupta cost.

Columns (as in the paper): TeraHAC at (eps, t) in {0, 0.1} x {0, 0.01},
SCC-5 / SCC-25 / SCC-100 (best level per measure, the paper's protocol),
Sci-Avg (exact metric average-linkage HAC over the full distance matrix,
cut at the ground-truth class count, = sklearn AgglomerativeClustering)
and DBSCAN (full distance matrix, grid-searched, best score).

TeraHAC / SCC run on the k=25 k-NN similarity graph; Sci-Avg / DBSCAN on
the raw pointset — exactly the paper's setup. ARI/NMI of dendrogram
algorithms are best-over-flatten-threshold (the paper's protocol for
producing flat clusterings, cf. §6.1 for SCC and §6.3 for TeraHAC);
Purity and Dasgupta are tree-level measures, reported only for
algorithms that produce dendrograms (SCC and DBSCAN get "-", as in the
paper). Quality runs use the local engines — identical algorithms to the
Spark engines (tested equivalent); Spark scheduling adds nothing to a
quality measurement on 1.8k-vertex graphs.
"""
from __future__ import annotations

import argparse
from dataclasses import dataclass

import numpy as np

from repro.baselines.dbscan import dbscan_metric
from repro.baselines.hac_exact import nn_chain_metric
from repro.baselines.scc import scc_local
from repro.core.dendrogram import Dendrogram
from repro.core.terahac_local import terahac_local
from repro.eval.datasets import (
    distance_matrix,
    knn_similarity_graph,
    make_pointset,
    similarity_matrix,
)
from repro.eval.flatten_eval import default_thresholds, sweep_flatten
from repro.eval.metrics import ari, dasgupta_cost, dendrogram_purity, nmi

TERAHAC_SETTINGS = [
    ("TeraHAC e=0 t=0", 0.0, 0.0),
    ("TeraHAC e=0 t=.01", 0.0, 0.01),
    ("TeraHAC e=.1 t=0", 0.1, 0.0),
    ("TeraHAC e=.1 t=.01", 0.1, 0.01),
]
SCC_ROUNDS = [5, 25, 100]


@dataclass
class Cell:
    """One algorithm's scores on one dataset ('None' = not applicable)."""

    ari: float | None = None
    nmi: float | None = None
    purity: float | None = None
    dasgupta: float | None = None


def _dendro_scores(
    d: Dendrogram, y: np.ndarray, sim: np.ndarray | None
) -> Cell:
    ths = default_thresholds(d)
    best_ari, _, _ = sweep_flatten(d, ths, lambda lab: ari(y, lab))
    best_nmi, _, _ = sweep_flatten(d, ths, lambda lab: nmi(y, lab))
    return Cell(
        ari=best_ari,
        nmi=best_nmi,
        purity=dendrogram_purity(d, y),
        dasgupta=dasgupta_cost(d, sim) if sim is not None else None,
    )


def evaluate_dataset(name: str, scc_rounds=SCC_ROUNDS) -> dict[str, Cell]:
    """Run every Table-2 algorithm on one dataset; returns column -> Cell."""
    ps = make_pointset(name)
    edges = knn_similarity_graph(ps.X, k=25)
    sim = similarity_matrix(ps.X)
    dist = distance_matrix(ps.X)
    out: dict[str, Cell] = {}

    for label, eps, t in TERAHAC_SETTINGS:
        res = terahac_local(edges, ps.n, eps=eps, t=t)
        out[label] = _dendro_scores(res.dendrogram, ps.y, sim)

    for r in scc_rounds:
        res = scc_local(edges, ps.n, rounds=r, t=0.01)
        out[f"SCC-{r}"] = Cell(
            ari=max(ari(ps.y, lab) for lab in res.levels),
            nmi=max(nmi(ps.y, lab) for lab in res.levels),
        )

    sci = nn_chain_metric(ps.X)
    sci_cell = _dendro_scores(sci, ps.y, sim)
    # The paper's Sci-Avg uses n_clusters = |classes|; keep the k-cut ARI/NMI.
    klab = sci.cut_by_order(ps.n_classes)
    sci_cell.ari = ari(ps.y, klab)
    sci_cell.nmi = nmi(ps.y, klab)
    out["Sci-Avg"] = sci_cell

    qs = np.quantile(dist[np.triu_indices(ps.n, 1)], [0.01, 0.03, 0.05, 0.1, 0.2, 0.35])
    best = Cell(ari=-1.0, nmi=-1.0)
    for e in qs:
        for mp in (2, 4, 8, 16, 32):
            lab = dbscan_metric(dist, float(e), mp)
            best.ari = max(best.ari, ari(ps.y, lab))
            best.nmi = max(best.nmi, nmi(ps.y, lab))
    out["DBSCAN"] = best
    return out


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--datasets", nargs="*", default=["iris", "wine", "digits", "faces"])
    ap.add_argument("--scc-rounds", nargs="*", type=int, default=SCC_ROUNDS)
    args = ap.parse_args()

    cols = [s[0] for s in TERAHAC_SETTINGS] + [
        f"SCC-{r}" for r in args.scc_rounds
    ] + ["Sci-Avg", "DBSCAN"]
    results = {ds: evaluate_dataset(ds, args.scc_rounds) for ds in args.datasets}
    for measure in ("ari", "nmi", "purity", "dasgupta"):
        print(f"\n== {measure.upper()} ==")
        print(f"{'dataset':8s} " + " ".join(f"{c:>18s}" for c in cols))
        for ds in args.datasets:
            row = []
            for c in cols:
                val = getattr(results[ds][c], measure)
                if val is None:
                    row.append(f"{'-':>18s}")
                elif measure == "dasgupta":
                    row.append(f"{val:>18.0f}")
                else:
                    row.append(f"{val:>18.3f}")
            print(f"{ds:8s} " + " ".join(row))


if __name__ == "__main__":
    main()
