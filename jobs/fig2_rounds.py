"""Fig. 2 / Fig. 15 analogues (as numeric tables): round counts of
TeraHAC(eps=0.1) vs OptimizedRAC (TeraHAC eps=0) vs ParHAC vs RAC, and
per-round good-edge counts for eps in {0, 0.1}.

All algorithms use weight threshold t=0.01, as in the paper's Fig. 2.
Local engines (round counts are an algorithmic property, not a systems
one; the Spark engine performs the same rounds — tested equivalent).
"""
from __future__ import annotations

import argparse

from repro.baselines.parhac import parhac
from repro.baselines.rac import rac
from repro.core.terahac_local import terahac_local
from repro.eval.datasets import knn_similarity_graph, make_pointset
from repro.synth_data import degree_weights_local, rmat_edges, web_query_lite


def workloads(rmat_scales=(10, 12)) -> dict[str, tuple[list, int]]:
    """Graphs for the round-count study: rMAT (degree-weighted, like the
    paper's OK/TW/FS/CW) + web-query-lite + the digits k-NN graph."""
    out: dict[str, tuple[list, int]] = {}
    for s in rmat_scales:
        pairs = rmat_edges(scale=s)
        out[f"rMAT-{s}"] = (degree_weights_local(pairs), int(pairs.max()) + 1)
    e, _, _ = web_query_lite(n=5_000)
    out["web-query-lite-5k"] = (e, 5_000)
    ps = make_pointset("digits")
    out["digits-knn25"] = (knn_similarity_graph(ps.X, k=25), ps.n)
    return out


def rounds_table(edges, n, t: float = 0.01) -> dict[str, int]:
    """Rounds used by each algorithm on one graph (Fig. 2 analogue)."""
    th = terahac_local(edges, n, eps=0.1, t=t)
    opt = terahac_local(edges, n, eps=0.0, t=t)
    _, rac_stats = rac(edges, n, t=t)
    _, ph_stats = parhac(edges, n, eps=0.1, t=t)
    return {
        "TeraHAC": th.rounds,
        "OptimizedRAC": opt.rounds,
        "ParHAC": len(ph_stats),
        "RAC": len(rac_stats),
    }


def good_edges_table(edges, n, t: float = 0.01) -> dict[float, list[int]]:
    """Per-round (1+eps)-good edge counts for eps in {0, 0.1} (Fig. 15)."""
    out = {}
    for eps in (0.0, 0.1):
        res = terahac_local(edges, n, eps=eps, t=t, collect_stats=True)
        out[eps] = [st.n_good for st in res.stats]
    return out


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--rmat-scales", nargs="*", type=int, default=[10, 12])
    args = ap.parse_args()

    print("== Rounds (Fig. 2 analogue, t=0.01) ==")
    print(f"{'graph':20s} {'TeraHAC':>8s} {'OptRAC':>8s} {'ParHAC':>8s} {'RAC':>8s}")
    wl = workloads(tuple(args.rmat_scales))
    for name, (edges, n) in wl.items():
        r = rounds_table(edges, n)
        print(
            f"{name:20s} {r['TeraHAC']:>8d} {r['OptimizedRAC']:>8d} "
            f"{r['ParHAC']:>8d} {r['RAC']:>8d}"
        )

    name = f"rMAT-{args.rmat_scales[-1]}"
    print(f"\n== Good edges per round on {name} (Fig. 15 analogue) ==")
    g = good_edges_table(*wl[name])
    for eps, counts in g.items():
        print(f"eps={eps}: {counts}")


if __name__ == "__main__":
    main()
