"""Flat-clustering evaluation helpers: threshold sweeps (Table 2) and
precision/recall over labelled query pairs (§6.3 / Fig. 13 analogue)."""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable, Iterable

import numpy as np

from repro.core.dendrogram import Dendrogram


def sweep_flatten(
    dendro: Dendrogram,
    thresholds: Iterable[float],
    score_fn: Callable[[np.ndarray], float],
) -> tuple[float, float, np.ndarray]:
    """Flatten at each threshold, score the labels, return
    ``(best_score, best_threshold, best_labels)``.

    Mirrors the paper's protocol of evaluating every flat clustering an
    algorithm induces and reporting the best (done explicitly for SCC in
    §6.1 and for TeraHAC's flattening thresholds in §6.3).
    """
    best = (-np.inf, np.nan, None)
    for t in thresholds:
        labels = dendro.flatten(t)
        s = score_fn(labels)
        if s > best[0]:
            best = (s, t, labels)
    assert best[2] is not None, "no thresholds supplied"
    return best


def default_thresholds(dendro: Dendrogram, cap: int = 40) -> list[float]:
    """Candidate flatten thresholds: the distinct merge similarities
    (subsampled to ``cap``) plus a coarse [0,1] grid."""
    sims = sorted({mg.similarity for mg in dendro.merges})
    if len(sims) > cap:
        sims = [sims[i] for i in np.linspace(0, len(sims) - 1, cap).astype(int)]
    eps = 1e-12
    return sorted({s + eps for s in sims} | {0.05, 0.1, 0.2, 0.3, 0.5, 0.7, 0.9})


@dataclass
class PrecisionRecall:
    """Pairwise precision/recall of a flat clustering against labelled
    pairs (the §6.3 protocol: a pair is predicted positive iff the two
    queries land in the same cluster)."""

    precision: float
    recall: float
    tp: int
    fp: int
    fn: int


def pair_precision_recall(
    labels: np.ndarray, pairs: list[tuple[int, int, bool]]
) -> PrecisionRecall:
    """Score ``labels`` against ``(a, b, is_positive)`` pairs."""
    tp = fp = fn = 0
    for a, b, pos in pairs:
        same = labels[a] == labels[b]
        if same and pos:
            tp += 1
        elif same and not pos:
            fp += 1
        elif not same and pos:
            fn += 1
    precision = tp / (tp + fp) if tp + fp else 1.0
    recall = tp / (tp + fn) if tp + fn else 1.0
    return PrecisionRecall(precision, recall, tp, fp, fn)
