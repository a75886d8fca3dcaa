"""Flat-clustering evaluation helpers."""
from __future__ import annotations

import numpy as np
import pytest

from repro.baselines.hac_exact import exact_hac_graph
from repro.eval.flatten_eval import (
    default_thresholds,
    pair_precision_recall,
    sweep_flatten,
)
from repro.eval.metrics import ari


def test_pair_precision_recall_hand_case():
    labels = np.array([0, 0, 1, 1, 2])
    pairs = [
        (0, 1, True),   # tp
        (0, 2, True),   # fn
        (2, 3, False),  # fp
        (0, 4, False),  # tn
    ]
    pr = pair_precision_recall(labels, pairs)
    assert pr.tp == 1 and pr.fp == 1 and pr.fn == 1
    assert pr.precision == pytest.approx(0.5)
    assert pr.recall == pytest.approx(0.5)


def test_pair_precision_recall_degenerate():
    pr = pair_precision_recall(np.arange(4), [(0, 1, False), (2, 3, False)])
    assert pr.precision == 1.0 and pr.recall == 1.0  # no positives at all


def test_sweep_flatten_picks_best():
    edges = [(0, 1, 0.9), (2, 3, 0.8), (1, 2, 0.1)]
    d = exact_hac_graph(edges, 4)
    y = np.array([0, 0, 1, 1])
    best, th, labels = sweep_flatten(d, [0.95, 0.5, 0.05], lambda lab: ari(y, lab))
    assert best == pytest.approx(1.0)
    assert 0.1 < th <= 0.9
    assert len(set(labels.tolist())) == 2


def test_default_thresholds_cover_merge_sims():
    edges = [(0, 1, 0.9), (2, 3, 0.8), (1, 2, 0.1)]
    d = exact_hac_graph(edges, 4)
    ths = default_thresholds(d)
    assert any(t > 0.8 for t in ths)
    assert any(t <= 0.11 for t in ths)
    assert ths == sorted(ths)


def test_default_thresholds_subsampling_cap():
    rng = np.random.default_rng(0)
    from repro.synth_data import random_weighted_graph

    edges = random_weighted_graph(n=300, avg_deg=5, seed=0)
    d = exact_hac_graph(edges, 300)
    ths = default_thresholds(d, cap=20)
    assert len(ths) <= 27  # 20 sims + 7 grid points
