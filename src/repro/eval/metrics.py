"""Evaluation metrics: AUC, ACC/CorS (via the annotator panel), AEEC."""
from __future__ import annotations

import numpy as np

from repro.world.annotators import acc_and_cors
from repro.world.entity_dict import EntityWorld


def auc(scores: np.ndarray, labels: np.ndarray) -> float:
    """Area under the ROC curve via the rank statistic (ties averaged)."""
    scores = np.asarray(scores, dtype=np.float64)
    labels = np.asarray(labels).astype(bool)
    n_pos = labels.sum()
    n_neg = len(labels) - n_pos
    if n_pos == 0 or n_neg == 0:
        return float("nan")
    order = np.argsort(scores, kind="mergesort")
    ranks = np.empty(len(scores))
    ranks[order] = np.arange(1, len(scores) + 1)
    # average ranks over ties
    sorted_scores = scores[order]
    i = 0
    while i < len(scores):
        j = i
        while j + 1 < len(scores) and sorted_scores[j + 1] == sorted_scores[i]:
            j += 1
        if j > i:
            ranks[order[i : j + 1]] = (i + 1 + j + 1) / 2.0
        i = j + 1
    return float((ranks[labels].sum() - n_pos * (n_pos + 1) / 2) / (n_pos * n_neg))


def relation_acc_cors(
    world: EntityWorld,
    src: np.ndarray,
    dst: np.ndarray,
    seed: int = 0,
    max_pairs: int = 4000,
) -> tuple[float, float]:
    """Manual-evaluation ACC and CorS of a mined relation set (panel-judged)."""
    return acc_and_cors(world, src, dst, seed=seed, max_pairs=max_pairs)


def aeec(n_relations: int, n_dict: int) -> float:
    """Average Expansion Entity Count = #relations / |Entity Dict| (Eq. 8)."""
    return float(n_relations) / max(1, n_dict)
