"""Simulated manual evaluation — substitute for the paper's 8 human annotators.

The paper computes ACC and CorS by sampling entity pairs and asking 8
annotators to rate each as highly correlated (1), medium (0.5) or
uncorrelated (0). Here each synthetic annotator observes the ground-truth
affinity through per-annotator Gaussian noise and personal thresholds, and
the panel's ratings are aggregated by averaging and snapping to {0, 0.5, 1}.

A pair is *accurate* when its aggregated correlation score is > 0 (the
paper's definition), so ACC is the fraction of judged pairs with score > 0.
"""
from __future__ import annotations

import numpy as np

from repro.world.entity_dict import EntityWorld

N_ANNOTATORS = 8
# Affinity thresholds the "population" of annotators centers on: above HI →
# highly correlated, above LO → medium. Chosen so same-topic pairs are almost
# always accurate, same-supertopic pairs mixed, cross-supertopic pairs not.
_TAU_HI = 0.70
_TAU_LO = 0.45
_NOISE = 0.08


def annotate_pairs(
    world: EntityWorld, src: np.ndarray, dst: np.ndarray, seed: int = 0
) -> np.ndarray:
    """Panel correlation score in {0, 0.5, 1} for each (src, dst) pair."""
    src = np.asarray(src, dtype=np.int64)
    dst = np.asarray(dst, dtype=np.int64)
    rng = np.random.default_rng(world.config.seed * 1000 + seed)
    affinity = world.true_affinity(src, dst)
    votes = np.zeros((N_ANNOTATORS, len(src)))
    for a in range(N_ANNOTATORS):
        # per-annotator bias on thresholds + per-pair perception noise
        hi = _TAU_HI + rng.normal(0, 0.03)
        lo = _TAU_LO + rng.normal(0, 0.03)
        perceived = affinity + rng.normal(0, _NOISE, len(src))
        votes[a] = np.where(perceived > hi, 1.0, np.where(perceived > lo, 0.5, 0.0))
    mean = votes.mean(axis=0)
    # snap panel mean to the paper's 3-level scale
    return np.where(mean > 0.75, 1.0, np.where(mean > 0.25, 0.5, 0.0))


def acc_and_cors(
    world: EntityWorld,
    src: np.ndarray,
    dst: np.ndarray,
    seed: int = 0,
    max_pairs: int = 4000,
) -> tuple[float, float]:
    """(ACC, CorS) over a random sample of at most ``max_pairs`` pairs.

    ACC = fraction of pairs with correlation score > 0;
    CorS = mean correlation score over judged pairs (the paper's
    sum(C)/sum(T) with T=1 for every judged relation).
    """
    src = np.asarray(src, dtype=np.int64)
    dst = np.asarray(dst, dtype=np.int64)
    if len(src) == 0:
        return 0.0, 0.0
    if len(src) > max_pairs:
        rng = np.random.default_rng(world.config.seed * 7 + seed)
        pick = rng.choice(len(src), size=max_pairs, replace=False)
        src, dst = src[pick], dst[pick]
    scores = annotate_pairs(world, src, dst, seed=seed)
    return float((scores > 0).mean()), float(scores.mean())
