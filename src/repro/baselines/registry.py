"""Method registry for Table II: name → (LinkDataset, TrainConfig) → scores.

Every entry returns test-pair logits; ALPC variants additionally return
their own predicted-positive decision (the adaptive threshold). The
``run_method`` helper runs one method end-to-end and evaluates it with the
Table-II protocol (AUC on held-out links, ACC via the annotator panel).
"""
from __future__ import annotations

import numpy as np

from repro.baselines.common import EvalResult, TrainConfig, evaluate_model
from repro.baselines.compgcn import compgcn_scores
from repro.baselines.embeddings import deepwalk_scores, node2vec_scores
from repro.baselines.pagnn import pagnn_scores
from repro.baselines.seal import seal_scores
from repro.baselines.vgae import vgae_scores
from repro.core.alpc import ALPC
from repro.eval.datasets import LinkDataset

METHODS = [
    "DeepWalk",
    "Node2Vec",
    "SEAL",
    "VGAE",
    "Geniepath",
    "CompGCN",
    "PaGNN",
    "ALPC",
    "ALPC_th-",
    "ALPC_cl-",
]

_ALPC_VARIANTS = {
    # name -> (alpha, beta); Geniepath is exactly ALPC with both tasks off
    "ALPC": (1.0, 1.0),
    "ALPC_th-": (0.0, 1.0),
    "ALPC_cl-": (1.0, 0.0),
    "Geniepath": (0.0, 0.0),
}


def run_method(name: str, ds: LinkDataset, cfg: TrainConfig) -> EvalResult:
    """Train + evaluate one Table-II method on one dataset."""
    if name in _ALPC_VARIANTS:
        alpha, beta = _ALPC_VARIANTS[name]
        model = ALPC(ds.features.shape[1], cfg, alpha=alpha, beta=beta).fit(ds)
        res = model.predict(ds)
        return evaluate_model(ds, res.test_logits, res.acc_scores, seed=cfg.seed)
    scorers = {
        "DeepWalk": deepwalk_scores,
        "Node2Vec": node2vec_scores,
        "SEAL": seal_scores,
        "VGAE": vgae_scores,
        "CompGCN": compgcn_scores,
        "PaGNN": pagnn_scores,
    }
    if name not in scorers:
        raise KeyError(f"unknown method {name!r}; known: {METHODS}")
    test_logits, acc_logits = scorers[name](ds, cfg)
    return evaluate_model(ds, np.asarray(test_logits), np.asarray(acc_logits), seed=cfg.seed)
