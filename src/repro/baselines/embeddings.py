"""Graph-embedding baselines: DeepWalk and Node2Vec.

Both learn structure-only node embeddings from random-walk corpora
(SGNS-equivalent SPPMI/SVD factorization, see :mod:`repro.embed.walks`) and
score links with logistic regression over Hadamard edge features — the
standard link-prediction protocol for these methods. They see no semantic /
co-occurrence node features, which is why GNN methods beat them in Table II.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.common import TrainConfig, logistic_regression_scores
from repro.embed.walks import walk_embeddings
from repro.eval.datasets import LinkDataset


def deepwalk_scores(ds: LinkDataset, cfg: TrainConfig) -> tuple[np.ndarray, np.ndarray]:
    emb = walk_embeddings(
        ds.graph, dim=cfg.hidden, num_walks=8, walk_len=20, seed=cfg.seed
    )
    return logistic_regression_scores(emb, ds, cfg, seed_offset=1)


def node2vec_scores(ds: LinkDataset, cfg: TrainConfig) -> tuple[np.ndarray, np.ndarray]:
    emb = walk_embeddings(
        ds.graph,
        dim=cfg.hidden,
        num_walks=8,
        walk_len=20,
        p=2.0,
        q=0.5,
        seed=cfg.seed,
    )
    return logistic_regression_scores(emb, ds, cfg, seed_offset=2)
