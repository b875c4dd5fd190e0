"""CompGCN baseline (Vashishth et al. 2020): composition-based relational
GCN. Our candidate graph carries two relation types (co-occurrence /
semantic) plus the self-loop relation; messages compose the neighbor state
with a learned relation embedding (subtraction composition, the paper's
default) before a per-layer linear transform.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.common import (
    LinkScorer,
    TrainConfig,
    prepared_graph,
    train_link_model,
)
from repro.eval.datasets import LinkDataset
from repro.nn.autograd import Tensor, gather_rows, segment_sum
from repro.nn.graph import EdgeGraph
from repro.nn.layers import Linear, Module

_N_REL = 3  # cooc, semantic, self-loop


class CompGCNLayer(Module):
    def __init__(self, d_in: int, d_out: int, rng: np.random.Generator):
        self.rel = Tensor(rng.normal(0, 0.1, size=(_N_REL, d_in)), requires_grad=True)
        self.lin = Linear(d_in, d_out, rng)

    def __call__(self, h: Tensor, g: EdgeGraph, w: np.ndarray) -> Tensor:
        # composition phi(h_src, r) = h_src - r  (sub composition)
        msg = (gather_rows(h, g.src) - gather_rows(self.rel, g.etype)) * Tensor(
            w[:, None]
        )
        return self.lin(segment_sum(msg, g.dst, g.n))


class CompGCNEncoder(Module):
    def __init__(self, d_in: int, d: int, rng: np.random.Generator):
        self.l1 = CompGCNLayer(d_in, d, rng)
        self.l2 = CompGCNLayer(d, d, rng)

    def __call__(self, x: np.ndarray, g: EdgeGraph, w: np.ndarray) -> Tensor:
        h = self.l1(Tensor(x), g, w).tanh()
        return self.l2(h, g, w).tanh()


def compgcn_scores(ds: LinkDataset, cfg: TrainConfig) -> tuple[np.ndarray, np.ndarray]:
    rng = np.random.default_rng(cfg.seed + 31)
    g, w = prepared_graph(ds.graph, loop_type=2)
    enc = CompGCNEncoder(ds.features.shape[1], cfg.hidden, rng)
    scorer = LinkScorer(cfg.hidden, rng)
    return train_link_model(
        lambda: enc(ds.features, g, w),
        scorer,
        enc.parameters() + scorer.parameters(),
        ds,
        cfg,
    )
