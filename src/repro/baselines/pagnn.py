"""PaGNN baseline (Yang et al. 2021) — pairwise-aware GNN, simplified.

PaGNN's core idea is *interactive structure learning*: when scoring (u, v),
the model uses pairwise structural interaction between the two enclosing
neighborhoods (broadcasting one endpoint into the other's aggregation)
rather than two independent node embeddings. We reproduce that essence at
our scale with:

* a GAT-style attentive encoder over the candidate graph (node features
  [e^Se || e^Co]), and
* pairwise interaction features per scored link — common-neighbor count and
  Jaccard overlap of the endpoint neighborhoods (the broadcast signal) plus
  the elementwise product and absolute difference of the two embeddings —
  fed jointly to the scoring MLP.

DESIGN.md documents this simplification; the behaviour that matters for
Table II (structure-interaction beats structure-independent scoring) is
preserved.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.common import TrainConfig, bce_with_logits, prepared_graph
from repro.eval.datasets import LinkDataset
from repro.nn.autograd import Tensor, concat, gather_rows
from repro.nn.graph import adjacency_sets
from repro.nn.layers import Linear, MLP, Module
from repro.nn.optim import Adam


class PaGNN(Module):
    def __init__(self, d_in: int, d: int, rng: np.random.Generator):
        # deferred import: core.alpc imports baselines.common, so a
        # module-level import here would close a cycle through
        # repro.baselines.__init__ -> registry -> pagnn -> core.alpc
        from repro.core.alpc import GeniePathBreadth

        self.proj = Linear(d_in, d, rng)
        self.att1 = GeniePathBreadth(d, rng)
        self.att2 = GeniePathBreadth(d, rng)
        self.out = MLP([4 * d + 2, d, 1], rng)

    def encode(self, x: np.ndarray, g) -> Tensor:
        h = self.proj(Tensor(x)).tanh()
        h = self.att1(h, g)
        return self.att2(h, g)

    def score(self, z: Tensor, src, dst, pairwise: np.ndarray) -> Tensor:
        zu = gather_rows(z, src)
        zv = gather_rows(z, dst)
        feats = concat(
            [zu, zv, zu * zv, ((zu - zv) ** 2.0)], axis=-1
        )
        return self.out(concat([feats, Tensor(pairwise)], axis=-1)).reshape(-1)


def _pairwise_features(adj, src: np.ndarray, dst: np.ndarray) -> np.ndarray:
    """Broadcast interaction features: common neighbors (log1p) + Jaccard."""
    out = np.zeros((len(src), 2))
    for i, (u, v) in enumerate(zip(src, dst)):
        a, b = adj[int(u)], adj[int(v)]
        inter = len(a & b)
        union = len(a | b)
        out[i, 0] = np.log1p(inter)
        out[i, 1] = inter / union if union else 0.0
    return out


def pagnn_scores(ds: LinkDataset, cfg: TrainConfig) -> tuple[np.ndarray, np.ndarray]:
    rng = np.random.default_rng(cfg.seed + 41)
    g, _ = prepared_graph(ds.graph)
    adj = adjacency_sets(ds.graph)
    model = PaGNN(ds.features.shape[1], cfg.hidden, rng)
    pw_train = _pairwise_features(adj, ds.train_src, ds.train_dst)
    opt = Adam(model.parameters(), lr=cfg.lr)
    for _ in range(cfg.epochs):
        opt.zero_grad()
        z = model.encode(ds.features, g)
        logits = model.score(z, ds.train_src, ds.train_dst, pw_train)
        bce_with_logits(logits, ds.train_y).backward()
        opt.step()
    z = model.encode(ds.features, g)
    pw_test = _pairwise_features(adj, ds.test_src, ds.test_dst)
    pw_acc = _pairwise_features(adj, ds.acc_src, ds.acc_dst)
    return (
        model.score(z, ds.test_src, ds.test_dst, pw_test).data,
        model.score(z, ds.acc_src, ds.acc_dst, pw_acc).data,
    )
