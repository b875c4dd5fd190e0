"""SEAL baseline (Zhang & Chen 2018): per-link enclosing subgraphs with
Double-Radius Node Labeling, a GCN over the (block-diagonal batched)
subgraphs, mean-pool readout, MLP scoring.

Faithful to the method's structure; scaled down (1-hop subgraphs, node cap,
training-link subsample) because every link costs a subgraph — exactly the
trade-off that makes SEAL heavy in practice.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.common import GCNLayer, TrainConfig, bce_with_logits
from repro.eval.datasets import LinkDataset
from repro.nn.autograd import Tensor, concat, segment_sum
from repro.nn.graph import (
    EdgeGraph,
    add_self_loops,
    adjacency_sets,
    drnl_labels,
    gcn_norm,
    k_hop_nodes,
)
from repro.nn.layers import MLP, Module
from repro.nn.optim import Adam

_MAX_LABEL = 8
_NODE_CAP = 25


def _build_batch(
    adj, feats: np.ndarray, src: np.ndarray, dst: np.ndarray
) -> tuple[EdgeGraph, np.ndarray, np.ndarray, np.ndarray]:
    """Block-diagonal batch of enclosing subgraphs for the given links.

    Returns (batched graph, node features, DRNL labels, subgraph id per node).
    The target link itself is removed from its subgraph (standard SEAL), so
    the model cannot read the label off the structure.
    """
    all_src, all_dst, all_feat, all_lab, all_seg = [], [], [], [], []
    offset = 0
    for si, (u, v) in enumerate(zip(src, dst)):
        u, v = int(u), int(v)
        nodes = sorted(k_hop_nodes(adj, [u, v], 1, cap=_NODE_CAP))
        local = {x: i for i, x in enumerate(nodes)}
        lab = drnl_labels(adj, nodes, u, v, max_label=_MAX_LABEL)
        es, ed = [], []
        for x in nodes:
            for y in adj[x]:
                if y in local and not ({x, y} == {u, v}):
                    es.append(local[x])
                    ed.append(local[y])
        all_src.append(np.asarray(es, dtype=np.int64) + offset)
        all_dst.append(np.asarray(ed, dtype=np.int64) + offset)
        all_feat.append(feats[nodes])
        all_lab.append(lab)
        all_seg.append(np.full(len(nodes), si))
        offset += len(nodes)
    g = EdgeGraph(
        offset,
        np.concatenate(all_src) if all_src else np.empty(0, dtype=np.int64),
        np.concatenate(all_dst) if all_dst else np.empty(0, dtype=np.int64),
    )
    return (
        g,
        np.concatenate(all_feat),
        np.concatenate(all_lab),
        np.concatenate(all_seg),
    )


class SEALNet(Module):
    def __init__(self, d_feat: int, d: int, rng: np.random.Generator):
        self.label_emb = Tensor(
            rng.normal(0, 0.1, size=(_MAX_LABEL + 1, 8)), requires_grad=True
        )
        self.gc1 = GCNLayer(d_feat + 8, d, rng)
        self.gc2 = GCNLayer(d, d, rng)
        self.out = MLP([d, d, 1], rng)

    def __call__(self, g: EdgeGraph, feats: np.ndarray, labels: np.ndarray, seg, n_sub):
        from repro.nn.autograd import gather_rows

        gl = add_self_loops(g)
        w = gcn_norm(gl)
        x = concat([Tensor(feats), gather_rows(self.label_emb, labels)], axis=-1)
        h = self.gc1(x, gl, w).relu()
        h = self.gc2(h, gl, w).relu()
        counts = np.bincount(seg, minlength=n_sub).astype(float)[:, None]
        pooled = segment_sum(h, seg, n_sub) * Tensor(1.0 / np.maximum(counts, 1.0))
        return self.out(pooled).reshape(-1)


def seal_scores(
    ds: LinkDataset, cfg: TrainConfig, max_train: int = 1500, batch: int = 128
) -> tuple[np.ndarray, np.ndarray]:
    rng = np.random.default_rng(cfg.seed + 21)
    adj = adjacency_sets(ds.graph)
    model = SEALNet(ds.features.shape[1], cfg.hidden, rng)
    opt = Adam(model.parameters(), lr=cfg.lr)
    n_train = len(ds.train_src)
    pick = (
        rng.choice(n_train, size=max_train, replace=False)
        if n_train > max_train
        else np.arange(n_train)
    )
    # fixed minibatch partition, subgraphs built once and reused each epoch
    epochs = max(1, cfg.epochs // 20)
    batches = []
    for i in range(0, len(pick), batch):
        idx = pick[i : i + batch]
        built = _build_batch(adj, ds.features, ds.train_src[idx], ds.train_dst[idx])
        batches.append((built, ds.train_y[idx]))
    for _ in range(epochs):
        for bi in rng.permutation(len(batches)):
            (g, f, lab, seg), y = batches[bi]
            opt.zero_grad()
            logits = model(g, f, lab, seg, len(y))
            bce_with_logits(logits, y).backward()
            opt.step()
    def infer(src, dst):
        out = np.zeros(len(src))
        for i in range(0, len(src), batch):
            sl = slice(i, min(i + batch, len(src)))
            g, f, lab, seg = _build_batch(adj, ds.features, src[sl], dst[sl])
            out[sl] = model(g, f, lab, seg, sl.stop - sl.start).data
        return out

    return infer(ds.test_src, ds.test_dst), infer(ds.acc_src, ds.acc_dst)
