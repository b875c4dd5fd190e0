"""VGAE baseline (Kipf & Welling 2016): GCN encoder to a Gaussian latent,
inner-product decoder, BCE reconstruction on the link samples + KL prior.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.common import GCNLayer, TrainConfig, bce_with_logits, prepared_graph
from repro.eval.datasets import LinkDataset
from repro.nn.autograd import Tensor, gather_rows
from repro.nn.layers import Module
from repro.nn.optim import Adam


class VGAE(Module):
    def __init__(self, d_in: int, d: int, rng: np.random.Generator):
        self.gc1 = GCNLayer(d_in, d, rng)
        self.gc_mu = GCNLayer(d, d, rng)
        self.gc_logvar = GCNLayer(d, d, rng)

    def encode(self, x, g, w):
        h = self.gc1(Tensor(x), g, w).relu()
        return self.gc_mu(h, g, w), self.gc_logvar(h, g, w)


def vgae_scores(ds: LinkDataset, cfg: TrainConfig) -> tuple[np.ndarray, np.ndarray]:
    rng = np.random.default_rng(cfg.seed + 11)
    g, w = prepared_graph(ds.graph)
    model = VGAE(ds.features.shape[1], cfg.hidden, rng)
    opt = Adam(model.parameters(), lr=cfg.lr)
    for _ in range(cfg.epochs):
        opt.zero_grad()
        mu, logvar = model.encode(ds.features, g, w)
        # reparameterized sample
        eps = Tensor(rng.normal(size=mu.shape))
        z = mu + eps * (logvar * 0.5).exp()
        logits = (gather_rows(z, ds.train_src) * gather_rows(z, ds.train_dst)).sum(axis=1)
        recon = bce_with_logits(logits, ds.train_y)
        kl = (-0.5 * (1.0 + logvar - mu * mu - logvar.exp()).sum(axis=1)).mean() * (
            1.0 / g.n
        )
        (recon + kl).backward()
        opt.step()
    mu, _ = model.encode(ds.features, g, w)

    def dots(src, dst):
        return (gather_rows(mu, src) * gather_rows(mu, dst)).sum(axis=1).data

    return dots(ds.test_src, ds.test_dst), dots(ds.acc_src, ds.acc_dst)
