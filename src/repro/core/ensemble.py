"""TRMP Stage III — the ensemble stage (Sec. III-B3, Eq. 6).

The ranking model is re-trained weekly on drifting data, so its accuracy
fluctuates. The ensemble stage stabilizes it: entity embeddings extracted
from the last T weekly ALPC models are concatenated per entity, encoded with
a multi-head attention encoder over the T snapshots, and a fresh MLP link
scorer is trained with cross-entropy on the current Dataset-M splits. The
attention-encoded concatenation h_e is what downstream modules (user entity
preference) consume.
"""
from __future__ import annotations

import numpy as np

from repro.baselines.common import TrainConfig, bce_with_logits
from repro.eval.datasets import LinkDataset
from repro.nn.autograd import Tensor, concat, gather_rows
from repro.nn.layers import MLP, Module, MultiHeadAttention
from repro.nn.optim import Adam


class EnsembleModel(Module):
    """Multi-head attention over weekly embedding snapshots + MLP scorer."""

    def __init__(
        self,
        n_weeks: int,
        d: int,
        rng: np.random.Generator,
        n_heads: int = 4,
    ):
        self.n_weeks = n_weeks
        self.d = d
        self.attn = MultiHeadAttention(d, n_heads, rng)
        self.scorer = MLP([2 * n_weeks * d, d, 1], rng)

    def encode(self, weekly: np.ndarray) -> Tensor:
        """(n, T, d) stacked weekly embeddings → (n, T*d) fused h_e."""
        n, t, d = weekly.shape
        out = self.attn(Tensor(weekly))
        return out.reshape(n, t * d)

    def score(self, h: Tensor, src: np.ndarray, dst: np.ndarray) -> Tensor:
        hu = gather_rows(h, src)
        hv = gather_rows(h, dst)
        return self.scorer(concat([hu, hv], axis=-1)).reshape(-1)


def stack_weekly(weekly_embeddings: list[np.ndarray]) -> np.ndarray:
    """Stack per-week (n, d) matrices into (n, T, d); L2-normalize each
    snapshot so one badly-scaled week cannot dominate the concatenation."""
    normed = []
    for z in weekly_embeddings:
        nrm = np.linalg.norm(z, axis=1, keepdims=True)
        normed.append(z / np.maximum(nrm, 1e-12))
    return np.stack(normed, axis=1)


def train_ensemble(
    weekly_embeddings: list[np.ndarray],
    ds: LinkDataset,
    cfg: TrainConfig,
) -> tuple[EnsembleModel, np.ndarray]:
    """Fit the ensemble on the current week's Dataset-M; returns the model
    and the stored entity embeddings h_e (n, T*d) for downstream use."""
    rng = np.random.default_rng(cfg.seed + 51)
    x = stack_weekly(weekly_embeddings)
    model = EnsembleModel(x.shape[1], x.shape[2], rng)
    opt = Adam(model.parameters(), lr=cfg.lr)
    for _ in range(cfg.epochs):
        opt.zero_grad()
        h = model.encode(x)
        logits = model.score(h, ds.train_src, ds.train_dst)
        bce_with_logits(logits, ds.train_y).backward()
        opt.step()
    h_final = model.encode(x)
    return model, h_final.data


def ensemble_decide(
    model: EnsembleModel,
    weekly_embeddings: list[np.ndarray],
    src: np.ndarray,
    dst: np.ndarray,
) -> np.ndarray:
    """Predicted-positive mask for candidate relations under the ensemble."""
    h = model.encode(stack_weekly(weekly_embeddings))
    return model.score(h, src, dst).data > 0.0
