"""ALPC — Adaptive-threshold Link Prediction with Contrastive learning.

The paper's ranking-stage model (TRMP Stage II, Sec. III-B2):

* **backbone**: GeniePath (Liu et al. 2018) over the candidate graph with
  node features [e^Se || e^Co] (Eq. 1) — adaptive *breadth* (attention over
  neighbors) + adaptive *depth* (LSTM gating across layers);
* **prediction task**: logit s_uv = g([z_u || z_v]) with cross-entropy
  (Eq. 2);
* **adaptive threshold task**: per-source threshold eps_u = MLP(z_u) trained
  with CE on sigma(s_uv - eps_u) (Eq. 3) — handles per-source score-scale
  skew (paper's Challenge 1);
* **contrastive task**: InfoNCE over semantic anchor pairs <e, e+> (pairs of
  correlated entities whose semantic similarity exceeds a threshold) with
  in-batch negatives (Eq. 4) — semantically-augmented hard negatives
  (paper's Challenge 2);
* total loss L = L_pred + alpha*L_th + beta*L_cl, alpha=beta=1 (Eq. 5).

Setting alpha=0 gives the ALPC_th- ablation, beta=0 gives ALPC_cl-, and
alpha=beta=0 with a fixed 0.5 decision threshold is exactly the plain
GeniePath baseline of Table II.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.baselines.common import (
    LinkScorer,
    TrainConfig,
    bce_with_logits,
    prepared_graph,
)
from repro.eval.datasets import LinkDataset
from repro.nn.autograd import (
    Tensor,
    concat,
    gather_rows,
    logsumexp,
    segment_softmax,
    segment_sum,
)
from repro.nn.graph import EdgeGraph
from repro.nn.layers import LSTMCell, Linear, MLP, Module
from repro.nn.optim import Adam


class GeniePathBreadth(Module):
    """Adaptive-breadth unit: attention over neighbors (GeniePath Eq. 1-4)."""

    def __init__(self, d: int, rng: np.random.Generator):
        self.Ws = Linear(d, d, rng, bias=False)
        self.Wd = Linear(d, d, rng, bias=False)
        self.v = Linear(d, 1, rng, bias=False)
        self.Wout = Linear(d, d, rng)

    def __call__(self, h: Tensor, g: EdgeGraph) -> Tensor:
        hs = gather_rows(h, g.src)
        hd = gather_rows(h, g.dst)
        e = self.v((self.Ws(hs) + self.Wd(hd)).tanh()).reshape(-1)
        alpha = segment_softmax(e, g.dst, g.n).reshape(-1, 1)
        msg = segment_sum(hs * alpha, g.dst, g.n)
        return self.Wout(msg).tanh()


class GeniePathEncoder(Module):
    """Stacked breadth (attention) + depth (LSTM) layers."""

    def __init__(self, d_in: int, d: int, n_layers: int, rng: np.random.Generator):
        self.proj = Linear(d_in, d, rng)
        self.breadth = [GeniePathBreadth(d, rng) for _ in range(n_layers)]
        self.depth = [LSTMCell(d, d, rng) for _ in range(n_layers)]
        self.d = d

    def __call__(self, x: np.ndarray, g: EdgeGraph) -> Tensor:
        h = self.proj(Tensor(x)).tanh()
        c = Tensor(np.zeros((g.n, self.d)))
        for breadth, depth in zip(self.breadth, self.depth):
            tmp = breadth(h, g)
            h, c = depth(tmp, h, c)
        return h


def _edge_semantic_cos(ds: LinkDataset) -> tuple[np.ndarray, np.ndarray, np.ndarray]:
    src, dst = ds.graph.src, ds.graph.dst
    mask = src < dst
    s, d = src[mask], dst[mask]
    sims = np.einsum("ij,ij->i", ds.e_se[s], ds.e_se[d])
    norm = np.linalg.norm(ds.e_se[s], axis=1) * np.linalg.norm(ds.e_se[d], axis=1)
    return s, d, sims / np.maximum(norm, 1e-12)


def semantic_anchor_pairs(
    ds: LinkDataset, tau_cl: float = 0.60
) -> tuple[np.ndarray, np.ndarray]:
    """Anchor pairs <e, e+>: correlated (graph-adjacent) entities whose
    semantic similarity exceeds ``tau_cl`` (Sec. III-B2, contrastive task)."""
    s, d, cos = _edge_semantic_cos(ds)
    keep = cos > tau_cl
    return s[keep], d[keep]


def semantic_hard_negatives(
    ds: LinkDataset, tau_neg: float = 0.30
) -> tuple[np.ndarray, np.ndarray]:
    """Semantically augmented hard negatives (the paper's Challenge 2):
    graph-adjacent pairs with LOW semantic similarity — co-occurrence says
    related, semantics disagrees, i.e. the suspected noise relations the
    contrastive task should push apart."""
    s, d, cos = _edge_semantic_cos(ds)
    keep = cos < tau_neg
    return s[keep], d[keep]


def _l2norm(z: Tensor) -> Tensor:
    return z * ((z * z).sum(axis=1, keepdims=True) + 1e-12) ** -0.5


@dataclass
class ALPCResult:
    test_logits: np.ndarray
    decision: np.ndarray  # predicted-positive mask on test pairs
    eps: np.ndarray | None  # per-test-pair adaptive thresholds (None if alpha=0)
    acc_scores: np.ndarray | None = None  # decision scores over the pool (s - eps)


class ALPC(Module):
    """The full ALPC model; ablations via ``alpha`` / ``beta``."""

    def __init__(
        self,
        d_in: int,
        cfg: TrainConfig,
        alpha: float = 1.0,
        beta: float = 1.0,
        n_layers: int = 2,
        tau_temp: float = 0.2,
        tau_cl: float = 0.60,
        tau_neg: float = 0.30,
        cl_batch: int = 256,
        cl_in_batch: bool = True,
    ):
        rng = np.random.default_rng(cfg.seed)
        self.cfg = cfg
        self.alpha = alpha
        self.beta = beta
        self.tau_temp = tau_temp
        self.tau_cl = tau_cl
        self.tau_neg = tau_neg
        self.cl_batch = cl_batch
        self.cl_in_batch = cl_in_batch
        self.encoder = GeniePathEncoder(d_in, cfg.hidden, n_layers, rng)
        # scorer sees one extra feature: cos(z_u, z_v), the geometry the
        # contrastive task shapes — Eq. 2 allows inner-product-style g(.)
        self.scorer = LinkScorer(cfg.hidden, rng, extra=1)
        self.th_mlp = MLP([cfg.hidden, cfg.hidden // 2, 1], rng)
        self._rng = rng

    # ------------------------------------------------------------- losses
    def _contrastive_loss(
        self,
        z: Tensor,
        anchors: tuple[np.ndarray, np.ndarray],
        hard_negs: tuple[np.ndarray, np.ndarray],
    ) -> Tensor:
        a_src, a_dst = anchors
        if len(a_src) < 4:
            return Tensor(0.0)
        k = min(self.cl_batch, len(a_src))
        pick = self._rng.choice(len(a_src), size=k, replace=False)
        zn = _l2norm(z)
        ze = gather_rows(zn, a_src[pick])
        zp = gather_rows(zn, a_dst[pick])
        pos = (ze * zp).sum(axis=1) * (1.0 / self.tau_temp)
        # In-batch negatives are the classic InfoNCE choice, but with few
        # topics they contain many false negatives (same-topic anchors);
        # the semantically-augmented hard negatives below are the cleaner
        # repulsion signal, so in-batch use is switchable.
        sims = []
        if self.cl_in_batch:
            sims.append((ze @ zp.T) * (1.0 / self.tau_temp))
        else:
            sims.append(pos.reshape(-1, 1))
        # semantically augmented hard negatives: per-anchor similarity to a
        # pool of suspected-noise co-occurrence partners (pushed apart)
        h_src, h_dst = hard_negs
        if len(h_src) >= 4:
            m = min(self.cl_batch, len(h_src))
            hp = self._rng.choice(len(h_src), size=m, replace=False)
            zw = gather_rows(zn, h_dst[hp])
            sims.append((ze @ zw.T) * (1.0 / self.tau_temp))
        denom = logsumexp(concat(sims, axis=-1), axis=1)
        # InfoNCE = mean(-log softmax over [positives | negatives]).
        # Normalized by its chance value log(#targets) so beta=1 (the
        # paper's reported best weighting on its own loss scales) weights
        # it comparably to the BCE terms.
        n_targets = sum(s.shape[1] for s in sims)
        return (denom - pos).mean() * (1.0 / np.log(max(3, n_targets)))

    # ------------------------------------------------------------- scoring
    def _score(self, z: Tensor, src: np.ndarray, dst: np.ndarray) -> Tensor:
        zn = _l2norm(z)
        cosf = (gather_rows(zn, src) * gather_rows(zn, dst)).sum(axis=1, keepdims=True)
        return self.scorer(z, src, dst, extra=cosf)

    # ------------------------------------------------------------ training
    def fit(self, ds: LinkDataset) -> "ALPC":
        g, _ = prepared_graph(ds.graph)
        self._graph = g
        self._features = ds.features
        anchors = semantic_anchor_pairs(ds, self.tau_cl)
        hard_negs = semantic_hard_negatives(ds, self.tau_neg)
        opt = Adam(self.parameters(), lr=self.cfg.lr)
        for _ in range(self.cfg.epochs):
            opt.zero_grad()
            z = self.encoder(self._features, g)
            logits = self._score(z, ds.train_src, ds.train_dst)
            loss = bce_with_logits(logits, ds.train_y)
            if self.alpha > 0:
                eps = self.th_mlp(gather_rows(z, ds.train_src)).reshape(-1)
                loss = loss + self.alpha * bce_with_logits(logits - eps, ds.train_y)
            if self.beta > 0:
                loss = loss + self.beta * self._contrastive_loss(z, anchors, hard_negs)
            loss.backward()
            opt.step()
        return self

    # ----------------------------------------------------------- inference
    def embeddings(self) -> np.ndarray:
        return self.encoder(self._features, self._graph).data

    def score_pairs(self, src: np.ndarray, dst: np.ndarray) -> np.ndarray:
        z = self.encoder(self._features, self._graph)
        return self._score(z, src, dst).data

    def decision_scores(self, src: np.ndarray, dst: np.ndarray) -> np.ndarray:
        """Decision score for arbitrary pairs: s - eps with the adaptive
        per-source threshold (plain s when alpha=0)."""
        z = self.encoder(self._features, self._graph)
        logits = self._score(z, src, dst).data
        if self.alpha > 0:
            eps = self.th_mlp(gather_rows(z, src)).reshape(-1).data
            return logits - eps
        return logits

    def decide_pairs(self, src: np.ndarray, dst: np.ndarray) -> np.ndarray:
        """Relation-keep decision: sigma(decision score) > 0.5."""
        return self.decision_scores(src, dst) > 0.0

    def predict(self, ds: LinkDataset) -> ALPCResult:
        z = self.encoder(self._features, self._graph)
        logits = self._score(z, ds.test_src, ds.test_dst).data
        acc_scores = self.decision_scores(ds.acc_src, ds.acc_dst)
        if self.alpha > 0:
            eps = self.th_mlp(gather_rows(z, ds.test_src)).reshape(-1).data
            return ALPCResult(logits, logits - eps > 0.0, eps, acc_scores)
        return ALPCResult(logits, logits > 0.0, None, acc_scores)
