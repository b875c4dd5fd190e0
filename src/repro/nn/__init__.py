"""Minimal numpy deep-learning substrate.

The paper trains GNN link-prediction models (GeniePath backbone, ALPC) on a
parameter-server stack; no torch/TF is available offline here, so this package
provides a small reverse-mode autodiff engine (:mod:`repro.nn.autograd`),
standard layers (:mod:`repro.nn.layers`), Adam (:mod:`repro.nn.optim`) and
sparse-graph message-passing primitives (:mod:`repro.nn.graph`).
"""
from repro.nn.autograd import Tensor, concat, gather_rows, logsumexp, segment_sum
from repro.nn.layers import LSTMCell, Linear, MLP, MultiHeadAttention, Module
from repro.nn.optim import Adam

__all__ = [
    "Tensor",
    "concat",
    "gather_rows",
    "logsumexp",
    "segment_sum",
    "Linear",
    "MLP",
    "LSTMCell",
    "MultiHeadAttention",
    "Module",
    "Adam",
]
