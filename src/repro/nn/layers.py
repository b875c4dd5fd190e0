"""Standard neural layers built on the autograd tape.

All parameters are Xavier-initialized from a caller-supplied
``numpy.random.Generator`` so model training is fully seed-deterministic.
"""
from __future__ import annotations

import numpy as np

from repro.nn.autograd import Tensor, concat, gather_rows


class Module:
    """Base class: recursively collects parameters from attributes."""

    def parameters(self) -> list[Tensor]:
        out: list[Tensor] = []
        for v in self.__dict__.values():
            if isinstance(v, Tensor) and v.requires_grad:
                out.append(v)
            elif isinstance(v, Module):
                out.extend(v.parameters())
            elif isinstance(v, (list, tuple)):
                for item in v:
                    if isinstance(item, Module):
                        out.extend(item.parameters())
                    elif isinstance(item, Tensor) and item.requires_grad:
                        out.append(item)
        return out


def _xavier(rng: np.random.Generator, fan_in: int, fan_out: int) -> np.ndarray:
    limit = np.sqrt(6.0 / (fan_in + fan_out))
    return rng.uniform(-limit, limit, size=(fan_in, fan_out))


class Linear(Module):
    """Affine map ``x @ W + b``."""

    def __init__(self, d_in: int, d_out: int, rng: np.random.Generator, bias: bool = True):
        self.W = Tensor(_xavier(rng, d_in, d_out), requires_grad=True)
        self.b = Tensor(np.zeros(d_out), requires_grad=True) if bias else None

    def __call__(self, x: Tensor) -> Tensor:
        out = x @ self.W
        return out + self.b if self.b is not None else out


class MLP(Module):
    """Feed-forward stack with ReLU between hidden layers (none after last)."""

    def __init__(self, dims: list[int], rng: np.random.Generator):
        self.layers = [Linear(a, b, rng) for a, b in zip(dims[:-1], dims[1:])]

    def __call__(self, x: Tensor) -> Tensor:
        for i, layer in enumerate(self.layers):
            x = layer(x)
            if i < len(self.layers) - 1:
                x = x.relu()
        return x


class LSTMCell(Module):
    """Single LSTM step — the depth-gating unit of GeniePath (its Eq. 5-9)."""

    def __init__(self, d_in: int, d_hidden: int, rng: np.random.Generator):
        self.Wx = Tensor(_xavier(rng, d_in, 4 * d_hidden), requires_grad=True)
        self.Wh = Tensor(_xavier(rng, d_hidden, 4 * d_hidden), requires_grad=True)
        self.b = Tensor(np.zeros(4 * d_hidden), requires_grad=True)
        self.d = d_hidden

    def __call__(self, x: Tensor, h: Tensor, c: Tensor) -> tuple[Tensor, Tensor]:
        z = x @ self.Wx + h @ self.Wh + self.b
        d = self.d
        zd = z.data
        i = Tensor(zd[:, :d], _parents=(z,), _backward=_slice_bw(z, 0, d)).sigmoid()
        f = Tensor(zd[:, d : 2 * d], _parents=(z,), _backward=_slice_bw(z, d, 2 * d)).sigmoid()
        g = Tensor(zd[:, 2 * d : 3 * d], _parents=(z,), _backward=_slice_bw(z, 2 * d, 3 * d)).tanh()
        o = Tensor(zd[:, 3 * d :], _parents=(z,), _backward=_slice_bw(z, 3 * d, 4 * d)).sigmoid()
        c_new = f * c + i * g
        h_new = o * c_new.tanh()
        return h_new, c_new


def _slice_bw(parent: Tensor, a: int, b: int):
    def bw(grad: np.ndarray):
        g = np.zeros_like(parent.data)
        g[:, a:b] = grad
        return [(parent, g)]

    return bw


class MultiHeadAttention(Module):
    """Self-attention over short token sequences, batched as (B, T, D) input.

    Used by the ensemble stage to fuse weekly embedding snapshots (the paper's
    "multi-head attention encoder"). T is small (#weeks), so a plain
    per-head loop over numpy matmuls is adequate.
    """

    def __init__(self, d_model: int, n_heads: int, rng: np.random.Generator):
        assert d_model % n_heads == 0, "d_model must divide n_heads"
        self.n_heads = n_heads
        self.d_head = d_model // n_heads
        self.Wq = Linear(d_model, d_model, rng, bias=False)
        self.Wk = Linear(d_model, d_model, rng, bias=False)
        self.Wv = Linear(d_model, d_model, rng, bias=False)
        self.Wo = Linear(d_model, d_model, rng, bias=False)

    def __call__(self, x: Tensor) -> Tensor:
        b, t, d = x.shape
        flat = x.reshape(b * t, d)
        q, k, v = self.Wq(flat), self.Wk(flat), self.Wv(flat)
        outs = []
        for h in range(self.n_heads):
            sl = np.arange(h * self.d_head, (h + 1) * self.d_head)
            qh = _take_cols(q, sl).reshape(b, t, self.d_head)
            kh = _take_cols(k, sl).reshape(b, t, self.d_head)
            vh = _take_cols(v, sl).reshape(b, t, self.d_head)
            # (B, T, T) attention via batched matmul on 3-D tensors.
            scores = _bmm(qh, _transpose12(kh)) * (1.0 / np.sqrt(self.d_head))
            attn = _softmax_last(scores)
            outs.append(_bmm(attn, vh).reshape(b * t, self.d_head))
        fused = concat(outs, axis=-1)
        return self.Wo(fused).reshape(b, t, d)


def _take_cols(x: Tensor, cols: np.ndarray) -> Tensor:
    """Column slice with gradient scatter (autograd-friendly x[:, cols])."""
    out_data = x.data[:, cols]

    def bw(g):
        gx = np.zeros_like(x.data)
        gx[:, cols] = g
        return [(x, gx)]

    needs = x.requires_grad or x._backward is not None
    return Tensor(out_data, _parents=(x,), _backward=bw if needs else None)


def _bmm(a: Tensor, b: Tensor) -> Tensor:
    """Batched matmul for 3-D tensors (np.matmul semantics)."""
    out_data = a.data @ b.data

    def bw(g):
        return [(a, g @ np.swapaxes(b.data, -1, -2)), (b, np.swapaxes(a.data, -1, -2) @ g)]

    needs = any(t.requires_grad or t._backward is not None for t in (a, b))
    return Tensor(out_data, _parents=(a, b), _backward=bw if needs else None)


def _transpose12(x: Tensor) -> Tensor:
    out_data = np.swapaxes(x.data, 1, 2)

    def bw(g):
        return [(x, np.swapaxes(g, 1, 2))]

    needs = x.requires_grad or x._backward is not None
    return Tensor(out_data, _parents=(x,), _backward=bw if needs else None)


def _softmax_last(x: Tensor) -> Tensor:
    m = x.data.max(axis=-1, keepdims=True)
    ex = (x - Tensor(m)).exp()
    return ex / ex.sum(axis=-1, keepdims=True)


def embedding_table(rng: np.random.Generator, n: int, d: int, scale: float = 0.1) -> Tensor:
    """Trainable lookup table; fetch rows with :func:`gather_rows`."""
    return Tensor(rng.normal(0.0, scale, size=(n, d)), requires_grad=True)


def lookup(table: Tensor, idx: np.ndarray) -> Tensor:
    return gather_rows(table, idx)
