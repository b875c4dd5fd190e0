"""Reverse-mode automatic differentiation over numpy arrays.

A micrograd-style tape: each :class:`Tensor` records its parents and a
closure that accumulates gradients into them. Supports broadcasting for
elementwise ops, matmul, reductions, row gather/scatter and segment sums —
everything needed for MLPs, attention, LSTM cells and sparse GNN message
passing.
"""
from __future__ import annotations

from typing import Callable, Iterable

import numpy as np


def _unbroadcast(grad: np.ndarray, shape: tuple) -> np.ndarray:
    """Sum ``grad`` down to ``shape`` (reverse of numpy broadcasting)."""
    if grad.shape == shape:
        return grad
    # Sum over leading axes added by broadcasting.
    while grad.ndim > len(shape):
        grad = grad.sum(axis=0)
    # Sum over axes that were 1 in the original shape.
    for ax, s in enumerate(shape):
        if s == 1 and grad.shape[ax] != 1:
            grad = grad.sum(axis=ax, keepdims=True)
    return grad.reshape(shape)


class Tensor:
    """A numpy array with a gradient tape.

    ``requires_grad`` tensors accumulate into ``.grad`` on :meth:`backward`.
    Non-float data is never differentiable.
    """

    __slots__ = ("data", "grad", "requires_grad", "_parents", "_backward")

    def __init__(
        self,
        data,
        requires_grad: bool = False,
        _parents: Iterable["Tensor"] = (),
        _backward: Callable[[np.ndarray], None] | None = None,
    ):
        self.data = np.asarray(data, dtype=np.float64)
        self.requires_grad = requires_grad
        self.grad: np.ndarray | None = None
        self._parents = tuple(_parents)
        self._backward = _backward

    # ---------------------------------------------------------------- misc
    @property
    def shape(self) -> tuple:
        return self.data.shape

    @property
    def ndim(self) -> int:
        return self.data.ndim

    def __repr__(self) -> str:  # pragma: no cover - debugging aid
        return f"Tensor(shape={self.data.shape}, requires_grad={self.requires_grad})"

    def detach(self) -> "Tensor":
        return Tensor(self.data)

    # ------------------------------------------------------------ autodiff
    def backward(self, grad: np.ndarray | None = None) -> None:
        """Backpropagate from this tensor (default seed: ones)."""
        topo: list[Tensor] = []
        seen: set[int] = set()

        def build(t: Tensor) -> None:
            if id(t) in seen:
                return
            seen.add(id(t))
            for p in t._parents:
                build(p)
            topo.append(t)

        build(self)
        grads: dict[int, np.ndarray] = {
            id(self): np.ones_like(self.data) if grad is None else np.asarray(grad)
        }
        for t in reversed(topo):
            g = grads.pop(id(t), None)
            if g is None:
                continue
            if t.requires_grad:
                t.grad = g if t.grad is None else t.grad + g
            if t._backward is not None:
                for p, pg in t._backward(g):
                    if id(p) in grads:
                        grads[id(p)] = grads[id(p)] + pg
                    else:
                        grads[id(p)] = pg

    # ------------------------------------------------------------- helpers
    @staticmethod
    def _lift(x) -> "Tensor":
        return x if isinstance(x, Tensor) else Tensor(x)

    def _needs(self, *others: "Tensor") -> bool:
        return any(t.requires_grad or t._backward is not None for t in (self, *others))

    # ---------------------------------------------------------- arithmetic
    def __add__(self, other) -> "Tensor":
        o = self._lift(other)
        out_data = self.data + o.data
        if not self._needs(o):
            return Tensor(out_data)

        def bw(g):
            return [
                (self, _unbroadcast(g, self.data.shape)),
                (o, _unbroadcast(g, o.data.shape)),
            ]

        return Tensor(out_data, _parents=(self, o), _backward=bw)

    __radd__ = __add__

    def __neg__(self) -> "Tensor":
        return self * -1.0

    def __sub__(self, other) -> "Tensor":
        return self + (-self._lift(other))

    def __rsub__(self, other) -> "Tensor":
        return self._lift(other) + (-self)

    def __mul__(self, other) -> "Tensor":
        o = self._lift(other)
        out_data = self.data * o.data
        if not self._needs(o):
            return Tensor(out_data)

        def bw(g):
            return [
                (self, _unbroadcast(g * o.data, self.data.shape)),
                (o, _unbroadcast(g * self.data, o.data.shape)),
            ]

        return Tensor(out_data, _parents=(self, o), _backward=bw)

    __rmul__ = __mul__

    def __truediv__(self, other) -> "Tensor":
        o = self._lift(other)
        return self * o ** -1.0

    def __rtruediv__(self, other) -> "Tensor":
        return self._lift(other) * self ** -1.0

    def __pow__(self, p: float) -> "Tensor":
        out_data = self.data**p
        if not self._needs():
            return Tensor(out_data)

        def bw(g):
            return [(self, _unbroadcast(g * p * self.data ** (p - 1), self.data.shape))]

        return Tensor(out_data, _parents=(self,), _backward=bw)

    def __matmul__(self, other) -> "Tensor":
        o = self._lift(other)
        out_data = self.data @ o.data
        if not self._needs(o):
            return Tensor(out_data)

        def bw(g):
            return [(self, g @ o.data.T), (o, self.data.T @ g)]

        return Tensor(out_data, _parents=(self, o), _backward=bw)

    # ---------------------------------------------------------- elementwise
    def exp(self) -> "Tensor":
        out_data = np.exp(self.data)

        def bw(g):
            return [(self, g * out_data)]

        return Tensor(out_data, _parents=(self,), _backward=bw if self._needs() else None)

    def log(self) -> "Tensor":
        out_data = np.log(self.data)

        def bw(g):
            return [(self, g / self.data)]

        return Tensor(out_data, _parents=(self,), _backward=bw if self._needs() else None)

    def tanh(self) -> "Tensor":
        out_data = np.tanh(self.data)

        def bw(g):
            return [(self, g * (1.0 - out_data**2))]

        return Tensor(out_data, _parents=(self,), _backward=bw if self._needs() else None)

    def sigmoid(self) -> "Tensor":
        out_data = 1.0 / (1.0 + np.exp(-np.clip(self.data, -60, 60)))

        def bw(g):
            return [(self, g * out_data * (1.0 - out_data))]

        return Tensor(out_data, _parents=(self,), _backward=bw if self._needs() else None)

    def relu(self) -> "Tensor":
        out_data = np.maximum(self.data, 0.0)

        def bw(g):
            return [(self, g * (self.data > 0))]

        return Tensor(out_data, _parents=(self,), _backward=bw if self._needs() else None)

    # ----------------------------------------------------------- reductions
    def sum(self, axis: int | None = None, keepdims: bool = False) -> "Tensor":
        out_data = self.data.sum(axis=axis, keepdims=keepdims)

        def bw(g):
            g = np.asarray(g)
            if axis is not None and not keepdims:
                g = np.expand_dims(g, axis)
            return [(self, np.broadcast_to(g, self.data.shape).copy())]

        return Tensor(out_data, _parents=(self,), _backward=bw if self._needs() else None)

    def mean(self, axis: int | None = None, keepdims: bool = False) -> "Tensor":
        n = self.data.size if axis is None else self.data.shape[axis]
        return self.sum(axis=axis, keepdims=keepdims) * (1.0 / n)

    # -------------------------------------------------------------- shaping
    def reshape(self, *shape: int) -> "Tensor":
        out_data = self.data.reshape(*shape)

        def bw(g):
            return [(self, g.reshape(self.data.shape))]

        return Tensor(out_data, _parents=(self,), _backward=bw if self._needs() else None)

    @property
    def T(self) -> "Tensor":
        out_data = self.data.T

        def bw(g):
            return [(self, g.T)]

        return Tensor(out_data, _parents=(self,), _backward=bw if self._needs() else None)


# --------------------------------------------------------------- free ops
def concat(tensors: list[Tensor], axis: int = -1) -> Tensor:
    """Concatenate along ``axis`` with gradient routing back to each input."""
    datas = [t.data for t in tensors]
    out_data = np.concatenate(datas, axis=axis)
    sizes = [d.shape[axis] for d in datas]
    offsets = np.cumsum([0] + sizes)

    def bw(g):
        out = []
        for t, a, b in zip(tensors, offsets[:-1], offsets[1:]):
            sl = [slice(None)] * g.ndim
            sl[axis if axis >= 0 else g.ndim + axis] = slice(a, b)
            out.append((t, g[tuple(sl)]))
        return out

    needs = any(t.requires_grad or t._backward is not None for t in tensors)
    return Tensor(out_data, _parents=tuple(tensors), _backward=bw if needs else None)


def gather_rows(x: Tensor, idx: np.ndarray) -> Tensor:
    """``x[idx]`` on axis 0; backward scatter-adds (handles repeated indices)."""
    idx = np.asarray(idx)
    out_data = x.data[idx]

    def bw(g):
        gx = np.zeros_like(x.data)
        np.add.at(gx, idx, g)
        return [(x, gx)]

    needs = x.requires_grad or x._backward is not None
    return Tensor(out_data, _parents=(x,), _backward=bw if needs else None)


def segment_sum(x: Tensor, seg: np.ndarray, num_segments: int) -> Tensor:
    """Sum rows of ``x`` into ``num_segments`` buckets by ``seg`` id.

    The sparse-aggregation primitive of message passing: ``x`` is per-edge
    data, ``seg`` the destination node of each edge.
    """
    seg = np.asarray(seg)
    out_data = np.zeros((num_segments,) + x.data.shape[1:])
    np.add.at(out_data, seg, x.data)

    def bw(g):
        return [(x, g[seg])]

    needs = x.requires_grad or x._backward is not None
    return Tensor(out_data, _parents=(x,), _backward=bw if needs else None)


def logsumexp(x: Tensor, axis: int = -1, keepdims: bool = False) -> Tensor:
    """Numerically-stable log-sum-exp (the max shift is treated as constant)."""
    m = np.max(x.data, axis=axis, keepdims=True)
    shifted = x - Tensor(m)
    out = shifted.exp().sum(axis=axis, keepdims=True).log() + Tensor(m)
    if not keepdims:
        new_shape = np.squeeze(out.data, axis=axis).shape
        out = out.reshape(*new_shape) if new_shape else out.reshape(1)
    return out


def segment_softmax(logits: Tensor, seg: np.ndarray, num_segments: int) -> Tensor:
    """Softmax over groups of rows sharing a segment id (attention over edges).

    ``logits`` has shape (E,) or (E, H); softmax is taken independently per
    segment (and per head for 2-D input). The per-segment max shift is a
    constant w.r.t. the tape, which is the standard stable-softmax treatment.
    """
    seg = np.asarray(seg)
    maxes = np.full((num_segments,) + logits.data.shape[1:], -np.inf)
    np.maximum.at(maxes, seg, logits.data)
    maxes[~np.isfinite(maxes)] = 0.0  # empty segments
    shifted = logits - Tensor(maxes[seg])
    ex = shifted.exp()
    denom = segment_sum(ex, seg, num_segments)
    return ex / gather_rows(denom + 1e-12, seg)
