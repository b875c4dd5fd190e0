"""Numeric gradient checks for the autodiff substrate."""
import numpy as np
import pytest

from repro.nn.autograd import (
    Tensor,
    concat,
    gather_rows,
    logsumexp,
    segment_softmax,
    segment_sum,
)

RNG = np.random.default_rng(0)


def numeric_grad(f, x: np.ndarray, eps: float = 1e-6) -> np.ndarray:
    g = np.zeros_like(x)
    it = np.nditer(x, flags=["multi_index"])
    while not it.finished:
        i = it.multi_index
        orig = x[i]
        x[i] = orig + eps
        fp = f()
        x[i] = orig - eps
        fm = f()
        x[i] = orig
        g[i] = (fp - fm) / (2 * eps)
        it.iternext()
    return g


def check(build_loss, *arrays):
    """build_loss(*tensors) -> scalar Tensor; compare autodiff vs numeric."""
    tensors = [Tensor(a, requires_grad=True) for a in arrays]
    loss = build_loss(*tensors)
    loss.backward()
    for t, a in zip(tensors, arrays):
        num = numeric_grad(lambda: build_loss(*[Tensor(x.data) for x in tensors]).data.item(), a)
        assert t.grad is not None
        np.testing.assert_allclose(t.grad, num, rtol=1e-4, atol=1e-6)


def test_add_mul_broadcast():
    a = RNG.normal(size=(3, 4))
    b = RNG.normal(size=(4,))
    check(lambda x, y: ((x + y) * (x * 2.0)).sum(), a, b)


def test_sub_div_pow():
    a = RNG.normal(size=(3, 4)) + 3.0
    b = RNG.normal(size=(3, 4)) + 3.0
    check(lambda x, y: ((x - y) / (y**2.0)).sum(), a, b)


def test_matmul():
    a = RNG.normal(size=(3, 5))
    b = RNG.normal(size=(5, 2))
    check(lambda x, y: (x @ y).sum(), a, b)


def test_elementwise_nonlinearities():
    a = RNG.normal(size=(4, 3))
    check(lambda x: (x.tanh() + x.sigmoid() + x.relu()).sum(), a)
    b = RNG.random((4, 3)) + 0.5
    check(lambda x: (x.log() + x.exp()).sum(), b)


def test_sum_axis_and_mean():
    a = RNG.normal(size=(3, 4))
    check(lambda x: x.sum(axis=0).sum(), a)
    check(lambda x: x.mean(axis=1).sum(), a)
    check(lambda x: x.mean(), a)


def test_reshape_transpose():
    a = RNG.normal(size=(3, 4))
    check(lambda x: (x.reshape(4, 3) @ x.reshape(4, 3).T).sum(), a)
    check(lambda x: (x.T @ x).sum(), a)


def test_concat():
    a = RNG.normal(size=(3, 2))
    b = RNG.normal(size=(3, 4))
    check(lambda x, y: (concat([x, y], axis=-1) ** 2.0).sum(), a, b)


def test_gather_rows_with_repeats():
    a = RNG.normal(size=(5, 3))
    idx = np.array([0, 2, 2, 4, 1, 0])
    check(lambda x: (gather_rows(x, idx) ** 2.0).sum(), a)


def test_segment_sum():
    a = RNG.normal(size=(6, 3))
    seg = np.array([0, 0, 1, 2, 2, 2])
    check(lambda x: (segment_sum(x, seg, 4) ** 2.0).sum(), a)
    # empty segment 3 stays zero
    out = segment_sum(Tensor(a), seg, 4)
    np.testing.assert_allclose(out.data[3], 0.0)


def test_logsumexp_matches_numpy():
    a = RNG.normal(size=(4, 6)) * 10
    out = logsumexp(Tensor(a), axis=-1)
    expect = np.log(np.exp(a - a.max(-1, keepdims=True)).sum(-1)) + a.max(-1)
    np.testing.assert_allclose(out.data, expect, rtol=1e-10)
    check(lambda x: logsumexp(x, axis=-1).sum(), RNG.normal(size=(3, 4)))


def test_segment_softmax_sums_to_one():
    logits = RNG.normal(size=(7,)) * 5
    seg = np.array([0, 0, 0, 1, 1, 2, 2])
    p = segment_softmax(Tensor(logits), seg, 3)
    sums = np.zeros(3)
    np.add.at(sums, seg, p.data)
    np.testing.assert_allclose(sums, 1.0, rtol=1e-9)


def test_segment_softmax_grad():
    logits = RNG.normal(size=(6,))
    seg = np.array([0, 0, 1, 1, 1, 2])
    w = RNG.normal(size=(6,))
    check(lambda x: (segment_softmax(x, seg, 3) * Tensor(w)).sum(), logits)


def test_grad_accumulates_over_reuse():
    a = Tensor(np.array([2.0]), requires_grad=True)
    loss = a * a + a * 3.0  # d/da = 2a + 3 = 7
    loss.backward()
    np.testing.assert_allclose(a.grad, [7.0])


def test_backward_seed():
    a = Tensor(np.ones((2, 2)), requires_grad=True)
    (a * 2.0).backward(np.full((2, 2), 0.5))
    np.testing.assert_allclose(a.grad, np.ones((2, 2)))


def test_detach_blocks_gradient():
    a = Tensor(np.ones(3), requires_grad=True)
    loss = (a.detach() * a).sum()
    loss.backward()
    np.testing.assert_allclose(a.grad, np.ones(3))


@pytest.mark.parametrize("shape", [(1,), (2, 3), (2, 1, 3)])
def test_unbroadcast_shapes(shape):
    a = RNG.normal(size=shape)
    b = RNG.normal(size=(2, 4, 3)) if len(shape) != 2 else RNG.normal(size=(4, 2, 3))
    t = Tensor(a, requires_grad=True)
    (t + Tensor(b)).sum().backward()
    assert t.grad.shape == shape
