"""Hypothesis property tests for the numeric substrate and metrics."""
import numpy as np
from hypothesis import given, settings, strategies as st
from hypothesis.extra.numpy import arrays

from repro.eval.metrics import auc
from repro.nn.autograd import Tensor, gather_rows, logsumexp, segment_softmax, segment_sum

FLOATS = st.floats(-10, 10, allow_nan=False, allow_infinity=False)


@settings(max_examples=40, deadline=None)
@given(arrays(np.float64, (4, 3), elements=FLOATS), arrays(np.float64, (4, 3), elements=FLOATS))
def test_add_commutes(a, b):
    np.testing.assert_allclose((Tensor(a) + Tensor(b)).data, (Tensor(b) + Tensor(a)).data)


@settings(max_examples=40, deadline=None)
@given(arrays(np.float64, (3, 4), elements=FLOATS))
def test_double_negation_identity(a):
    np.testing.assert_allclose((-(-Tensor(a))).data, a)


@settings(max_examples=40, deadline=None)
@given(arrays(np.float64, (5, 2), elements=FLOATS))
def test_sum_axis_consistency(a):
    t = Tensor(a)
    np.testing.assert_allclose(t.sum().data, t.sum(axis=0).sum().data, rtol=1e-9)


@settings(max_examples=40, deadline=None)
@given(arrays(np.float64, (6,), elements=FLOATS))
def test_logsumexp_bounds(x):
    """max(x) <= logsumexp(x) <= max(x) + log(n)."""
    v = logsumexp(Tensor(x), axis=-1).data
    assert x.max() - 1e-9 <= v <= x.max() + np.log(len(x)) + 1e-9


@settings(max_examples=40, deadline=None)
@given(arrays(np.float64, (8, 2), elements=FLOATS))
def test_segment_sum_total_preserved(x):
    seg = np.array([0, 0, 1, 1, 2, 2, 3, 3])
    out = segment_sum(Tensor(x), seg, 4)
    np.testing.assert_allclose(out.data.sum(axis=0), x.sum(axis=0), rtol=1e-9)


@settings(max_examples=40, deadline=None)
@given(arrays(np.float64, (7,), elements=FLOATS))
def test_segment_softmax_probabilities(logits):
    seg = np.array([0, 0, 0, 1, 1, 2, 2])
    p = segment_softmax(Tensor(logits), seg, 3).data
    assert (p >= 0).all() and (p <= 1 + 1e-12).all()
    sums = np.zeros(3)
    np.add.at(sums, seg, p)
    np.testing.assert_allclose(sums, 1.0, rtol=1e-9)


@settings(max_examples=40, deadline=None)
@given(arrays(np.float64, (5, 3), elements=FLOATS), st.lists(st.integers(0, 4), min_size=1, max_size=8))
def test_gather_rows_matches_numpy(x, idx):
    idx = np.array(idx)
    np.testing.assert_allclose(gather_rows(Tensor(x), idx).data, x[idx])


@settings(max_examples=40, deadline=None)
@given(arrays(np.float64, (12,), elements=FLOATS))
def test_auc_invariant_to_monotone_transform(scores):
    labels = np.arange(12) % 2
    a1 = auc(scores, labels)
    # power-of-two scaling is exact for every finite float, so the rank
    # order (incl. ties) is preserved bit-for-bit
    a2 = auc(scores * 4.0, labels)
    np.testing.assert_allclose(a1, a2, rtol=1e-9)


@settings(max_examples=40, deadline=None)
@given(arrays(np.float64, (10,), elements=st.floats(0.01, 0.99)))
def test_auc_complement_symmetry(scores):
    labels = (np.arange(10) % 3 == 0).astype(int)
    a = auc(scores, labels)
    b = auc(-scores, labels)
    np.testing.assert_allclose(a + b, 1.0, rtol=1e-9)
