"""Tests for the ALPC model, its ablations, and the GeniePath encoder."""
import numpy as np
import pytest

from repro.baselines.common import TrainConfig, bce_with_logits, evaluate_model
from repro.core.alpc import (
    ALPC,
    GeniePathBreadth,
    GeniePathEncoder,
    semantic_anchor_pairs,
    _l2norm,
)
from repro.nn.autograd import Tensor
from repro.nn.graph import EdgeGraph, add_self_loops, symmetrize

from tests.model_fixtures import synthetic_link_dataset


@pytest.fixture(scope="module")
def ds(world):
    return synthetic_link_dataset(world, seed=1)


@pytest.fixture(scope="module")
def fitted_alpc(ds):
    return ALPC(ds.features.shape[1], TrainConfig(epochs=40, seed=0)).fit(ds)


def test_bce_with_logits_matches_reference():
    rng = np.random.default_rng(0)
    logits = rng.normal(size=20) * 3
    y = rng.integers(0, 2, 20).astype(float)
    got = bce_with_logits(Tensor(logits), y).data
    p = 1 / (1 + np.exp(-logits))
    ref = -(y * np.log(p) + (1 - y) * np.log(1 - p)).mean()
    np.testing.assert_allclose(got, ref, rtol=1e-9)


def test_bce_with_logits_extreme_values_stable():
    logits = np.array([1000.0, -1000.0, 0.0])
    y = np.array([1.0, 0.0, 1.0])
    val = bce_with_logits(Tensor(logits), y).data
    assert np.isfinite(val)


def test_geniepath_breadth_shapes():
    rng = np.random.default_rng(1)
    g = add_self_loops(
        symmetrize(EdgeGraph(6, np.array([0, 1, 2]), np.array([1, 2, 3])))
    )
    layer = GeniePathBreadth(8, rng)
    out = layer(Tensor(rng.normal(size=(6, 8))), g)
    assert out.shape == (6, 8)
    assert np.isfinite(out.data).all()


def test_geniepath_encoder_gradients_flow():
    rng = np.random.default_rng(2)
    g = add_self_loops(
        symmetrize(EdgeGraph(5, np.array([0, 1, 2, 3]), np.array([1, 2, 3, 4])))
    )
    enc = GeniePathEncoder(4, 8, 2, rng)
    z = enc(rng.normal(size=(5, 4)), g)
    z.sum().backward()
    grads = [p.grad for p in enc.parameters()]
    assert all(g is not None for g in grads)
    assert any(np.abs(g).max() > 0 for g in grads)


def test_l2norm_unit_rows():
    z = Tensor(np.random.default_rng(3).normal(size=(4, 6)) * 10)
    zn = _l2norm(z)
    np.testing.assert_allclose(np.linalg.norm(zn.data, axis=1), 1.0, rtol=1e-6)


def test_semantic_anchor_pairs_are_graph_edges(ds):
    a_src, a_dst = semantic_anchor_pairs(ds, tau_cl=0.7)
    edge_set = set(zip(ds.graph.src.tolist(), ds.graph.dst.tolist()))
    for s, d in zip(a_src[:200], a_dst[:200]):
        assert (int(s), int(d)) in edge_set


def test_alpc_learns(ds, fitted_alpc):
    res = fitted_alpc.predict(ds)
    ev = evaluate_model(ds, res.test_logits, res.acc_scores)
    assert ev.auc > 0.8
    assert ev.acc > 0.7
    assert res.eps is not None and len(res.eps) == len(ds.test_src)


def test_alpc_threshold_is_adaptive(ds, fitted_alpc):
    """Different source entities must get different learned thresholds."""
    res = fitted_alpc.predict(ds)
    assert np.std(res.eps) > 1e-4


def test_alpc_decide_pairs_consistent_with_predict(ds, fitted_alpc):
    res = fitted_alpc.predict(ds)
    dec = fitted_alpc.decide_pairs(ds.test_src, ds.test_dst)
    np.testing.assert_array_equal(dec, res.decision)


def test_alpc_embeddings_shape(ds, fitted_alpc):
    z = fitted_alpc.embeddings()
    assert z.shape == (ds.n, 32)
    assert np.isfinite(z).all()


def test_alpc_ablations_run(ds):
    cfg = TrainConfig(epochs=15, seed=0)
    for alpha, beta in [(0.0, 1.0), (1.0, 0.0), (0.0, 0.0)]:
        m = ALPC(ds.features.shape[1], cfg, alpha=alpha, beta=beta).fit(ds)
        res = m.predict(ds)
        assert np.isfinite(res.test_logits).all()
        if alpha == 0:
            assert res.eps is None  # fixed 0.5 threshold
        ev = evaluate_model(ds, res.test_logits, res.acc_scores)
        assert ev.auc > 0.6


def test_alpc_deterministic(ds):
    cfg = TrainConfig(epochs=10, seed=5)
    a = ALPC(ds.features.shape[1], cfg).fit(ds).predict(ds).test_logits
    b = ALPC(ds.features.shape[1], cfg).fit(ds).predict(ds).test_logits
    np.testing.assert_allclose(a, b)
