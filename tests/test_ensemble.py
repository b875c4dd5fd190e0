"""Tests for the Stage-III ensemble model."""
import numpy as np
import pytest

from repro.baselines.common import TrainConfig
from repro.eval.metrics import auc
from repro.core.alpc import ALPC
from repro.core.ensemble import (
    EnsembleModel,
    ensemble_decide,
    stack_weekly,
    train_ensemble,
)

from tests.model_fixtures import synthetic_link_dataset


@pytest.fixture(scope="module")
def ds(world):
    return synthetic_link_dataset(world, seed=4)


@pytest.fixture(scope="module")
def weekly(ds):
    """Three 'weekly' ALPC snapshots with different seeds (stand-ins for
    models trained on drifted weekly data)."""
    out = []
    for wk in range(3):
        m = ALPC(ds.features.shape[1], TrainConfig(epochs=20, seed=wk)).fit(ds)
        out.append(m.embeddings())
    return out


def test_stack_weekly_shapes_and_norm(weekly):
    x = stack_weekly(weekly)
    assert x.shape == (weekly[0].shape[0], 3, weekly[0].shape[1])
    norms = np.linalg.norm(x, axis=2)
    assert (norms < 1.0 + 1e-9).all()


def test_train_ensemble_learns(ds, weekly):
    model, h_e = train_ensemble(weekly, ds, TrainConfig(epochs=40, seed=0))
    assert h_e.shape == (ds.n, 3 * weekly[0].shape[1])
    assert np.isfinite(h_e).all()
    from repro.nn.autograd import Tensor

    h = model.encode(stack_weekly(weekly))
    logits = model.score(h, ds.test_src, ds.test_dst).data
    assert auc(logits, ds.test_y) > 0.8


def test_ensemble_decide_mask(ds, weekly):
    model, _ = train_ensemble(weekly, ds, TrainConfig(epochs=30, seed=0))
    pos = ds.train_y == 1
    dec = ensemble_decide(model, weekly, ds.train_src[pos][:200], ds.train_dst[pos][:200])
    assert dec.dtype == bool
    assert dec.mean() > 0.5  # keeps most true training relations


def test_ensemble_single_snapshot(ds, weekly):
    """Week 0: ensemble over one snapshot must still work."""
    model, h_e = train_ensemble(weekly[:1], ds, TrainConfig(epochs=20, seed=0))
    assert h_e.shape == (ds.n, weekly[0].shape[1])


def test_ensemble_deterministic(ds, weekly):
    cfg = TrainConfig(epochs=10, seed=9)
    _, h1 = train_ensemble(weekly, ds, cfg)
    _, h2 = train_ensemble(weekly, ds, cfg)
    np.testing.assert_allclose(h1, h2)
