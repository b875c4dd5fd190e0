"""Tests for all Table-II baseline models via the registry."""
import numpy as np
import pytest

from repro.baselines import METHODS, TrainConfig, run_method
from repro.baselines.seal import _build_batch
from repro.nn.graph import adjacency_sets

from tests.model_fixtures import synthetic_link_dataset


@pytest.fixture(scope="module")
def ds(world):
    return synthetic_link_dataset(world, seed=2)


CFG = TrainConfig(epochs=25, seed=0)


@pytest.mark.parametrize("name", METHODS)
def test_method_beats_chance(ds, name):
    res = run_method(name, ds, CFG)
    assert np.isfinite(res.auc)
    assert res.auc > 0.65, f"{name} AUC={res.auc}"
    assert 0.0 <= res.acc <= 1.0


def test_unknown_method_raises(ds):
    with pytest.raises(KeyError):
        run_method("nope", ds, CFG)


def test_gnn_methods_beat_embedding_methods_with_features(world):
    """On a dataset where structure is noisy but features are informative,
    feature-using GNNs must beat structure-only embeddings (the Table-II
    mechanism)."""
    ds = synthetic_link_dataset(world, seed=3)
    auc_dw = run_method("DeepWalk", ds, CFG).auc
    auc_alpc = run_method("ALPC", ds, TrainConfig(epochs=50, seed=0)).auc
    assert auc_alpc > auc_dw - 0.05  # ALPC at least competitive at tiny scale


def test_seal_build_batch_removes_target_link(ds):
    adj = adjacency_sets(ds.graph)
    pos = ds.train_y == 1
    src, dst = ds.train_src[pos][:4], ds.train_dst[pos][:4]
    g, feats, labels, seg = _build_batch(adj, ds.features, src, dst)
    assert g.n == len(feats) == len(labels) == len(seg)
    assert set(np.unique(seg)) == set(range(4))
    # DRNL: exactly two label-1 nodes (the endpoints) per subgraph
    for s in range(4):
        assert (labels[seg == s] == 1).sum() == 2
    # the target link must not appear as an edge inside its own subgraph
    for s in range(4):
        nodes_s = np.where(seg == s)[0]
        lab1 = nodes_s[labels[nodes_s] == 1]
        pairs = set(zip(g.src.tolist(), g.dst.tolist()))
        assert (int(lab1[0]), int(lab1[1])) not in pairs
        assert (int(lab1[1]), int(lab1[0])) not in pairs


def test_evaluate_model_budget(ds):
    """The fixed relation budget keeps exactly KEEP_BUDGET of the pool."""
    from repro.baselines import evaluate_model
    from repro.baselines.common import KEEP_BUDGET

    scores = np.random.default_rng(0).normal(size=len(ds.acc_src))
    res = evaluate_model(ds, np.full(len(ds.test_src), -10.0), scores)
    assert res.n_predicted_pos == int(KEEP_BUDGET * len(ds.acc_src))
    assert 0.0 <= res.acc <= 1.0
